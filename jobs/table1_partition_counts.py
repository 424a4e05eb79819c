#!/usr/bin/env python
"""Reproduce Table 1: partition counts from Shapiro's Eq. 2 (paper §4).

Run: ``python jobs/table1_partition_counts.py`` (no Spark needed).
"""
from repro.experiments.runner import show
from repro.experiments.table1 import table1


def main() -> None:
    df = table1()
    show("Table 1 — number of partitions by Eq. 2 (M=128 frames, F=1.3)", df)
    assert bool(df["match"].all()), "Table 1 mismatch"
    print("\nAll 8 rows match the paper exactly.")


if __name__ == "__main__":
    main()
