#!/usr/bin/env python
"""Reproduce Figure 9: insertion algorithms, all-small records (§5.3.1).

Run: ``python jobs/fig9_insertion_small.py [n_records]``.
"""
import sys

from repro.experiments.fig9 import fig9
from repro.experiments.runner import show


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 30_000
    show("Fig 9 — insertion algorithms on All Small Records", fig9(n=n).round(4))


if __name__ == "__main__":
    main()
