#!/usr/bin/env python
"""Reproduce Figures 10/11: insertion algorithms, variable-size records.

Run: ``python jobs/fig1011_insertion_variable.py [target_mb]``.
"""
import sys

from repro.experiments.fig1011 import fig10, fig11
from repro.experiments.runner import show


def main() -> None:
    mb = int(sys.argv[1]) if len(sys.argv) > 1 else 32
    target = mb << 20
    show("Fig 10 — 3-Large Record Coexist", fig10(n_bytes_target=target).round(4))
    show("Fig 11 — 1-Large Record Coexist", fig11(n_bytes_target=target).round(4))


if __name__ == "__main__":
    main()
