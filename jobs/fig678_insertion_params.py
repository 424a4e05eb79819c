#!/usr/bin/env python
"""Reproduce Figures 6/7/8: insertion-policy parameter tuning (paper §5.1).

Run: ``python jobs/fig678_insertion_params.py [n_records]``.
"""
import sys

from repro.experiments.fig678 import fig6_append, fig7_first_fit, fig8_random
from repro.experiments.runner import show


def main() -> None:
    n = int(sys.argv[1]) if len(sys.argv) > 1 else 5000
    show("Fig 6 — Append(k) sweep (1-Large Coexist)", fig6_append(n=n))
    show("Fig 7 — First-Fit(%p) sweep (1-Large Coexist)", fig7_first_fit(n=n))
    show("Fig 8 — Random(%p) sweep (1-Large Coexist)", fig8_random(n=n))


if __name__ == "__main__":
    main()
