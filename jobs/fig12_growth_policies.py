#!/usr/bin/env python
"""Reproduce Figure 12: G-S vs NG-NS growth policies ± fs cache (§6.2).

Run: ``python jobs/fig12_growth_policies.py [memory_frames]``.
"""
import sys

from repro.experiments.fig12 import fig12
from repro.experiments.runner import show


def main() -> None:
    mem = int(sys.argv[1]) if len(sys.argv) > 1 else 128
    df = fig12(memory_frames=mem)
    show("Fig 12 — growth policies for spilled partitions", df.round(3))


if __name__ == "__main__":
    main()
