#!/usr/bin/env python
"""Reproduce Figure 13: the 13 victim policies vs join-key skew (§7.1.1).

Run: ``python jobs/fig13_victim_skew.py [memory_frames]``.
"""
import sys

from repro.experiments.fig13 import fig13a, fig13b
from repro.experiments.runner import show


def main() -> None:
    mem = int(sys.argv[1]) if len(sys.argv) > 1 else 256
    da = fig13a(memory_frames=mem)
    show("Fig 13-a — no skew (spill/ideal)",
         da.pivot(index="ratio", columns="policy", values="spill_over_ideal").round(3))
    db = fig13b(memory_frames=mem)
    show("Fig 13-b — skewed build keys (spill/ideal)",
         db.pivot(index="ratio", columns="policy", values="spill_over_ideal").round(3))


if __name__ == "__main__":
    main()
