#!/usr/bin/env python
"""Reproduce Figures 14–17: victim policies, variable sizes ± skew (§7.1.2–3).

Run: ``python jobs/fig14_17_victim_variable.py [memory_frames]``.
"""
import sys

from repro.experiments.fig14_17 import fig14, fig15, fig16, fig17
from repro.experiments.runner import show


def main() -> None:
    mem = int(sys.argv[1]) if len(sys.argv) > 1 else 256
    for name, fn in (("Fig 14 — 1-Large, unique keys", fig14),
                     ("Fig 15 — 3-Large, unique keys", fig15),
                     ("Fig 16 — 1-Large, skewed keys", fig16),
                     ("Fig 17 — 3-Large, skewed keys", fig17)):
        df = fn(memory_frames=mem)
        for pct, grp in df.groupby("pct_large"):
            show(f"{name}, {int(pct*100)}% large (spill/ideal)",
                 grp.pivot(index="ratio", columns="policy",
                           values="spill_over_ideal").round(3))


if __name__ == "__main__":
    main()
