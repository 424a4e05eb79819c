#!/usr/bin/env python
"""Reproduce Figures 3/4/5: impact of the number of partitions (paper §4).

Run: ``python jobs/fig345_num_partitions.py`` (no Spark needed).
"""
from repro.experiments.fig345 import fig3, fig4, fig5, lower_bound_summary
from repro.experiments.runner import show


def main() -> None:
    df3 = fig3()
    show("Fig 3 — total spilling (MB), same #partitions in every round",
         df3.pivot(index="partitions", columns="input_mb", values="total_spill_mb"))
    show("Fig 3 summary — spilling at P=2 vs P=20 vs best", lower_bound_summary(df3))
    df4 = fig4()
    show("Fig 4 — total spilling (MB), Eq.2-accurate later rounds",
         df4.pivot(index="partitions", columns="input_mb", values="total_spill_mb"))
    df5 = fig5()
    show("Fig 5 — memory utilization after round-1 build",
         df5.pivot(index="partitions", columns="input_mb",
                   values="memory_utilization").round(3))


if __name__ == "__main__":
    main()
