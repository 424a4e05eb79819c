"""Figures 3, 4, 5 — impact of the number of partitions (paper §4).

Setting (paper): memory fixed at 128 MB; build = probe inputs sweep
128 MB … 8192 MB; x-axis sweeps the number of partitions. Simulated at
frame granularity (1 frame = 1 MB) by :mod:`repro.core.sim_partitions`.

* Fig 3 — total spilled data, same partition count in every round;
* Fig 4 — total spilled data, Eq. 2-accurate counts after round 1;
* Fig 5 — build data still in memory after the first round's build.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd

from ..core.sim_partitions import in_memory_after_first_round, simulate_join

MEMORY_MB = 128
INPUT_SIZES_MB = (128, 256, 512, 1024, 2048, 4096, 8192)
PARTITION_COUNTS = (2, 3, 4, 6, 8, 12, 16, 20, 24, 32, 48, 64, 96, 128)


def fig3(memory_mb: int = MEMORY_MB,
         input_sizes_mb: Sequence[int] = INPUT_SIZES_MB,
         partition_counts: Sequence[int] = PARTITION_COUNTS) -> pd.DataFrame:
    """Total spilling (MB) with the same partition count in all rounds."""
    rows = []
    for size in input_sizes_mb:
        for p in partition_counts:
            if p > memory_mb:
                continue
            b, pr = simulate_join(size, memory_mb, p, accurate_later_rounds=False)
            rows.append({"input_mb": size, "partitions": p,
                         "build_spill_mb": b, "probe_spill_mb": pr,
                         "total_spill_mb": b + pr})
    return pd.DataFrame(rows)


def fig4(memory_mb: int = MEMORY_MB,
         input_sizes_mb: Sequence[int] = INPUT_SIZES_MB,
         partition_counts: Sequence[int] = PARTITION_COUNTS) -> pd.DataFrame:
    """Total spilling (MB) when later rounds use Eq. 2-accurate counts."""
    rows = []
    for size in input_sizes_mb:
        for p in partition_counts:
            if p > memory_mb:
                continue
            b, pr = simulate_join(size, memory_mb, p, accurate_later_rounds=True)
            rows.append({"input_mb": size, "partitions": p,
                         "build_spill_mb": b, "probe_spill_mb": pr,
                         "total_spill_mb": b + pr})
    return pd.DataFrame(rows)


def fig5(memory_mb: int = MEMORY_MB,
         input_sizes_mb: Sequence[int] = INPUT_SIZES_MB,
         partition_counts: Sequence[int] = PARTITION_COUNTS) -> pd.DataFrame:
    """Build data (MB) remaining in memory after round 1's build phase."""
    rows = []
    for size in input_sizes_mb:
        for p in partition_counts:
            if p > memory_mb:
                continue
            rows.append({"input_mb": size, "partitions": p,
                         "in_memory_mb": in_memory_after_first_round(size, memory_mb, p),
                         "memory_utilization":
                             in_memory_after_first_round(size, memory_mb, p) / memory_mb})
    return pd.DataFrame(rows)


def lower_bound_summary(df3: pd.DataFrame, at_partitions: int = 20) -> pd.DataFrame:
    """§4 claim check: spilling at P=2 vs P=20 vs the best P per input size."""
    rows = []
    for size, grp in df3.groupby("input_mb"):
        by_p = grp.set_index("partitions")["total_spill_mb"]
        rows.append({
            "input_mb": size,
            "spill_at_p2": by_p.get(2),
            "spill_at_p20": by_p.get(at_partitions),
            "spill_best": by_p.min(),
            "p2_over_p20": (by_p.get(2) / by_p.get(at_partitions))
            if by_p.get(at_partitions) else float("nan"),
        })
    return pd.DataFrame(rows)
