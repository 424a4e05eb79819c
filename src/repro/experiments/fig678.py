"""Figures 6, 7, 8 — tuning Append(k), First-Fit(%p), Random(%p) (§5.1).

Setting (paper): the 1-Large Record Coexist dataset with 90%/50%/10%
large records; enough memory that nothing spills; metrics are the average
frame fullness and the total number of frames searched. The paper picks
Append(8), First-Fit(10%) and Random(10%) from these sweeps.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd

from ..core.join import DynamicHybridHashJoin, HHJConfig
from ..insertion.policies import AppendN, FirstFitPct, RandomPct
from ..synth_data import wisconsin_record_stream

FRAME_BYTES = 32 * 1024
PCTS_LARGE = (0.9, 0.5, 0.1)


def _run_insertion(records, factory, frame_bytes: int = FRAME_BYTES,
                   num_partitions: int = 20):
    """Build phase with ample memory; returns (fullness, frames_searched)."""
    total_bytes = sum(r[1] for r in records)
    ample = 2 * (total_bytes // frame_bytes + 1) + num_partitions + 8
    cfg = HHJConfig(memory_frames=int(ample), frame_bytes=frame_bytes,
                    num_partitions=num_partitions, insertion=factory)
    op = DynamicHybridHashJoin(cfg)
    parts = op.build_only(records)
    assert op.stats.partitions_spilled == 0, "sweep must not spill"
    frames = [f for q in parts for f in q.frames]
    fullness = (sum(f.used for f in frames)
                / (len(frames) * frame_bytes)) if frames else 0.0
    return fullness, op.stats.frames_searched


def fig6_append(ks: Sequence[int] = tuple(range(1, 11)),
                pcts_large: Sequence[float] = PCTS_LARGE,
                n: int = 5000, seed: int = 0) -> pd.DataFrame:
    """Fig 6: frame fullness and searched frames per Append(k)."""
    rows = []
    for pct in pcts_large:
        recs = wisconsin_record_stream(n=n, dataset="1-large", pct_large=pct,
                                       seed=seed)
        for k in ks:
            fullness, searched = _run_insertion(recs, lambda pid, k=k: AppendN(k))
            rows.append({"pct_large": pct, "param": k,
                         "avg_frame_fullness": fullness,
                         "frames_searched": searched})
    return pd.DataFrame(rows)


def fig7_first_fit(params: Sequence[float] = (0.05, 0.10, 0.25, 0.50, 1.00),
                   pcts_large: Sequence[float] = PCTS_LARGE,
                   n: int = 5000, seed: int = 0) -> pd.DataFrame:
    """Fig 7: frame fullness and searched frames per First-Fit(%p)."""
    rows = []
    for pct in pcts_large:
        recs = wisconsin_record_stream(n=n, dataset="1-large", pct_large=pct,
                                       seed=seed)
        for p in params:
            fullness, searched = _run_insertion(recs, lambda pid, p=p: FirstFitPct(p))
            rows.append({"pct_large": pct, "param": p,
                         "avg_frame_fullness": fullness,
                         "frames_searched": searched})
    return pd.DataFrame(rows)


def fig8_random(params: Sequence[float] = (0.05, 0.10, 0.25, 0.50, 1.00),
                pcts_large: Sequence[float] = PCTS_LARGE,
                n: int = 5000, seed: int = 0) -> pd.DataFrame:
    """Fig 8: frame fullness and searched frames per Random(%p)."""
    rows = []
    for pct in pcts_large:
        recs = wisconsin_record_stream(n=n, dataset="1-large", pct_large=pct,
                                       seed=seed)
        for p in params:
            fullness, searched = _run_insertion(
                recs, lambda pid, p=p: RandomPct(p, seed=1000 + pid))
            rows.append({"pct_large": pct, "param": p,
                         "avg_frame_fullness": fullness,
                         "frames_searched": searched})
    return pd.DataFrame(rows)
