"""Figure 9 — insertion algorithms with small, similar-size records (§5.3.1).

Setting (paper): build = probe = 1 GB of All Small Records (700–1500 B)
in 32 KB frames; enough memory that nothing spills; metrics are the
average frame fullness and the join response time on HDD / SSD / EBS.
With no spilling the I/O term is identical for every algorithm, so the
response-time differences come from the per-record search CPU cost —
exactly the paper's point (Best-Fit worst, Append(8) best).
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd

from ..core.join import DynamicHybridHashJoin, HHJConfig
from ..insertion.policies import default_policies
from ..storage.device import DEVICES, response_time
from ..synth_data import wisconsin_record_stream

FRAME_BYTES = 32 * 1024
ALGORITHMS = tuple(default_policies().keys())


def fig9(n: int = 30_000, frame_bytes: int = FRAME_BYTES,
         algorithms: Sequence[str] = ALGORITHMS,
         seed: int = 0) -> pd.DataFrame:
    """Fullness + modeled response time per insertion algorithm."""
    build = wisconsin_record_stream(n=n, dataset="all-small", seed=seed)
    probe = wisconsin_record_stream(n=n, dataset="all-small", seed=seed + 100)
    input_bytes = sum(r[1] for r in build) + sum(r[1] for r in probe)
    total_frames = sum(r[1] for r in build) // frame_bytes + 1
    ample = int(2 * total_frames + 64)
    rows = []
    for alg in algorithms:
        cfg = HHJConfig(memory_frames=ample, frame_bytes=frame_bytes,
                        num_partitions=20, insertion=alg)
        op = DynamicHybridHashJoin(cfg)
        # drain the join; output pairs themselves are not the metric
        n_out = sum(1 for _ in op.run(build, probe))
        # fullness comes from a build-only rerun (the full run tears its
        # partitions down while streaming)
        fullness_op = DynamicHybridHashJoin(cfg)
        parts = fullness_op.build_only(list(build))
        frames = [f for q in parts for f in q.frames]
        fullness = sum(f.used for f in frames) / (len(frames) * frame_bytes)
        row = {"algorithm": alg, "avg_frame_fullness": fullness,
               "frames_searched": op.stats.frames_searched,
               "out_pairs": n_out}
        for dev_name, dev in DEVICES.items():
            row[f"time_{dev_name}_s"] = response_time(op.stats, dev, input_bytes,
                                                      frame_bytes)
        rows.append(row)
    return pd.DataFrame(rows)
