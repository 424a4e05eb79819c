"""Shared helpers for the experiment harnesses.

Every ``figNN.py``/``table1.py`` module returns a ``pandas.DataFrame``
whose rows are exactly the numbers behind the paper's table/figure, and
each ``jobs/`` entrypoint prints it with :func:`show` so the output can
be diffed against the numbers recorded in EXPERIMENTS.md.
"""
from __future__ import annotations

import sys

import pandas as pd


def show(title: str, df: pd.DataFrame, file=None) -> None:
    """Print one experiment's result table in a stable, diffable format."""
    file = file or sys.stdout
    print(f"\n=== {title} ===", file=file)
    with pd.option_context("display.width", 200, "display.max_columns", 50,
                           "display.max_rows", 500):
        print(df.to_string(index=False), file=file)


def records_for_ratio(ratio: float, memory_frames: int, frame_bytes: int,
                      avg_record_bytes: float) -> int:
    """How many records make the build input ``ratio`` × the memory size."""
    target_bytes = ratio * memory_frames * frame_bytes
    return max(1, int(round(target_bytes / avg_record_bytes)))


def avg_record_bytes(dataset: str, pct_large: float) -> float:
    """Expected record size of a Table 2 dataset configuration."""
    from ..synth_data import WISCONSIN_SIZES

    spec = WISCONSIN_SIZES[dataset]
    lo_s, hi_s = spec["small"]
    small = (lo_s + hi_s) / 2
    if spec["large"] is None or pct_large <= 0:
        return small
    lo_l, hi_l = spec["large"]
    large = (lo_l + hi_l) / 2
    return pct_large * large + (1 - pct_large) * small
