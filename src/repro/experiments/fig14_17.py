"""Figures 14–17 — victim policies, variable record sizes ± skew (§7.1.2–3).

* Fig 14: 1-Large Record Coexist, unique keys, %large ∈ {10, 50, 90};
* Fig 15: 3-Large Records Coexist, unique keys, same sweep;
* Fig 16: 1-Large + Normal-skewed build keys;
* Fig 17: 3-Large + Normal-skewed build keys.

All reuse :func:`repro.experiments.fig13.victim_experiment`; the metric
is build-phase spill over ideal spill, plus the spilled-partition count
and the write-op mix the paper discusses qualitatively.
"""
from __future__ import annotations

from typing import Sequence

import pandas as pd

from .fig13 import victim_experiment

PCTS_LARGE = (0.1, 0.5, 0.9)


def _sweep(dataset: str, skew: bool, pcts_large: Sequence[float] = PCTS_LARGE,
           **kw) -> pd.DataFrame:
    return pd.concat(
        [victim_experiment(dataset, pct, skew, **kw) for pct in pcts_large],
        ignore_index=True,
    )


def fig14(**kw) -> pd.DataFrame:
    """1-Large Record Coexist, unique keys (paper Fig 14 a/b/c)."""
    return _sweep("1-large", skew=False, **kw)


def fig15(**kw) -> pd.DataFrame:
    """3-Large Records Coexist, unique keys (paper Fig 15 a/b/c)."""
    return _sweep("3-large", skew=False, **kw)


def fig16(**kw) -> pd.DataFrame:
    """1-Large + skewed build keys (paper Fig 16 a/b/c)."""
    return _sweep("1-large", skew=True, **kw)


def fig17(**kw) -> pd.DataFrame:
    """3-Large + skewed build keys (paper Fig 17 a/b/c)."""
    return _sweep("3-large", skew=True, **kw)
