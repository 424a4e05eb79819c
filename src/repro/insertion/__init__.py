"""Partition-insertion algorithms (paper §5)."""
from .policies import (
    AppendN,
    BestFit,
    FirstFit,
    FirstFitPct,
    InsertionPolicy,
    NextFit,
    RandomPct,
    default_policies,
    make_policy,
)

__all__ = [
    "AppendN",
    "BestFit",
    "FirstFit",
    "FirstFitPct",
    "InsertionPolicy",
    "NextFit",
    "RandomPct",
    "default_policies",
    "make_policy",
]
