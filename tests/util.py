"""Shared helpers for the record-level tests."""
from __future__ import annotations

import random
from typing import List, Tuple

Record = Tuple[int, int, object]


def make_records(n: int, *, key_range: int = 1000, lo: int = 700, hi: int = 1500,
                 seed: int = 0, tag: str = "r") -> List[Record]:
    """Deterministic (key, size, payload) records with uniform keys."""
    rng = random.Random(seed)
    return [(rng.randrange(1, key_range + 1), rng.randrange(lo, hi + 1), f"{tag}{i}")
            for i in range(n)]


def make_skewed_records(n: int, *, hot_keys: int = 5, seed: int = 0,
                        lo: int = 700, hi: int = 1500, tag: str = "s") -> List[Record]:
    """90% of records share ``hot_keys`` keys; the rest are unique-ish."""
    rng = random.Random(seed)
    out = []
    for i in range(n):
        if rng.random() < 0.9:
            k = rng.randrange(1, hot_keys + 1)
        else:
            k = rng.randrange(hot_keys + 1, hot_keys + n)
        out.append((k, rng.randrange(lo, hi + 1), f"{tag}{i}"))
    return out
