"""Partition-insertion algorithms (paper §5).

Each policy answers: *given a partition's in-memory frame array and an
incoming record size, which frame should hold the record?* Returning
``None`` means "no searched frame fits — allocate a new frame".

All searches run over the partition's frame array with index 0 the
oldest frame and index −1 the newest, matching the paper's "search starts
from the newest allocated frame and proceeds towards the oldest".

Every policy counts the frames it inspects (``frames_searched``) because
the paper's efficiency metric is exactly that count (Figs 6–8) and the
CPU term of the storage model charges per inspected frame.
"""
from __future__ import annotations

import math
import random
from typing import List, Optional

from ..frames.frame import Frame


class InsertionPolicy:
    """Base class: bookkeeping shared by all §5 algorithms."""

    name = "base"

    def __init__(self) -> None:
        self.frames_searched = 0
        self.calls = 0

    def reset_stats(self) -> None:
        self.frames_searched = 0
        self.calls = 0

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        """Index of a frame that fits ``size`` bytes, or None to allocate."""
        raise NotImplementedError

    def notify_inserted(self, index: int, size: int, appended: bool) -> None:
        """Hook for stateful policies (Next-Fit); default is stateless."""

    def notify_spilled(self) -> None:
        """Hook: the partition's frame array was truncated by a spill."""

    def __repr__(self) -> str:  # pragma: no cover - debug aid
        return f"{type(self).__name__}()"


class AppendN(InsertionPolicy):
    """Append(n): check only the newest ``n`` frames, newest→oldest."""

    def __init__(self, n: int = 8) -> None:
        super().__init__()
        if n < 1:
            raise ValueError("Append(n) needs n >= 1")
        self.n = n
        self.name = f"append({n})"

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        lo = max(0, len(frames) - self.n)
        for i in range(len(frames) - 1, lo - 1, -1):
            self.frames_searched += 1
            if frames[i].fits(size):
                return i
        return None


class FirstFit(InsertionPolicy):
    """First-Fit: scan every frame newest→oldest, stop at the first fit."""

    name = "first-fit"

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        for i in range(len(frames) - 1, -1, -1):
            self.frames_searched += 1
            if frames[i].fits(size):
                return i
        return None


class FirstFitPct(InsertionPolicy):
    """First-Fit(%p): like First-Fit but stop after ⌈p·|frames|⌉ frames."""

    def __init__(self, pct: float = 0.10) -> None:
        super().__init__()
        if not 0 < pct <= 1:
            raise ValueError("First-Fit(%p) needs 0 < p <= 1")
        self.pct = pct
        self.name = f"first-fit({int(pct * 100)}%)"

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        limit = math.ceil(self.pct * len(frames))
        lo = max(0, len(frames) - limit)
        for i in range(len(frames) - 1, lo - 1, -1):
            self.frames_searched += 1
            if frames[i].fits(size):
                return i
        return None


class BestFit(InsertionPolicy):
    """Best-Fit: scan *all* frames, pick the tightest fit."""

    name = "best-fit"

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        best_i: Optional[int] = None
        best_free = None
        for i in range(len(frames) - 1, -1, -1):
            self.frames_searched += 1
            free = frames[i].free
            if free >= size and (best_free is None or free < best_free):
                best_i, best_free = i, free
                if free == size:  # cannot do better than an exact fit
                    break
        return best_i


class NextFit(InsertionPolicy):
    """Next-Fit: resume the search where the previous record landed.

    Per the paper: the first record searches from the newest frame. After
    that, the search starts at the previous record's frame; if the new
    record is *larger* than the previous one the search moves toward
    newer frames, if *smaller* it tries older frames first and falls back
    to newer frames on failure.
    """

    name = "next-fit"

    def __init__(self) -> None:
        super().__init__()
        self._last_index: Optional[int] = None
        self._last_size: Optional[int] = None

    def reset_stats(self) -> None:
        super().reset_stats()
        self._last_index = None
        self._last_size = None

    def notify_inserted(self, index: int, size: int, appended: bool) -> None:
        self._last_index = index
        self._last_size = size

    def notify_spilled(self) -> None:
        # Frame array was truncated — stored index is no longer valid.
        self._last_index = None
        self._last_size = None

    def _scan(self, frames: List[Frame], size: int, start: int, step: int) -> Optional[int]:
        i = start
        while 0 <= i < len(frames):
            self.frames_searched += 1
            if frames[i].fits(size):
                return i
            i += step
        return None

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        if not frames:
            return None
        if self._last_index is None or self._last_index >= len(frames):
            # first record (or state invalidated): newest → oldest
            return self._scan(frames, size, len(frames) - 1, -1)
        start = self._last_index
        if self._last_size is not None and size > self._last_size:
            return self._scan(frames, size, start, +1)
        hit = self._scan(frames, size, start, -1)
        if hit is not None:
            return hit
        if start + 1 < len(frames):
            return self._scan(frames, size, start + 1, +1)
        return None


class RandomPct(InsertionPolicy):
    """Random(%p): probe up to ⌈p·|frames|⌉ frames chosen at random."""

    def __init__(self, pct: float = 0.10, seed: int = 0) -> None:
        super().__init__()
        if not 0 < pct <= 1:
            raise ValueError("Random(%p) needs 0 < p <= 1")
        self.pct = pct
        self._rng = random.Random(seed)
        self.name = f"random({int(pct * 100)}%)"

    def find_frame(self, frames: List[Frame], size: int) -> Optional[int]:
        self.calls += 1
        if not frames:
            return None
        k = min(len(frames), math.ceil(self.pct * len(frames)))
        for i in self._rng.sample(range(len(frames)), k):
            self.frames_searched += 1
            if frames[i].fits(size):
                return i
        return None


def default_policies() -> dict:
    """The six §5.3 contenders at the paper's chosen parameter values."""
    return {
        "append(8)": AppendN(8),
        "first-fit": FirstFit(),
        "first-fit(10%)": FirstFitPct(0.10),
        "best-fit": BestFit(),
        "next-fit": NextFit(),
        "random(10%)": RandomPct(0.10),
    }


def make_policy(name: str) -> InsertionPolicy:
    """Construct a policy from its canonical name (fresh stats)."""
    p = default_policies().get(name)
    if p is None:
        raise KeyError(f"unknown insertion policy {name!r}; "
                       f"choose from {sorted(default_policies())}")
    return p
