"""Global frame budget for one join operator.

The paper's operator receives a fixed number of memory frames |M| and
must fit *all* partitions' in-memory frames — including spilled
partitions' output buffers — inside it. ``BufferPool`` enforces that
budget; allocation beyond it must first be funded by spilling.
"""
from __future__ import annotations


class BufferPool:
    """Counts allocated frames against a hard budget."""

    def __init__(self, budget_frames: int) -> None:
        if budget_frames < 3:
            # 2 partitions × 1 frame + 1 input frame is the absolute floor.
            raise ValueError(f"join needs at least 3 frames of memory, got {budget_frames}")
        self.budget = budget_frames
        self.allocated = 0

    @property
    def free(self) -> int:
        return self.budget - self.allocated

    def can_allocate(self, n: int = 1) -> bool:
        return self.allocated + n <= self.budget

    def allocate(self, n: int = 1) -> None:
        if not self.can_allocate(n):
            raise MemoryError(
                f"buffer pool over budget: {self.allocated}+{n} > {self.budget}"
            )
        self.allocated += n

    def release(self, n: int = 1) -> None:
        if n > self.allocated:
            raise ValueError(f"releasing {n} frames but only {self.allocated} allocated")
        self.allocated -= n
