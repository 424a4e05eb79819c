"""A join partition: an array of in-memory frames plus spill state.

Mirrors the paper's Fig. 2 structure: each partition owns an ordered
array of frames (oldest first, newest last); when the partition spills it
gains a spill file and — under NG-NS — is reduced to a single output
buffer frame.
"""
from __future__ import annotations

from typing import Any, Callable, List, Optional

from .frame import Frame
from .spillfile import MemorySpillFile


class Partition:
    """One build- or probe-side partition of the Dynamic HHJ operator."""

    def __init__(self, pid: int, frame_bytes: int,
                 spill_file_factory: Callable[[], Any] = MemorySpillFile) -> None:
        self.pid = pid
        self.frame_bytes = frame_bytes
        self.frames: List[Frame] = []
        self.spilled = False
        self.spill_file: Optional[Any] = None
        self._spill_file_factory = spill_file_factory
        # lifetime counters (in-memory state is derivable from frames)
        self.records_spilled = 0
        self.bytes_spilled = 0

    # -- in-memory state -------------------------------------------------
    @property
    def num_frames(self) -> int:
        return len(self.frames)

    @property
    def in_memory_bytes(self) -> int:
        return sum(f.used for f in self.frames)

    @property
    def in_memory_records(self) -> int:
        return sum(len(f) for f in self.frames)

    @property
    def fragmentation_bytes(self) -> int:
        """Total free space inside allocated frames (paper's Least-Fragmentation metric)."""
        return sum(f.free for f in self.frames)

    @property
    def total_records(self) -> int:
        """Records routed to this partition so far (memory + spilled)."""
        return self.in_memory_records + self.records_spilled

    @property
    def total_bytes(self) -> int:
        return self.in_memory_bytes + self.bytes_spilled

    def avg_frame_fullness(self) -> float:
        """Mean fullness of this partition's allocated in-memory frames."""
        if not self.frames:
            return 0.0
        return sum(f.fullness for f in self.frames) / len(self.frames)

    # -- frame management ------------------------------------------------
    def new_frame(self) -> Frame:
        """Append a freshly allocated frame (caller must hold a pool grant)."""
        f = Frame(self.frame_bytes)
        self.frames.append(f)
        return f

    def ensure_spill_file(self) -> Any:
        if self.spill_file is None:
            self.spill_file = self._spill_file_factory()
        return self.spill_file

    def flush_frames(self, frames: List[Frame]) -> int:
        """Write ``frames`` to the spill file, one spill-file frame each.

        Returns the number of bytes moved. Does **not** touch
        ``self.frames`` — the caller decides which frames leave memory
        (growth-policy specific) and releases them from the pool.
        """
        sf = self.ensure_spill_file()
        moved = 0
        for f in frames:
            sf.write_frame(f.records, self.frame_bytes)
            self.records_spilled += len(f)
            self.bytes_spilled += f.used
            moved += f.used
        return moved

    def close(self) -> None:
        if self.spill_file is not None:
            self.spill_file.close()
            self.spill_file = None
        self.frames = []
