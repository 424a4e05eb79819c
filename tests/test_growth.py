"""Unit tests for the §6 growth policies (NG-NS and G-S)."""
import pytest

from repro.core.stats import JoinStats
from repro.frames import BufferPool, Partition
from repro.growth import GrowSteal, NoGrowNoSteal, make_policy
from repro.insertion import AppendN
from repro.victim import VictimContext, make_policy as make_victim

CAP = 1000


def filled_partition(pid, n_frames, bytes_per_frame=800, pool=None):
    p = Partition(pid, CAP)
    for _ in range(n_frames):
        if pool is not None:
            pool.allocate(1)
        p.new_frame().insert(bytes_per_frame)
    return p


class TestMakePolicy:
    def test_known_names(self):
        assert isinstance(make_policy("ng-ns"), NoGrowNoSteal)
        assert isinstance(make_policy("g-s"), GrowSteal)

    def test_unknown_raises(self):
        with pytest.raises(KeyError):
            make_policy("grow-only")


class TestInitialSpill:
    def test_writes_one_sequential_chunk_and_keeps_buffer(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 5, pool=pool)
        g = NoGrowNoSteal()
        freed = g.initial_spill(part, pool, stats, "build", 0)
        assert freed == 4
        assert part.spilled
        assert part.num_frames == 1
        assert part.frames[0].used == 0          # buffer cleared
        assert pool.allocated == 1
        assert stats.partitions_spilled == 1
        assert len(stats.write_trace) == 1
        op = stats.write_trace[0]
        assert op.n_frames == 5
        assert op.sequential                      # multi-frame chunk
        assert stats.build_bytes_spilled == 5 * 800

    def test_single_frame_victim_is_random_write(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 1, pool=pool)
        NoGrowNoSteal().initial_spill(part, pool, stats, "build", 0)
        assert not stats.write_trace[0].sequential

    def test_double_spill_asserts(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 2, pool=pool)
        g = NoGrowNoSteal()
        g.initial_spill(part, pool, stats, "build", 0)
        with pytest.raises(AssertionError):
            g.initial_spill(part, pool, stats, "build", 0)


class TestNGNS:
    def test_buffer_insert_and_flush_cycle(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 2, pool=pool)
        g = NoGrowNoSteal()
        g.initial_spill(part, pool, stats, "build", 0)
        ins = AppendN(8)
        # fill the buffer: 900 fits
        assert g.insert_into_spilled(part, 900, "a", pool, ins, stats, "build", 0)
        # next 900 does not fit → buffer flushes as one random write
        assert g.insert_into_spilled(part, 900, "b", pool, ins, stats, "build", 0)
        assert part.num_frames == 1                       # invariant holds
        flushes = [w for w in stats.write_trace if w.n_frames == 1]
        assert len(flushes) == 1
        assert part.records_spilled == 2 + 1              # 2 initial + 1 flushed

    def test_spilled_partition_never_grows(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 3, pool=pool)
        g = NoGrowNoSteal()
        g.initial_spill(part, pool, stats, "build", 0)
        ins = AppendN(8)
        for i in range(20):
            g.insert_into_spilled(part, 600, i, pool, ins, stats, "build", 0)
            assert part.num_frames == 1

    def test_free_memory_only_victimizes_residents(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        spilled = filled_partition(0, 1, pool=pool)
        spilled.spilled = True
        resident = filled_partition(1, 3, pool=pool)
        g = NoGrowNoSteal()
        freed = g.free_memory([spilled, resident], VictimContext(1, 1, 2), pool,
                              make_victim("largest-size"), stats, "build", 0)
        assert freed == 2
        assert resident.spilled

    def test_free_memory_no_candidates_returns_zero(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        spilled = filled_partition(0, 1, pool=pool)
        spilled.spilled = True
        g = NoGrowNoSteal()
        assert g.free_memory([spilled], VictimContext(0, 1, 1), pool,
                             make_victim("largest-size"), stats, "build", 0) == 0


class TestGS:
    def test_spilled_partition_grows_while_memory_lasts(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 2, pool=pool)
        g = GrowSteal()
        g.initial_spill(part, pool, stats, "build", 0)
        ins = AppendN(8)
        for i in range(10):
            assert g.insert_into_spilled(part, 900, i, pool, ins, stats, "build", 0)
        assert part.num_frames > 1                       # it grew

    def test_insert_fails_when_pool_exhausted(self):
        pool = BufferPool(3)
        stats = JoinStats(CAP)
        part = filled_partition(0, 3, pool=pool)
        g = GrowSteal()
        part.spilled = True          # simulate an already-spilled, full state
        ins = AppendN(8)
        assert not g.insert_into_spilled(part, 900, "x", pool, ins, stats,
                                         "build", 0)

    def test_steal_flushes_largest_spilled_sequentially(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        a = filled_partition(0, 4, pool=pool)
        a.spilled = True
        b = filled_partition(1, 2, pool=pool)
        b.spilled = True
        resident = filled_partition(2, 2, pool=pool)
        g = GrowSteal()
        freed = g.free_memory([a, b, resident], VictimContext(2, 2, 3), pool,
                              make_victim("largest-size"), stats, "build", 0)
        assert freed == 3                     # a had 4 frames → keeps 1 buffer
        assert a.num_frames == 1
        assert not resident.spilled           # resident untouched
        assert stats.write_trace[-1].sequential

    def test_falls_back_to_resident_victims(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        spilled = filled_partition(0, 1, pool=pool)
        spilled.spilled = True
        resident = filled_partition(1, 3, pool=pool)
        g = GrowSteal()
        g.free_memory([spilled, resident], VictimContext(1, 1, 2), pool,
                      make_victim("largest-size"), stats, "build", 0)
        assert resident.spilled


class TestFlushSpilled:
    def test_empty_frames_release_without_write(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = Partition(0, CAP)
        for _ in range(3):
            pool.allocate(1)
            part.new_frame()
        part.spilled = True
        g = NoGrowNoSteal()
        freed = g.flush_spilled(part, pool, stats, "build", 0, keep_buffer=False)
        assert freed == 3
        assert stats.write_trace == []        # nothing written

    def test_keep_buffer_leaves_one_frame(self):
        pool = BufferPool(16)
        stats = JoinStats(CAP)
        part = filled_partition(0, 3, pool=pool)
        part.spilled = True
        g = GrowSteal()
        freed = g.flush_spilled(part, pool, stats, "build", 0, keep_buffer=True)
        assert freed == 2
        assert part.num_frames == 1
        assert part.frames[0].used == 0
