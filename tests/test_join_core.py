"""Correctness and behaviour tests for the Dynamic HHJ operator itself.

The operator must produce *exactly* the naive equijoin output under every
combination of policies and memory budgets — including budgets that force
spilling, multi-round recursion, role reversal, bail-out, and reload.
"""
import pytest

from repro.core.baselines import naive_hash_join
from repro.core.join import DynamicHybridHashJoin, HHJConfig, dynamic_hash_join
from repro.insertion import default_policies as insertion_policies
from repro.victim import default_policies as victim_policies

from tests.util import make_records, make_skewed_records

FRAME = 1024


def small_inputs():
    build = make_records(400, key_range=150, lo=100, hi=300, seed=1, tag="b")
    probe = make_records(800, key_range=150, lo=100, hi=300, seed=2, tag="p")
    return build, probe


def run_and_compare(build, probe, **cfg_kw):
    cfg_kw.setdefault("frame_bytes", FRAME)
    cfg_kw.setdefault("min_partitions", 4)
    cfg = HHJConfig(**cfg_kw)
    pairs, stats = dynamic_hash_join(build, probe, cfg)
    assert sorted(pairs) == sorted(naive_hash_join(build, probe))
    return stats


class TestCorrectnessGrid:
    """Every policy combination must return the exact join result."""

    @pytest.mark.parametrize("victim", sorted(victim_policies().keys()))
    @pytest.mark.parametrize("growth", ["ng-ns", "g-s"])
    @pytest.mark.parametrize("memory", [12, 48])
    def test_policy_grid(self, victim, growth, memory):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=memory,
                                growth=growth, victim=victim,
                                num_partitions=min(8, memory))
        if memory == 12:
            assert stats.partitions_spilled > 0   # spilling actually happened

    @pytest.mark.parametrize("insertion", sorted(insertion_policies().keys()))
    @pytest.mark.parametrize("memory", [12, 48, 4096])
    def test_insertion_grid(self, insertion, memory):
        build, probe = small_inputs()
        run_and_compare(build, probe, memory_frames=memory,
                        insertion=insertion, num_partitions=8)

    @pytest.mark.parametrize("num_partitions", [2, 3, 5, 8, 12])
    def test_partition_counts(self, num_partitions):
        build, probe = small_inputs()
        run_and_compare(build, probe, memory_frames=24,
                        num_partitions=num_partitions)

    @pytest.mark.parametrize("seed", range(5))
    def test_random_victim_seeds(self, seed):
        build, probe = small_inputs()
        run_and_compare(build, probe, memory_frames=12, victim="random",
                        num_partitions=8, seed=seed)


class TestSkewedData:
    @pytest.mark.parametrize("growth", ["ng-ns", "g-s"])
    def test_skewed_build(self, growth):
        build = make_skewed_records(500, hot_keys=3, lo=100, hi=300, seed=3)
        probe = make_records(500, key_range=600, lo=100, hi=300, seed=4)
        run_and_compare(build, probe, memory_frames=12, growth=growth,
                        num_partitions=8)

    def test_single_key_build_triggers_bailout(self):
        # every record in one partition → hashing can never shrink it
        build = [(7, 200, f"b{i}") for i in range(300)]
        probe = [(7, 200, f"p{i}") for i in range(100)]
        cfg = HHJConfig(memory_frames=12, frame_bytes=FRAME, num_partitions=4,
                        min_partitions=4)
        op = DynamicHybridHashJoin(cfg)
        pairs = op.run_collect(build, probe)
        assert len(pairs) == 300 * 100
        assert op.stats.bnlj_rounds >= 1

    def test_bailout_disabled_still_terminates(self):
        build = [(7, 200, f"b{i}") for i in range(300)]
        probe = [(7, 200, f"p{i}") for i in range(100)]
        cfg = HHJConfig(memory_frames=12, frame_bytes=FRAME, num_partitions=4,
                        min_partitions=4, bailout=False, max_levels=6)
        op = DynamicHybridHashJoin(cfg)
        pairs = op.run_collect(build, probe)
        assert len(pairs) == 300 * 100   # max_levels fallback bails to BNLJ


class TestOptimizations:
    def test_role_reversal_counts(self):
        # probe side much smaller per spilled pair → reversal expected
        build = make_records(1200, key_range=300, lo=100, hi=300, seed=5, tag="b")
        probe = make_records(120, key_range=300, lo=100, hi=300, seed=6, tag="p")
        cfg = HHJConfig(memory_frames=12, frame_bytes=FRAME, num_partitions=6,
                        min_partitions=4)
        op = DynamicHybridHashJoin(cfg)
        pairs = op.run_collect(build, probe)
        assert sorted(pairs) == sorted(naive_hash_join(build, probe))
        assert op.stats.role_reversals > 0

    def test_role_reversal_disabled(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=12,
                                num_partitions=6, role_reversal=False)
        assert stats.role_reversals == 0

    def test_in_memory_shortcut_used(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=16,
                                num_partitions=8)
        assert stats.in_memory_rounds > 0

    def test_in_memory_shortcut_disabled(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=16,
                                num_partitions=8, in_memory_shortcut=False)
        assert stats.in_memory_rounds == 0

    def test_reload_recovers_spilled_partition(self):
        # memory fits nearly everything: a spilled partition can come back
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=90,
                                num_partitions=8)
        stats_noreload = run_and_compare(build, probe, memory_frames=90,
                                         num_partitions=8,
                                         reload_spilled=False)
        assert stats.frames_reloaded >= 0
        # with reload on, probe-side spill can only be lower or equal
        assert stats.probe_bytes_spilled <= stats_noreload.probe_bytes_spilled

    def test_reload_disabled_reloads_nothing(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=90,
                                num_partitions=8, reload_spilled=False)
        assert stats.frames_reloaded == 0


class TestEdgeCases:
    def test_empty_build(self):
        probe = make_records(50, lo=100, hi=300)
        assert dynamic_hash_join([], probe, HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))[0] == []

    def test_empty_probe(self):
        build = make_records(50, lo=100, hi=300)
        assert dynamic_hash_join(build, [], HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))[0] == []

    def test_both_empty(self):
        assert dynamic_hash_join([], [], HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4))[0] == []

    def test_no_matches(self):
        build = [(i, 200, f"b{i}") for i in range(100)]
        probe = [(i + 1000, 200, f"p{i}") for i in range(100)]
        pairs, _ = dynamic_hash_join(build, probe, HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))
        assert pairs == []

    def test_duplicate_keys_cross_product(self):
        build = [(1, 200, f"b{i}") for i in range(20)]
        probe = [(1, 200, f"p{i}") for i in range(30)]
        pairs, _ = dynamic_hash_join(build, probe, HHJConfig(
            memory_frames=64, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))
        assert len(pairs) == 600

    def test_key_type_normalization(self):
        import numpy as np
        build = [(np.int64(5), 200, "b"), (7.0, 200, "b7")]
        probe = [(5, 200, "p"), (7, 200, "p7")]
        pairs, _ = dynamic_hash_join(build, probe, HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))
        assert sorted(pairs) == [("b", "p"), ("b7", "p7")]

    def test_string_keys(self):
        build = [(f"k{i % 20}", 150, f"b{i}") for i in range(100)]
        probe = [(f"k{i % 25}", 150, f"p{i}") for i in range(100)]
        pairs, _ = dynamic_hash_join(build, probe, HHJConfig(
            memory_frames=8, frame_bytes=FRAME, num_partitions=4,
            min_partitions=4))
        assert sorted(pairs) == sorted(naive_hash_join(build, probe))

    def test_record_exceeding_frame_raises(self):
        cfg = HHJConfig(memory_frames=8, frame_bytes=FRAME, num_partitions=4)
        op = DynamicHybridHashJoin(cfg)
        with pytest.raises(ValueError):
            op.run_collect([(1, FRAME + 1, "big")], [])

    def test_record_exactly_frame_size_is_ok(self):
        pairs, _ = dynamic_hash_join([(1, FRAME, "b")], [(1, 100, "p")],
                                     HHJConfig(memory_frames=8,
                                               frame_bytes=FRAME,
                                               num_partitions=4,
                                               min_partitions=4))
        assert pairs == [("b", "p")]


class TestConfigValidation:
    def test_memory_floor(self):
        with pytest.raises(ValueError):
            HHJConfig(memory_frames=2)

    @pytest.mark.parametrize("p", [0, 1])
    def test_partitions_floor(self, p):
        with pytest.raises(ValueError):
            HHJConfig(memory_frames=16, num_partitions=p)

    def test_partitions_cannot_exceed_memory(self):
        with pytest.raises(ValueError):
            HHJConfig(memory_frames=16, num_partitions=17)

    def test_default_partition_policy_is_twenty(self):
        cfg = HHJConfig(memory_frames=256)
        op = DynamicHybridHashJoin(cfg)
        parts = op.build_only(make_records(50, lo=100, hi=300))
        assert len(parts) == 20


class TestStatsAccounting:
    def test_no_spill_run_has_empty_trace(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=4096,
                                num_partitions=8)
        assert stats.partitions_spilled == 0
        assert stats.build_bytes_spilled == 0
        assert stats.write_trace == []

    def test_spill_bytes_bounded_by_rounds_times_input(self):
        build, probe = small_inputs()
        build_bytes = sum(r[1] for r in build)
        stats = run_and_compare(build, probe, memory_frames=12,
                                num_partitions=6)
        assert stats.build_bytes_spilled <= stats.rounds * build_bytes * 1.5

    def test_trace_matches_frame_counters(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=12,
                                num_partitions=6)
        assert (stats.sequential_frames_written + stats.random_frames_written
                == stats.total_frames_spilled)
        assert (stats.sequential_write_ops + stats.random_write_ops
                == len(stats.write_trace))

    def test_records_processed_counts_both_sides(self):
        build, probe = small_inputs()
        stats = run_and_compare(build, probe, memory_frames=4096,
                                num_partitions=8)
        assert stats.records_processed >= len(build) + len(probe)

    def test_build_only_flushes_everything_spilled(self):
        build = make_records(800, lo=100, hi=300, seed=9)
        cfg = HHJConfig(memory_frames=12, frame_bytes=FRAME, num_partitions=6)
        op = DynamicHybridHashJoin(cfg)
        parts = op.build_only(build)
        for q in parts:
            if q.spilled:
                assert q.in_memory_bytes == 0      # nothing left unflushed
        spilled_bytes = sum(q.bytes_spilled for q in parts)
        assert spilled_bytes == op.stats.build_bytes_spilled
