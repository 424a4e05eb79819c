"""The baseline joins must all agree with the naive reference result."""
import pytest

from repro.core.baselines import (
    block_nested_loop_join,
    grace_hash_join,
    naive_hash_join,
    simple_hash_join,
    static_hybrid_hash_join,
)

from tests.util import make_records, make_skewed_records

FRAME = 1024


def inputs(seed=0):
    build = make_records(300, key_range=120, lo=100, hi=300, seed=seed, tag="b")
    probe = make_records(600, key_range=120, lo=100, hi=300, seed=seed + 1, tag="p")
    return build, probe


BASELINES = {
    "grace": lambda b, p, m: grace_hash_join(b, p, m, FRAME),
    "simple": lambda b, p, m: simple_hash_join(b, p, m, FRAME),
    "static-hhj": lambda b, p, m: static_hybrid_hash_join(b, p, m, FRAME),
    "bnlj": lambda b, p, m: block_nested_loop_join(b, p, m, FRAME),
}


@pytest.mark.parametrize("name", sorted(BASELINES.keys()))
@pytest.mark.parametrize("memory", [6, 16, 64, 1024])
class TestBaselineCorrectness:
    def test_matches_naive(self, name, memory):
        build, probe = inputs()
        got = BASELINES[name](build, probe, memory)
        assert sorted(got) == sorted(naive_hash_join(build, probe))

    def test_skewed_inputs(self, name, memory):
        build = make_skewed_records(250, hot_keys=4, lo=100, hi=300, seed=7)
        probe = make_records(250, key_range=300, lo=100, hi=300, seed=8)
        got = BASELINES[name](build, probe, memory)
        assert sorted(got) == sorted(naive_hash_join(build, probe))


@pytest.mark.parametrize("name", sorted(BASELINES.keys()))
class TestBaselineEdges:
    def test_empty_inputs(self, name):
        assert BASELINES[name]([], [], 16) == []

    def test_empty_probe(self, name):
        build, _ = inputs()
        assert BASELINES[name](build, [], 16) == []

    def test_cross_product_of_duplicates(self, name):
        build = [(1, 200, f"b{i}") for i in range(10)]
        probe = [(1, 200, f"p{i}") for i in range(15)]
        assert len(BASELINES[name](build, probe, 16)) == 150


class TestBaselineIOShapes:
    def test_grace_writes_everything_once_when_no_recursion(self):
        build, probe = inputs()
        grace_hash_join(build, probe, 1024, FRAME, num_partitions=8)
        stats = grace_hash_join.last_stats
        total_bytes = sum(r[1] for r in build) + sum(r[1] for r in probe)
        # grace always writes both inputs fully (±frame fragmentation)
        written = stats.build_bytes_spilled + stats.probe_bytes_spilled
        assert written == total_bytes

    def test_simple_spills_nothing_with_ample_memory(self):
        build, probe = inputs()
        simple_hash_join(build, probe, 1024, FRAME)
        assert simple_hash_join.last_stats.total_bytes_spilled == 0

    def test_simple_spills_with_tight_memory(self):
        build, probe = inputs()
        simple_hash_join(build, probe, 8, FRAME)
        s = simple_hash_join.last_stats
        assert s.total_bytes_spilled > 0
        assert s.rounds > 1

    def test_static_hhj_memory_resident_partition_spills_nothing_when_fits(self):
        build, probe = inputs()
        static_hybrid_hash_join(build, probe, 1024, FRAME)
        assert static_hybrid_hash_join.last_stats.total_bytes_spilled == 0

    def test_static_hhj_spills_b_partitions(self):
        build, probe = inputs()
        static_hybrid_hash_join(build, probe, 16, FRAME)
        s = static_hybrid_hash_join.last_stats
        assert s.total_bytes_spilled > 0

    def test_bnlj_multiple_blocks(self):
        build, probe = inputs()
        block_nested_loop_join(build, probe, 6, FRAME)
        s = block_nested_loop_join.last_stats
        # comparisons > probe cardinality ⇒ more than one block scanned
        assert s.comparisons > len(probe)
