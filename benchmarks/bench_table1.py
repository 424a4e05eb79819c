"""Benchmark: Table 1 partition-count computation (paper §4, Eq. 2)."""
from repro.experiments.table1 import table1


def test_table1_partition_counts(benchmark):
    df = benchmark(table1)
    assert bool(df["match"].all())
