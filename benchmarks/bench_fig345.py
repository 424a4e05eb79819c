"""Benchmark: Figures 3/4/5 partition-count simulation sweep (paper §4)."""
from repro.experiments.fig345 import fig3, fig4, fig5

SIZES = (512, 2048, 8192)
COUNTS = (2, 4, 8, 20, 64)


def test_fig3_fixed_partitions(benchmark):
    df = benchmark(fig3, input_sizes_mb=SIZES, partition_counts=COUNTS)
    assert len(df) == len(SIZES) * len(COUNTS)


def test_fig4_accurate_partitions(benchmark):
    df = benchmark(fig4, input_sizes_mb=SIZES, partition_counts=COUNTS)
    assert (df["total_spill_mb"] >= 0).all()


def test_fig5_in_memory_data(benchmark):
    df = benchmark(fig5, input_sizes_mb=SIZES, partition_counts=COUNTS)
    assert (df["memory_utilization"] <= 1.0).all()
