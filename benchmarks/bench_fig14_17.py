"""Benchmark: Figures 14–17 victim policies × variable sizes ± skew (§7.1.2–3)."""
from repro.experiments.fig14_17 import fig14, fig16

KW = dict(memory_frames=128, ratios=(2.0, 4.0), pcts_large=(0.1, 0.9),
          policies=("largest-size", "largest-records", "smallest-size",
                    "median-records", "half-empty"))


def test_fig14_variable_sizes(benchmark):
    df = benchmark.pedantic(fig14, kwargs=KW, rounds=2, iterations=1)
    assert len(df) == 2 * 2 * 5


def test_fig16_variable_sizes_with_skew(benchmark):
    df = benchmark.pedantic(fig16, kwargs=KW, rounds=2, iterations=1)
    assert (df["spill_over_ideal"] > 0).all()
