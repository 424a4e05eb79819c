"""Benchmark: Figure 13 victim-selection sweep with/without skew (§7.1.1)."""
from repro.experiments.fig13 import fig13a, fig13b

KW = dict(memory_frames=128, ratios=(1.2, 4.0),
          policies=("largest-size", "largest-records", "smallest-size",
                    "smallest-records", "median-size", "random"))


def test_fig13a_no_skew(benchmark):
    df = benchmark.pedantic(fig13a, kwargs=KW, rounds=2, iterations=1)
    assert (df["spill_over_ideal"] >= 0.99).all()


def test_fig13b_skew(benchmark):
    df = benchmark.pedantic(fig13b, kwargs=KW, rounds=2, iterations=1)
    assert (df["spill_over_ideal"] >= 0.99).all()
