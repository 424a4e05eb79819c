"""Benchmark: Figures 6/7/8 insertion-parameter sweeps (paper §5.1)."""
from repro.experiments.fig678 import fig6_append, fig7_first_fit, fig8_random

N = 2000


def test_fig6_append_sweep(benchmark):
    df = benchmark.pedantic(fig6_append, kwargs=dict(ks=(1, 4, 8, 10), n=N),
                            rounds=2, iterations=1)
    assert len(df) == 3 * 4


def test_fig7_first_fit_sweep(benchmark):
    df = benchmark.pedantic(fig7_first_fit, kwargs=dict(params=(0.1, 0.5, 1.0), n=N),
                            rounds=2, iterations=1)
    assert len(df) == 3 * 3


def test_fig8_random_sweep(benchmark):
    df = benchmark.pedantic(fig8_random, kwargs=dict(params=(0.1, 0.5, 1.0), n=N),
                            rounds=2, iterations=1)
    assert len(df) == 3 * 3
