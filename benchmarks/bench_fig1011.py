"""Benchmark: Figures 10/11 insertion algorithms, variable sizes (§5.3.2)."""
from repro.experiments.fig1011 import fig10, fig11


def test_fig10_three_large(benchmark):
    df = benchmark.pedantic(fig10, kwargs=dict(n_bytes_target=8 << 20),
                            rounds=2, iterations=1)
    assert len(df) == 3 * 6


def test_fig11_one_large(benchmark):
    df = benchmark.pedantic(fig11, kwargs=dict(n_bytes_target=8 << 20),
                            rounds=2, iterations=1)
    mean_by_pct = df.groupby("pct_large")["avg_frame_fullness"].mean()
    assert mean_by_pct[0.1] > mean_by_pct[0.9]
