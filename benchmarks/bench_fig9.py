"""Benchmark: Figure 9 insertion algorithms on all-small records (§5.3.1)."""
from repro.experiments.fig9 import fig9


def test_fig9_small_records(benchmark):
    df = benchmark.pedantic(fig9, kwargs=dict(n=10_000), rounds=2, iterations=1)
    by = df.set_index("algorithm")
    # the paper's headline orderings must hold every run
    assert by.loc["best-fit", "time_hdd_s"] == df["time_hdd_s"].max()
    assert by.loc["append(8)", "frames_searched"] < by.loc["best-fit", "frames_searched"]
