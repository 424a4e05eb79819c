"""Benchmark: Figure 12 G-S vs NG-NS growth-policy sweep (§6.2)."""
from repro.experiments.fig12 import fig12


def test_fig12_growth_policies(benchmark):
    df = benchmark.pedantic(
        fig12, kwargs=dict(memory_frames=64, ratios=(1.2, 2.0, 10.0),
                           cache_frames=256),
        rounds=2, iterations=1)
    big = df[df.ratio >= 10].set_index("growth")
    assert big.loc["ng-ns", "rand_write_ops"] > big.loc["g-s", "rand_write_ops"]
    assert big.loc["g-s", "time_hdd_direct_s"] < big.loc["ng-ns", "time_hdd_direct_s"]
