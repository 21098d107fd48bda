"""Benchmark: Figs 9/10 — simulated cache misses + partition ablation."""
from repro.experiments.cache import cache_misses, partition_effect


def test_bench_fig9(benchmark):
    df = benchmark.pedantic(cache_misses, args=("bench",), rounds=1, iterations=1)
    print("\n[Fig 9]\n", df.to_string(index=False))
    gg = df[df["method"] == "gograph"]["norm_misses"]
    assert gg.mean() < 0.8  # paper: ~30% average reduction


def test_bench_fig10(benchmark):
    df = benchmark.pedantic(partition_effect, args=("bench",), rounds=1, iterations=1)
    print("\n[Fig 10]\n", df.to_string(index=False))
    # paper: 33% average / 58% max reduction from partitioning
    assert df["reduction_pct"].mean() > 10
    assert df["reduction_pct"].max() > 30
