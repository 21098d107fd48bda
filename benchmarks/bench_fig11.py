"""Benchmark: Fig 11 — memory usage accounting."""
from repro.experiments.memuse import memory_usage


def test_bench_fig11(benchmark):
    df = benchmark.pedantic(memory_usage, args=("bench",), rounds=1, iterations=1)
    print("\n[Fig 11]\n", df.to_string(index=False))
    assert (df["sync_overhead_ratio"] > 1.0).all()
