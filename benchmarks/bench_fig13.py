"""Benchmark: Fig 13 — GoGraph with different partitioners."""
from repro.experiments.partition_methods import partition_methods


def test_bench_fig13(benchmark):
    df = benchmark.pedantic(
        partition_methods, args=("bench",), rounds=1, iterations=1
    )
    print("\n[Fig 13]\n", df.to_string(index=False))
    assert set(df["partitioner"]) == {"rabbit", "metis", "louvain", "fennel"}
