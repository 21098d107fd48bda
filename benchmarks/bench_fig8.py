"""Benchmark: Fig 8 — sync vs async vs async+GoGraph."""
from repro.experiments.async_impact import async_impact


def test_bench_fig8(benchmark):
    df = benchmark.pedantic(async_impact, args=("bench",), rounds=1, iterations=1)
    print("\n[Fig 8]\n", df.to_string(index=False))
    assert (df["async_gograph_rounds"] <= df["sync_def_rounds"]).all()
