"""Benchmark: Fig 7 — convergence speed comparison."""
from repro.experiments.convergence import convergence, gograph_time_fraction


def test_bench_fig7(benchmark):
    df = benchmark.pedantic(convergence, args=("bench",), rounds=1, iterations=1)
    frac = gograph_time_fraction(df)
    print("\n[Fig 7 — GoGraph time fraction]\n", frac.to_string(index=False))
    # paper: GoGraph needs 59% of the others' average time; our scaled-down
    # stand-ins are noisier on short-horizon cells — assert the aggregate
    assert frac["gograph_time_frac"].mean() < 1.0
