"""Benchmark: Figs 5/6 — normalized runtime & rounds, all cells."""
from repro.experiments.overall import gograph_speedups, overall


def test_bench_fig5_6(benchmark):
    df = benchmark.pedantic(overall, args=("bench",), rounds=1, iterations=1)
    sp = gograph_speedups(df)
    print("\n[Fig 5/6 — GoGraph vs competitors]\n", sp.to_string(index=False))
    gg = df[df["method"] == "gograph"]
    # paper: fewest rounds "on most tested conditions" — assert the robust
    # aggregate plus the long-horizon algorithms cell-by-cell
    assert gg["norm_rounds"].mean() < 1.0
    long_horizon = gg[gg["algo"].isin(["pagerank", "php"])]
    assert (long_horizon["norm_rounds"] <= 1.0 + 1e-9).all()
