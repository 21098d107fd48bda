"""Benchmark: Fig 12 — impact of average degree (BA graphs)."""
from repro.experiments.degrees import degrees_experiment


def test_bench_fig12(benchmark):
    df = benchmark.pedantic(
        degrees_experiment, kwargs={"n": 10_000}, rounds=1, iterations=1
    )
    print("\n[Fig 12]\n", df.to_string(index=False))
    gg = df[df["method"] == "gograph"].set_index("avg_degree")["rounds"]
    dd = df[df["method"] == "default"].set_index("avg_degree")["rounds"]
    assert (gg <= dd).all()
