"""Benchmark: Table II — M(·) and async rounds per reorder method on CP."""
from repro.experiments.table2 import table2


def test_bench_table2(benchmark):
    df = benchmark.pedantic(table2, args=("bench",), rounds=1, iterations=1)
    print("\n[Table II on CP stand-in]\n", df.to_string(index=False))
    d = df.set_index("method")
    assert d["M"].idxmax() == "gograph"
    assert d.loc["gograph", "rounds_pagerank"] == d["rounds_pagerank"].min()
