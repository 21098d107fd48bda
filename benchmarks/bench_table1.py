"""Benchmark: Table I dataset generation (all six stand-ins, bench scale)."""
from repro.experiments.table1 import table1


def test_bench_table1(benchmark):
    df = benchmark.pedantic(table1, args=("bench",), rounds=1, iterations=1)
    print("\n[Table I]\n", df.to_string(index=False))
    assert len(df) == 6
