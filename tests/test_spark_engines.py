"""Parity tests: Spark engines vs the local reference engine.

Graphs are tiny and fast-converging algorithms are used for full-run
parity; PageRank (≈100 rounds) is compared with capped rounds so the
suite stays fast — per-round deltas and states must match exactly
either way.
"""
import numpy as np
import pytest

from repro.engine.algorithms import make_algo
from repro.engine.reference import gauss_seidel, jacobi
from repro.engine.spark_async import run_async_spark
from repro.engine.spark_sync import run_sync_spark
from repro.graphs.gen import ba_graph
from repro.reorder.api import compute_order


@pytest.fixture(scope="module")
def tiny():
    return ba_graph(100, 3, forward_frac=0.3, extra_frac=0.2, seed=21)


def _close(a, b):
    return np.allclose(
        np.nan_to_num(a, posinf=1e30), np.nan_to_num(b, posinf=1e30), atol=1e-9
    )


@pytest.mark.parametrize("algo", ["sssp", "bfs", "cc", "sswp"])
def test_sync_full_convergence_parity(spark, tiny, algo):
    ref = jacobi(tiny, make_algo(algo))
    got = run_sync_spark(spark, tiny, algo)
    assert got.rounds == ref.rounds
    assert got.converged
    assert _close(got.x, ref.x)


@pytest.mark.parametrize("algo", ["pagerank", "php"])
def test_sync_capped_rounds_parity(spark, tiny, algo):
    ref = jacobi(tiny, make_algo(algo), max_rounds=6)
    got = run_sync_spark(spark, tiny, algo, max_rounds=6)
    assert got.rounds == ref.rounds
    assert np.allclose(got.deltas, ref.deltas)
    assert _close(got.x, ref.x)


@pytest.mark.parametrize("method", ["default", "gograph"])
def test_async_full_convergence_parity_sssp(spark, tiny, method):
    pos = compute_order(tiny, method)
    ref = gauss_seidel(tiny, make_algo("sssp"), pos)
    got = run_async_spark(spark, tiny, "sssp", pos, n_blocks=3)
    assert got.rounds == ref.rounds
    assert _close(got.x, ref.x)


def test_async_capped_rounds_parity_pagerank(spark, tiny):
    pos = compute_order(tiny, "gograph")
    ref = gauss_seidel(tiny, make_algo("pagerank"), pos, max_rounds=4)
    got = run_async_spark(spark, tiny, "pagerank", pos, n_blocks=3, max_rounds=4)
    assert got.rounds == ref.rounds
    assert np.allclose(got.deltas, ref.deltas)
    assert _close(got.x, ref.x)


def test_async_block_count_invariance(spark, tiny):
    """Eq. 2 semantics do not depend on the dataflow block granularity."""
    pos = compute_order(tiny, "gograph")
    r1 = run_async_spark(spark, tiny, "bfs", pos, n_blocks=1)
    r2 = run_async_spark(spark, tiny, "bfs", pos, n_blocks=4)
    assert r1.rounds == r2.rounds
    assert _close(r1.x, r2.x)


def test_async_beats_sync_rounds_on_spark(spark, tiny):
    """The paper's core observation, reproduced on the Spark engines."""
    pos = compute_order(tiny, "gograph")
    sync = run_sync_spark(spark, tiny, "bfs")
    asy = run_async_spark(spark, tiny, "bfs", pos, n_blocks=2)
    assert asy.rounds <= sync.rounds
