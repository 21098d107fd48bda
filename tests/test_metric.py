"""Tests for the metric function M(·) (Eq. 7)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.metric import metric_m_local, metric_m_spark, positions_to_spark
from repro.graphs.gen import ba_graph, dataset_graph, edges_to_spark
from repro.graphs.local import LocalGraph


def _tiny():
    # a → b → c, c → a  (one directed triangle)
    return LocalGraph(
        n=3,
        src=np.array([0, 1, 2]),
        dst=np.array([1, 2, 0]),
        w=np.ones(3),
        name="tri",
    )


def test_identity_order_on_triangle():
    g = _tiny()
    assert metric_m_local(g, np.array([0, 1, 2])) == 2  # (0,1), (1,2) positive


def test_reversed_order_on_triangle():
    g = _tiny()
    assert metric_m_local(g, np.array([2, 1, 0])) == 1  # only (2,0) positive


def test_cycle_cannot_be_fully_positive():
    g = _tiny()
    for perm in ([0, 1, 2], [0, 2, 1], [1, 0, 2], [1, 2, 0], [2, 0, 1], [2, 1, 0]):
        assert metric_m_local(g, np.array(perm)) <= 2


def test_dag_topological_order_is_maximal():
    # 0→1, 0→2, 1→3, 2→3: identity is topological → M == |E|
    g = LocalGraph(
        n=4,
        src=np.array([0, 0, 1, 2]),
        dst=np.array([1, 2, 3, 3]),
        w=np.ones(4),
    )
    assert metric_m_local(g, np.arange(4)) == 4


@pytest.mark.parametrize("seed", range(5))
def test_complement_under_reversal(seed):
    """M(O) + M(reverse(O)) == |E| (no self-loops, deduped edges)."""
    g = ba_graph(200, 3, forward_frac=0.4, extra_frac=0.1, seed=seed)
    pos = np.random.default_rng(seed).permutation(g.n)
    rev = g.n - 1 - pos
    assert metric_m_local(g, pos) + metric_m_local(g, rev) == g.n_edges


@pytest.mark.parametrize("seed", range(5))
def test_bounds(seed):
    g = ba_graph(150, 3, seed=seed)
    pos = np.random.default_rng(seed).permutation(g.n)
    m = metric_m_local(g, pos)
    assert 0 <= m <= g.n_edges


def test_random_order_is_about_half():
    g = ba_graph(2000, 4, forward_frac=0.5, seed=9)
    rng = np.random.default_rng(0)
    ms = [metric_m_local(g, rng.permutation(g.n)) for _ in range(5)]
    assert abs(np.mean(ms) / g.n_edges - 0.5) < 0.05


def test_spark_matches_local(spark):
    g = dataset_graph("IC", scale=0.1)
    pos = np.random.default_rng(1).permutation(g.n)
    edf = edges_to_spark(spark, g)
    assert metric_m_spark(edf, positions_to_spark(spark, pos)) == metric_m_local(
        g, pos
    )


def test_spark_matches_duckdb_oracle(spark):
    """M as a SQL join/count, cross-checked with the DuckDB oracle."""
    from pyspark.sql import functions as F

    from repro.oracle import assert_equivalent

    g = dataset_graph("IC", scale=0.1)
    pos = np.random.default_rng(2).permutation(g.n)
    edf = edges_to_spark(spark, g)
    pdf = positions_to_spark(spark, pos)
    spark_m = (
        edf.join(pdf.select(F.col("vid").alias("src"), F.col("pos").alias("ps")), "src")
        .join(pdf.select(F.col("vid").alias("dst"), F.col("pos").alias("pd")), "dst")
        .agg(F.sum(F.when(F.col("ps") < F.col("pd"), 1).otherwise(0)).alias("m"))
    )
    assert_equivalent(
        spark_m,
        """
        SELECT SUM(CASE WHEN p1.pos < p2.pos THEN 1 ELSE 0 END) AS m
        FROM edges e JOIN pos p1 ON e.src = p1.vid JOIN pos p2 ON e.dst = p2.vid
        """,
        edges=pd.DataFrame({"src": g.src, "dst": g.dst}),
        pos=pd.DataFrame({"vid": np.arange(g.n), "pos": pos}),
    )
