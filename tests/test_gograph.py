"""Tests for the GoGraph reordering pipeline (Algorithm 1)."""
import numpy as np
import pytest

from repro.core.gograph import (
    _split_graph,
    gograph_order,
    reorder_subgraph,
)
from repro.core.metric import metric_m_local
from repro.graphs.gen import ba_graph, community_ba_graph, dataset_graph
from repro.graphs.local import LocalGraph
from repro.reorder.api import assert_permutation


@pytest.mark.parametrize("name", ["IC", "SK", "GL", "WK", "CP", "LJ"])
def test_positions_are_permutation(name):
    g = dataset_graph(name, scale=0.1)
    assert_permutation(gograph_order(g), g.n)


@pytest.mark.parametrize("seed", range(10))
def test_theorem2_at_least_half_edges_positive(seed):
    """Theorem 2: M(O_GoGraph) ≥ |E|/2 on arbitrary cyclic graphs."""
    g = ba_graph(300, 3, forward_frac=0.3, extra_frac=0.3, seed=seed)
    pos = gograph_order(g)
    assert metric_m_local(g, pos) >= g.n_edges / 2


@pytest.mark.parametrize("name", ["IC", "CP", "LJ"])
def test_beats_default_order(name):
    g = dataset_graph(name, scale=0.1)
    assert metric_m_local(g, gograph_order(g)) > metric_m_local(
        g, np.arange(g.n)
    )


def test_beats_all_baselines_on_cp():
    """Table II headline: GoGraph has the largest M of all methods."""
    from repro.reorder.api import METHODS, compute_order

    g = dataset_graph("CP", scale=0.1)
    ms = {m: metric_m_local(g, compute_order(g, m)) for m in METHODS}
    assert max(ms, key=ms.get) == "gograph"


def test_deterministic():
    g = dataset_graph("CP", scale=0.1)
    assert np.array_equal(gograph_order(g), gograph_order(g))


def test_dag_identity_is_perfect():
    """On a forward-oriented DAG GoGraph should reach M close to |E|."""
    g = ba_graph(300, 3, forward_frac=1.0, extra_frac=0.0, seed=5)
    pos = gograph_order(g)
    assert metric_m_local(g, pos) >= 0.9 * g.n_edges


def test_split_extracts_top_degree_vertices():
    g = dataset_graph("CP", scale=0.1)
    hd_mask, iso_mask, core_src, core_dst = _split_graph(g, 0.002)
    k = int(np.ceil(0.002 * g.n))
    assert hd_mask.sum() == k
    deg = g.degree()
    assert deg[hd_mask].min() >= np.sort(deg)[::-1][k - 1]
    # core edges touch no HD vertex
    assert not hd_mask[core_src].any() and not hd_mask[core_dst].any()
    # isolated vertices have no core edges
    touched = set(core_src.tolist()) | set(core_dst.tolist())
    assert not any(v in touched for v in np.flatnonzero(iso_mask))


def test_hd_frac_parameter():
    g = dataset_graph("CP", scale=0.1)
    hd_mask, _, _, _ = _split_graph(g, 0.01)
    assert hd_mask.sum() == int(np.ceil(0.01 * g.n))


def test_isolated_vertices_handled():
    # star: all spokes connect only to the hub → removing the hub isolates all
    n = 20
    g = LocalGraph(
        n=n,
        src=np.arange(1, n),
        dst=np.zeros(n - 1, dtype=np.int64),
        w=np.ones(n - 1),
    )
    pos = gograph_order(g, hd_frac=0.05)
    assert_permutation(pos, n)


def test_empty_core_all_high_degree():
    g = ba_graph(20, 2, seed=1)
    pos = gograph_order(g, hd_frac=1.0)  # every vertex extracted as HD
    assert_permutation(pos, g.n)


@pytest.mark.parametrize("partitioner", ["rabbit", "metis", "louvain", "fennel"])
def test_all_partitioners_supported(partitioner):
    g = dataset_graph("CP", scale=0.1)
    pos = gograph_order(g, partitioner=partitioner)
    assert_permutation(pos, g.n)
    assert metric_m_local(g, pos) >= g.n_edges / 2


def test_unpartitioned_ablation():
    g = dataset_graph("CP", scale=0.1)
    pos = gograph_order(g, partitioned=False)
    assert_permutation(pos, g.n)
    assert metric_m_local(g, pos) >= g.n_edges / 2


def test_reorder_subgraph_chain():
    # chain 0→1→2→3 must be ordered topologically (all edges positive)
    vals = reorder_subgraph([0, 1, 2, 3], [(0, 1, 1.0), (1, 2, 1.0), (2, 3, 1.0)])
    order = sorted(vals, key=lambda v: vals[v])
    assert order == [0, 1, 2, 3]


def test_reorder_subgraph_respects_weights():
    # super-vertices: heavy edge (0→1, w=10) must be positive even if the
    # light edge (1→0, w=1) then is negative
    vals = reorder_subgraph([0, 1], [(0, 1, 10.0), (1, 0, 1.0)])
    assert vals[0] < vals[1]


def test_reorder_subgraph_input_order_invariant():
    edges = [(0, 1, 1.0), (1, 2, 1.0), (2, 0, 1.0), (0, 3, 1.0)]
    v1 = reorder_subgraph([0, 1, 2, 3], edges)
    v2 = reorder_subgraph([3, 2, 1, 0], list(reversed(edges)))
    assert v1 == v2


def test_community_graph_orders_members_near_each_other():
    """Locality: average |pos(u)−pos(v)| over edges far below random."""
    g = community_ba_graph(1500, 4, comm_size=60, forward_frac=0.3, seed=8)
    pos = gograph_order(g)
    spread = float(np.mean(np.abs(pos[g.src] - pos[g.dst])))
    # random order expected spread ≈ n/3
    assert spread < g.n / 6


def test_target_size_bounds_subgraphs():
    g = dataset_graph("CP", scale=0.1)
    for ts in (64, 256):
        assert_permutation(gograph_order(g, target_size=ts), g.n)


def test_gograph_spark_matches_local(spark):
    from repro.core.gograph import gograph_positions_spark
    from repro.graphs.gen import edges_to_spark

    g = dataset_graph("IC", scale=0.1)
    edf = edges_to_spark(spark, g)
    pdf = gograph_positions_spark(spark, edf, g.n).toPandas().sort_values("vid")
    assert np.array_equal(pdf["pos"].to_numpy(), gograph_order(g))


def test_gograph_spark_matches_local_second_graph(spark):
    from repro.core.gograph import gograph_positions_spark
    from repro.graphs.gen import edges_to_spark

    g = community_ba_graph(400, 3, comm_size=50, forward_frac=0.2, seed=17)
    edf = edges_to_spark(spark, g)
    pdf = gograph_positions_spark(spark, edf, g.n).toPandas().sort_values("vid")
    assert np.array_equal(pdf["pos"].to_numpy(), gograph_order(g))
