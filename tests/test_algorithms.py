"""Tests for algorithm specs (engine/algorithms.py)."""
import numpy as np
import pytest

from repro.engine.algorithms import ALGOS, effective_graph, make_algo
from repro.graphs.gen import ba_graph


@pytest.fixture(scope="module")
def g():
    return ba_graph(100, 3, forward_frac=0.4, seed=2)


@pytest.mark.parametrize("name", sorted(ALGOS))
def test_prepare_shapes(g, name):
    prep = make_algo(name).prepare(g, source=0)
    eg = effective_graph(g, prep)
    assert len(prep.init) == g.n
    assert len(prep.base) == g.n
    assert len(prep.param) == eg.n_edges


def test_pagerank_params_sum_to_damping(g):
    prep = make_algo("pagerank").prepare(g)
    # Σ_e param over out-edges of u == d for every u with out-degree > 0
    sums = np.bincount(g.src, weights=prep.param, minlength=g.n)
    out = g.out_degree() > 0
    assert np.allclose(sums[out], 0.85)


def test_php_source_fixed(g):
    prep = make_algo("php").prepare(g, source=5)
    assert prep.fixed == {5: 1.0}
    assert prep.init[5] == 1.0


def test_php_edge_params_normalized_by_out_weight(g):
    prep = make_algo("php").prepare(g, source=0)
    sums = np.bincount(g.src, weights=prep.param, minlength=g.n)
    out = g.out_weight() > 0
    assert np.allclose(sums[out], 0.85)


def test_sssp_init(g):
    prep = make_algo("sssp").prepare(g, source=3)
    assert prep.init[3] == 0.0
    assert np.isinf(prep.init[:3]).all()


def test_bfs_unit_params(g):
    prep = make_algo("bfs").prepare(g, source=0)
    assert (prep.param == 1.0).all()


def test_cc_symmetrizes_edges(g):
    prep = make_algo("cc").prepare(g)
    eg = effective_graph(g, prep)
    assert eg.n_edges == 2 * g.n_edges


def test_sswp_source_infinite(g):
    prep = make_algo("sswp").prepare(g, source=2)
    assert np.isinf(prep.init[2])
    assert prep.init[(np.arange(g.n) != 2)].max() == 0.0


def test_default_source_is_highest_out_degree(g):
    prep = make_algo("sssp").prepare(g)  # no source given
    assert prep.init[g.highest_out_degree_vertex()] == 0.0


def test_make_algo_unknown():
    with pytest.raises(KeyError):
        make_algo("dijkstra")
