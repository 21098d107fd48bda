"""Tests for GetOptVal (core/insertion.py) — brute-force verified."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.insertion import get_opt_val, insertion_positive_edges


def brute_force_best(nbrs):
    """Try every cut position of the val-sorted neighbor list."""
    ns = sorted(nbrs, key=lambda t: t[0])
    vals = [ns[0][0] - 1.0]
    for i in range(len(ns) - 1):
        vals.append((ns[i][0] + ns[i + 1][0]) / 2.0)
    vals.append(ns[-1][0] + 1.0)
    best = max(insertion_positive_edges(ns, v) for v in vals)
    return best


def test_empty_neighbors_returns_empty_val():
    assert get_opt_val([], empty_val=7.5) == (7.5, 0.0)


def test_single_incoming_neighbor_goes_after():
    # u → v : v must be placed after u (positive edge)
    val, pe = get_opt_val([(3.0, 1.0, 0.0)])
    assert val > 3.0
    assert pe == 1.0


def test_single_outgoing_neighbor_goes_before():
    # v → u : v must be placed before u
    val, pe = get_opt_val([(3.0, 0.0, 1.0)])
    assert val < 3.0
    assert pe == 1.0


def test_mutual_edges_tie_any_side():
    val, pe = get_opt_val([(1.0, 1.0, 1.0)])
    assert pe == 1.0  # one of the two edges is positive either way


def test_sandwich_between_in_and_out():
    # in-neighbor at 0, out-neighbor at 10 → insert in between, both positive
    val, pe = get_opt_val([(0.0, 1.0, 0.0), (10.0, 0.0, 1.0)])
    assert 0.0 < val < 10.0
    assert pe == 2.0


def test_conflicting_in_and_out_keeps_best():
    # out-neighbor at 0, in-neighbor at 10 → at most one can be positive
    val, pe = get_opt_val([(0.0, 0.0, 1.0), (10.0, 1.0, 0.0)])
    assert pe == 1.0


def test_weighted_super_vertex_edges():
    # heavy incoming (w=5) at val 2; light outgoing (w=1) at val 1
    val, pe = get_opt_val([(2.0, 5.0, 0.0), (1.0, 0.0, 1.0)])
    assert val > 2.0  # heavy in-edge dominates → go after both
    assert pe == 5.0


@pytest.mark.parametrize("seed", range(20))
def test_matches_brute_force_random(seed):
    rng = np.random.default_rng(seed)
    k = int(rng.integers(1, 10))
    nbrs = []
    for i in range(k):
        w_in = float(rng.integers(0, 3))
        w_out = float(rng.integers(0, 3))
        if w_in == w_out == 0:
            w_in = 1.0
        nbrs.append((float(rng.normal() * 10), w_in, w_out))
    # distinct vals so midpoints are unambiguous
    nbrs = [(v + i * 1e-6, wi, wo) for i, (v, wi, wo) in enumerate(nbrs)]
    val, pe = get_opt_val(nbrs)
    assert pe == pytest.approx(brute_force_best(nbrs))
    assert insertion_positive_edges(nbrs, val) == pytest.approx(pe)


@given(
    st.lists(
        st.tuples(
            st.integers(-50, 50),
            st.integers(0, 4),
            st.integers(0, 4),
        ),
        min_size=1,
        max_size=12,
    )
)
@settings(max_examples=200, deadline=None)
def test_hypothesis_reported_pe_is_achieved_and_optimal(raw):
    # give every neighbor a distinct val, keep weights as floats
    nbrs = [
        (float(v) + i * 1e-3, float(wi), float(wo))
        for i, (v, wi, wo) in enumerate(raw)
    ]
    val, pe = get_opt_val(nbrs)
    assert insertion_positive_edges(nbrs, val) == pytest.approx(pe)
    assert pe == pytest.approx(brute_force_best(nbrs))


@given(
    st.lists(
        st.tuples(st.integers(-20, 20), st.integers(0, 3), st.integers(0, 3)),
        min_size=1,
        max_size=10,
    )
)
@settings(max_examples=200, deadline=None)
def test_hypothesis_lemma2_half_edges_positive(raw):
    """Lemma 2: inserting v makes ≥ half of its order-edges positive."""
    nbrs = [
        (float(v) + i * 1e-3, float(wi), float(wo))
        for i, (v, wi, wo) in enumerate(raw)
    ]
    total = sum(wi + wo for _, wi, wo in nbrs)
    _, pe = get_opt_val(nbrs)
    assert pe >= total / 2.0 - 1e-9
