"""Tests for the shared sweep kernels (engine/kernels.py)."""
import pytest

from repro.engine.kernels import gs_sweep, jacobi_step, max_delta, vertex_update


def test_vertex_update_sum():
    assert vertex_update("sum", 0.0, 0.15, [(1.0, 0.5), (2.0, 0.25)]) == pytest.approx(
        0.15 + 0.5 + 0.5
    )


def test_vertex_update_min():
    assert vertex_update("min", 7.0, 0.0, [(3.0, 1.0), (10.0, 1.0)]) == 4.0
    assert vertex_update("min", 2.0, 0.0, [(3.0, 1.0)]) == 2.0  # keeps own


def test_vertex_update_maxmin():
    assert vertex_update("maxmin", 0.0, 0.0, [(5.0, 3.0), (2.0, 9.0)]) == 3.0


def test_vertex_update_unknown_kind():
    with pytest.raises(ValueError):
        vertex_update("prod", 0.0, 0.0, [])


def test_gs_sweep_uses_updated_values_in_order():
    """Chain a→b→c (SSSP): one sweep propagates through both hops."""
    out = gs_sweep(
        order_vids=[0, 1, 2],
        in_edges={1: [(0, 1.0)], 2: [(1, 1.0)]},
        prev_vals={0: 0.0, 1: float("inf"), 2: float("inf")},
        src_vals={0: 0.0, 1: float("inf"), 2: float("inf")},
        prep_kind="min",
        base={},
        fixed={},
    )
    assert out == {0: 0.0, 1: 1.0, 2: 2.0}


def test_gs_sweep_reverse_order_uses_previous_round():
    """Processing c before b means c sees b's stale value (Eq. 2)."""
    out = gs_sweep(
        order_vids=[2, 1, 0],
        in_edges={1: [(0, 1.0)], 2: [(1, 1.0)]},
        prev_vals={0: 0.0, 1: float("inf"), 2: float("inf")},
        src_vals={0: 0.0, 1: float("inf"), 2: float("inf")},
        prep_kind="min",
        base={},
        fixed={},
    )
    assert out[1] == 1.0 and out[2] == float("inf")


def test_gs_sweep_respects_fixed():
    out = gs_sweep(
        order_vids=[0, 1],
        in_edges={0: [(1, 0.5)], 1: [(0, 0.5)]},
        prev_vals={0: 1.0, 1: 0.0},
        src_vals={0: 1.0, 1: 0.0},
        prep_kind="sum",
        base={0: 0.0, 1: 0.0},
        fixed={0: 1.0},
    )
    assert out[0] == 1.0  # clamped
    assert out[1] == 0.5  # reads clamped source


def test_gs_sweep_extends_external_updated_dict():
    updated = {5: 42.0}  # from an earlier block this round
    out = gs_sweep(
        order_vids=[0],
        in_edges={0: [(5, 1.0)]},
        prev_vals={0: float("inf")},
        src_vals={5: 100.0},  # stale join value, must be shadowed
        prep_kind="min",
        base={},
        fixed={},
        updated=updated,
    )
    assert out[0] == 43.0
    assert updated[0] == 43.0


def test_jacobi_step_ignores_this_round():
    out = jacobi_step(
        vids=[0, 1, 2],
        in_edges={1: [(0, 1.0)], 2: [(1, 1.0)]},
        prev_vals={0: 0.0, 1: float("inf"), 2: float("inf")},
        prep_kind="min",
        base={},
        fixed={},
    )
    assert out[1] == 1.0 and out[2] == float("inf")


def test_max_delta_inf_equal_is_zero():
    inf = float("inf")
    assert max_delta({0: inf, 1: 1.0}, {0: inf, 1: 3.0}) == 2.0
