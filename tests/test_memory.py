"""Tests for the memory accounting model (Fig 11)."""
import pytest

from repro.engine.memory import SCENARIOS, memory_bytes
from repro.graphs.gen import dataset_graph


def test_sync_larger_than_async():
    g = dataset_graph("IC", scale=0.1)
    assert memory_bytes(g, "sync_default") > memory_bytes(g, "async_default")


def test_gograph_adds_no_runtime_memory():
    g = dataset_graph("IC", scale=0.1)
    assert memory_bytes(g, "async_gograph") == memory_bytes(g, "async_default")


def test_sync_overhead_is_exactly_one_state_array():
    g = dataset_graph("IC", scale=0.1)
    assert (
        memory_bytes(g, "sync_default") - memory_bytes(g, "async_default")
        == g.n * 8
    )


def test_bytes_scale_with_graph():
    small = dataset_graph("CP", scale=0.05)
    big = dataset_graph("CP", scale=0.1)
    for s in SCENARIOS:
        assert memory_bytes(big, s) > memory_bytes(small, s)


def test_unknown_scenario_raises():
    g = dataset_graph("IC", scale=0.1)
    with pytest.raises(ValueError):
        memory_bytes(g, "wat")
