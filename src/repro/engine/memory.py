"""Memory-usage accounting model (paper Fig 11).

The paper reports that sync/async/GoGraph memory use is similar, with
sync slightly higher because it must keep both the previous- and
current-round state arrays; GoGraph adds no runtime structures (the
permutation is applied at preprocessing time). We account bytes of the
in-memory representation: CSR topology + weights + state arrays.
"""
from __future__ import annotations

from repro.graphs.local import LocalGraph

_IDX = 8  # int64 index / offset
_VAL = 8  # float64 state / weight


def memory_bytes(g: LocalGraph, scenario: str) -> int:
    """Bytes for scenario ∈ {'sync_default', 'async_default', 'async_gograph'}."""
    csr = (g.n + 1) * _IDX + g.n_edges * _IDX + g.n_edges * _VAL
    if scenario == "sync_default":
        return csr + 2 * g.n * _VAL  # previous + current states
    if scenario in ("async_default", "async_gograph"):
        return csr + g.n * _VAL  # single in-place state array
    raise ValueError(f"unknown scenario {scenario!r}")


SCENARIOS = ("sync_default", "async_default", "async_gograph")
