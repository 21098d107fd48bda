"""Memory-access traces of iterative computation under a vertex order.

PageRank's inner loop reads, for each vertex v in processing order, the
states of v's in-neighbors and then writes v's own state. States live in
an array indexed by *position* (reordering relabels the layout — that is
the whole point of locality-oriented methods), 8 bytes per state, 64
bytes per line.
"""
from __future__ import annotations

import numpy as np

from repro.graphs.local import LocalGraph

STATE_BYTES = 8
LINE_BYTES = 64
STATES_PER_LINE = LINE_BYTES // STATE_BYTES


def pagerank_trace(g: LocalGraph, positions: np.ndarray) -> np.ndarray:
    """Cache-line trace of one PageRank sweep in ``positions`` order."""
    in_adj = g.in_edges_by_vertex()
    order = np.argsort(positions, kind="stable")
    pos = positions
    out: list[int] = []
    for v in order.tolist():
        for u, _ in in_adj[v]:
            out.append(int(pos[u]) // STATES_PER_LINE)
        out.append(int(pos[v]) // STATES_PER_LINE)
    return np.asarray(out, dtype=np.int64)
