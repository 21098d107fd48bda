"""``GetOptVal`` (paper Algorithm 1, function lines 1–21).

Given a candidate vertex v and its neighbors already present in the
current processing order (each with its ``val`` and the weights of edges
to/from v), find the insertion position maximizing the number of
positive edges contributed by v, and return a ``val`` encoding that
position (midpoint of the surrounding neighbors' vals; head → min−1,
tail → max+1).

Key incremental idea from the paper: only positions adjacent to v's
*neighbors* matter — crossing a non-neighbor never changes the positive
edge count — so we scan the |N|+1 "cut" positions of the val-sorted
neighbor sequence, updating the count in O(1) per step:

* at the head, all out-edges of v are positive: ``pe = Σ w_out``;
* moving v past neighbor u flips u's edges: ``pe += w_in(u) − w_out(u)``.

Weights are 1 for ordinary vertices and inter-subgraph edge counts for
super-vertices (Algorithm 1 lines 9–19). The paper's sketch leaves the
head position implicit; we evaluate it explicitly (DESIGN.md §4).
"""
from __future__ import annotations


def get_opt_val(
    nbrs: list[tuple[float, float, float]],
    empty_val: float = 0.0,
) -> tuple[float, float]:
    """Optimal insertion val for a candidate with ordered-neighbor info.

    ``nbrs``: [(val_u, w_in, w_out)] for each neighbor u already in the
    order, where ``w_in`` is the total weight of edges u→v (v's incoming)
    and ``w_out`` of v→u. Unsorted input is fine.

    Returns ``(val, positive_edge_weight)``. With no neighbors in the
    order, the position is irrelevant: returns ``(empty_val, 0.0)``.
    """
    if not nbrs:
        return empty_val, 0.0
    ns = sorted(nbrs, key=lambda t: t[0])
    # position 0: v before every neighbor → all v→u edges positive
    pe = sum(t[2] for t in ns)
    best_pe = pe
    best_idx = 0
    for i, (_, w_in, w_out) in enumerate(ns):
        pe += w_in - w_out
        if pe > best_pe:
            best_pe = pe
            best_idx = i + 1
    if best_idx == 0:
        val = ns[0][0] - 1.0
    elif best_idx == len(ns):
        val = ns[-1][0] + 1.0
    else:
        val = (ns[best_idx - 1][0] + ns[best_idx][0]) / 2.0
    return val, best_pe


def insertion_positive_edges(
    nbrs: list[tuple[float, float, float]], val: float
) -> float:
    """Positive-edge weight contributed by v if inserted at ``val``.

    Brute-force oracle used in tests: an edge v→u is positive iff
    ``val < val_u``; u→v is positive iff ``val_u < val``. Neighbors whose
    val equals ``val`` would be ambiguous — callers avoid that by
    construction (midpoints between *distinct* neighbor vals).
    """
    pe = 0.0
    for val_u, w_in, w_out in nbrs:
        if val < val_u:
            pe += w_out
        elif val_u < val:
            pe += w_in
    return pe
