"""Pure-Python sweep kernels shared by the Spark async engine and the
local reference engine.

``gs_sweep`` is the literal implementation of Eq. 2: vertices are
processed in ascending position; an in-neighbor contributes its
*this-round* value if it was already updated (in ``updated``) and its
previous-round value otherwise. The Spark async engine calls it once per
block inside ``applyInPandas`` (with ``updated`` carrying earlier-block
values); the reference engine calls it once per round over the whole
graph. Sharing the kernel makes the two engines agree by construction.
"""
from __future__ import annotations

from repro.engine.algorithms import Prepared


def vertex_update(
    kind: str,
    prev_val: float,
    base: float,
    contribs: list[tuple[float, float]],
) -> float:
    """One application of F(·): ``contribs`` = [(x_u, edge_param), ...]."""
    if kind == "sum":
        acc = base
        for xu, p in contribs:
            acc += xu * p
        return acc
    if kind == "min":
        best = prev_val
        for xu, p in contribs:
            cand = xu + p
            if cand < best:
                best = cand
        return best
    if kind == "maxmin":
        best = prev_val
        for xu, p in contribs:
            cand = xu if xu < p else p
            if cand > best:
                best = cand
        return best
    raise ValueError(f"unknown kind {kind!r}")


def gs_sweep(
    order_vids: list[int],
    in_edges: dict[int, list[tuple[int, float]]],
    prev_vals: dict[int, float],
    src_vals: dict[int, float],
    prep_kind: str,
    base: dict[int, float],
    fixed: dict[int, float],
    updated: dict[int, float] | None = None,
) -> dict[int, float]:
    """Sequential Eq. 2 sweep over ``order_vids`` (ascending position).

    ``in_edges[v]``  — [(u, param)] for edges (u, v) whose dst is in this sweep.
    ``prev_vals[v]`` — x_v^{k-1} for swept vertices.
    ``src_vals[u]``  — state of u as seen at sweep start (previous round for
                       later-position vertices; current round for vertices
                       already updated in earlier blocks of this round).
    ``updated``      — optional dict of values already updated this round
                       (earlier blocks); the sweep extends it in place.

    Returns {v: new value} for swept vertices.
    """
    if updated is None:
        updated = {}
    out: dict[int, float] = {}
    for v in order_vids:
        if v in fixed:
            out[v] = fixed[v]
            updated[v] = fixed[v]
            continue
        contribs = []
        for u, p in in_edges.get(v, ()):
            xu = updated.get(u)
            if xu is None:
                xu = src_vals[u]
            contribs.append((xu, p))
        nv = vertex_update(prep_kind, prev_vals[v], base.get(v, 0.0), contribs)
        out[v] = nv
        updated[v] = nv
    return out


def jacobi_step(
    vids: list[int],
    in_edges: dict[int, list[tuple[int, float]]],
    prev_vals: dict[int, float],
    prep_kind: str,
    base: dict[int, float],
    fixed: dict[int, float],
) -> dict[int, float]:
    """One Eq. 1 step: every contribution uses previous-round values."""
    out: dict[int, float] = {}
    for v in vids:
        if v in fixed:
            out[v] = fixed[v]
            continue
        contribs = [(prev_vals[u], p) for u, p in in_edges.get(v, ())]
        out[v] = vertex_update(prep_kind, prev_vals[v], base.get(v, 0.0), contribs)
    return out


def max_delta(old: dict[int, float], new: dict[int, float]) -> float:
    """max_v |new_v - old_v| treating inf == inf as zero change."""
    m = 0.0
    for v, nv in new.items():
        ov = old[v]
        if ov == nv:
            continue
        d = abs(nv - ov)
        if d > m:
            m = d
    return m


def prepared_dicts(prep: Prepared):
    """Prepared arrays → dict views used by the kernels (tiny graphs only)."""
    base = {i: float(b) for i, b in enumerate(prep.base)} if prep.kind == "sum" else {}
    return base, dict(prep.fixed)
