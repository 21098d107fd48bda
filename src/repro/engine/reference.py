"""Local reference engine: Jacobi (Eq. 1) and Gauss–Seidel (Eq. 2).

This is the round-counting oracle and the harness used for the large
parameter sweeps (7 orders × 4 algorithms × 6 graphs); the Spark engines
are validated against it in tests (`tests/test_spark_engines.py`) and
timed on a subset in benchmarks. See DESIGN.md §4 for why both exist.

Semantics:

* ``jacobi``       — every contribution uses previous-round values.
* ``gauss_seidel`` — vertices are processed in ascending position of the
  supplied order; the state array is updated in place, so in-neighbors
  with smaller positions contribute this-round values and the rest
  previous-round values — exactly Eq. 2.

A round is counted iff its max state change exceeds the algorithm's
tolerance (the final detection sweep is not counted; DESIGN.md §4).
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np

from repro.engine.algorithms import Algo, Prepared, effective_graph
from repro.graphs.local import LocalGraph

MAX_ROUNDS = 10_000


@dataclass
class RunResult:
    """Outcome of an iterative run."""

    rounds: int
    x: np.ndarray
    converged: bool
    deltas: list[float]
    elapsed_s: float
    sums: list[float] = None  # Σ of finite states after each counted round


def _finite_sum(x: np.ndarray) -> float:
    """Σ over finite entries — the paper's Fig 7 distance uses Σ x_t."""
    return float(x[np.isfinite(x)].sum())


def _delta(a: np.ndarray, b: np.ndarray) -> float:
    """max |a-b| with inf==inf counted as no change."""
    with np.errstate(invalid="ignore"):
        diff = np.abs(a - b)
    diff[np.isnan(diff)] = 0.0  # inf - inf
    return float(diff.max(initial=0.0))


def jacobi(
    g: LocalGraph, algo: Algo, *, source: int | None = None, max_rounds: int = MAX_ROUNDS
) -> RunResult:
    """Synchronous (Eq. 1) iteration, vectorized with numpy."""
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    t0 = time.perf_counter()
    x = prep.init.copy()
    fixed_idx = np.fromiter(prep.fixed.keys(), dtype=np.int64, count=len(prep.fixed))
    fixed_val = np.fromiter(prep.fixed.values(), dtype=np.float64, count=len(prep.fixed))
    deltas: list[float] = []
    sums: list[float] = []
    rounds = 0
    converged = False
    for _ in range(max_rounds):
        xn = _jacobi_step_arrays(x, eg, prep)
        if len(fixed_idx):
            xn[fixed_idx] = fixed_val
        d = _delta(x, xn)
        x = xn
        if d <= prep.tol:
            converged = True
            break
        deltas.append(d)
        sums.append(_finite_sum(x))
        rounds += 1
    return RunResult(rounds, x, converged, deltas, time.perf_counter() - t0, sums)


def _jacobi_step_arrays(x: np.ndarray, eg: LocalGraph, prep: Prepared) -> np.ndarray:
    if prep.kind == "sum":
        msg = x[eg.src] * prep.param
        msg[~np.isfinite(msg)] = 0.0
        return prep.base + np.bincount(eg.dst, weights=msg, minlength=eg.n)
    if prep.kind == "min":
        xn = x.copy()
        np.minimum.at(xn, eg.dst, x[eg.src] + prep.param)
        return xn
    if prep.kind == "maxmin":
        xn = x.copy()
        np.maximum.at(xn, eg.dst, np.minimum(x[eg.src], prep.param))
        return xn
    raise ValueError(prep.kind)


def gauss_seidel(
    g: LocalGraph,
    algo: Algo,
    positions: np.ndarray,
    *,
    source: int | None = None,
    max_rounds: int = MAX_ROUNDS,
    impl: str = "fast",
) -> RunResult:
    """Asynchronous (Eq. 2) iteration under ``positions`` (vid → ordinal).

    ``impl='python'`` is the literal sequential sweep; ``impl='fast'`` is
    the vectorized level-synchronous equivalent (see
    :func:`gauss_seidel_fast`) — tests assert they produce identical
    rounds and states.
    """
    if impl == "fast":
        return gauss_seidel_fast(
            g, algo, positions, source=source, max_rounds=max_rounds
        )
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    t0 = time.perf_counter()
    order = np.argsort(positions, kind="stable").tolist()
    in_adj: list[list[tuple[int, float]]] = [[] for _ in range(eg.n)]
    for s, d, p in zip(eg.src.tolist(), eg.dst.tolist(), prep.param.tolist()):
        in_adj[d].append((s, p))

    kind = prep.kind
    base = prep.base.tolist()
    fixed = prep.fixed
    x = prep.init.tolist()
    deltas: list[float] = []
    sums: list[float] = []
    rounds = 0
    converged = False
    for _ in range(max_rounds):
        xp = x.copy()
        # in-place sweep == Eq. 2 (earlier positions already updated)
        if kind == "sum":
            for v in order:
                if v in fixed:
                    continue
                acc = base[v]
                for u, p in in_adj[v]:
                    xu = x[u]
                    if xu != float("inf"):
                        acc += xu * p
                x[v] = acc
        elif kind == "min":
            for v in order:
                if v in fixed:
                    continue
                best = x[v]
                for u, p in in_adj[v]:
                    cand = x[u] + p
                    if cand < best:
                        best = cand
                x[v] = best
        elif kind == "maxmin":
            for v in order:
                if v in fixed:
                    continue
                best = x[v]
                for u, p in in_adj[v]:
                    xu = x[u]
                    cand = xu if xu < p else p
                    if cand > best:
                        best = cand
                x[v] = best
        else:
            raise ValueError(kind)
        d = _delta(np.asarray(xp), np.asarray(x))
        if d <= prep.tol:
            converged = True
            break
        deltas.append(d)
        sums.append(_finite_sum(np.asarray(x)))
        rounds += 1
    return RunResult(
        rounds, np.asarray(x), converged, deltas, time.perf_counter() - t0, sums
    )


def fixpoint(g: LocalGraph, algo: Algo, *, source: int | None = None) -> np.ndarray:
    """Converged state x* (tight-tolerance Jacobi) — oracle for tests."""
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    x = prep.init.copy()
    fixed_idx = np.fromiter(prep.fixed.keys(), dtype=np.int64, count=len(prep.fixed))
    fixed_val = np.fromiter(prep.fixed.values(), dtype=np.float64, count=len(prep.fixed))
    tol = prep.tol / 1e3 if prep.tol > 0 else 0.0
    for _ in range(MAX_ROUNDS):
        xn = _jacobi_step_arrays(x, eg, prep)
        if len(fixed_idx):
            xn[fixed_idx] = fixed_val
        if _delta(x, xn) <= tol:
            return xn
        x = xn
    return x


def gauss_seidel_fast(
    g: LocalGraph,
    algo: Algo,
    positions: np.ndarray,
    *,
    source: int | None = None,
    max_rounds: int = MAX_ROUNDS,
) -> RunResult:
    """Vectorized Eq. 2 sweep via levels of the positive-edge DAG.

    A sequential in-position sweep is equivalent to processing vertices
    level by level, where ``level(v) = 1 + max(level(u))`` over positive
    in-edges (u, v) (0 if none): when a level is processed, every
    positive in-neighbor (smaller position → strictly smaller level) has
    already received its this-round value, and every negative in-neighbor
    contributes its previous-round value — exactly the sequential
    semantics, since a vertex's update never depends on same-level
    vertices. Each level is one numpy scatter over its in-edge slice,
    turning the O(|E|) Python loop into ~#levels numpy ops per round.
    Parity with the ``python`` implementation is asserted in tests.
    """
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    t0 = time.perf_counter()
    n = eg.n
    pos = positions
    positive = pos[eg.src] < pos[eg.dst]

    # level(v) over the positive-edge DAG, computed in position order
    order = np.argsort(pos, kind="stable")
    level = np.zeros(n, dtype=np.int64)
    in_adj_pos: list[list[int]] = [[] for _ in range(n)]
    for e, (s, d) in enumerate(zip(eg.src.tolist(), eg.dst.tolist())):
        if positive[e]:
            in_adj_pos[d].append(s)
    for v in order.tolist():
        lv = 0
        for u in in_adj_pos[v]:
            lu = level[u] + 1
            if lu > lv:
                lv = lu
        level[v] = lv

    # group edges and vertices by destination level
    dst_level = level[eg.dst]
    edge_order = np.argsort(dst_level, kind="stable")
    e_src = eg.src[edge_order]
    e_dst = eg.dst[edge_order]
    e_param = prep.param[edge_order]
    e_pos = positive[edge_order]
    n_levels = int(level.max(initial=0)) + 1
    e_bounds = np.searchsorted(dst_level[edge_order], np.arange(n_levels + 1))
    vert_level_order = np.argsort(level, kind="stable")
    v_bounds = np.searchsorted(level[vert_level_order], np.arange(n_levels + 1))

    fixed_idx = np.fromiter(prep.fixed.keys(), dtype=np.int64, count=len(prep.fixed))
    fixed_val = np.fromiter(prep.fixed.values(), dtype=np.float64, count=len(prep.fixed))
    fixed_mask = np.zeros(n, dtype=bool)
    fixed_mask[fixed_idx] = True

    x = prep.init.copy()
    deltas: list[float] = []
    sums: list[float] = []
    rounds = 0
    converged = False
    kind = prep.kind
    for _ in range(max_rounds):
        x_prev = x.copy()
        for L in range(n_levels):
            lo, hi = e_bounds[L], e_bounds[L + 1]
            vlo, vhi = v_bounds[L], v_bounds[L + 1]
            verts = vert_level_order[vlo:vhi]
            if hi > lo:
                s = e_src[lo:hi]
                src_val = np.where(e_pos[lo:hi], x[s], x_prev[s])
                d = e_dst[lo:hi]
                if kind == "sum":
                    msg = src_val * e_param[lo:hi]
                    msg[~np.isfinite(msg)] = 0.0
                    acc = np.bincount(d, weights=msg, minlength=n)
                    x[verts] = prep.base[verts] + acc[verts]
                elif kind == "min":
                    np.minimum.at(x, d, src_val + e_param[lo:hi])
                elif kind == "maxmin":
                    np.maximum.at(x, d, np.minimum(src_val, e_param[lo:hi]))
                else:
                    raise ValueError(kind)
            elif kind == "sum" and len(verts):
                # no in-edges into this level → sum semantics reset to base
                x[verts] = prep.base[verts]
            if len(fixed_idx):
                # re-clamp before any later level reads these values
                x[fixed_idx] = fixed_val
        dlt = _delta(x_prev, x)
        if dlt <= prep.tol:
            converged = True
            break
        deltas.append(dlt)
        sums.append(_finite_sum(x))
        rounds += 1
    return RunResult(rounds, x, converged, deltas, time.perf_counter() - t0, sums)


def per_round_time(
    g: LocalGraph,
    algo: Algo,
    positions: np.ndarray | None = None,
    *,
    source: int | None = None,
    sweeps: int = 3,
) -> float:
    """Measured wall-clock of one round of the *sequential* engine.

    Runs ``sweeps`` full sweeps of the pure-Python engine (no
    convergence checks) and returns the best per-sweep time.
    ``positions=None`` times the synchronous mode (contributions read
    from a round-start snapshot); otherwise the Eq. 2 in-place sweep in
    position order. Experiments report runtime as
    ``rounds × per_round_time`` — the paper's engine is a sequential
    sweep whose per-round cost is order-independent, whereas the
    vectorized fast engine's per-round cost varies with the positive-DAG
    depth, which would be a measurement artifact (DESIGN.md §4).
    """
    prep = algo.prepare(g, source)
    eg = effective_graph(g, prep)
    order = (
        np.argsort(positions, kind="stable").tolist()
        if positions is not None
        else list(range(eg.n))
    )
    in_adj: list[list[tuple[int, float]]] = [[] for _ in range(eg.n)]
    for s, d, p in zip(eg.src.tolist(), eg.dst.tolist(), prep.param.tolist()):
        in_adj[d].append((s, p))
    kind = prep.kind
    base = prep.base.tolist()
    fixed = prep.fixed
    x = prep.init.tolist()
    best = float("inf")
    for _ in range(sweeps):
        t0 = time.perf_counter()
        src_of = x if positions is not None else x.copy()
        if kind == "sum":
            for v in order:
                if v in fixed:
                    continue
                acc = base[v]
                for u, p in in_adj[v]:
                    xu = src_of[u]
                    if xu != float("inf"):
                        acc += xu * p
                x[v] = acc
        elif kind == "min":
            for v in order:
                if v in fixed:
                    continue
                b = x[v]
                for u, p in in_adj[v]:
                    cand = src_of[u] + p
                    if cand < b:
                        b = cand
                x[v] = b
        elif kind == "maxmin":
            for v in order:
                if v in fixed:
                    continue
                b = x[v]
                for u, p in in_adj[v]:
                    xu = src_of[u]
                    cand = xu if xu < p else p
                    if cand > b:
                        b = cand
                x[v] = b
        best = min(best, time.perf_counter() - t0)
    return best
