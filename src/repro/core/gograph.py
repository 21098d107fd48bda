"""GoGraph (paper Algorithm 1): divide-and-conquer vertex reordering.

Phases (§IV-A):

1. *Divide*: extract high-degree vertices (top ``hd_frac`` by total
   degree) and the vertices isolated by their removal; partition the
   remainder into subgraphs of ~``target_size`` vertices.
2. *Conquer*: inside each subgraph, insert vertices one at a time (BFS
   selection from a min-in-degree seed) at the position maximizing the
   positive-edge count (:func:`repro.core.insertion.get_opt_val`),
   encoding positions as float ``val``s.
3. *Combine*: treat subgraphs as super-vertices with weighted edges
   (inter-subgraph edge counts), order them the same way, then decompress
   by shifting each subgraph's vals past the previous subgraph's max
   (Algorithm 1 lines 21–29, made robust to negative vals — DESIGN.md §4).
4. Insert high-degree then isolated vertices into the global order.

Two entry points: :func:`gograph_order` (pure local, used by the big
experiment sweeps) and :func:`gograph_positions_spark` (the conquer
phase runs distributed via ``groupBy(part).applyInPandas``; tests assert
it returns identical positions).
"""
from __future__ import annotations

import math

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.core.insertion import get_opt_val
from repro.graphs.local import LocalGraph
from repro.partition.api import partition

HD_FRAC_DEFAULT = 0.002  # paper: "extract the top 0.2% vertices"


def _select_bfs_order(
    vids: list[int],
    und: dict[int, set[int]],
    indeg: dict[int, int],
) -> list[int]:
    """Vertex selection order: BFS from min-in-degree seeds (paper §IV-A)."""
    remaining = set(vids)
    out: list[int] = []
    seeds = sorted(vids, key=lambda v: (indeg.get(v, 0), v))
    seed_i = 0
    from collections import deque

    while remaining:
        while seeds[seed_i] not in remaining:
            seed_i += 1
        root = seeds[seed_i]
        q = deque([root])
        remaining.discard(root)
        while q:
            v = q.popleft()
            out.append(v)
            for u in sorted(und.get(v, ())):
                if u in remaining:
                    remaining.discard(u)
                    q.append(u)
    return out


def reorder_subgraph(
    vids: list[int],
    edges: list[tuple[int, int, float]],
    selection: str = "bfs",
) -> dict[int, float]:
    """Conquer phase for one (sub)graph: vid → val.

    ``edges`` are intra-subgraph weighted edges (weight 1 for ordinary
    vertices; inter-subgraph counts when vids are super-vertices).
    ``selection`` picks the candidate order: ``bfs`` (paper §IV-A, from
    min-in-degree seeds, gives locality) or ``id`` (plain vid order —
    used by the Fig 10 "without partitioning" ablation, where no
    subgraph-local BFS frontier exists). Deterministic regardless of
    input row order.
    """
    vids = sorted(set(vids))
    # per-vertex directed neighbor weights
    w_in: dict[int, dict[int, float]] = {v: {} for v in vids}
    w_out: dict[int, dict[int, float]] = {v: {} for v in vids}
    und: dict[int, set[int]] = {v: set() for v in vids}
    indeg: dict[int, int] = {v: 0 for v in vids}
    for s, d, w in sorted(edges):
        if s == d:
            continue
        w_out[s][d] = w_out[s].get(d, 0.0) + w
        w_in[d][s] = w_in[d].get(s, 0.0) + w
        und[s].add(d)
        und[d].add(s)
        indeg[d] += 1

    vals: dict[int, float] = {}
    cur_max = -1.0
    cand = _select_bfs_order(vids, und, indeg) if selection == "bfs" else vids
    for v in cand:
        nbrs = [
            (vals[u], w_in[v].get(u, 0.0), w_out[v].get(u, 0.0))
            for u in und[v]
            if u in vals
        ]
        val, _ = get_opt_val(nbrs, empty_val=cur_max + 1.0)
        vals[v] = val
        cur_max = max(cur_max, val)
    return vals


def _split_graph(
    g: LocalGraph, hd_frac: float
) -> tuple[np.ndarray, np.ndarray, np.ndarray, np.ndarray]:
    """Divide phase: (hd_mask, iso_mask, core_src, core_dst) over E'."""
    deg = g.degree()
    k_hd = max(1, int(math.ceil(hd_frac * g.n)))
    # top-k by degree, ties → smaller vid (stable argsort on -deg)
    hd = np.argsort(-deg, kind="stable")[:k_hd]
    hd_mask = np.zeros(g.n, dtype=bool)
    hd_mask[hd] = True
    keep = ~hd_mask[g.src] & ~hd_mask[g.dst]
    core_src, core_dst = g.src[keep], g.dst[keep]
    touched = np.zeros(g.n, dtype=bool)
    touched[core_src] = True
    touched[core_dst] = True
    iso_mask = ~hd_mask & ~touched
    return hd_mask, iso_mask, core_src, core_dst


def _order_supers_and_offsets(
    part_of: dict[int, int],
    vals: dict[int, float],
    core_src: np.ndarray,
    core_dst: np.ndarray,
) -> dict[int, float]:
    """Combine phase: order super-vertices, return global vid → val."""
    # weighted super edges (inter-part edge counts)
    sedges: dict[tuple[int, int], float] = {}
    for s, d in zip(core_src.tolist(), core_dst.tolist()):
        ps, pd_ = part_of[s], part_of[d]
        if ps != pd_:
            sedges[(ps, pd_)] = sedges.get((ps, pd_), 0.0) + 1.0
    part_ids = sorted(set(part_of.values()))
    svals = reorder_subgraph(
        part_ids, [(a, b, w) for (a, b), w in sedges.items()]
    )
    # decompress: shift each part's vals past the previous part's max
    members: dict[int, list[int]] = {p: [] for p in part_ids}
    for v, p in part_of.items():
        members[p].append(v)
    out: dict[int, float] = {}
    offset = 0.0
    for p in sorted(part_ids, key=lambda q: (svals[q], q)):
        vs = members[p]
        lo = min(vals[v] for v in vs)
        hi = max(vals[v] for v in vs)
        for v in vs:
            out[v] = vals[v] - lo + offset
        offset += (hi - lo) + 1.0
    return out


def _insert_remaining(
    g: LocalGraph,
    vals: dict[int, float],
    hd_mask: np.ndarray,
    iso_mask: np.ndarray,
) -> dict[int, float]:
    """Insert high-degree (degree-descending) then isolated vertices."""
    w_in: dict[int, dict[int, float]] = {}
    w_out: dict[int, dict[int, float]] = {}
    special = hd_mask | iso_mask
    for s, d in zip(g.src.tolist(), g.dst.tolist()):
        if special[s]:
            w_out.setdefault(s, {})[d] = w_out.setdefault(s, {}).get(d, 0.0) + 1.0
        if special[d]:
            w_in.setdefault(d, {})[s] = w_in.setdefault(d, {}).get(s, 0.0) + 1.0
    deg = g.degree()
    cur_max = max(vals.values(), default=-1.0)
    hd_list = sorted(np.flatnonzero(hd_mask).tolist(), key=lambda v: (-deg[v], v))
    iso_list = sorted(np.flatnonzero(iso_mask).tolist())
    for v in hd_list + iso_list:
        wi, wo = w_in.get(v, {}), w_out.get(v, {})
        nbr_ids = (set(wi) | set(wo)) - {v}
        nbrs = [
            (vals[u], wi.get(u, 0.0), wo.get(u, 0.0))
            for u in sorted(nbr_ids)
            if u in vals
        ]
        val, _ = get_opt_val(nbrs, empty_val=cur_max + 1.0)
        vals[v] = val
        cur_max = max(cur_max, val)
    return vals


def _vals_to_positions(n: int, vals: dict[int, float]) -> np.ndarray:
    """vid → ordinal by ascending (val, vid) (Algorithm 1 line 36)."""
    arr = np.full(n, np.inf)
    for v, x in vals.items():
        arr[v] = x
    order = np.lexsort((np.arange(n), arr))
    pos = np.empty(n, dtype=np.int64)
    pos[order] = np.arange(n)
    return pos


def gograph_order(
    g: LocalGraph,
    *,
    partitioner: str = "rabbit",
    hd_frac: float = HD_FRAC_DEFAULT,
    target_size: int = 256,
    seed: int = 0,
    partitioned: bool = True,
) -> np.ndarray:
    """GoGraph positions (vid → ordinal), fully local.

    ``partitioned=False`` is the Fig 10 ablation: the divide phase is
    skipped entirely — the whole core graph is one subgraph and
    candidates are inserted in ID order (no subgraph-local BFS).
    """
    hd_mask, iso_mask, core_src, core_dst = _split_graph(g, hd_frac)
    core_vids = np.flatnonzero(~hd_mask & ~iso_mask)

    vals: dict[int, float] = {}
    if len(core_vids) and not partitioned:
        vals = reorder_subgraph(
            core_vids.tolist(),
            list(zip(core_src.tolist(), core_dst.tolist(), [1.0] * len(core_src))),
            selection="id",
        )
    elif len(core_vids):
        part_of, part_edges, part_vids = _partition_core(
            g, core_vids, core_src, core_dst, partitioner, target_size, seed
        )
        for p, vids in part_vids.items():
            vals.update(reorder_subgraph(vids, part_edges.get(p, [])))
        vals = _order_supers_and_offsets(part_of, vals, core_src, core_dst)
    vals = _insert_remaining(g, vals, hd_mask, iso_mask)
    return _vals_to_positions(g.n, vals)


def _partition_core(
    g: LocalGraph,
    core_vids: np.ndarray,
    core_src: np.ndarray,
    core_dst: np.ndarray,
    partitioner: str,
    target_size: int,
    seed: int,
):
    """Partition the induced core subgraph; return part maps keyed by vid."""
    remap = {int(v): i for i, v in enumerate(core_vids)}
    sub = LocalGraph(
        n=len(core_vids),
        src=np.array([remap[int(s)] for s in core_src], dtype=np.int64),
        dst=np.array([remap[int(d)] for d in core_dst], dtype=np.int64),
        w=np.ones(len(core_src)),
        name=f"{g.name}-core",
    )
    parts = partition(sub, partitioner, target_size=target_size, seed=seed)
    part_of = {int(v): int(parts[remap[int(v)]]) for v in core_vids}
    part_vids: dict[int, list[int]] = {}
    for v, p in part_of.items():
        part_vids.setdefault(p, []).append(v)
    part_edges: dict[int, list[tuple[int, int, float]]] = {}
    for s, d in zip(core_src.tolist(), core_dst.tolist()):
        ps, pd_ = part_of[s], part_of[d]
        if ps == pd_:
            part_edges.setdefault(ps, []).append((s, d, 1.0))
    return part_of, part_edges, part_vids


def gograph_positions_spark(
    spark: SparkSession,
    edges_df: DataFrame,
    n: int,
    *,
    partitioner: str = "rabbit",
    hd_frac: float = HD_FRAC_DEFAULT,
    target_size: int = 256,
    seed: int = 0,
) -> DataFrame:
    """GoGraph with the conquer phase as ``groupBy(part).applyInPandas``.

    Returns DataFrame(vid long, pos long); positions are identical to
    :func:`gograph_order` (asserted in tests).
    """
    from repro.graphs.local import to_local

    g = to_local(edges_df, n=n, name="spark-in")
    hd_mask, iso_mask, core_src, core_dst = _split_graph(g, hd_frac)
    core_vids = np.flatnonzero(~hd_mask & ~iso_mask)

    vals: dict[int, float] = {}
    if len(core_vids):
        part_of, part_edges, part_vids = _partition_core(
            g, core_vids, core_src, core_dst, partitioner, target_size, seed
        )
        # conquer phase on the cluster: one pandas group per subgraph
        rows = []
        for p, vids in part_vids.items():
            for v in vids:
                rows.append((p, v, -1, 0.0))  # vertex marker row
            for s, d, w in part_edges.get(p, []):
                rows.append((p, s, d, w))
        in_df = spark.createDataFrame(
            pd.DataFrame(rows, columns=["part", "src", "dst", "w"])
        )

        def _conquer(pdf: pd.DataFrame) -> pd.DataFrame:
            part = int(pdf["part"].iloc[0])
            vids = pdf.loc[pdf["dst"] < 0, "src"].astype(int).tolist()
            edges = [
                (int(r.src), int(r.dst), float(r.w))
                for r in pdf[pdf["dst"] >= 0].itertuples()
            ]
            vv = reorder_subgraph(vids, edges)
            return pd.DataFrame(
                {"vid": list(vv.keys()), "val": list(vv.values()), "part": part}
            )

        out = (
            in_df.groupBy("part")
            .applyInPandas(_conquer, "vid long, val double, part long")
            .toPandas()
        )
        vals = dict(zip(out["vid"].astype(int), out["val"].astype(float)))
        vals = _order_supers_and_offsets(part_of, vals, core_src, core_dst)
    vals = _insert_remaining(g, vals, hd_mask, iso_mask)
    pos = _vals_to_positions(g.n, vals)
    return spark.createDataFrame(
        pd.DataFrame({"vid": np.arange(g.n, dtype=np.int64), "pos": pos})
    )
