"""Figs 9 & 10 (as tables) — simulated CPU cache misses.

Fig 9: PageRank cache misses per reorder method on every graph (paper:
GoGraph reduces misses ~30% on average vs competitors). Fig 10: GoGraph
with vs without its partitioning step (paper: partitioning cuts misses
33% avg / 58% max). Misses come from the LRU substrate (DESIGN.md §2).
"""
from __future__ import annotations

import pandas as pd

from repro.cachesim.lru import simulate_misses
from repro.cachesim.trace import pagerank_trace
from repro.core.gograph import gograph_order
from repro.experiments.common import GRAPHS, load_graph, order_for
from repro.reorder.api import METHODS

PAPER_FIG9 = {"gograph_avg_reduction_pct": 30}
PAPER_FIG10 = {"partition_reduction_avg_pct": 33, "partition_reduction_max_pct": 58}

#: Simulated cache: 4 KiB (16 sets × 4 ways × 64 B). The paper measures a
#: 32 KiB L1d against graphs 100–1000× larger than our stand-ins; scaling
#: the cache down keeps the state-array/cache ratio in the regime where
#: locality matters (the smallest stand-in, IC, has an 18 KiB state array).
CACHE = dict(n_sets=16, assoc=4)


def cache_misses(
    scale: str = "bench", graphs: tuple[str, ...] = GRAPHS
) -> pd.DataFrame:
    """Fig 9: PageRank-trace misses per (graph, method)."""
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        for method in METHODS:
            pos = order_for(g, method)
            misses, accesses = simulate_misses(pagerank_trace(g, pos), **CACHE)
            rows.append(
                {
                    "graph": gname,
                    "method": method,
                    "misses": misses,
                    "accesses": accesses,
                    "miss_rate": round(misses / accesses, 4),
                }
            )
    df = pd.DataFrame(rows)
    base = df[df["method"] == "default"].set_index("graph")["misses"].rename("base")
    df = df.join(base, on="graph")
    df["norm_misses"] = (df["misses"] / df["base"]).round(3)
    return df.drop(columns="base")


def partition_effect(
    scale: str = "bench", graphs: tuple[str, ...] = GRAPHS
) -> pd.DataFrame:
    """Fig 10: GoGraph misses with vs without the partitioning step.

    "Without partitioning" = skip the divide phase entirely: one
    subgraph, candidates inserted in ID order (no subgraph-local BFS
    frontier exists without the divide phase — DESIGN.md §4).
    """
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        pos_with = gograph_order(g)
        pos_without = gograph_order(g, partitioned=False)
        m_with, acc = simulate_misses(pagerank_trace(g, pos_with), **CACHE)
        m_without, _ = simulate_misses(pagerank_trace(g, pos_without), **CACHE)
        rows.append(
            {
                "graph": gname,
                "misses_with_partition": m_with,
                "misses_without_partition": m_without,
                "reduction_pct": round(100 * (1 - m_with / max(1, m_without)), 1),
            }
        )
    return pd.DataFrame(rows)
