"""Fig 13 (as table) — GoGraph with different partitioning methods.

Paper: Rabbit-Partition (default), Metis and Louvain perform similarly
inside GoGraph; Fennel underperforms because streaming decisions see
only partial graph structure. Normalized to Rabbit-Partition = 1.0.
"""
from __future__ import annotations

import pandas as pd

from repro.core.gograph import gograph_order
from repro.engine.algorithms import make_algo
from repro.engine.reference import per_round_time
from repro.core.metric import metric_m_local
from repro.experiments.common import GRAPHS, load_graph, run_async
from repro.partition.api import PARTITIONERS


def partition_methods(
    scale: str = "bench",
    graphs: tuple[str, ...] = ("CP", "LJ", "WK", "GL"),
    repeats: int = 3,
) -> pd.DataFrame:
    """PageRank rounds/runtime for GoGraph × partitioner, Rabbit-normalized."""
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        for p in PARTITIONERS:
            pos = gograph_order(g, partitioner=p)
            rounds = run_async(g, "pagerank", pos).rounds
            prt = per_round_time(g, make_algo("pagerank"), pos, sweeps=repeats)
            rows.append(
                {
                    "graph": gname,
                    "partitioner": p,
                    "M_over_E": round(metric_m_local(g, pos) / g.n_edges, 3),
                    "rounds": rounds,
                    "runtime_s": rounds * prt,
                }
            )
    df = pd.DataFrame(rows)
    base = (
        df[df["partitioner"] == "rabbit"]
        .set_index("graph")[["rounds", "runtime_s"]]
        .rename(columns={"rounds": "base_rounds", "runtime_s": "base_rt"})
    )
    df = df.join(base, on="graph")
    df["norm_rounds"] = (df["rounds"] / df["base_rounds"]).round(3)
    df["norm_runtime"] = (df["runtime_s"] / df["base_rt"]).round(3)
    return df.drop(columns=["base_rounds", "base_rt"])
