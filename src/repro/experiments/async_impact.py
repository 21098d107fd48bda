"""Fig 8 (as table) — impact of processing order in improving async mode.

Compares Sync+Default (Eq. 1), Async+Default (Eq. 2, original order) and
Async+GoGraph on PageRank and SSSP across all graphs. The paper reports
Async+GoGraph speedups over Sync+Default of 1.56×–6.30× (3.04× avg).
"""
from __future__ import annotations

import pandas as pd

from repro.engine.algorithms import make_algo
from repro.engine.reference import per_round_time
from repro.experiments.common import GRAPHS, load_graph, order_for, run_async, run_sync

PAPER_FIG8 = {"speedup_range": (1.56, 6.30), "speedup_avg": 3.04}


def async_impact(
    scale: str = "bench",
    graphs: tuple[str, ...] = GRAPHS,
    algos: tuple[str, ...] = ("pagerank", "sssp"),
    repeats: int = 3,
) -> pd.DataFrame:
    """Rounds & runtime for the three (mode, order) scenarios."""
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        pos_def = order_for(g, "default")
        pos_gg = order_for(g, "gograph")
        for algo in algos:
            a = make_algo(algo)
            sync_rounds = run_sync(g, algo).rounds
            adef_rounds = run_async(g, algo, pos_def).rounds
            agg_rounds = run_async(g, algo, pos_gg).rounds
            prt_sync = per_round_time(g, a, None, sweeps=repeats)
            prt_def = per_round_time(g, a, pos_def, sweeps=repeats)
            prt_gg = per_round_time(g, a, pos_gg, sweeps=repeats)
            t_sync = sync_rounds * prt_sync
            t_def = adef_rounds * prt_def
            t_gg = agg_rounds * prt_gg
            rows.append(
                {
                    "graph": gname,
                    "algo": algo,
                    "sync_def_rounds": sync_rounds,
                    "async_def_rounds": adef_rounds,
                    "async_gograph_rounds": agg_rounds,
                    "sync_def_s": t_sync,
                    "async_def_s": t_def,
                    "async_gograph_s": t_gg,
                    "speedup_vs_sync": round(t_sync / max(t_gg, 1e-12), 2),
                    "round_speedup_vs_sync": round(sync_rounds / max(1, agg_rounds), 2),
                }
            )
    return pd.DataFrame(rows)
