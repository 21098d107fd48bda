"""Fig 12 (as table) — impact of average degree (Barabási–Albert graphs).

The paper generates BA graphs with 1M vertices and average degrees
2/4/6/8 (NetworkX), runs PageRank under every reorder method, and finds
(i) GoGraph still wins, (ii) gains shrink vs real graphs because BA's
default order is already good. We generate BA graphs at 10k vertices
with our own generator (NetworkX is unavailable offline) and default
orientation ~0.5 — naturally much better than CP's 0.07.
"""
from __future__ import annotations

import pandas as pd

from repro.engine.algorithms import make_algo
from repro.engine.reference import per_round_time
from repro.experiments.common import order_for, run_async
from repro.graphs.gen import ba_graph
from repro.reorder.api import METHODS

AVG_DEGREES = (2, 4, 6, 8)


def degrees_experiment(n: int = 10_000, repeats: int = 3) -> pd.DataFrame:
    """PageRank rounds/runtime per method on BA graphs of varying degree."""
    rows = []
    for avg_deg in AVG_DEGREES:
        m = max(1, avg_deg // 2)  # each attachment adds ~1 edge → deg ≈ 2m
        g = ba_graph(n, m, forward_frac=0.5, extra_frac=0.0, seed=42 + avg_deg, name=f"BA-d{avg_deg}")
        for method in METHODS:
            pos = order_for(g, method)
            rounds = run_async(g, "pagerank", pos).rounds
            prt = per_round_time(g, make_algo("pagerank"), pos, sweeps=repeats)
            rows.append(
                {
                    "avg_degree": avg_deg,
                    "edges": g.n_edges,
                    "method": method,
                    "rounds": rounds,
                    "runtime_s": rounds * prt,
                }
            )
    return pd.DataFrame(rows)
