"""Figs 5 & 6 (as tables) — normalized runtime and iteration rounds of
each reorder method across all graphs and algorithms.

The paper normalizes to Default = 1.0 per (graph, algorithm) cell and
reports GoGraph speedups of 2.10× avg / up to 3.33× over Default, with
the fewest rounds in most cells. Runtime = measured per-round wall-clock
of the sequential sweep engine × rounds-to-convergence (see
``repro.engine.reference.per_round_time`` for why not the vectorized
engine's wall-clock).
"""
from __future__ import annotations

import pandas as pd

from repro.engine.algorithms import make_algo
from repro.engine.reference import per_round_time
from repro.experiments.common import GRAPHS, TABLE2_ALGOS, load_graph, order_for, run_async
from repro.reorder.api import METHODS

#: Paper headline speedups of GoGraph over each method (avg, max) — Fig 5.
PAPER_FIG5_SPEEDUPS = {
    "default": (2.10, 3.33),
    "degsort": (1.66, 2.75),
    "hubsort": (1.85, 3.24),
    "hubcluster": (1.93, 3.34),
    "rabbit": (1.80, 2.42),
    "gorder": (1.62, 2.68),
}
#: Paper round reductions of GoGraph vs each method (avg%, max%) — Fig 6.
PAPER_FIG6_REDUCTIONS = {
    "default": (52, 71),
    "degsort": (39, 65),
    "hubsort": (40, 70),
    "hubcluster": (45, 68),
    "rabbit": (32, 57),
    "gorder": (39, 67),
}


def overall(
    scale: str = "bench",
    graphs: tuple[str, ...] = GRAPHS,
    algos: tuple[str, ...] = TABLE2_ALGOS,
    repeats: int = 3,
) -> pd.DataFrame:
    """Long-form results: one row per (graph, algo, method).

    ``runtime_s`` = rounds × best-of-``repeats`` per-round sweep time;
    normalized columns use the Default row of the same (graph, algo).
    """
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        for method in METHODS:
            pos = order_for(g, method)
            for algo in algos:
                rounds = run_async(g, algo, pos).rounds
                prt = per_round_time(g, make_algo(algo), pos, sweeps=repeats)
                rows.append(
                    {
                        "graph": gname,
                        "algo": algo,
                        "method": method,
                        "rounds": rounds,
                        "runtime_s": rounds * prt,
                    }
                )
    df = pd.DataFrame(rows)
    base = (
        df[df["method"] == "default"]
        .set_index(["graph", "algo"])[["rounds", "runtime_s"]]
        .rename(columns={"rounds": "base_rounds", "runtime_s": "base_runtime"})
    )
    df = df.join(base, on=["graph", "algo"])
    df["norm_runtime"] = df["runtime_s"] / df["base_runtime"]
    df["norm_rounds"] = df["rounds"] / df["base_rounds"]
    return df.drop(columns=["base_rounds", "base_runtime"])


def gograph_speedups(df: pd.DataFrame) -> pd.DataFrame:
    """GoGraph speedup & round reduction vs each competitor (Fig 5/6 style)."""
    gg = df[df["method"] == "gograph"].set_index(["graph", "algo"])
    out = []
    for method in METHODS:
        if method == "gograph":
            continue
        other = df[df["method"] == method].set_index(["graph", "algo"])
        sp = other["runtime_s"] / gg["runtime_s"]
        rr = 1.0 - gg["rounds"] / other["rounds"]
        out.append(
            {
                "vs_method": method,
                "speedup_avg": round(float(sp.mean()), 2),
                "speedup_max": round(float(sp.max()), 2),
                "round_red_avg_pct": round(float(rr.mean()) * 100),
                "round_red_max_pct": round(float(rr.max()) * 100),
            }
        )
    return pd.DataFrame(out)
