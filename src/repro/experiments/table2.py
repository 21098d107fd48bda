"""Table II — M(·), M/|E| and iteration rounds per reorder method on CP.

The paper's headline correlation: larger M(·) ⇒ fewer async iteration
rounds, with GoGraph maximal M and minimal rounds for PageRank, SSSP,
BFS and PHP.
"""
from __future__ import annotations

import pandas as pd

from repro.core.metric import metric_m_local
from repro.experiments.common import (
    TABLE2_ALGOS,
    load_graph,
    order_for,
    run_async,
)
from repro.reorder.api import METHODS

#: Paper Table II rows: M, M/|E|, rounds for (PageRank, SSSP, BFS, PHP).
PAPER_TABLE2 = {
    "default": (1_302_313, 0.07, 99, 25, 36, 67),
    "hubcluster": (2_303_977, 0.13, 94, 20, 34, 52),
    "degsort": (3_623_082, 0.20, 77, 20, 25, 48),
    "hubsort": (3_691_804, 0.20, 77, 22, 26, 44),
    "gorder": (5_875_924, 0.32, 76, 19, 22, 43),
    "rabbit": (8_883_616, 0.49, 75, 20, 25, 49),
    "gograph": (13_871_315, 0.76, 54, 14, 17, 27),
}


def table2(scale: str = "bench", graph: str = "CP") -> pd.DataFrame:
    """M(·) and async rounds of the four algorithms per reorder method."""
    g = load_graph(graph, scale)
    rows = []
    for method in METHODS:
        pos = order_for(g, method)
        m = metric_m_local(g, pos)
        rounds = {a: run_async(g, a, pos).rounds for a in TABLE2_ALGOS}
        rows.append(
            {
                "method": method,
                "M": m,
                "M_over_E": round(m / g.n_edges, 2),
                **{f"rounds_{a}": rounds[a] for a in TABLE2_ALGOS},
            }
        )
    return pd.DataFrame(rows)
