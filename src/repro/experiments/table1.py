"""Table I — dataset statistics (paper graphs vs our stand-ins)."""
from __future__ import annotations

import pandas as pd

from repro.experiments.common import GRAPHS, load_graph

#: Paper Table I: (vertices, edges).
PAPER_TABLE1 = {
    "IC": (11_358, 49_138),
    "SK": (121_422, 367_579),
    "GL": (875_713, 5_241_298),
    "WK": (1_864_433, 4_652_358),
    "CP": (3_774_768, 18_204_371),
    "LJ": (4_033_137, 27_972_078),
}


def table1(scale: str = "bench") -> pd.DataFrame:
    """Dataset stats: paper |V|/|E| next to stand-in |V|/|E|."""
    rows = []
    for name in GRAPHS:
        g = load_graph(name, scale)
        pv, pe = PAPER_TABLE1[name]
        rows.append(
            {
                "graph": name,
                "paper_V": pv,
                "paper_E": pe,
                "ours_V": g.n,
                "ours_E": g.n_edges,
                "ours_avg_deg": round(g.n_edges / g.n, 2),
            }
        )
    return pd.DataFrame(rows)
