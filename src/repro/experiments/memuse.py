"""Fig 11 (as table) — memory usage of the three computation scenarios.

Paper: usage is similar across Sync+Def / Async+Def / Async+GoGraph;
sync is slightly higher (keeps previous+current states); GoGraph adds
no runtime structures. Reproduced with the byte-accounting model.
"""
from __future__ import annotations

import pandas as pd

from repro.engine.memory import SCENARIOS, memory_bytes
from repro.experiments.common import GRAPHS, load_graph


def memory_usage(scale: str = "bench", graphs: tuple[str, ...] = GRAPHS) -> pd.DataFrame:
    """Modelled MiB per (graph, scenario) + sync overhead ratio."""
    rows = []
    for gname in graphs:
        g = load_graph(gname, scale)
        b = {s: memory_bytes(g, s) for s in SCENARIOS}
        rows.append(
            {
                "graph": gname,
                **{f"{s}_MiB": round(v / 2**20, 3) for s, v in b.items()},
                "sync_overhead_ratio": round(
                    b["sync_default"] / b["async_default"], 3
                ),
            }
        )
    return pd.DataFrame(rows)
