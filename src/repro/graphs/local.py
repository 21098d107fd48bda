"""Local (driver-side) graph view shared by the reference engine, the
sequential reorder kernels, and the cache simulator.

``LocalGraph`` is a plain struct of numpy edge arrays; adjacency builders
are cached. Spark DataFrames remain the canonical interchange format —
``to_local`` collects a Spark edge frame when a sequential substrate
(Gauss–Seidel sweep, Gorder window, LRU simulation) needs the whole graph
in memory, which is fine at reproduction scale (≤ ~100k edges).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
from pyspark.sql import DataFrame


@dataclass
class LocalGraph:
    """Directed weighted graph as parallel edge arrays (vertices 0..n-1)."""

    n: int
    src: np.ndarray  # int64 (|E|,)
    dst: np.ndarray  # int64 (|E|,)
    w: np.ndarray  # float64 (|E|,)
    name: str = "g"
    _cache: dict = field(default_factory=dict, repr=False)

    @property
    def n_edges(self) -> int:
        return len(self.src)

    def out_degree(self) -> np.ndarray:
        """Out-degree per vertex (int64)."""
        if "outdeg" not in self._cache:
            self._cache["outdeg"] = np.bincount(self.src, minlength=self.n)
        return self._cache["outdeg"]

    def in_degree(self) -> np.ndarray:
        if "indeg" not in self._cache:
            self._cache["indeg"] = np.bincount(self.dst, minlength=self.n)
        return self._cache["indeg"]

    def degree(self) -> np.ndarray:
        """Total degree (in + out)."""
        return self.in_degree() + self.out_degree()

    def out_weight(self) -> np.ndarray:
        """Sum of outgoing edge weights per vertex (for PHP normalization)."""
        if "outw" not in self._cache:
            self._cache["outw"] = np.bincount(
                self.src, weights=self.w, minlength=self.n
            )
        return self._cache["outw"]

    def in_edges_by_vertex(self) -> list[list[tuple[int, float]]]:
        """``adj[v]`` = list of ``(u, w)`` for each edge (u, v)."""
        if "in_adj" not in self._cache:
            adj: list[list[tuple[int, float]]] = [[] for _ in range(self.n)]
            for s, d, ww in zip(self.src.tolist(), self.dst.tolist(), self.w.tolist()):
                adj[d].append((s, ww))
            self._cache["in_adj"] = adj
        return self._cache["in_adj"]

    def undirected_adj(self) -> list[list[int]]:
        """``adj[v]`` = neighbors of v ignoring direction (with repeats deduped)."""
        if "und_adj" not in self._cache:
            adj: list[set[int]] = [set() for _ in range(self.n)]
            for s, d in zip(self.src.tolist(), self.dst.tolist()):
                adj[s].add(d)
                adj[d].add(s)
            self._cache["und_adj"] = [sorted(a) for a in adj]
        return self._cache["und_adj"]

    def highest_out_degree_vertex(self) -> int:
        """Canonical source vertex for SSSP/BFS/PHP (best propagation reach)."""
        return int(np.argmax(self.out_degree()))


def to_local(edges_df: DataFrame, n: int | None = None, name: str = "g") -> LocalGraph:
    """Collect a Spark edge frame (src, dst[, weight]) into a LocalGraph."""
    pdf = edges_df.toPandas()
    src = pdf["src"].to_numpy(dtype=np.int64)
    dst = pdf["dst"].to_numpy(dtype=np.int64)
    w = (
        pdf["weight"].to_numpy(dtype=np.float64)
        if "weight" in pdf.columns
        else np.ones(len(src))
    )
    if n is None:
        n = int(max(src.max(initial=-1), dst.max(initial=-1))) + 1
    return LocalGraph(n=n, src=src, dst=dst, w=w, name=name)
