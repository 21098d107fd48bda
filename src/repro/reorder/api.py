"""Registry of reordering methods (paper §V-A): name → positions."""
from __future__ import annotations

import numpy as np

from repro.core.gograph import gograph_order
from repro.graphs.local import LocalGraph
from repro.reorder.baselines import default_order, degree_sort, hub_cluster, hub_sort
from repro.reorder.gorder import gorder
from repro.reorder.rabbit import rabbit_order

#: Paper-order method list (Table II rows / Fig 5–6 series).
METHODS = (
    "default",
    "hubcluster",
    "degsort",
    "hubsort",
    "gorder",
    "rabbit",
    "gograph",
)


def compute_order(g: LocalGraph, method: str, **kw) -> np.ndarray:
    """Positions (vid → ordinal) for ``method`` ∈ METHODS."""
    if method == "default":
        return default_order(g)
    if method == "degsort":
        return degree_sort(g)
    if method == "hubsort":
        return hub_sort(g)
    if method == "hubcluster":
        return hub_cluster(g)
    if method == "rabbit":
        return rabbit_order(g, **kw)
    if method == "gorder":
        return gorder(g, **kw)
    if method == "gograph":
        return gograph_order(g, **kw)
    raise ValueError(f"unknown reorder method {method!r}")


def assert_permutation(pos: np.ndarray, n: int) -> None:
    """Sanity guard: positions must be a permutation of 0..n−1."""
    if len(pos) != n or not np.array_equal(np.sort(pos), np.arange(n)):
        raise AssertionError("positions are not a permutation")
