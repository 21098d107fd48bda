"""Set-associative LRU cache simulator.

The paper measures hardware cache misses (perf counters on a Xeon);
offline we reproduce the *relative* effect of vertex orders on locality
with a classic set-associative LRU model: 64-byte lines, ``n_sets``
sets, ``assoc`` ways (defaults model a 32 KiB 8-way L1d). Orders that
co-locate a vertex with its neighbors reuse the same lines and miss
less — exactly the mechanism Figs 9–10 attribute to GoGraph's
partition-based layout. DESIGN.md §2 documents this substitution.
"""
from __future__ import annotations

import numpy as np


class LRUCache:
    """Set-associative LRU over cache-line ids."""

    def __init__(self, n_sets: int = 64, assoc: int = 8):
        self.n_sets = n_sets
        self.assoc = assoc
        # per-set ordered dict: insertion order == LRU order (dicts are ordered)
        self._sets: list[dict[int, None]] = [dict() for _ in range(n_sets)]
        self.hits = 0
        self.misses = 0

    def access(self, line: int) -> bool:
        """Touch a line; returns True on hit."""
        s = self._sets[line % self.n_sets]
        if line in s:
            del s[line]  # move to MRU
            s[line] = None
            self.hits += 1
            return True
        if len(s) >= self.assoc:
            del s[next(iter(s))]  # evict LRU
        s[line] = None
        self.misses += 1
        return False


def simulate_misses(
    lines: np.ndarray, *, n_sets: int = 64, assoc: int = 8
) -> tuple[int, int]:
    """Run a line-id trace through the cache; returns (misses, accesses)."""
    c = LRUCache(n_sets=n_sets, assoc=assoc)
    access = c.access
    for line in lines.tolist():
        access(line)
    return c.misses, len(lines)
