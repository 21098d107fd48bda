"""CPU-cache substrate: LRU simulator over state-access traces (Figs 9-10)."""
from repro.cachesim.lru import LRUCache, simulate_misses  # noqa: F401
from repro.cachesim.trace import pagerank_trace  # noqa: F401
