"""Vertex reordering methods: GoGraph's competitors + registry."""
from repro.reorder.api import METHODS, compute_order  # noqa: F401
