"""Experiment harnesses — one module per paper table/figure (DESIGN.md §3)."""
