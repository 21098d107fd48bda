"""Figs 5 & 6 as tables: normalized runtime & rounds across all cells.

Usage: spark-submit jobs/run_fig5_6.py [--scale bench|test]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.overall import gograph_speedups, overall

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    df = overall(args.scale)
    print(markdown_table(df, float_fmt="{:.4f}"))
    print("\nGoGraph vs competitors (paper Fig 5/6 headline):")
    print(markdown_table(gograph_speedups(df)))
