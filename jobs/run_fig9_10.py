"""Figs 9 & 10 as tables: simulated cache misses; partition ablation.

Usage: spark-submit jobs/run_fig9_10.py [--scale bench|test]
"""
import argparse

from repro.experiments.cache import cache_misses, partition_effect
from repro.experiments.common import markdown_table

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    print(markdown_table(cache_misses(args.scale), float_fmt="{:.3f}"))
    print()
    print(markdown_table(partition_effect(args.scale), float_fmt="{:.1f}"))
