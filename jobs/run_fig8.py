"""Fig 8 as table: Sync+Def vs Async+Def vs Async+GoGraph.

Usage: spark-submit jobs/run_fig8.py [--scale bench|test]
"""
import argparse

from repro.experiments.async_impact import async_impact
from repro.experiments.common import markdown_table

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    print(markdown_table(async_impact(args.scale), float_fmt="{:.4f}"))
