"""Fig 11 as table: memory usage accounting per scenario.

Usage: spark-submit jobs/run_fig11.py [--scale bench|test]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.memuse import memory_usage

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    print(markdown_table(memory_usage(args.scale), float_fmt="{:.3f}"))
