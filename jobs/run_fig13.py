"""Fig 13 as table: GoGraph with different partitioning methods.

Usage: spark-submit jobs/run_fig13.py [--scale bench|test]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.partition_methods import partition_methods

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    print(markdown_table(partition_methods(args.scale), float_fmt="{:.3f}"))
