"""Table II: M(·), M/|E| and iteration rounds per reorder method on CP.

Usage: spark-submit jobs/run_table2.py [--scale bench|test] [--graph CP]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.table2 import PAPER_TABLE2, table2

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    ap.add_argument("--graph", default="CP")
    args = ap.parse_args()
    print(markdown_table(table2(args.scale, args.graph)))
    print("\npaper Table II (M, M/|E|, PR, SSSP, BFS, PHP):")
    for k, v in PAPER_TABLE2.items():
        print(f"  {k:11s} {v}")
