"""Table I: dataset statistics (paper vs stand-ins).

Usage: spark-submit jobs/run_table1.py [--scale bench|test]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.table1 import table1

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    print(markdown_table(table1(args.scale)))
