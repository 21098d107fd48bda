"""Fig 12 as table: impact of average degree (BA graphs), PageRank.

Usage: spark-submit jobs/run_fig12.py [--n 10000]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.degrees import degrees_experiment

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--n", type=int, default=10_000)
    args = ap.parse_args()
    print(markdown_table(degrees_experiment(n=args.n), float_fmt="{:.4f}"))
