"""Fig 7 as table: convergence speed (time to reach converged state).

Usage: spark-submit jobs/run_fig7.py [--scale bench|test]
"""
import argparse

from repro.experiments.common import markdown_table
from repro.experiments.convergence import convergence, gograph_time_fraction

if __name__ == "__main__":
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", default="bench", choices=["bench", "test"])
    args = ap.parse_args()
    df = convergence(args.scale)
    print(markdown_table(df, float_fmt="{:.4f}"))
    print("\nGoGraph time fraction vs average of others (paper: 0.59 avg, 0.37 min):")
    print(markdown_table(gograph_time_fraction(df)))
