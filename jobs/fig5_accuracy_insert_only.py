"""Fig. 5: relative error on insertion-only streams (α = 0%).

Usage: python jobs/fig5_accuracy_insert_only.py [--scale 1.0] [--runs 5]
"""
import argparse

from repro.experiments.accuracy import accuracy_sweep
from repro.experiments.report import print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--runs", type=int, default=5)
    args = ap.parse_args()
    rows = accuracy_sweep(alpha=0.0, runs=args.runs, scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "k", "algo", "rel_err", "est_mean", "truth_mean"],
        title="Fig. 5 — relative error, insertion-only (alpha=0)",
    )


if __name__ == "__main__":
    main()
