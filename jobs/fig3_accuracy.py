"""Fig. 3: relative error on fully dynamic streams (α = 20%).

Usage: python jobs/fig3_accuracy.py [--scale 1.0] [--runs 5]
"""
import argparse

from repro.experiments.accuracy import accuracy_sweep, improvement_over_baselines
from repro.experiments.report import print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--runs", type=int, default=5)
    ap.add_argument("--alpha", type=float, default=0.20)
    args = ap.parse_args()
    rows = accuracy_sweep(alpha=args.alpha, runs=args.runs, scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "k", "algo", "rel_err", "est_mean", "truth_mean"],
        title=f"Fig. 3 — relative error, fully dynamic (alpha={args.alpha})",
    )
    print_table(
        improvement_over_baselines(rows),
        title="Fig. 3 — ABACUS accuracy improvement over baselines (x)",
    )


if __name__ == "__main__":
    main()
