"""Fig. 7: ABACUS elapsed time vs processed stream fraction (linearity).

Usage: python jobs/fig7_scalability.py [--scale 1.0]
"""
import argparse

from repro.experiments.report import print_table
from repro.experiments.scalability import linearity_r2, scalability_series


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    rows = scalability_series(scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "k", "pct", "elements", "elapsed_s"],
        title="Fig. 7 — elapsed time per 10% checkpoint (alpha=0.2)",
    )
    print_table(linearity_r2(rows), title="Fig. 7 — linearity (R^2 of elapsed~elements)")


if __name__ == "__main__":
    main()
