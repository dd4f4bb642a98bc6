"""Fig. 6: impact of the deletions ratio α on accuracy and throughput.

Usage: python jobs/fig6_deletions.py [--scale 1.0] [--runs 3] [--k N]
"""
import argparse

from repro.experiments.deletions import deletions_sweep
from repro.experiments.report import print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--runs", type=int, default=3)
    ap.add_argument("--k", type=int, default=None, help="effective sample size; default: scaled mid-grid")
    args = ap.parse_args()
    rows = deletions_sweep(k=args.k, runs=args.runs, scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "alpha", "k", "rel_err", "edges_per_s"],
        title="Fig. 6 — impact of deletions ratio",
    )


if __name__ == "__main__":
    main()
