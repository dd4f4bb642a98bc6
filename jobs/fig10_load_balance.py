"""Fig. 10 + Sec. VI-G: per-thread workload balance and total comparisons.

Usage: spark-submit jobs/fig10_load_balance.py [--scale 1.0] [--serial]
"""
import argparse

from repro.experiments.load_balance import (
    balance_summary,
    load_per_group,
    total_comparisons,
)
from repro.experiments.report import print_table


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--serial", action="store_true", help="skip Spark executor")
    args = ap.parse_args()
    spark = None
    if not args.serial:
        from repro.spark_util import get_session

        spark = get_session("fig10-load-balance")
    rows = load_per_group(scale=args.scale, spark=spark)
    print_table(rows, title="Fig. 10 — per-group intersection comparisons")
    print_table(balance_summary(rows), title="Fig. 10 — balance summary")
    print_table(
        total_comparisons(scale=args.scale),
        title="Sec. VI-G — total comparisons per dataset",
    )
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
