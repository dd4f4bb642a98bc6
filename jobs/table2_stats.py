"""Table II: dataset statistics (|E|, |L|, |R|, |B|, butterfly density).

Usage: spark-submit jobs/table2_stats.py [--scale 1.0] [--engine spark|duckdb]
"""
import argparse

from repro.experiments.report import print_table
from repro.experiments.stats import dataset_stats


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--engine", choices=("spark", "duckdb"), default="spark")
    args = ap.parse_args()
    spark = None
    if args.engine == "spark":
        from repro.spark_util import get_session

        spark = get_session("table2-stats")
    rows = dataset_stats(scale=args.scale, spark=spark)
    print_table(rows, title=f"Table II — dataset statistics (scale={args.scale})")
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
