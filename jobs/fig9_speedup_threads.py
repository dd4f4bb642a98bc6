"""Fig. 9: PARABACUS speedup over ABACUS vs number of thread groups.

Usage: spark-submit jobs/fig9_speedup_threads.py [--scale 1.0]
"""
import argparse

from repro.experiments.report import print_table
from repro.experiments.speedup import speedup_vs_threads
from repro.spark_util import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_session("fig9-speedup-threads")
    rows = speedup_vs_threads(spark, scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "k", "n_groups", "batch_size", "t_seq_s", "t_par_s", "speedup"],
        title="Fig. 9 — speedup vs #thread groups",
    )
    spark.stop()


if __name__ == "__main__":
    main()
