"""Fig. 8: PARABACUS speedup over ABACUS vs mini-batch size.

Usage: spark-submit jobs/fig8_speedup_batch.py [--scale 1.0]
"""
import argparse

from repro.experiments.report import print_table
from repro.experiments.speedup import speedup_vs_batch
from repro.spark_util import get_session


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    args = ap.parse_args()
    spark = get_session("fig8-speedup-batch")
    rows = speedup_vs_batch(spark, scale=args.scale)
    print_table(
        rows,
        columns=["dataset", "k", "batch_size", "n_groups", "t_seq_s", "t_par_s", "speedup"],
        title="Fig. 8 — speedup vs mini-batch size",
    )
    spark.stop()


if __name__ == "__main__":
    main()
