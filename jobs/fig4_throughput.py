"""Fig. 4: throughput (edges/s) of ABACUS / PARABACUS / FLEET / CAS.

Usage: spark-submit jobs/fig4_throughput.py [--scale 1.0] [--no-parabacus]
"""
import argparse

from repro.experiments.report import print_table
from repro.experiments.throughput import throughput_sweep


def main() -> None:
    ap = argparse.ArgumentParser()
    ap.add_argument("--scale", type=float, default=1.0)
    ap.add_argument("--no-parabacus", action="store_true")
    args = ap.parse_args()
    algos = ["abacus", "abacus_ins", "fleet", "cas"]
    spark = None
    if not args.no_parabacus:
        from repro.spark_util import get_session

        spark = get_session("fig4-throughput")
        algos.append("parabacus")
    rows = throughput_sweep(scale=args.scale, algos=algos, spark=spark)
    print_table(
        rows,
        columns=["dataset", "k", "algo", "stream_len", "elapsed_s", "edges_per_s"],
        title="Fig. 4 — throughput (alpha=0.2)",
    )
    if spark is not None:
        spark.stop()


if __name__ == "__main__":
    main()
