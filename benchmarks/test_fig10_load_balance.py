"""Fig. 10 + Sec. VI-G benchmark: per-thread workload balance.

Paper claims: the versioned-sample contiguous grouping gives every
thread a near-equal number of set-intersection comparisons, and total
work tracks butterfly density (MovieLens ~7x Orkut per thread).
"""
from repro.experiments.load_balance import (
    balance_summary,
    load_per_group,
    total_comparisons,
)
from repro.experiments.report import print_table

SCALE = 0.5
GROUPS = 8


def test_fig10_load_balance(benchmark, spark):
    rows = benchmark.pedantic(
        load_per_group,
        kwargs=dict(batch_size=8000, n_groups=GROUPS, scale=SCALE, spark=spark),
        rounds=1,
        iterations=1,
    )
    print_table(rows, title=f"Fig. 10 — per-group comparisons (scale={SCALE})")
    summaries = balance_summary(rows)
    print_table(summaries, title="Fig. 10 — balance summary")
    totals = total_comparisons(scale=SCALE)
    print_table(totals, title=f"Sec. VI-G — total comparisons (scale={SCALE})")

    for s in summaries:
        assert s["groups"] == GROUPS
        # near-equal loads (paper's Fig. 10 bars are visually flat)
        assert s["imbalance_max_over_mean"] < 1.35, s
    by_total = {t["dataset"]: t["total_comparisons"] for t in totals}
    # denser graph => more intersection work (Sec. VI-G: ML 2.21B vs Orkut 0.30B)
    assert by_total["movielens_lite"] > by_total["orkut_lite"]
    by_mean = {s["dataset"]: s["mean"] for s in summaries}
    assert by_mean["movielens_lite"] > by_mean["orkut_lite"]
