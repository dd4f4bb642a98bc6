"""Fig. 6 benchmark: impact of the deletions ratio α on ABACUS.

Paper claims: relative error < 8% at every α and roughly α-independent;
throughput flat in α.
"""
from repro.experiments.deletions import deletions_sweep
from repro.experiments.report import print_table

SCALE = 0.5
RUNS = 2


def test_fig6_deletions_impact(benchmark):
    rows = benchmark.pedantic(
        deletions_sweep,
        kwargs=dict(runs=RUNS, scale=SCALE),
        rounds=1,
        iterations=1,
    )
    print_table(
        rows,
        columns=["dataset", "alpha", "k", "rel_err", "edges_per_s"],
        title=f"Fig. 6 — impact of deletions (scale={SCALE})",
    )
    by_ds = {}
    for r in rows:
        by_ds.setdefault(r["dataset"], []).append(r)
    for ds, rs in by_ds.items():
        # error bounded at every alpha (paper: < 8%; MC margin here)
        assert all(r["rel_err"] < 0.25 for r in rs), ds
        # throughput flat in alpha: max/min within 2x
        thr = [r["edges_per_s"] for r in rs]
        assert max(thr) / min(thr) < 2.0, ds
