"""Fig. 5 benchmark: accuracy on insertion-only streams (α = 0%).

Paper claim: ABACUS is at least as accurate as the insert-only
specialists; error decreases with the sample size.
"""
from repro.experiments import common
from repro.experiments.accuracy import accuracy_sweep
from repro.experiments.report import print_table

SCALE = 0.5
RUNS = 3
KS = common.scaled_ks(common.DEFAULT_KS, SCALE)


def test_fig5_accuracy_insert_only(benchmark):
    rows = benchmark.pedantic(
        accuracy_sweep,
        kwargs=dict(alpha=0.0, runs=RUNS, scale=SCALE),
        rounds=1,
        iterations=1,
    )
    print_table(
        rows,
        columns=["dataset", "k", "algo", "rel_err", "est_mean", "truth_mean"],
        title=f"Fig. 5 — relative error, alpha=0% (scale={SCALE}, runs={RUNS})",
    )
    by = {(r["dataset"], r["k"], r["algo"]): r["rel_err"] for r in rows}
    datasets = {r["dataset"] for r in rows}
    # ABACUS comparable to the specialists (within 3x of the best baseline,
    # generous MC margin) on every dataset/size
    for ds in datasets:
        for k in KS:
            best_baseline = min(by[(ds, k, "fleet")], by[(ds, k, "cas")])
            assert by[(ds, k, "abacus")] < 3.0 * best_baseline + 0.05, (ds, k)
    # error shrinks with k for ABACUS (smallest vs largest sample)
    for ds in datasets:
        assert by[(ds, KS[-1], "abacus")] < by[(ds, KS[0], "abacus")] + 0.02, ds
