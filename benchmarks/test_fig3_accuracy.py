"""Fig. 3 benchmark: accuracy on fully dynamic streams (α = 20%).

Relative error of ABACUS vs the deletion-ignoring FLEET/CAS baselines,
per dataset and sample size. Paper headline: ABACUS is 2.6-148x more
accurate; its own error is 0.5-8.3% on average.
"""
from repro.experiments import common
from repro.experiments.accuracy import accuracy_sweep, improvement_over_baselines
from repro.experiments.report import print_table

SCALE = 0.5
RUNS = 3
KS = common.scaled_ks(common.DEFAULT_KS, SCALE)


def test_fig3_accuracy_fully_dynamic(benchmark):
    rows = benchmark.pedantic(
        accuracy_sweep,
        kwargs=dict(alpha=0.20, runs=RUNS, scale=SCALE),
        rounds=1,
        iterations=1,
    )
    print_table(
        rows,
        columns=["dataset", "k", "algo", "rel_err", "est_mean", "truth_mean"],
        title=f"Fig. 3 — relative error, alpha=20% (scale={SCALE}, runs={RUNS})",
    )
    imp = improvement_over_baselines(rows)
    print_table(imp, title="Fig. 3 — ABACUS improvement over baselines (x)")
    by = {(r["dataset"], r["k"], r["algo"]): r["rel_err"] for r in rows}
    # ABACUS beats both baselines on every dataset and sample size
    for (ds, k, algo), err in by.items():
        if algo == "abacus":
            assert err < by[(ds, k, "fleet")], (ds, k)
            assert err < by[(ds, k, "cas")], (ds, k)
    # and every improvement factor is > 1 (paper: 2.57x .. 148.4x)
    assert all(r["improvement_x"] > 1.0 for r in imp)
