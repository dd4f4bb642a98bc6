"""Fig. 7 benchmark: ABACUS scales linearly with the input stream size.

Cumulative elapsed time at each 10% checkpoint for three sample sizes
on trackers_lite and orkut_lite; linearity asserted via R² ≈ 1.
"""
from repro.experiments import common
from repro.experiments.report import print_table
from repro.experiments.scalability import linearity_r2, scalability_series

SCALE = 0.5
KS = common.scaled_ks(common.DEFAULT_KS, SCALE)


def test_fig7_scalability(benchmark):
    rows = benchmark.pedantic(
        scalability_series, kwargs=dict(scale=SCALE), rounds=1, iterations=1
    )
    print_table(
        rows,
        columns=["dataset", "k", "pct", "elements", "elapsed_s"],
        title=f"Fig. 7 — elapsed vs stream fraction (scale={SCALE})",
    )
    fits = linearity_r2(rows)
    print_table(fits, title="Fig. 7 — linearity R^2")
    for f in fits:
        assert f["r2"] > 0.95, f
    # larger sample => larger total elapsed time (paper observation)
    by = {(f["dataset"], f["k"]): f["total_s"] for f in fits}
    for ds in {f["dataset"] for f in fits}:
        assert by[(ds, KS[-1])] > by[(ds, KS[0])], ds
