"""Fig. 9 benchmark: PARABACUS speedup over ABACUS vs #thread groups.

Paper shape: more threads => more speedup; larger samples gain more.
"""
from repro.experiments.report import print_table
from repro.experiments.speedup import speedup_vs_threads

SCALE = 1.0
KS = (12000, 24000)
THREADS = (2, 8, 16)


def test_fig9_speedup_vs_threads(benchmark, spark):
    rows = benchmark.pedantic(
        speedup_vs_threads,
        args=(spark,),
        kwargs=dict(
            dataset_names=("movielens_lite",),
            ks=KS,
            thread_counts=THREADS,
            batch_size=16000,
            scale=SCALE,
        ),
        rounds=1,
        iterations=1,
    )
    print_table(
        rows,
        columns=["dataset", "k", "n_groups", "batch_size", "t_seq_s", "t_par_s", "speedup"],
        title="Fig. 9 — PARABACUS speedup vs #thread groups",
    )
    by = {(r["k"], r["n_groups"]): r["speedup"] for r in rows}
    # more threads help at the largest sample size
    assert by[(KS[-1], THREADS[-1])] > by[(KS[-1], THREADS[0])]
    # the largest sample size gains the most at full parallelism
    assert by[(KS[-1], THREADS[-1])] >= by[(KS[0], THREADS[-1])] * 0.9
