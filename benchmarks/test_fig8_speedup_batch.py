"""Fig. 8 benchmark: PARABACUS speedup over ABACUS vs mini-batch size.

Paper shape: speedup grows with the mini-batch size, with the sample
size, and with butterfly density (MovieLens highest, Orkut lowest).
Absolute factors are smaller here (Spark task overhead vs Java threads
— DESIGN.md §3); the monotone shapes are what is asserted.
"""
from repro.experiments.report import print_table
from repro.experiments.speedup import speedup_vs_batch

SCALE = 1.0
KS = (12000, 24000)
BATCHES = (4000, 16000, 32000)


def test_fig8_speedup_vs_batch(benchmark, spark):
    rows = benchmark.pedantic(
        speedup_vs_batch,
        args=(spark,),
        kwargs=dict(
            dataset_names=("movielens_lite", "orkut_lite"),
            ks=KS,
            batch_sizes=BATCHES,
            n_groups=16,
            scale=SCALE,
        ),
        rounds=1,
        iterations=1,
    )
    print_table(
        rows,
        columns=["dataset", "k", "batch_size", "n_groups", "t_seq_s", "t_par_s", "speedup"],
        title="Fig. 8 — PARABACUS speedup vs mini-batch size",
    )
    by = {(r["dataset"], r["k"], r["batch_size"]): r["speedup"] for r in rows}
    # speedup grows with the mini-batch size (dense dataset, both ks)
    for k in KS:
        assert by[("movielens_lite", k, BATCHES[-1])] > by[("movielens_lite", k, BATCHES[0])]
    # speedup grows with the sample size at the largest batch
    assert (
        by[("movielens_lite", KS[-1], BATCHES[-1])]
        > by[("movielens_lite", KS[0], BATCHES[0])]
    )
    # denser graph => more speedup (paper: MovieLens 17.6x vs Orkut 5x)
    assert (
        by[("movielens_lite", KS[-1], BATCHES[-1])]
        > by[("orkut_lite", KS[-1], BATCHES[-1])]
    )
    # parallelism pays off on the dense dataset at the largest k and batch
    assert by[("movielens_lite", KS[-1], BATCHES[-1])] > 1.5
