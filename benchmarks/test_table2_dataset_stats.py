"""Table II benchmark: dataset statistics at benchmark scale (0.5).

Prints the reproduction of Table II's rows (|E|, |L|, |R|, |B|,
butterfly density) next to the paper's values. Benchmarked unit: the
exact butterfly count of all four datasets.
"""
from repro.experiments.report import print_table
from repro.experiments.stats import dataset_stats

SCALE = 0.5


def test_table2_dataset_stats(benchmark):
    rows = benchmark.pedantic(
        dataset_stats, kwargs=dict(scale=SCALE), rounds=1, iterations=1
    )
    print_table(rows, title=f"Table II — dataset statistics (scale={SCALE})")
    by = {r["dataset"]: r for r in rows}
    # Table II's density ordering is the property the substitution preserves
    assert (
        by["movielens_lite"]["density"]
        > by["trackers_lite"]["density"]
        > by["livejournal_lite"]["density"]
        > by["orkut_lite"]["density"]
    )
    for r in rows:
        assert r["B"] > 0
