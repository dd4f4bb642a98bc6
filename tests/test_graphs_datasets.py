"""Tests for the synthetic graph generators and dataset registry."""
import pytest

from repro.core import exact
from repro.core.encoding import is_left
from repro.streamgen import datasets
from repro.streamgen.graphs import complete_bipartite, zipf_bipartite, zipf_weights


def test_zipf_weights_normalized_and_decreasing():
    w = zipf_weights(100, 1.0)
    assert w.sum() == pytest.approx(1.0)
    assert all(w[i] >= w[i + 1] for i in range(99))


def test_zipf_weights_flat_when_a_zero():
    w = zipf_weights(10, 0.0)
    assert all(abs(x - 0.1) < 1e-12 for x in w)


@pytest.mark.parametrize("seed", range(5))
def test_zipf_bipartite_edge_count_and_uniqueness(seed):
    edges = zipf_bipartite(50, 40, 300, seed=seed)
    assert len(edges) == 300
    assert len(set(edges)) == 300


def test_zipf_bipartite_is_bipartite():
    for u, v in zipf_bipartite(20, 20, 100, seed=0):
        assert is_left(u) and not is_left(v)


def test_zipf_bipartite_vertex_ranges():
    edges = zipf_bipartite(10, 7, 50, seed=1)
    pdf = exact.edges_to_pdf(edges)
    assert pdf["l"].between(0, 9).all()
    assert pdf["r"].between(0, 6).all()


def test_zipf_bipartite_deterministic():
    assert zipf_bipartite(20, 20, 100, seed=5) == zipf_bipartite(20, 20, 100, seed=5)
    assert zipf_bipartite(20, 20, 100, seed=5) != zipf_bipartite(20, 20, 100, seed=6)


def test_zipf_bipartite_capacity_guard():
    with pytest.raises(ValueError):
        zipf_bipartite(5, 5, 21, seed=0)


def test_skew_increases_hub_degree():
    flat = exact.edges_to_pdf(zipf_bipartite(100, 100, 800, 0.0, 0.0, seed=2))
    skew = exact.edges_to_pdf(zipf_bipartite(100, 100, 800, 1.2, 1.2, seed=2))
    assert skew.groupby("l").size().max() > flat.groupby("l").size().max()


def test_complete_bipartite():
    edges = complete_bipartite(3, 4)
    assert len(edges) == 12
    assert len(set(edges)) == 12


def test_dataset_registry_names():
    names = datasets.dataset_names()
    assert set(names) == {
        "movielens_lite",
        "trackers_lite",
        "livejournal_lite",
        "orkut_lite",
    }
    assert set(datasets.PAPER_TABLE2) == set(names)


@pytest.mark.parametrize("name", datasets.dataset_names())
def test_dataset_loads_at_small_scale(name):
    spec = datasets.DATASETS[name].scaled(0.02)
    edges = datasets.load(name, scale=0.02)
    assert len(edges) == spec.n_edges
    assert len(set(edges)) == spec.n_edges


def test_scaled_spec_keeps_shape():
    spec = datasets.DATASETS["movielens_lite"]
    s = spec.scaled(0.5)
    assert s.n_edges == spec.n_edges // 2
    assert s.a_left == spec.a_left and s.a_right == spec.a_right
    assert s.seed == spec.seed


def test_scaled_spec_has_minimums():
    s = datasets.DATASETS["movielens_lite"].scaled(1e-9)
    assert s.n_left >= 8 and s.n_right >= 8 and s.n_edges >= 16


def test_density_ordering_matches_table2_at_reduced_scale():
    """The substitution's key property: Table II's butterfly-density
    ordering (movielens > trackers > livejournal > orkut)."""
    dens = {}
    for name in datasets.dataset_names():
        edges = datasets.load(name, scale=0.15)
        b = exact.butterflies_duckdb(exact.edges_to_pdf(edges))
        dens[name] = exact.butterfly_density(b, len(edges))
    assert dens["movielens_lite"] > dens["trackers_lite"]
    assert dens["trackers_lite"] > dens["livejournal_lite"]
    assert dens["livejournal_lite"] > dens["orkut_lite"]


def test_density_definition_reproduces_paper_values():
    """density = |B|/|E|^4 recovers Table II's printed densities."""
    for name, row in datasets.PAPER_TABLE2.items():
        got = exact.butterfly_density(int(row["B"]), int(row["E"]))
        assert got == pytest.approx(row["density"], rel=0.25), name
