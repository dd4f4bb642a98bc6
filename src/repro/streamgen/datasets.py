"""The four KONECT-lite dataset configurations (Table II substitutes).

Each real KONECT graph from Table II is replaced by a seeded synthetic
Zipf-bipartite graph scaled ~1:100–1:1000 in edges (see DESIGN.md §3).
Left/right partition ratios mirror the originals; Zipf exponents are
tuned so the *butterfly-density ordering* of Table II is preserved
(movielens ≫ trackers ≥ livejournal > orkut, density = |B|/|E|⁴).

``load(name, scale)`` lets tests and benchmarks shrink a dataset further
while keeping its shape (scale multiplies edge and vertex counts).
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Tuple

from repro.streamgen.graphs import Edge, zipf_bipartite


@dataclass(frozen=True)
class DatasetSpec:
    """Shape parameters of one synthetic dataset."""

    name: str
    n_left: int
    n_right: int
    n_edges: int
    a_left: float
    a_right: float
    seed: int

    def scaled(self, scale: float) -> "DatasetSpec":
        """Shrink (or grow) the dataset, keeping ratios and exponents.

        Edge count scales linearly; vertex counts scale as sqrt(scale) so
        the edge density |E|/(|L||R|) — which drives butterfly formation —
        stays constant across scales.
        """
        sv = scale**0.5
        return DatasetSpec(
            name=self.name,
            n_left=max(8, int(self.n_left * sv)),
            n_right=max(8, int(self.n_right * sv)),
            n_edges=max(16, int(self.n_edges * scale)),
            a_left=self.a_left,
            a_right=self.a_right,
            seed=self.seed,
        )


#: Order matches Table II (densest to sparsest in butterfly density).
DATASETS: Dict[str, DatasetSpec] = {
    "movielens_lite": DatasetSpec("movielens_lite", 3000, 420, 80_000, 0.85, 0.85, 101),
    "trackers_lite": DatasetSpec("trackers_lite", 14_000, 6_400, 70_000, 0.90, 0.95, 103),
    "livejournal_lite": DatasetSpec(
        "livejournal_lite", 16_000, 48_000, 56_000, 0.85, 0.85, 102
    ),
    "orkut_lite": DatasetSpec("orkut_lite", 13_500, 43_600, 80_000, 0.65, 0.65, 104),
}

#: Table II as printed in the paper, for EXPERIMENTS.md side-by-side.
PAPER_TABLE2: Dict[str, Dict[str, float]] = {
    "movielens_lite": {
        "paper_name": "MovieLens",
        "E": 10e6, "L": 69.8e3, "R": 10.6e3, "B": 1.1e12, "density": 1.1e-16,
    },
    "livejournal_lite": {
        "paper_name": "LiveJournal",
        "E": 112e6, "L": 3.2e6, "R": 10.7e6, "B": 3.3e12, "density": 2.1e-20,
    },
    "trackers_lite": {
        "paper_name": "Trackers",
        "E": 140.6e6, "L": 27.6e6, "R": 12.7e6, "B": 20.0e12, "density": 5.1e-20,
    },
    "orkut_lite": {
        "paper_name": "Orkut",
        "E": 327e6, "L": 2.7e6, "R": 8.73e6, "B": 22.1e12, "density": 1.9e-21,
    },
}


def load(name: str, scale: float = 1.0) -> List[Edge]:
    """Generate the named dataset's edge list (deterministic in spec.seed)."""
    spec = DATASETS[name].scaled(scale)
    return zipf_bipartite(
        spec.n_left,
        spec.n_right,
        spec.n_edges,
        a_left=spec.a_left,
        a_right=spec.a_right,
        seed=spec.seed,
    )


def dataset_names() -> Tuple[str, ...]:
    return tuple(DATASETS)
