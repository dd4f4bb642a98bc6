"""CAS-R baseline (Li et al., TKDE 2022) — insert-only, behavioural.

Co-Affiliation Sampling with the reservoir variant (CAS-R) splits its
memory budget ``k``: a fraction λ goes to an AMS sketch, the rest to an
edge reservoir. We reimplement it at the description level of the
ABACUS paper (the original is closed-source and its internals are not
needed to reproduce the *measured* behaviours — see DESIGN.md §3):

- Reservoir sampling over the first-seen edges with capacity
  ``(1-λ)·k``; every stored edge is in the reservoir with probability
  ``q = min(1, cap / n_seen)``, uniform as in classic reservoir
  sampling.
- For every arriving insertion, count the butterflies it forms with the
  reservoir and add ``count / q³`` to the estimate.
- An AMS sketch of ``λ·k`` counters is updated with 4 hash rows per
  edge. This reproduces the two behaviours the ABACUS evaluation
  attributes to CAS: the smaller effective sample for a given budget
  (accuracy at/below FLEET's), and the per-edge sketch-update cost that
  halves throughput on sketch-heavy workloads (Sec. VI-C, Trackers).
- **Deletions are ignored**, as in the original.
"""
from __future__ import annotations

import random
from typing import Iterable

import numpy as np

from repro.core.abacus import Element
from repro.core.counting import count_butterflies_with_sample
from repro.core.sample_graph import SampleGraph

_AMS_ROWS = 4


class CasR:
    """CAS-R estimator with total memory budget ``budget`` edges."""

    def __init__(self, budget: int, lam: float = 0.33, seed: int = 0):
        if budget < 4:
            raise ValueError("budget must be >= 4")
        if not 0.0 < lam < 1.0:
            raise ValueError("lam must be in (0, 1)")
        self.budget = budget
        self.lam = lam
        self.capacity = max(2, int(round((1.0 - lam) * budget)))
        self.sketch_width = max(1, (budget - self.capacity) // _AMS_ROWS)
        self.sketch = np.zeros((_AMS_ROWS, self.sketch_width), dtype=np.int64)
        self.sample = SampleGraph()
        self.n_seen = 0  # insertions observed
        self.estimate = 0.0
        self.comparisons = 0
        self.rng = random.Random(seed)
        self.elements_processed = 0
        # per-row hash seeds for the AMS update
        self._hash_seeds = [self.rng.randrange(1 << 30) | 1 for _ in range(_AMS_ROWS)]

    @property
    def q(self) -> float:
        """Current per-edge reservoir membership probability."""
        if self.n_seen == 0:
            return 1.0
        return min(1.0, self.capacity / self.n_seen)

    def _sketch_update(self, u: int, v: int) -> None:
        """AMS-style update: one bucket ±1 per hash row."""
        key = (u << 1) ^ (v * 0x9E3779B1)
        for row, seed in enumerate(self._hash_seeds):
            h = (key * seed + row) & 0x7FFFFFFF
            bucket = h % self.sketch_width
            sign = 1 if (h >> 15) & 1 else -1
            self.sketch[row, bucket] += sign

    def process(self, u: int, v: int, sign: int) -> float:
        """Process one element; deletions are no-ops (returns 0.0)."""
        self.elements_processed += 1
        if sign < 0:
            return 0.0
        # Count before the membership probability shifts with this edge.
        n_bf, comps = count_butterflies_with_sample(self.sample.adj, u, v)
        self.comparisons += comps
        q = self.q if self.n_seen >= self.capacity else 1.0
        adj_amount = n_bf / q**3 if n_bf else 0.0
        self.estimate += adj_amount
        self._sketch_update(u, v)
        # classic reservoir insert
        self.n_seen += 1
        if len(self.sample) < self.capacity:
            self.sample.add(u, v)
        elif self.rng.random() < self.capacity / self.n_seen:
            a, b = self.sample.random_edge(self.rng)
            self.sample.remove(a, b)
            self.sample.add(u, v)
        return adj_amount

    def process_stream(self, stream: Iterable[Element]) -> float:
        for u, v, sign in stream:
            self.process(u, v, sign)
        return self.estimate
