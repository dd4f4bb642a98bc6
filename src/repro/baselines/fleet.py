"""FLEET3 baseline (Sanei-Mehri et al., CIKM 2019) — insert-only.

Reimplemented from the FLEET paper's description (the best variant,
FLEET3, as used by the ABACUS evaluation with resizing parameter
γ = 0.75):

- A reservoir of capacity ``M`` holds edges, each present independently
  with the current sampling probability ``p`` (p starts at 1).
- For **every** arriving insertion (whether or not it is later sampled —
  the ThinkD-style decoupling that distinguishes FLEET3), count the
  butterflies the edge forms with the reservoir and add
  ``count / p³`` to the estimate (3 partner edges, each sampled w.p. p).
- The edge then enters the reservoir with probability ``p``. If the
  reservoir is full, it is first *subsampled*: every stored edge is kept
  independently with probability γ and ``p ← γ·p`` (this rescaling keeps
  per-edge membership uniform at the current ``p``, which is why the
  single current ``p`` is the right scale factor); the incoming edge
  then joins at the new rate (extra γ coin).
- **Deletions are ignored** — FLEET has no mechanism for them; this is
  precisely the deficiency the ABACUS paper measures.
"""
from __future__ import annotations

import random
from typing import Iterable

from repro.core.abacus import Element
from repro.core.counting import count_butterflies_with_sample
from repro.core.sample_graph import SampleGraph


class Fleet3:
    """FLEET3 estimator with reservoir capacity ``capacity``."""

    def __init__(self, capacity: int, gamma: float = 0.75, seed: int = 0):
        if capacity < 2:
            raise ValueError("capacity must be >= 2")
        if not 0.0 < gamma < 1.0:
            raise ValueError("gamma must be in (0, 1)")
        self.capacity = capacity
        self.gamma = gamma
        self.sample = SampleGraph()
        self.p = 1.0
        self.estimate = 0.0
        self.comparisons = 0
        self.rng = random.Random(seed)
        self.elements_processed = 0
        self.n_subsamples = 0

    def _subsample(self) -> None:
        """ADAPT: keep each stored edge w.p. γ; p ← γ·p."""
        rng = self.rng
        for u, v in self.sample.edges():
            if rng.random() >= self.gamma:
                self.sample.remove(u, v)
        self.p *= self.gamma
        self.n_subsamples += 1

    def process(self, u: int, v: int, sign: int) -> float:
        """Process one element; deletions are no-ops (returns 0.0)."""
        self.elements_processed += 1
        if sign < 0:
            return 0.0
        n_bf, comps = count_butterflies_with_sample(self.sample.adj, u, v)
        self.comparisons += comps
        adj_amount = n_bf / self.p**3 if n_bf else 0.0
        self.estimate += adj_amount
        if self.rng.random() < self.p:
            if len(self.sample) >= self.capacity:
                self._subsample()
                if self.rng.random() < self.gamma:
                    self.sample.add(u, v)
            else:
                self.sample.add(u, v)
        return adj_amount

    def process_stream(self, stream: Iterable[Element]) -> float:
        for u, v, sign in stream:
            self.process(u, v, sign)
        return self.estimate
