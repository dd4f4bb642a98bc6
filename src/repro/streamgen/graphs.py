"""Synthetic bipartite graph generators (KONECT dataset substitutes).

Real KONECT graphs are unavailable offline, so we generate bipartite
graphs with independently Zipf-distributed endpoint popularity on each
side — the degree-skew family that drives butterfly density in the real
datasets (hubs on both sides create quadratically many wedges and
quartically many butterflies). The exponents ``a_left``/``a_right``
tune the skew; dataset shapes live in :mod:`repro.streamgen.datasets`.

Edges are simple (deduplicated), emitted in generation order — the
stream's "natural order" (Sec. VI-A) — as encoded ``(u, v)`` pairs with
``u`` left (>= 0) and ``v`` right (< 0).
"""
from __future__ import annotations

from typing import List, Tuple

import numpy as np

from repro.core.encoding import enc_right

Edge = Tuple[int, int]


def zipf_weights(n: int, a: float) -> np.ndarray:
    """Normalized Zipf weights ``rank^-a`` over ``n`` items."""
    w = 1.0 / np.arange(1, n + 1, dtype=np.float64) ** a
    return w / w.sum()


def zipf_bipartite(
    n_left: int,
    n_right: int,
    n_edges: int,
    a_left: float = 0.8,
    a_right: float = 0.8,
    seed: int = 0,
) -> List[Edge]:
    """Generate ``n_edges`` distinct bipartite edges with Zipf endpoints.

    Raises if the requested edge count exceeds 80% of the complete
    bipartite capacity (rejection would stall near saturation).
    """
    if n_edges > 0.8 * n_left * n_right:
        raise ValueError(
            f"n_edges={n_edges} too close to capacity {n_left * n_right}"
        )
    rng = np.random.default_rng(seed)
    wl = zipf_weights(n_left, a_left)
    wr = zipf_weights(n_right, a_right)
    seen: set[Edge] = set()
    out: List[Edge] = []
    while len(out) < n_edges:
        m = int((n_edges - len(out)) * 1.5) + 16
        us = rng.choice(n_left, size=m, p=wl)
        rs = rng.choice(n_right, size=m, p=wr)
        for u, r in zip(us.tolist(), rs.tolist()):
            e = (u, enc_right(r))
            if e not in seen:
                seen.add(e)
                out.append(e)
                if len(out) == n_edges:
                    break
    return out


def complete_bipartite(n_left: int, n_right: int) -> List[Edge]:
    """K_{n_left, n_right} — C(n_left,2)*C(n_right,2) butterflies (tests)."""
    return [(u, enc_right(r)) for u in range(n_left) for r in range(n_right)]
