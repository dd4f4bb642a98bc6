"""Per-edge butterfly counting kernel (Algorithm 1, lines 6-11).

Given the sample adjacency and an incoming edge {u, v}, count how many
butterflies the edge forms with edges of the sample. A butterfly
{u, v, w, x} is discovered iff the three partner edges {u, w'},
{w', x}, {x', v} are all in the sample; the kernel finds them via set
intersections:

- *Cheapest-side selection* (line 7): explore the neighbors (in the
  sample) of the endpoint whose sampled neighborhood has the smaller
  cumulative degree — the common heuristic of [28], [20] that picks the
  side yielding cheaper intersections.
- For each explored neighbor ``w`` of that endpoint, the common
  neighbors ``CN = N_w ∩ N_other`` each close one butterfly (lines
  8-11). The endpoint itself is excluded from ``CN`` (it may appear
  there when the incoming edge is a deletion whose edge is still
  sampled — the paper's running example makes the same exclusion).

The kernel also reports the number of element *comparisons* performed
inside the intersections (cost = size of the smaller set, which is what
CPython's ``set.__and__`` iterates) — the per-thread workload metric of
Fig. 10 and the "vertices examined" totals of Sec. VI-G.

It operates on a plain ``dict[int, set[int]]`` so the very same code
runs on the driver (ABACUS) and inside Spark tasks (PARABACUS) against a
broadcast adjacency.
"""
from __future__ import annotations

from typing import Dict, Set, Tuple

_EMPTY: frozenset = frozenset()


def count_butterflies_with_sample(
    adj: Dict[int, Set[int]], u: int, v: int
) -> Tuple[int, int]:
    """Count butterflies the edge {u, v} forms with the sampled edges.

    Returns ``(n_butterflies, comparisons)``. ``adj`` is the sample's
    adjacency; {u, v} itself may or may not be present (deletion case).
    """
    nu = adj.get(u, _EMPTY)
    nv = adj.get(v, _EMPTY)
    if not nu or not nv:
        return 0, 0

    # Cheapest side (Alg. 1 line 7): cumulative sampled degree of each
    # endpoint's sampled neighborhood.
    cum_u = sum(len(adj[x]) for x in nu)
    cum_v = sum(len(adj[x]) for x in nv)
    if cum_u > cum_v:
        # Explore neighbors of v, intersect against N_u.
        u, v = v, u
        nu, nv = nv, nu

    count = 0
    comparisons = 0
    for w in nu:
        if w == v:
            continue
        nw = adj[w]
        comparisons += min(len(nw), len(nv))
        cn = nw & nv
        c = len(cn)
        if u in cn:
            c -= 1
        count += c
    return count, comparisons
