"""Vertex id encoding for bipartite graphs.

The two bipartitions live in one flat integer id space so that a single
``dict[int, set[int]]`` adjacency serves both sides: left vertices keep
their non-negative ids, right vertices are mapped to negative ids via
``r -> -r - 1``. Bipartiteness then holds by construction (an edge always
connects a non-negative and a negative id) and is asserted in tests.
"""
from __future__ import annotations


def enc_left(u: int) -> int:
    """Encode a left-partition vertex id (identity; must be >= 0)."""
    if u < 0:
        raise ValueError(f"left vertex id must be >= 0, got {u}")
    return u


def enc_right(r: int) -> int:
    """Encode a right-partition vertex id into the negative range."""
    if r < 0:
        raise ValueError(f"right vertex id must be >= 0, got {r}")
    return -r - 1


def dec_right(v: int) -> int:
    """Invert :func:`enc_right`."""
    if v >= 0:
        raise ValueError(f"encoded right vertex id must be < 0, got {v}")
    return -v - 1


def is_left(v: int) -> bool:
    """True iff the encoded id belongs to the left partition."""
    return v >= 0


def assert_bipartite_edge(u: int, v: int) -> None:
    """Raise unless exactly one endpoint is left-encoded."""
    if is_left(u) == is_left(v):
        raise ValueError(f"edge ({u}, {v}) is not bipartite under the encoding")
