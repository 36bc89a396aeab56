"""Small named graphs shared across test modules.

Each is an edge list; tests build DiGraphs from them and compare the
distributed algorithms against the dense references. Kept tiny so any
failure is hand-checkable.
"""
from __future__ import annotations

import numpy as np

#: 3-cycle: 0 -> 1 -> 2 -> 0.
CYCLE3 = [(0, 1), (1, 2), (2, 0)]

#: 4-cycle.
CYCLE4 = [(0, 1), (1, 2), (2, 3), (3, 0)]

#: Two mutual pairs sharing node 0 plus a triangle — several overlapping
#: cycles of lengths 2 and 3 through node 0.
BOWTIE = [(0, 1), (1, 0), (0, 2), (2, 0), (1, 2), (2, 1), (2, 3), (3, 0), (3, 4), (4, 3)]

#: Star with absorbing-ish centre: leaves point at 0, 0 points at 1.
STAR_IN = [(1, 0), (2, 0), (3, 0), (4, 0), (0, 1)]

#: Complete digraph on 4 nodes (every ordered pair).
COMPLETE4 = [(a, b) for a in range(4) for b in range(4) if a != b]

#: Chain with a dangling sink: 0 -> 1 -> 2 -> 3 (3 has no out-edges).
DANGLING_CHAIN = [(0, 1), (1, 2), (2, 3)]

#: Two disjoint mutual pairs (disconnected components).
DISCONNECTED = [(0, 1), (1, 0), (2, 3), (3, 2)]

#: A graph with NO cycles through node 0 (out-tree).
ACYCLIC_FROM_0 = [(0, 1), (0, 2), (1, 3), (2, 3), (3, 4)]

NAMED = {
    "cycle3": CYCLE3,
    "cycle4": CYCLE4,
    "bowtie": BOWTIE,
    "star_in": STAR_IN,
    "complete4": COMPLETE4,
    "dangling_chain": DANGLING_CHAIN,
    "disconnected": DISCONNECTED,
    "acyclic_from_0": ACYCLIC_FROM_0,
}


def random_digraph(n: int, p: float, seed: int) -> list[tuple[int, int]]:
    """Seeded Erdős–Rényi digraph (no self-loops), as an edge list."""
    rng = np.random.default_rng(seed)
    mask = rng.random((n, n)) < p
    np.fill_diagonal(mask, False)
    src, dst = np.nonzero(mask)
    edges = list(zip(src.tolist(), dst.tolist()))
    # keep every vertex present even if isolated by the draw
    for v in range(n - 1):
        if not any(v in e for e in edges):
            edges.append((v, (v + 1) % n))
    return edges
