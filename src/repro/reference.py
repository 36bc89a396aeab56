"""Dense NumPy / pure-Python reference implementations.

These are the *test oracles* for the distributed algorithms in
``repro.core``: written independently (adjacency matrices and recursive
DFS, no Spark), so a bug in the DataFrame formulation cannot hide in a
shared code path. Only usable on graphs that fit in driver memory —
which every test graph does.
"""
from __future__ import annotations

import math
from typing import Callable, Mapping, Sequence

import numpy as np

Edge = tuple[int, int]


def _index(edges: Sequence[Edge]) -> tuple[list[int], dict[int, int]]:
    """Sorted vertex ids and id→position mapping for a dense matrix."""
    ids = sorted({v for e in edges for v in e})
    return ids, {v: i for i, v in enumerate(ids)}


def pagerank_ref(
    edges: Sequence[Edge],
    *,
    alpha: float = 0.85,
    refs: Sequence[int] | None = None,
    max_iter: int = 200,
    tol: float = 1e-12,
) -> dict[int, float]:
    """Dense power-iteration PageRank / Personalized PageRank.

    Args:
        edges: directed edge list; vertex set is derived from it.
        alpha: damping factor.
        refs: teleport set for PPR; ``None`` → uniform teleport (PR).
        max_iter, tol: L1 convergence controls.

    Returns:
        id→score mapping; scores sum to 1. Dangling mass follows the
        teleport vector, matching ``repro.core.pagerank``.
    """
    ids, pos = _index(edges)
    n = len(ids)
    A = np.zeros((n, n))  # column-stochastic link matrix: A[j, i] = 1/out(i)
    out = np.zeros(n)
    for s, d in set(edges):
        out[pos[s]] += 1
    for s, d in set(edges):
        A[pos[d], pos[s]] = 1.0
    nz = out > 0
    A[:, nz] /= out[nz]
    tele = np.zeros(n)
    if refs is None:
        tele[:] = 1.0 / n
    else:
        for r in refs:
            tele[pos[r]] += 1.0 / len(refs)
    x = np.full(n, 1.0 / n)
    for _ in range(max_iter):
        dangling = x[~nz].sum()
        nxt = (1 - alpha) * tele + alpha * (A @ x + dangling * tele)
        if np.abs(nxt - x).sum() <= tol:
            x = nxt
            break
        x = nxt
    return {v: float(x[pos[v]]) for v in ids}


def cheirank_ref(edges: Sequence[Edge], **kw) -> dict[int, float]:
    """PageRank on the transposed edge list."""
    return pagerank_ref([(d, s) for s, d in edges], **kw)


def simple_cycles_ref(
    edges: Sequence[Edge], ref: int, k: int
) -> list[tuple[int, ...]]:
    """All simple cycles through ``ref`` with 2..k edges, via DFS.

    Returns:
        Each cycle as the tuple of its nodes starting at ``ref``
        (closing edge implicit) — the same representation
        ``repro.core.cyclerank`` uses.
    """
    adj: dict[int, list[int]] = {}
    for s, d in set(edges):
        if s != d:
            adj.setdefault(s, []).append(d)
    for v in adj:
        adj[v].sort()
    cycles: list[tuple[int, ...]] = []

    def dfs(node: int, path: list[int]) -> None:
        for nxt in adj.get(node, ()):  # path has len(path) nodes = edges so far
            if nxt == ref:
                if len(path) >= 2:
                    cycles.append(tuple(path))
            elif nxt not in path and len(path) < k:
                path.append(nxt)
                dfs(nxt, path)
                path.pop()

    dfs(ref, [ref])
    return cycles


def cyclerank_ref(
    edges: Sequence[Edge],
    ref: int,
    k: int,
    sigma: Callable[[int], float] = lambda n: math.exp(-n),
) -> dict[int, float]:
    """Reference CycleRank: DFS-enumerate cycles, then apply Equation 1.

    Returns id→score for every vertex in the edge list (0 when on no
    cycle).
    """
    ids, _ = _index(edges)
    scores = {v: 0.0 for v in ids}
    for cyc in simple_cycles_ref(edges, ref, k):
        w = sigma(len(cyc))
        for v in cyc:
            scores[v] += w
    return scores


def ranks_ref(scores: Mapping[int, float]) -> dict[int, int]:
    """1-based ranks, descending score, ascending-id tie-break."""
    order = sorted(scores, key=lambda v: (-scores[v], v))
    return {v: i + 1 for i, v in enumerate(order)}


def twodrank_ref(
    k_ranks: Mapping[int, int], kstar_ranks: Mapping[int, int]
) -> dict[int, int]:
    """Reference 2DRank square sweep over (K, K*) ranks.

    Mirrors :func:`repro.core.tdrank.combine_ranks`: order by shell
    ``max(K, K*)``; within a shell the vertical side (K = shell,
    K* < shell) by K*, then the horizontal side (K* = shell) by K.
    """
    def key(v: int) -> tuple:
        kk, ks = k_ranks[v], kstar_ranks[v]
        shell = max(kk, ks)
        side = 0 if ks < kk else 1
        offset = ks if ks < kk else kk
        return (shell, side, offset, v)

    order = sorted(k_ranks, key=key)
    return {v: i + 1 for i, v in enumerate(order)}
