"""Personalized PageRank and personalized CheiRank.

Personalized PageRank replaces the uniform teleport vector with one
concentrated on the reference node(s): every teleport — including the
escape from dangling vertices — jumps back to the reference set. The
stationary distribution is then the probability of being at each node
on random walks restarted from the references, i.e. a relevance score
around the query.
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.pagerank import _power_iteration
from repro.graph.graph import DiGraph


def _teleport_vector(g: DiGraph, refs: Iterable[int]) -> DataFrame:
    """Uniform probability over the reference set, 0 elsewhere."""
    ref_list = sorted({int(r) for r in refs})
    if not ref_list:
        raise ValueError("reference set must be non-empty")
    spark = g.vertices.sparkSession
    tele = spark.createDataFrame(
        [(r, 1.0 / len(ref_list)) for r in ref_list], "id long, tele double"
    )
    missing = tele.join(g.vertices, "id", "left_anti").count()
    if missing:
        raise KeyError(f"{missing} reference id(s) not present in the graph")
    return tele


def personalized_pagerank(
    g: DiGraph,
    refs: int | Iterable[int],
    *,
    alpha: float = 0.85,
    max_iter: int = 50,
    tol: float = 1e-8,
) -> DataFrame:
    """Personalized PageRank around one or more reference nodes.

    Args:
        g: the graph.
        refs: reference node id or ids (the teleport set).
        alpha: damping factor — the paper's Table I uses α=0.3 (strong
            teleport) on Wikipedia and α=0.85 on Amazon.
        max_iter, tol: convergence controls.

    Returns:
        DataFrame ``(id, score)``; scores sum to 1 and the reference
        set typically dominates.
    """
    if isinstance(refs, int):
        refs = [refs]
    return _power_iteration(g, _teleport_vector(g, refs), alpha, max_iter, tol)


def personalized_cheirank(
    g: DiGraph,
    refs: int | Iterable[int],
    *,
    alpha: float = 0.85,
    max_iter: int = 50,
    tol: float = 1e-8,
) -> DataFrame:
    """Personalized CheiRank: PPR on the transposed graph."""
    if isinstance(refs, int):
        refs = [refs]
    gt = g.transpose()
    return _power_iteration(gt, _teleport_vector(gt, refs), alpha, max_iter, tol)
