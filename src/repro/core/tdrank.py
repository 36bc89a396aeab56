"""2DRank: Zhirov's two-dimensional combination of PageRank and CheiRank.

Zhirov et al. [EPJ B 2010] place every node in the (K, K*) plane, where
K is its PageRank rank index and K* its CheiRank rank index (1 = best).
The 2DRank order K2 is built by sweeping growing squares [1..r]×[1..r]:
when the sweep reaches size r, the nodes newly entering the square are
those on its right and top edges. Following the paper's construction we
append, at each r, first the nodes on the vertical side (K = r, K* < r)
ordered by K*, then the nodes on the horizontal side (K* = r, K ≤ r)
ordered by K — so the corner node (K = K* = r) comes last within its
shell. 2DRank produces a *ranking only*, not a score (Section II), so
the result column is ``rank``.

Implemented as a pure rank-space transformation: compute both ranks,
then order by ``(shell = max(K, K*), side, offset)`` — an equivalent,
single-pass formulation of the square sweep.
"""
from __future__ import annotations

from typing import Iterable

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.core.pagerank import cheirank, pagerank
from repro.core.ppr import personalized_cheirank, personalized_pagerank
from repro.core.ranking import ranks
from repro.graph.graph import DiGraph


def combine_ranks(pr_ranks: DataFrame, cr_ranks: DataFrame) -> DataFrame:
    """Merge PageRank ranks K and CheiRank ranks K* into the 2DRank order.

    Args:
        pr_ranks: ``(id, rank)`` from the PageRank-side ranking.
        cr_ranks: ``(id, rank)`` from the CheiRank-side ranking.

    Returns:
        ``(id, rank)`` — the 2DRank position (1 = best).
    """
    joined = (
        pr_ranks.select("id", F.col("rank").alias("k"))
        .join(cr_ranks.select("id", F.col("rank").alias("kstar")), "id")
    )
    shell = F.greatest("k", "kstar")
    # vertical side (K == shell, K* < shell) first, ordered by K*;
    # then horizontal side (K* == shell) ordered by K — corner lands last.
    side = F.when(F.col("kstar") < F.col("k"), F.lit(0)).otherwise(F.lit(1))
    offset = F.when(F.col("kstar") < F.col("k"), F.col("kstar")).otherwise(F.col("k"))
    w = Window.orderBy(shell.asc(), side.asc(), offset.asc(), F.col("id").asc())
    return joined.select("id", F.row_number().over(w).alias("rank"))


def twodrank(
    g: DiGraph, *, alpha: float = 0.85, max_iter: int = 50, tol: float = 1e-8
) -> DataFrame:
    """Global 2DRank: square sweep over PageRank × CheiRank ranks."""
    pr = ranks(pagerank(g, alpha=alpha, max_iter=max_iter, tol=tol))
    cr = ranks(cheirank(g, alpha=alpha, max_iter=max_iter, tol=tol))
    return combine_ranks(pr, cr)


def personalized_twodrank(
    g: DiGraph,
    refs: int | Iterable[int],
    *,
    alpha: float = 0.85,
    max_iter: int = 50,
    tol: float = 1e-8,
) -> DataFrame:
    """Personalized 2DRank: square sweep over PPR × personalized-CheiRank
    ranks (the demo's 'personalized variant' of 2DRank)."""
    pr = ranks(
        personalized_pagerank(g, refs, alpha=alpha, max_iter=max_iter, tol=tol)
    )
    cr = ranks(
        personalized_cheirank(g, refs, alpha=alpha, max_iter=max_iter, tol=tol)
    )
    return combine_ranks(pr, cr)
