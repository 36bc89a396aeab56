"""PageRank and CheiRank as pregel power iteration.

PageRank models a random surfer: with probability α (the damping
factor, 0.85 in the paper's Table I/II runs) follow a uniformly random
out-edge, with probability 1−α teleport to a uniformly random vertex.
Dangling vertices (no out-edges) teleport with probability 1, so their
mass is redistributed uniformly each iteration — this keeps the score
vector a probability distribution (sums to 1).

CheiRank [Chepelianskii 2010] is exactly PageRank on the transposed
graph, ranking by outgoing instead of incoming connections.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.graph import DiGraph
from repro.pregel.engine import pregel


def _power_iteration(
    g: DiGraph,
    teleport: DataFrame | None,
    alpha: float,
    max_iter: int,
    tol: float,
) -> DataFrame:
    """Shared PR/PPR power iteration.

    Dangling mass is redistributed along the teleport vector. Rather
    than summing dangling vertices' scores every superstep, we use the
    identity ``α·d = 1 − Σy`` where ``y = (1−α)t + α·A·x`` — the full
    update is ``x' = y + (1 − Σy)·t``, one aggregate over the already-
    checkpointed ``y`` (pregel's ``finalize`` hook). Graphs with no
    dangling vertices skip the aggregate entirely.

    Args:
        g: the graph.
        teleport: ``(id, tele)`` probability vector (sums to 1), or
            ``None`` for the uniform vector (classic PageRank).
        alpha: damping factor — probability of following an out-edge.
        max_iter, tol: convergence controls (L1).

    Returns:
        ``(id, score)`` summing to 1.
    """
    if not 0.0 <= alpha <= 1.0:
        raise ValueError(f"alpha must be in [0, 1], got {alpha}")
    n = g.num_vertices()
    if n == 0:
        raise ValueError("graph has no vertices")

    deg = g.out_degrees()
    if teleport is None:
        tele = g.vertices.select("id", F.lit(1.0 / n).alias("tele"))
    else:
        tele = g.vertices.select("id").join(
            teleport.select("id", "tele"), "id", "left"
        ).select("id", F.coalesce("tele", F.lit(0.0)).alias("tele"))
    # State carries (id, value, out_degree, tele) so each superstep is a
    # single join against the edge frame. The walk starts from the
    # teleport vector (uniform for PR): nodes unreachable from the
    # reference set then stay at exactly 0 instead of holding a slowly
    # decaying α^k residual of a uniform start.
    state = (
        tele.select("id", F.col("tele").alias("value"))
        .join(deg, "id")
        .join(tele, "id")
        .localCheckpoint(eager=True)
    )
    edges = g.edges.localCheckpoint(eager=True)
    has_dangling = not state.filter(F.col("out_degree") == 0).isEmpty()

    def send(joined: DataFrame) -> DataFrame:
        return joined.select(
            "dst", (F.col("value") / F.col("out_degree")).alias("msg")
        )

    def update(cur: DataFrame, msgs: DataFrame) -> DataFrame:
        return cur.join(msgs, "id", "left").select(
            "id",
            (
                (1.0 - alpha) * F.col("tele")
                + alpha * F.coalesce(F.col("msg"), F.lit(0.0))
            ).alias("value"),
            "out_degree",
            "tele",
        )

    def renormalize(y: DataFrame) -> DataFrame:
        missing = 1.0 - (y.agg(F.sum("value")).first()[0] or 0.0)
        return y.select(
            "id",
            (F.col("value") + missing * F.col("tele")).alias("value"),
            "out_degree",
            "tele",
        )

    res = pregel(
        state,
        edges,
        send,
        update,
        finalize=renormalize if has_dangling else None,
        max_iter=max_iter,
        tol=tol,
        check_every=5,
    )
    return res.state.select("id", F.col("value").alias("score"))


def pagerank(
    g: DiGraph, *, alpha: float = 0.85, max_iter: int = 50, tol: float = 1e-8
) -> DataFrame:
    """Classic PageRank.

    Args:
        g: the graph.
        alpha: damping factor (probability of following a link).
        max_iter: power-iteration cap.
        tol: L1 convergence threshold.

    Returns:
        DataFrame ``(id, score)``; scores sum to 1.
    """
    return _power_iteration(g, None, alpha, max_iter, tol)


def cheirank(
    g: DiGraph, *, alpha: float = 0.85, max_iter: int = 50, tol: float = 1e-8
) -> DataFrame:
    """CheiRank: PageRank on the transposed graph (out-link based)."""
    return _power_iteration(g.transpose(), None, alpha, max_iter, tol)
