"""A GraphX-Pregel-style superstep engine over Spark DataFrames.

GraphX is JVM-only and unavailable from PySpark without external
packages, so this module reimplements the superstep model with
DataFrame joins and aggregations (the standard PySpark idiom for
iterative vertex programs):

each superstep:
  1. **send**: join the vertex-state frame with the edge frame and emit
     one message per edge (``send_msg`` builds the message column);
  2. **aggregate**: group messages by destination and combine them
     (``agg_msgs``, default ``sum``);
  3. **update**: join aggregated messages back to vertex state and
     produce the next state (``update``).

Convergence is the L1 distance between successive state vectors.
Every iteration truncates lineage with ``localCheckpoint`` — without
this, 30+ chained joins make Catalyst analysis time explode.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class PregelResult:
    """Outcome of a pregel run.

    Attributes:
        state: final vertex-state DataFrame ``(id, value)``.
        iterations: supersteps executed.
        delta: final L1 distance between the last two states
            (``float('inf')`` if only one iteration ran with no check).
        converged: whether ``delta <= tol`` stopped the loop (as opposed
            to hitting ``max_iter``).
    """

    state: DataFrame
    iterations: int
    delta: float
    converged: bool


def pregel(
    state: DataFrame,
    edges: DataFrame,
    send_msg: Callable[[DataFrame], DataFrame],
    update: Callable[[DataFrame, DataFrame], DataFrame],
    *,
    finalize: Callable[[DataFrame], DataFrame] | None = None,
    agg_msgs: Callable[[Column], Column] = F.sum,
    max_iter: int = 50,
    tol: float = 1e-9,
    check_every: int = 1,
) -> PregelResult:
    """Run supersteps until convergence or ``max_iter``.

    Args:
        state: initial vertex state, columns ``(id, value)`` with
            ``value`` double.
        edges: edge frame, columns ``(src, dst)``.
        send_msg: maps the frame ``state ⋈ edges`` (columns ``id``,
            ``value``, plus any state columns, and ``dst``) to a frame
            ``(dst, msg)`` — one message per edge.
        update: maps ``(state, msgs)`` — where ``msgs`` has columns
            ``(id, msg)``, one row per vertex that received messages —
            to the next state frame ``(id, value, ...)``.
        finalize: optional cheap post-step applied to the *checkpointed*
            update result (e.g. PageRank's dangling-mass renormalization,
            which needs an aggregate of the new state). Runs inside the
            superstep but outside the checkpoint, so aggregates it
            triggers don't recompute the join.
        agg_msgs: aggregate applied to the per-destination ``msg``
            column (default: sum).
        max_iter: superstep cap.
        tol: L1 convergence threshold.
        check_every: compute the (action-triggering) L1 delta only every
            this many supersteps.

    Returns:
        A :class:`PregelResult`.
    """
    cur = state.localCheckpoint(eager=True)
    delta = float("inf")
    converged = False
    it = 0
    for it in range(1, max_iter + 1):
        joined = cur.join(edges, cur["id"] == edges["src"], "inner")
        msgs = (
            send_msg(joined)
            .groupBy(F.col("dst").alias("id"))
            .agg(agg_msgs(F.col("msg")).alias("msg"))
        )
        nxt = update(cur, msgs).localCheckpoint(eager=True)
        if finalize is not None:
            nxt = finalize(nxt)
        if it % check_every == 0 or it == max_iter:
            delta = (
                nxt.alias("n")
                .join(cur.alias("c"), "id", "outer")
                .select(
                    F.abs(
                        F.coalesce(F.col("n.value"), F.lit(0.0))
                        - F.coalesce(F.col("c.value"), F.lit(0.0))
                    ).alias("d")
                )
                .agg(F.sum("d"))
                .first()[0]
                or 0.0
            )
            if delta <= tol:
                cur = nxt
                converged = True
                break
        cur = nxt
    return PregelResult(state=cur, iterations=it, delta=delta, converged=converged)


def iterate_frontier(
    frontier: DataFrame,
    edges: DataFrame,
    *,
    max_depth: int,
    direction: str = "out",
) -> DataFrame:
    """Bounded BFS: all vertex ids reachable from ``frontier`` within
    ``max_depth`` hops, following out-edges (``direction='out'``) or
    in-edges (``direction='in'``).

    Args:
        frontier: DataFrame with an ``id`` column (the seed set).
        edges: edge frame ``(src, dst)``.
        max_depth: number of hops to expand.
        direction: ``'out'`` follows src→dst, ``'in'`` follows dst→src.

    Returns:
        DataFrame with a distinct ``id`` column: seeds plus everything
        reached. Used by CycleRank's K-ball pruning.
    """
    if direction == "out":
        from_col, to_col = "src", "dst"
    elif direction == "in":
        from_col, to_col = "dst", "src"
    else:
        raise ValueError(f"direction must be 'out' or 'in', got {direction!r}")
    seen = frontier.select("id").distinct().localCheckpoint(eager=True)
    cur = seen
    for _ in range(max_depth):
        nxt = (
            cur.join(edges, cur["id"] == edges[from_col])
            .select(F.col(to_col).alias("id"))
            .distinct()
            .join(seen, "id", "left_anti")
            .localCheckpoint(eager=True)
        )
        if nxt.isEmpty():
            break
        seen = seen.union(nxt).localCheckpoint(eager=True)
        cur = nxt
    return seen
