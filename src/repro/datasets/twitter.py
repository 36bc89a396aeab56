"""Synthetic Twitter interaction networks (``cop27`` and ``8m``).

Stand-in for the paper's two keyword-collected Twitter datasets. Users
are nodes; a directed edge means the source interacted with the target
via one of ``retweet``/``reply``/``quote``/``mention``. The generator
produces a raw *interaction* frame (with the ``kind`` column) and the
collapsed distinct-edge graph used by the algorithms — plus the usual
planted strata (influencer hubs, a topical community around a seed
account) so the dataset-comparison use case behaves like the others.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.datasets.builder import (
    ClusterSpec,
    LabeledGraph,
    build_strata_graph,
    stable_seed,
)

TOPICS = ("cop27", "8m")
INTERACTION_KINDS = ("retweet", "reply", "quote", "mention")

#: Per-topic planted accounts: influencer hubs and the seed community.
_TOPIC_SPEC: dict[str, dict] = {
    "cop27": {
        "hubs": ("@UNFCCC", "@UN", "@COP27P", "@GretaThunberg", "@IPCC_CH"),
        "ref": "@ClimateActivist",
        "members": ("@FridaysForFuture", "@ClimateReality", "@350",
                    "@ExtinctionR", "@WWF", "@Greenpeace"),
    },
    "8m": {
        "hubs": ("@UN_Women", "@ONUMujeres", "@womensmarch", "@UNESCO", "@Mujeres"),
        "ref": "@FeministCollective",
        "members": ("@8M_Madrid", "@NiUnaMenos", "@VivasNosQueremos",
                    "@HeForShe", "@TimesUpNow", "@MeTooMVMT"),
    },
}


def twitter(
    spark: SparkSession, topic: str = "cop27", *, scale: float = 1.0, seed: int = 0
) -> LabeledGraph:
    """Generate the collapsed interaction graph for a topic.

    Args:
        spark: active session.
        topic: ``"cop27"`` or ``"8m"``.
        scale: background-user multiplier (1.0 → 300 users).
        seed: base RNG seed.
    """
    if topic not in TOPICS:
        raise ValueError(f"unknown topic {topic!r}; know {TOPICS}")
    spec = _TOPIC_SPEC[topic]
    return build_strata_graph(
        spark,
        hubs=spec["hubs"],
        clusters=(ClusterSpec(ref=spec["ref"], members=spec["members"]),),
        n_background=max(40, int(300 * scale)),
        seed=stable_seed("twitter", topic, seed),
        # interactions reciprocate more than wikilinks (mutual mentions)
        p_bg_recip=0.35,
    )


def twitter_interactions(
    spark: SparkSession, topic: str = "cop27", *, scale: float = 1.0, seed: int = 0
) -> DataFrame:
    """Raw interaction events ``(src, dst, kind)`` for a topic.

    Each distinct edge of :func:`twitter` yields 1–4 events with kinds
    drawn from :data:`INTERACTION_KINDS` (retweets most common).
    Collapsing this frame to distinct ``(src, dst)`` reproduces the
    graph exactly — tested against the DuckDB oracle.
    """
    g = twitter(spark, topic, scale=scale, seed=seed)
    edges = g.graph.edges.toPandas().sort_values(["src", "dst"], ignore_index=True)
    rng = np.random.default_rng(stable_seed("twitter-events", topic, seed))
    reps = rng.integers(1, 5, size=len(edges))
    rows = edges.loc[edges.index.repeat(reps)].reset_index(drop=True)
    rows["kind"] = rng.choice(
        INTERACTION_KINDS, size=len(rows), p=(0.5, 0.2, 0.1, 0.2)
    )
    return spark.createDataFrame(pd.DataFrame(rows))
