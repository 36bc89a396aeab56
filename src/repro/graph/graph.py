"""DataFrame-backed directed graph.

A :class:`DiGraph` pairs a vertex DataFrame ``(id: long, name: string)``
with an edge DataFrame ``(src: long, dst: long)``. All algorithms in
``repro.core`` operate on these two frames with DataFrame joins and
aggregations (Catalyst), never RDDs.

Graphs are small enough at our scale factors that vertex frames fit in
driver memory when a name lookup is needed, but all algorithmic code
stays distributed.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Iterable, Mapping, Sequence

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

EDGE_COLS = ("src", "dst")
VERTEX_COLS = ("id", "name")


@dataclass(frozen=True)
class DiGraph:
    """A directed graph as two DataFrames.

    Attributes:
        vertices: DataFrame with columns ``id`` (long) and ``name``
            (string). Every endpoint in ``edges`` appears here.
        edges: DataFrame with columns ``src`` and ``dst`` (long). Edges
            are deduplicated; self-loops are allowed but ignored by all
            cycle-based algorithms (a self-loop is a length-1 cycle and
            CycleRank starts at n=2).
    """

    vertices: DataFrame
    edges: DataFrame

    # -- constructors ---------------------------------------------------

    @staticmethod
    def from_edges(
        spark: SparkSession,
        edges: DataFrame | Sequence[tuple[int, int]],
        names: Mapping[int, str] | None = None,
    ) -> "DiGraph":
        """Build a graph from an edge list, deriving the vertex set.

        Args:
            spark: active session.
            edges: either a DataFrame with ``src``/``dst`` columns or a
                Python sequence of ``(src, dst)`` pairs.
            names: optional id→name mapping; ids without an entry get
                ``"node_<id>"``.
        """
        if not isinstance(edges, DataFrame):
            pdf = pd.DataFrame(list(edges), columns=list(EDGE_COLS), dtype="int64")
            edges = spark.createDataFrame(pdf)
        e = (
            edges.select(
                F.col("src").cast("long").alias("src"),
                F.col("dst").cast("long").alias("dst"),
            )
            .dropna()
            .dropDuplicates(["src", "dst"])
        )
        ids = (
            e.select(F.col("src").alias("id"))
            .union(e.select(F.col("dst").alias("id")))
            .distinct()
        )
        if names:
            npdf = pd.DataFrame(
                {"id": list(names.keys()), "name": [str(v) for v in names.values()]}
            )
            npdf["id"] = npdf["id"].astype("int64")
            ndf = spark.createDataFrame(npdf)
            v = ids.join(ndf, "id", "left").select(
                "id",
                F.coalesce(F.col("name"), F.format_string("node_%d", F.col("id"))).alias(
                    "name"
                ),
            )
        else:
            v = ids.select(
                "id", F.format_string("node_%d", F.col("id")).alias("name")
            )
        return DiGraph(vertices=v, edges=e)

    @staticmethod
    def from_pandas(
        spark: SparkSession, edges: pd.DataFrame, vertices: pd.DataFrame | None = None
    ) -> "DiGraph":
        """Build a graph from pandas frames (``src/dst`` and optional ``id/name``)."""
        names = None
        if vertices is not None:
            names = dict(zip(vertices["id"].astype("int64"), vertices["name"]))
        return DiGraph.from_edges(
            spark, spark.createDataFrame(edges[list(EDGE_COLS)]), names
        )

    # -- basic properties ----------------------------------------------

    def num_vertices(self) -> int:
        """Number of distinct vertices."""
        return self.vertices.count()

    def num_edges(self) -> int:
        """Number of distinct directed edges."""
        return self.edges.count()

    def out_degrees(self) -> DataFrame:
        """Per-vertex out-degree: ``(id, out_degree)``, zero for sinks."""
        deg = self.edges.groupBy(F.col("src").alias("id")).agg(
            F.count("*").alias("out_degree")
        )
        return self.vertices.select("id").join(deg, "id", "left").select(
            "id", F.coalesce("out_degree", F.lit(0)).alias("out_degree")
        )

    def in_degrees(self) -> DataFrame:
        """Per-vertex in-degree: ``(id, in_degree)``, zero for sources."""
        deg = self.edges.groupBy(F.col("dst").alias("id")).agg(
            F.count("*").alias("in_degree")
        )
        return self.vertices.select("id").join(deg, "id", "left").select(
            "id", F.coalesce("in_degree", F.lit(0)).alias("in_degree")
        )

    def transpose(self) -> "DiGraph":
        """The graph with every edge reversed (basis of CheiRank)."""
        return DiGraph(
            vertices=self.vertices,
            edges=self.edges.select(
                F.col("dst").alias("src"), F.col("src").alias("dst")
            ),
        )

    def subgraph(self, keep: DataFrame) -> "DiGraph":
        """Induced subgraph on the vertex ids in ``keep`` (an ``id`` column)."""
        ids = keep.select("id").distinct()
        e = (
            self.edges.join(ids.withColumnRenamed("id", "src"), "src")
            .join(ids.withColumnRenamed("id", "dst"), "dst")
            .select("src", "dst")
        )
        v = self.vertices.join(ids, "id").select("id", "name")
        return DiGraph(vertices=v, edges=e)

    def cache(self) -> "DiGraph":
        """Cache both frames (call before iterative algorithms)."""
        self.vertices.cache()
        self.edges.cache()
        return self

    # -- name lookups (driver-side; for display and experiment harnesses) --

    def id_of(self, name: str) -> int:
        """Vertex id for an exact ``name`` (raises KeyError if absent/ambiguous)."""
        rows = self.vertices.filter(F.col("name") == name).select("id").collect()
        if len(rows) != 1:
            raise KeyError(f"name {name!r} matched {len(rows)} vertices")
        return rows[0]["id"]

    def names_of(self, ids: Iterable[int]) -> dict[int, str]:
        """id→name mapping for the given ids (driver-side collect)."""
        ids = list(ids)
        rows = self.vertices.filter(F.col("id").isin(ids)).collect()
        return {r["id"]: r["name"] for r in rows}

    def with_names(self, scores: DataFrame) -> DataFrame:
        """Join a per-vertex result (``id`` column) with vertex names."""
        return scores.join(self.vertices, "id", "left")
