"""Tests for the DataFrame-backed DiGraph substrate."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from tests.graphs import BOWTIE, CYCLE3, DANGLING_CHAIN, STAR_IN
from repro.graph.graph import DiGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def bowtie(spark):
    return DiGraph.from_edges(spark, BOWTIE, names={0: "zero", 1: "one"})


def test_from_edges_counts(spark, bowtie):
    assert bowtie.num_vertices() == 5
    assert bowtie.num_edges() == len(BOWTIE)


def test_from_edges_deduplicates(spark):
    g = DiGraph.from_edges(spark, [(0, 1), (0, 1), (1, 0)])
    assert g.num_edges() == 2


def test_from_edges_dataframe_input(spark):
    df = spark.createDataFrame(pd.DataFrame({"src": [0, 1], "dst": [1, 0]}))
    g = DiGraph.from_edges(spark, df)
    assert g.num_edges() == 2
    assert g.num_vertices() == 2


def test_default_names(spark):
    g = DiGraph.from_edges(spark, [(7, 8)])
    names = {r["id"]: r["name"] for r in g.vertices.collect()}
    assert names == {7: "node_7", 8: "node_8"}


def test_explicit_names_with_fallback(bowtie):
    names = {r["id"]: r["name"] for r in bowtie.vertices.collect()}
    assert names[0] == "zero"
    assert names[1] == "one"
    assert names[3] == "node_3"


def test_from_pandas(spark):
    e = pd.DataFrame({"src": [0, 1], "dst": [1, 2]})
    v = pd.DataFrame({"id": [0, 1, 2], "name": ["a", "b", "c"]})
    g = DiGraph.from_pandas(spark, e, v)
    assert g.id_of("b") == 1


# -- degrees (checked against the DuckDB oracle) ------------------------


def test_out_degrees_oracle(spark, bowtie):
    edges = bowtie.edges.toPandas()
    verts = bowtie.vertices.select("id").toPandas()
    assert_equivalent(
        bowtie.out_degrees(),
        """
        SELECT v.id, COALESCE(d.c, 0) AS out_degree
        FROM verts v LEFT JOIN (
            SELECT src AS id, COUNT(*) AS c FROM edges GROUP BY src
        ) d USING (id)
        """,
        edges=edges,
        verts=verts,
    )


def test_in_degrees_oracle(spark, bowtie):
    edges = bowtie.edges.toPandas()
    verts = bowtie.vertices.select("id").toPandas()
    assert_equivalent(
        bowtie.in_degrees(),
        """
        SELECT v.id, COALESCE(d.c, 0) AS in_degree
        FROM verts v LEFT JOIN (
            SELECT dst AS id, COUNT(*) AS c FROM edges GROUP BY dst
        ) d USING (id)
        """,
        edges=edges,
        verts=verts,
    )


def test_dangling_has_zero_out_degree(spark):
    g = DiGraph.from_edges(spark, DANGLING_CHAIN)
    degs = {r["id"]: r["out_degree"] for r in g.out_degrees().collect()}
    assert degs[3] == 0
    assert degs[0] == 1


def test_star_in_degree(spark):
    g = DiGraph.from_edges(spark, STAR_IN)
    degs = {r["id"]: r["in_degree"] for r in g.in_degrees().collect()}
    assert degs[0] == 4


# -- transpose ----------------------------------------------------------


def test_transpose_reverses_edges(spark):
    g = DiGraph.from_edges(spark, [(0, 1), (1, 2)])
    t = {(r["src"], r["dst"]) for r in g.transpose().edges.collect()}
    assert t == {(1, 0), (2, 1)}


def test_transpose_involution(spark, bowtie):
    tt = {(r["src"], r["dst"]) for r in bowtie.transpose().transpose().edges.collect()}
    assert tt == set(BOWTIE)


def test_transpose_swaps_degrees(spark, bowtie):
    outs = {r["id"]: r["out_degree"] for r in bowtie.out_degrees().collect()}
    t_ins = {r["id"]: r["in_degree"] for r in bowtie.transpose().in_degrees().collect()}
    assert outs == t_ins


# -- subgraph -----------------------------------------------------------


def test_subgraph_induced(spark, bowtie):
    keep = bowtie.vertices.filter(F.col("id").isin([0, 1, 2])).select("id")
    sub = bowtie.subgraph(keep)
    assert sub.num_vertices() == 3
    got = {(r["src"], r["dst"]) for r in sub.edges.collect()}
    assert got == {(0, 1), (1, 0), (0, 2), (2, 0), (1, 2), (2, 1)}


def test_subgraph_empty(spark, bowtie):
    keep = bowtie.vertices.filter(F.col("id") > 100).select("id")
    sub = bowtie.subgraph(keep)
    assert sub.num_vertices() == 0
    assert sub.num_edges() == 0


# -- lookups ------------------------------------------------------------


def test_id_of(bowtie):
    assert bowtie.id_of("zero") == 0


def test_id_of_missing_raises(bowtie):
    with pytest.raises(KeyError):
        bowtie.id_of("missing")


def test_names_of(bowtie):
    assert bowtie.names_of([0, 3]) == {0: "zero", 3: "node_3"}


def test_with_names_join(spark, bowtie):
    scores = spark.createDataFrame([(0, 1.5), (1, 0.5)], "id long, score double")
    rows = {r["id"]: r["name"] for r in bowtie.with_names(scores).collect()}
    assert rows == {0: "zero", 1: "one"}


def test_cycle3_roundtrip(spark):
    g = DiGraph.from_edges(spark, CYCLE3)
    assert g.num_vertices() == 3
    assert g.num_edges() == 3
