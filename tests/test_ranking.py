"""Tests for ranking helpers (top-k, ranks, overlap metrics)."""
import pandas as pd
import pytest

from repro.core.ranking import contamination, ranks, top_k, top_k_names, topk_overlap
from repro.graph.graph import DiGraph
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def scores_df(spark):
    rows = [(0, 0.9), (1, 0.5), (2, 0.5), (3, 0.1), (4, 0.7)]
    return spark.createDataFrame(rows, "id long, score double")


def test_ranks_descending(scores_df):
    got = {r["id"]: r["rank"] for r in ranks(scores_df).collect()}
    assert got[0] == 1
    assert got[4] == 2
    assert got[3] == 5


def test_ranks_tie_broken_by_id(scores_df):
    got = {r["id"]: r["rank"] for r in ranks(scores_df).collect()}
    assert got[1] == 3
    assert got[2] == 4


def test_ranks_ascending(scores_df):
    got = {r["id"]: r["rank"] for r in ranks(scores_df, ascending=True).collect()}
    assert got[3] == 1
    assert got[0] == 5


def test_ranks_oracle(spark, scores_df):
    assert_equivalent(
        ranks(scores_df),
        """
        SELECT id, score,
               ROW_NUMBER() OVER (ORDER BY score DESC, id ASC) AS rank
        FROM scores
        """,
        scores=scores_df,
    )


def test_top_k(scores_df):
    got = [(r["id"], r["rank"]) for r in top_k(scores_df, 2).orderBy("rank").collect()]
    assert got == [(0, 1), (4, 2)]


def test_top_k_larger_than_n(scores_df):
    assert top_k(scores_df, 99).count() == 5


def test_top_k_oracle(spark, scores_df):
    assert_equivalent(
        top_k(scores_df, 3),
        """
        SELECT * FROM (
            SELECT id, score,
                   ROW_NUMBER() OVER (ORDER BY score DESC, id ASC) AS rank
            FROM scores
        ) WHERE rank <= 3
        """,
        scores=scores_df,
    )


def test_top_k_names(spark, scores_df):
    g = DiGraph.from_edges(
        spark,
        [(0, 1), (1, 2), (2, 3), (3, 4), (4, 0)],
        names={i: f"n{i}" for i in range(5)},
    )
    assert top_k_names(g, scores_df, 3) == ["n0", "n4", "n1"]


# -- overlap / contamination -------------------------------------------


def test_topk_overlap_identical():
    assert topk_overlap(["a", "b"], ["b", "a"]) == 1.0


def test_topk_overlap_disjoint():
    assert topk_overlap(["a", "b"], ["c", "d"]) == 0.0


def test_topk_overlap_partial():
    assert topk_overlap(["a", "b", "c", "d"], ["c", "d", "e", "f"]) == 0.5


def test_topk_overlap_length_mismatch_raises():
    with pytest.raises(ValueError):
        topk_overlap(["a"], ["a", "b"])


def test_topk_overlap_empty():
    assert topk_overlap([], []) == 1.0


@pytest.mark.parametrize(
    "topk,bad,expected",
    [
        (["a", "b", "c", "d", "e"], {"x"}, 0.0),
        (["a", "b", "c", "d", "e"], {"a", "e"}, 0.4),
        (["a", "b"], {"a", "b"}, 1.0),
        ([], {"a"}, 0.0),
    ],
)
def test_contamination(topk, bad, expected):
    assert contamination(topk, bad) == pytest.approx(expected)
