"""2DRank: the square sweep, its reference, and the full pipeline."""
import pytest

from tests.graphs import BOWTIE, STAR_IN, random_digraph
from repro.core.ranking import ranks
from repro.core.tdrank import combine_ranks, personalized_twodrank, twodrank
from repro.reference import (
    cheirank_ref,
    pagerank_ref,
    ranks_ref,
    twodrank_ref,
)

RANDOM_A = random_digraph(12, 0.25, seed=7)


def _rank_df(spark, mapping):
    return spark.createDataFrame(
        [(k, 0.0, v) for k, v in mapping.items()], "id long, score double, rank int"
    )


def test_combine_ranks_diagonal(spark):
    k = {0: 1, 1: 2, 2: 3}
    out = combine_ranks(_rank_df(spark, k), _rank_df(spark, k))
    got = {r["id"]: r["rank"] for r in out.collect()}
    assert got == k


@pytest.mark.parametrize("seed", [1, 2, 3, 4])
def test_combine_ranks_matches_reference_on_permutations(spark, seed):
    import numpy as np

    rng = np.random.default_rng(seed)
    n = 8
    k = {i: int(r) + 1 for i, r in enumerate(rng.permutation(n))}
    kstar = {i: int(r) + 1 for i, r in enumerate(rng.permutation(n))}
    out = combine_ranks(_rank_df(spark, k), _rank_df(spark, kstar))
    got = {r["id"]: r["rank"] for r in out.collect()}
    assert got == twodrank_ref(k, kstar)


def test_combine_ranks_is_permutation(spark):
    k = {0: 2, 1: 1, 2: 3, 3: 4}
    kstar = {0: 4, 1: 3, 2: 1, 3: 2}
    out = combine_ranks(_rank_df(spark, k), _rank_df(spark, kstar))
    assert sorted(r["rank"] for r in out.collect()) == [1, 2, 3, 4]


@pytest.fixture(scope="module")
def twod_random(spark):
    from repro.graph.graph import DiGraph

    g = DiGraph.from_edges(spark, RANDOM_A)
    got = {
        r["id"]: r["rank"]
        for r in twodrank(g, max_iter=60, tol=1e-10).collect()
    }
    pr = ranks_ref(pagerank_ref(RANDOM_A))
    cr = ranks_ref(cheirank_ref(RANDOM_A))
    return got, twodrank_ref(pr, cr)


def test_twodrank_matches_reference(twod_random):
    got, want = twod_random
    assert got == want


def test_twodrank_is_full_ranking(twod_random):
    got, _ = twod_random
    assert sorted(got.values()) == list(range(1, len(got) + 1))


def test_twodrank_produces_ranking_not_scores(spark):
    """Section II: 2DRank 'does not assign a score to each node, but
    just produces a ranking' — the output column is ``rank``."""
    from repro.graph.graph import DiGraph

    g = DiGraph.from_edges(spark, BOWTIE)
    out = twodrank(g, max_iter=20)
    assert set(out.columns) == {"id", "rank"}


def test_personalized_twodrank_matches_reference(spark):
    from repro.graph.graph import DiGraph

    g = DiGraph.from_edges(spark, RANDOM_A)
    got = {
        r["id"]: r["rank"]
        for r in personalized_twodrank(g, 5, max_iter=60, tol=1e-10).collect()
    }
    pr = ranks_ref(pagerank_ref(RANDOM_A, refs=[5]))
    cr = ranks_ref(pagerank_ref([(d, s) for s, d in RANDOM_A], refs=[5]))
    assert got == twodrank_ref(pr, cr)


def test_personalized_twodrank_star(spark):
    """On the in-star from ref 0, rankings stay deterministic and
    complete."""
    from repro.graph.graph import DiGraph

    g = DiGraph.from_edges(spark, STAR_IN)
    out = personalized_twodrank(g, 0, max_iter=30)
    assert sorted(r["rank"] for r in out.collect()) == [1, 2, 3, 4, 5]


def test_ranks_helper_consistency(spark):
    """repro.core.ranking.ranks (used inside twodrank) agrees with
    ranks_ref on the same scores."""
    scores = {0: 0.4, 1: 0.1, 2: 0.4, 3: 0.9}
    df = spark.createDataFrame(list(scores.items()), "id long, score double")
    got = {r["id"]: r["rank"] for r in ranks(df).collect()}
    assert got == ranks_ref(scores)
