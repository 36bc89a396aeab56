"""Micro-benchmarks for the individual algorithms on one shared graph.

Times PageRank vs PPR vs CycleRank (K=3 and K=5) on the benchmark-scale
English wikilink graph. The paper's demo motivation — CycleRank's
locality (after (K−1)-ball pruning its cost depends on the reference's
neighbourhood, not the graph size) vs the global power iterations — is
visible directly in these timings.
"""
import pytest

from repro.core.cyclerank import cyclerank
from repro.core.pagerank import pagerank
from repro.core.ppr import personalized_pagerank
from repro.datasets.wikilink import wikilink

SCALE = 2.0


@pytest.fixture(scope="module")
def wiki(spark):
    lg = wikilink(spark, "en", 2018, scale=SCALE, seed=0)
    lg.graph.cache()
    lg.graph.edges.count()  # materialize before timing
    return lg


def test_bench_pagerank(benchmark, wiki):
    out = benchmark.pedantic(
        lambda: pagerank(wiki.graph, alpha=0.85).collect(), rounds=1, iterations=1
    )
    assert len(out) == wiki.graph.num_vertices()


def test_bench_ppr(benchmark, wiki):
    ref = wiki.id_of("Freddie Mercury")
    out = benchmark.pedantic(
        lambda: personalized_pagerank(wiki.graph, ref, alpha=0.3).collect(),
        rounds=1,
        iterations=1,
    )
    assert len(out) == wiki.graph.num_vertices()


@pytest.mark.parametrize("k", [3, 5])
def test_bench_cyclerank(benchmark, wiki, k):
    ref = wiki.id_of("Freddie Mercury")
    out = benchmark.pedantic(
        lambda: cyclerank(wiki.graph, ref, k=k).collect(), rounds=1, iterations=1
    )
    assert len(out) == wiki.graph.num_vertices()
