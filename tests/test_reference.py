"""Self-consistency tests for the dense NumPy reference oracles.

The references verify the Spark implementations, so they get their own
analytic checks: closed forms on symmetric graphs, probability-mass
conservation, and hand-counted cycles.
"""
import math

import pytest

from tests.graphs import BOWTIE, COMPLETE4, CYCLE3, CYCLE4, DANGLING_CHAIN, STAR_IN
from repro.reference import (
    cheirank_ref,
    cyclerank_ref,
    pagerank_ref,
    ranks_ref,
    simple_cycles_ref,
    twodrank_ref,
)


# -- pagerank_ref -------------------------------------------------------


@pytest.mark.parametrize("edges", [CYCLE3, CYCLE4, COMPLETE4, STAR_IN, DANGLING_CHAIN])
def test_pagerank_sums_to_one(edges):
    assert sum(pagerank_ref(edges).values()) == pytest.approx(1.0, abs=1e-9)


@pytest.mark.parametrize("edges,n", [(CYCLE3, 3), (CYCLE4, 4), (COMPLETE4, 4)])
def test_pagerank_uniform_on_vertex_transitive(edges, n):
    """Cycles and complete digraphs are vertex-transitive → uniform PR."""
    for v in pagerank_ref(edges).values():
        assert v == pytest.approx(1.0 / n, abs=1e-9)


def test_pagerank_star_centre_highest():
    scores = pagerank_ref(STAR_IN)
    assert max(scores, key=scores.get) == 0


def test_pagerank_alpha_zero_is_teleport_vector():
    scores = pagerank_ref(STAR_IN, alpha=0.0)
    for v in scores.values():
        assert v == pytest.approx(1.0 / 5, abs=1e-12)


def test_ppr_mass_concentrates_on_ref():
    scores = pagerank_ref(BOWTIE, refs=[0], alpha=0.3)
    assert max(scores, key=scores.get) == 0
    assert scores[0] > 0.5


def test_ppr_unreachable_gets_zero():
    # 0 <-> 1, isolated pair 2 <-> 3: walks from 0 never reach 2 or 3.
    edges = [(0, 1), (1, 0), (2, 3), (3, 2)]
    scores = pagerank_ref(edges, refs=[0])
    assert scores[2] == pytest.approx(0.0, abs=1e-12)
    assert scores[3] == pytest.approx(0.0, abs=1e-12)


def test_cheirank_is_pagerank_of_transpose():
    a = cheirank_ref(STAR_IN)
    b = pagerank_ref([(d, s) for s, d in STAR_IN])
    assert a == b


def test_cheirank_star_leaves_symmetric():
    """Transposed in-star: the centre fans out to every leaf, so all
    leaves (including 1, whose extra edge is outgoing there) get equal
    CheiRank."""
    scores = cheirank_ref(STAR_IN)
    assert scores[1] == pytest.approx(scores[2], abs=1e-9)
    assert scores[2] == pytest.approx(scores[3], abs=1e-9)
    assert scores[3] == pytest.approx(scores[4], abs=1e-9)


# -- simple_cycles_ref --------------------------------------------------


def test_cycle3_single_cycle():
    assert simple_cycles_ref(CYCLE3, 0, 3) == [(0, 1, 2)]


def test_cycle3_too_short_k():
    assert simple_cycles_ref(CYCLE3, 0, 2) == []


def test_bowtie_cycles_k2():
    cycles = simple_cycles_ref(BOWTIE, 0, 2)
    assert sorted(cycles) == [(0, 1), (0, 2)]


def test_bowtie_cycles_k3():
    cycles = set(simple_cycles_ref(BOWTIE, 0, 3))
    assert cycles == {(0, 1), (0, 2), (0, 1, 2), (0, 2, 1), (0, 2, 3)}


def test_complete4_cycle_counts():
    """K_4: through node 0 there are 3 2-cycles, 3·2=6 3-cycles and
    3·2·1=6 4-cycles."""
    by_len = {}
    for c in simple_cycles_ref(COMPLETE4, 0, 4):
        by_len[len(c)] = by_len.get(len(c), 0) + 1
    assert by_len == {2: 3, 3: 6, 4: 6}


def test_cycles_ignore_self_loops():
    assert simple_cycles_ref([(0, 0), (0, 1), (1, 0)], 0, 3) == [(0, 1)]


# -- cyclerank_ref ------------------------------------------------------


def test_cyclerank_cycle3_scores():
    scores = cyclerank_ref(CYCLE3, 0, 3)
    w = math.exp(-3)
    assert scores == pytest.approx({0: w, 1: w, 2: w})


def test_cyclerank_ref_node_is_max():
    scores = cyclerank_ref(BOWTIE, 0, 4)
    assert max(scores, key=scores.get) == 0


def test_cyclerank_custom_sigma():
    scores = cyclerank_ref(CYCLE3, 0, 3, sigma=lambda n: 1.0)
    assert scores[1] == 1.0


def test_cyclerank_no_cycles_all_zero():
    scores = cyclerank_ref([(0, 1), (1, 2)], 0, 4)
    assert set(scores.values()) == {0.0}


# -- ranks / 2drank -----------------------------------------------------


def test_ranks_ref_orders_descending_with_id_ties():
    assert ranks_ref({3: 0.5, 1: 0.5, 2: 0.9}) == {2: 1, 1: 2, 3: 3}


def test_twodrank_ref_diagonal():
    """When K == K* for everyone, 2DRank equals that common order."""
    k = {1: 1, 2: 2, 3: 3}
    assert twodrank_ref(k, dict(k)) == k


def test_twodrank_ref_square_sweep():
    """Shell 1: node a (1,1). Shell 2: vertical side (K=2,K*=1) then
    horizontal (K*=2)."""
    k = {"a": 1, "b": 2, "c": 3}
    kstar = {"a": 1, "b": 3, "c": 2}
    # b: shell 3 (K*=3); c: shell 3 (K=3)... recompute: shells: a=1, b=max(2,3)=3, c=max(3,2)=3
    # b is horizontal-side? K*=3=shell → side 1, offset K=2; c: K=3=shell, K*=2<3 → side 0, offset 2.
    assert twodrank_ref(k, kstar) == {"a": 1, "c": 2, "b": 3}
