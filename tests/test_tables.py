"""Integration tests: the shape claims of Tables I, II and III.

We cannot match literal Wikipedia/Amazon rows on synthetic data — the
generators plant the paper's names as ground truth, and these tests
assert the paper's *qualitative claims* (which algorithm surfaces which
stratum; who suffers hub contamination). EXPERIMENTS.md records the
measured rows next to the paper's.
"""
import pytest

from repro.datasets.amazon import DYSTOPIA_REF, HUBS as AMAZON_HUBS, TOLKIEN_REF
from repro.datasets.wikilink import FAKE_NEWS, HUBS
from repro.experiments.tables import TABLE3_LANGS, table1, table2, table3, table3_column

SCALE = 0.5


@pytest.fixture(scope="module")
def t1(spark):
    return table1(spark, scale=SCALE, seed=0)


@pytest.fixture(scope="module")
def t2(spark):
    return table2(spark, scale=SCALE, seed=0)


@pytest.fixture(scope="module")
def t3(spark):
    return table3(spark, scale=SCALE, seed=0)


# -- Table I ------------------------------------------------------------


def test_t1_pagerank_top5_is_exactly_the_hub_list(t1):
    """Paper: PR top-5 = United States, Animal, Arthropod, Association
    football, Insect — our planted hubs in planted order."""
    assert t1.columns["PageRank"] == list(HUBS["en"])


@pytest.mark.parametrize("ref", ["Freddie Mercury", "Pasta"])
def test_t1_cyclerank_ref_first(t1, ref):
    """By definition the reference gets the maximal CycleRank score."""
    assert t1.columns[f"Cyclerank[{ref}]"][0] == ref


@pytest.mark.parametrize("ref", ["Freddie Mercury", "Pasta"])
def test_t1_cyclerank_stays_in_cluster(t1, ref):
    from repro.datasets.wikilink import EN_CLUSTERS

    col = t1.columns[f"Cyclerank[{ref}]"]
    allowed = {ref} | set(EN_CLUSTERS[ref])
    assert set(col) <= allowed


@pytest.mark.parametrize("ref", ["Freddie Mercury", "Pasta"])
def test_t1_ppr_ref_first(t1, ref):
    """With α=0.3 most mass teleports home — the ref tops its own PPR."""
    assert t1.columns[f"Pers.PageRank[{ref}]"][0] == ref


@pytest.mark.parametrize("ref", ["Freddie Mercury", "Pasta"])
def test_t1_ppr_contaminated_cr_clean(t1, ref):
    """The paper's central observation (Section I): PPR promotes
    globally central nodes; CycleRank does not."""
    assert t1.metrics[f"hub_rate:CR[{ref}]"] == 0.0
    assert t1.metrics[f"hub_rate:PPR[{ref}]"] > 0.0


def test_t1_pagerank_fully_contaminated(t1):
    assert t1.metrics["hub_rate:PageRank"] == 1.0


# -- Table II -----------------------------------------------------------


def test_t2_pagerank_top5_are_bestsellers(t2):
    """Paper: the PR column holds globally popular items — our planted
    best-sellers (top hubs + popular members), never the Potter books."""
    popular = {AMAZON_HUBS[0], AMAZON_HUBS[1], "The Catcher in the Rye",
               "The Great Gatsby", "Lord of the Flies"}
    assert set(t2.columns["PageRank"]) == popular


def test_t2_potter_not_in_pagerank_top5(t2):
    assert not any("Harry Potter" in n for n in t2.columns["PageRank"])


@pytest.mark.parametrize("ref", [DYSTOPIA_REF, TOLKIEN_REF])
def test_t2_cyclerank_stays_in_cluster(t2, ref):
    from repro.datasets.amazon import DYSTOPIA, TOLKIEN

    members = DYSTOPIA if ref == DYSTOPIA_REF else TOLKIEN
    assert set(t2.columns[f"Cyclerank[{ref}]"]) <= set(members)


def test_t2_cyclerank_excludes_ref_row(t2):
    """Table II lists top-5 *excluding* the reference item."""
    for ref in (DYSTOPIA_REF, TOLKIEN_REF):
        assert ref not in t2.columns[f"Cyclerank[{ref}]"]
        assert ref not in t2.columns[f"Pers.PageRank[{ref}]"]


def test_t2_ppr_fellowship_surfaces_potter(t2):
    """Paper: PPR suggests the popular Harry Potter books for The
    Fellowship of the Ring; CycleRank does not."""
    ppr = t2.columns[f"Pers.PageRank[{TOLKIEN_REF}]"]
    cr = t2.columns[f"Cyclerank[{TOLKIEN_REF}]"]
    assert any("Harry Potter" in n for n in ppr)
    assert not any("Harry Potter" in n for n in cr)


@pytest.mark.parametrize("ref", [DYSTOPIA_REF, TOLKIEN_REF])
def test_t2_contamination_ordering(t2, ref):
    assert t2.metrics[f"hub_rate:CR[{ref}]"] == 0.0
    assert t2.metrics[f"hub_rate:PPR[{ref}]"] > 0.0


def test_t2_cr_dystopia_top_rows_match_paper_members(t2):
    """The paper's CR top-5 for 1984 (Animal Farm, Fahrenheit 451, The
    Catcher in the Rye, Brave New World, Lord of the Flies) should
    mostly re-surface: at K=5 long-cycle combinatorics can promote a
    deeper cluster member into one or two slots, so require >=3 hits."""
    from repro.datasets.amazon import DYSTOPIA

    paper_rows = set(DYSTOPIA[:5])
    ours = set(t2.columns[f"Cyclerank[{DYSTOPIA_REF}]"])
    assert len(ours & paper_rows) >= 3


# -- Table III ----------------------------------------------------------


def test_t3_has_six_language_columns(t3):
    assert len(t3.columns) == len(TABLE3_LANGS)


@pytest.mark.parametrize("lang", TABLE3_LANGS)
def test_t3_top5_within_language_cluster(t3, lang):
    """Each language's CR top-5 comes from that language's planted
    Fake-news cluster (the cross-cultural framing differs)."""
    _, members = FAKE_NEWS[lang]
    col = t3.columns[table3_column(lang)]
    assert 1 <= len(col) <= 5
    assert set(col) <= set(members)


@pytest.mark.parametrize("lang", TABLE3_LANGS)
def test_t3_no_hub_contamination(t3, lang):
    assert t3.metrics[f"hub_rate:CR[{lang}]"] == 0.0


def test_t3_language_results_disjoint(t3):
    """Different language editions surface different related concepts —
    the paper's cross-cultural comparison point."""
    cols = [frozenset(v) for v in t3.columns.values()]
    for i in range(len(cols)):
        for j in range(i + 1, len(cols)):
            assert not (cols[i] & cols[j])


def test_t3_rendering_includes_all_columns(t3):
    text = t3.to_text()
    for lang in TABLE3_LANGS:
        assert table3_column(lang) in text


def test_table_text_renders(t1):
    text = t1.to_text()
    assert "PageRank" in text and "United States" in text
