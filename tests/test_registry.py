"""Dataset registry: the demo's pre-loaded catalogue."""
import pytest

from repro.datasets.registry import REGISTRY, list_datasets, load_dataset
from repro.datasets.wikilink import LANGUAGES, YEARS


def test_registry_size():
    """9 languages x 4 years + amazon + 2 twitter = 39 enumerated
    datasets (Section IV-B)."""
    assert len(REGISTRY) == 9 * 4 + 1 + 2


def test_all_wikilink_combinations_present():
    for lang in LANGUAGES:
        for year in YEARS:
            assert f"wikilink-{lang}-{year}" in REGISTRY


def test_amazon_and_twitter_present():
    assert "amazon" in REGISTRY
    assert "twitter-cop27" in REGISTRY
    assert "twitter-8m" in REGISTRY


def test_list_datasets_sorted():
    names = list_datasets()
    assert names == sorted(names)
    assert len(names) == len(REGISTRY)


def test_load_unknown_raises(spark):
    with pytest.raises(KeyError, match="unknown dataset"):
        load_dataset(spark, "nope")


@pytest.mark.parametrize(
    "name", ["wikilink-it-2008", "amazon", "twitter-8m"]
)
def test_load_dataset_returns_labeled_graph(spark, name):
    lg = load_dataset(spark, name, scale=0.1)
    assert lg.graph.num_vertices() > 0
    assert lg.hubs


def test_loaders_have_docstrings():
    for name, loader in REGISTRY.items():
        assert loader.__doc__, f"loader {name} lacks a docstring"
