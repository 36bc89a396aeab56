"""Registry of the demo's pre-loaded datasets.

The paper ships "50 pre-loaded datasets from Wikipedia, Twitter and
Amazon": the WikiLinkGraphs snapshots (9 languages × 4 years = 36), the
Amazon co-purchase graph, and the two Twitter collections — 39 distinct
graphs as enumerated in Section IV-B (the abstract's "50" also counts
format variants; we register the 39 enumerated ones). Each entry maps a
stable dataset name to its synthetic generator.
"""
from __future__ import annotations

from typing import Callable

from pyspark.sql import SparkSession

from repro.datasets.amazon import amazon
from repro.datasets.builder import LabeledGraph
from repro.datasets.twitter import TOPICS, twitter
from repro.datasets.wikilink import LANGUAGES, YEARS, wikilink

Loader = Callable[..., LabeledGraph]


def _wikilink_loader(lang: str, year: int) -> Loader:
    def load(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> LabeledGraph:
        return wikilink(spark, lang, year, scale=scale, seed=seed)

    load.__doc__ = f"WikiLinkGraphs {lang} snapshot {year}-03-01 (synthetic)."
    return load


def _twitter_loader(topic: str) -> Loader:
    def load(spark: SparkSession, *, scale: float = 1.0, seed: int = 0) -> LabeledGraph:
        return twitter(spark, topic, scale=scale, seed=seed)

    load.__doc__ = f"Twitter {topic} interaction network (synthetic)."
    return load


REGISTRY: dict[str, Loader] = {
    **{
        f"wikilink-{lang}-{year}": _wikilink_loader(lang, year)
        for lang in LANGUAGES
        for year in YEARS
    },
    "amazon": amazon,
    **{f"twitter-{topic}": _twitter_loader(topic) for topic in TOPICS},
}


def list_datasets() -> list[str]:
    """All registered dataset names, sorted."""
    return sorted(REGISTRY)


def load_dataset(
    spark: SparkSession, name: str, *, scale: float = 1.0, seed: int = 0
) -> LabeledGraph:
    """Load a registered dataset by name.

    Raises:
        KeyError: if ``name`` is not registered.
    """
    try:
        loader = REGISTRY[name]
    except KeyError:
        raise KeyError(
            f"unknown dataset {name!r}; see list_datasets()"
        ) from None
    return loader(spark, scale=scale, seed=seed)
