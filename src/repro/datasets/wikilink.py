"""Synthetic WikiLinkGraphs: per-language, per-year wikilink networks.

Stand-in for the WikiLinkGraphs corpus [Consonni et al., ICWSM 2019]
(see DESIGN.md § dataset substitutions). For each of the paper's nine
language editions and four snapshot years we generate a stratified
graph whose planted ground truth uses the *actual article names from
the paper's tables*:

- the English hubs are Table I's PageRank top-5 ("United States",
  "Animal", …);
- the English clusters are Table I's CycleRank/PPR result sets around
  "Freddie Mercury" and "Pasta";
- every language has a "Fake news" cluster whose members are Table
  III's per-language rows (plus plausible extras to fill the cluster).

Snapshot year scales edge density: 2018 is the densest (factor 1.0)
down to 2003 (factor 0.4), modelling the growth of Wikipedia.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.datasets.builder import (
    ClusterSpec,
    LabeledGraph,
    build_strata_graph,
    stable_seed,
)

LANGUAGES = ("de", "en", "es", "fr", "it", "nl", "pl", "ru", "sv")
YEARS = (2003, 2008, 2013, 2018)
_DENSITY = {2018: 1.0, 2013: 0.8, 2008: 0.6, 2003: 0.4}

#: Per-language global hubs; ``en`` is Table I's PageRank column.
HUBS: dict[str, tuple[str, ...]] = {
    "de": ("Vereinigte Staaten", "Deutschland", "Frankreich", "Tier", "Fußball"),
    "en": ("United States", "Animal", "Arthropod", "Association football", "Insect"),
    "es": ("Estados Unidos", "España", "Animalia", "Fútbol", "Madrid"),
    "fr": ("États-Unis", "France", "Paris", "Football", "Animal"),
    "it": ("Stati Uniti d'America", "Italia", "Roma", "Calcio", "Animalia"),
    "nl": ("Verenigde Staten", "Nederland", "Frankrijk", "Voetbal", "Dier"),
    "pl": ("Stany Zjednoczone", "Polska", "Francja", "Zwierzęta", "Warszawa"),
    "ru": ("США", "Россия", "Франция", "Животные", "Москва"),
    "sv": ("USA", "Sverige", "Frankrike", "Djur", "Fotboll"),
}

#: Table III rows per language: reference article → related articles in
#: the paper's order (padded with plausible extras to reach cluster size).
FAKE_NEWS: dict[str, tuple[str, tuple[str, ...]]] = {
    "de": (
        "Fake News (de)",
        ("Barack Obama", "Tagesschau.de", "Desinformation", "Fake",
         "Donald Trump (de)", "Lügenpresse", "Soziale Medien"),
    ),
    "en": (
        "Fake news",
        ("CNN", "Facebook", "United States presidential election, 2016",
         "Propaganda", "Social media", "Donald Trump", "Post-truth politics"),
    ),
    "es": (
        "Fake news (es)",
        ("Desinformación", "Posverdad", "Bulo", "Donald Trump (es)",
         "Redes sociales", "CNN (es)", "Periodismo"),
    ),
    "fr": (
        "Fake news (fr)",
        ("Ère post-vérité", "Donald Trump (fr)", "Facebook (fr)", "Hoax (fr)",
         "Alex Jones (complotiste)", "Désinformation", "Réseaux sociaux"),
    ),
    "it": (
        "Fake news (it)",
        ("Disinformazione", "Post-verità", "Bufala", "Debunker",
         "Clickbait", "Bugia", "Social media (it)"),
    ),
    "nl": (
        "Nepnieuws",
        ("Facebook (nl)", "Journalistiek", "Hoax (nl)", "Donald Trump (nl)",
         "Desinformatie", "Sociale media", "Complottheorie"),
    ),
    "pl": (
        "Fake news (pl)",
        ("Dezinformacja", "Propaganda (pl)", "Media społecznościowe",
         "Plotka", "Manipulacja", "Donald Trump (pl)", "Postprawda"),
    ),
    "ru": (
        "Фейковые новости",
        ("Дезинформация", "Пропаганда", "Социальные сети", "Постправда",
         "Мистификация", "Жёлтая пресса", "Фейк"),
    ),
    "sv": (
        "Fejknyheter",
        ("Desinformation (sv)", "Propaganda (sv)", "Sociala medier",
         "Faktoid", "Postsanning", "Donald Trump (sv)", "Källkritik"),
    ),
}

#: Table I clusters (English only): reference → members in paper order
#: plus plausible extras.
EN_CLUSTERS: dict[str, tuple[str, ...]] = {
    "Freddie Mercury": (
        "Queen (band)", "Brian May", "Roger Taylor (Queen drummer)",
        "John Deacon", "The Freddie Mercury Tribute Concert", "HIV/AIDS",
        "Queen II", "Bohemian Rhapsody", "A Night at the Opera (album)",
    ),
    "Pasta": (
        "Italian cuisine", "Italy", "Spaghetti", "Flour", "Bolognese sauce",
        "Carbonara", "Durum", "Lasagne", "Penne",
    ),
}


def wikilink(
    spark: SparkSession,
    lang: str = "en",
    year: int = 2018,
    *,
    scale: float = 1.0,
    seed: int = 0,
) -> LabeledGraph:
    """Generate the synthetic wikilink graph for a language edition.

    Args:
        spark: active session.
        lang: one of :data:`LANGUAGES`.
        year: one of :data:`YEARS` — older snapshots are sparser.
        scale: background-stratum multiplier (1.0 → 400 background
            articles; benchmarks use ~10).
        seed: base RNG seed, mixed with ``lang``/``year``.

    Returns:
        A :class:`LabeledGraph` with planted hubs, the per-language
        "Fake news" cluster, and (for ``en``) the Table I clusters.
    """
    if lang not in LANGUAGES:
        raise ValueError(f"unknown language {lang!r}; know {LANGUAGES}")
    if year not in YEARS:
        raise ValueError(f"unknown snapshot year {year}; know {YEARS}")
    fn_ref, fn_members = FAKE_NEWS[lang]
    clusters = [ClusterSpec(ref=fn_ref, members=fn_members)]
    if lang == "en":
        clusters += [
            ClusterSpec(ref=r, members=m) for r, m in EN_CLUSTERS.items()
        ]
    return build_strata_graph(
        spark,
        hubs=HUBS[lang],
        clusters=tuple(clusters),
        n_background=max(40, int(400 * scale)),
        seed=stable_seed("wikilink", lang, year, seed),
        density=_DENSITY[year],
    )
