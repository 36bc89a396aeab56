"""Synthetic Amazon co-purchase graph.

Stand-in for the Leskovec et al. co-purchase corpus ("Customers who
bought X also bought Y", 548k products) used by Table II. The planted
ground truth uses the paper's actual item names:

- *hubs* (globally co-purchased best-sellers): "Good to Great",
  "DSM-IV", and the "Harry Potter" volumes — the Potter books are the
  popularity intruders that PPR surfaces for "The Fellowship of the
  Ring" while CycleRank does not;
- the *dystopia-classics* cluster around "1984" (Table II left half);
- the *Tolkien* cluster around "The Fellowship of the Ring" (right half);
- three dystopia members are additionally marked *popular* ("The
  Catcher in the Rye", "The Great Gatsby", "Lord of the Flies") — they
  appear in both the global PageRank top-5 and the cluster results,
  exactly as in the paper's table.

The Tolkien cluster's one-way hub links point at the Harry Potter
volumes (hub indices 2–4): epic-fantasy buyers also buy Potter, but
Potter buyers buy everything — so the links don't come back.
"""
from __future__ import annotations

from pyspark.sql import SparkSession

from repro.datasets.builder import (
    ClusterSpec,
    LabeledGraph,
    build_strata_graph,
    stable_seed,
)

HUBS: tuple[str, ...] = (
    "Good to Great",
    "DSM-IV",
    "Harry Potter and the Sorcerer's Stone (Book 1)",
    "Harry Potter and the Chamber of Secrets (Book 2)",
    "Harry Potter and the Prisoner of Azkaban (Book 3)",
)

#: Per-hub background fan-in fractions. The Potter volumes are popular
#: but below the dystopia "popular members", so they crack PPR's top-5
#: (via the Tolkien cluster's one-way links) but not PageRank's.
HUB_FRACS: tuple[float, ...] = (0.92, 0.62, 0.16, 0.13, 0.10)

DYSTOPIA_REF = "1984"
DYSTOPIA: tuple[str, ...] = (
    "Animal Farm", "Fahrenheit 451", "The Catcher in the Rye",
    "Brave New World", "Lord of the Flies", "To Kill a Mockingbird",
    "A Clockwork Orange", "The Great Gatsby",
)

TOLKIEN_REF = "The Fellowship of the Ring"
TOLKIEN: tuple[str, ...] = (
    "The Hobbit", "The Return of the King", "The Silmarillion",
    "The Two Towers", "Unfinished Tales", "The Lord of the Rings (1978 film)",
)

#: Cluster members that are also global best-sellers (back-half fan-in).
POPULAR_MEMBERS: dict[str, float] = {
    "The Catcher in the Rye": 0.45,
    "The Great Gatsby": 0.40,
    "Lord of the Flies": 0.36,
}


def amazon(
    spark: SparkSession, *, scale: float = 1.0, seed: int = 0
) -> LabeledGraph:
    """Generate the synthetic Amazon co-purchase graph.

    Args:
        spark: active session.
        scale: background-stratum multiplier (1.0 → 500 products).
        seed: base RNG seed.

    Returns:
        A :class:`LabeledGraph` with the Table II ground truth planted.
    """
    clusters = (
        ClusterSpec(ref=DYSTOPIA_REF, members=DYSTOPIA, hub_links=(0, 1)),
        ClusterSpec(ref=TOLKIEN_REF, members=TOLKIEN, hub_links=(2, 3, 4)),
    )
    return build_strata_graph(
        spark,
        hubs=HUBS,
        clusters=clusters,
        n_background=max(40, int(500 * scale)),
        seed=stable_seed("amazon", seed),
        hub_fracs=HUB_FRACS,
        popular_members=POPULAR_MEMBERS,
        # co-purchase links are more often mutual than wikilinks
        p_bg_recip=0.4,
        p_member_member=0.55,
    )
