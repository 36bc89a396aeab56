"""Benchmark: full Table I reproduction (en wikilink, PR + 2x(CR, PPR)).

One pedantic round — each run is a complete multi-algorithm Spark
pipeline (~dozens of shuffle rounds), so pytest-benchmark's default
calibration would take hours. The printed table is the artefact
recorded in EXPERIMENTS.md.
"""
import os

from repro.experiments.tables import table1

SCALE = 2.0  # ~800 background articles, ~(SF 0.1)-sized edge frame


def _save(name: str, text: str) -> None:
    """Persist the rendered table under benchmarks/results/ (pytest
    captures stdout, so the artefact would otherwise be lost)."""
    out = os.path.join(os.path.dirname(__file__), "results")
    os.makedirs(out, exist_ok=True)
    with open(os.path.join(out, name), "w", encoding="utf-8") as fh:
        fh.write(text + "\n")


def test_bench_table1(benchmark, spark):
    result = benchmark.pedantic(
        lambda: table1(spark, scale=SCALE, seed=0), rounds=1, iterations=1
    )
    _save("table1.txt", result.to_text())
    print()
    print(result.to_text())
    assert result.columns["PageRank"]
