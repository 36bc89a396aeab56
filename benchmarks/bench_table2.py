"""Benchmark: full Table II reproduction (Amazon, PR + 2x(CR K=5, PPR))."""
import os

from repro.experiments.tables import table2

SCALE = 2.0  # ~1000 products


def _save(name: str, text: str) -> None:
    """Persist the rendered table under benchmarks/results/ (pytest
    captures stdout, so the artefact would otherwise be lost)."""
    out = os.path.join(os.path.dirname(__file__), "results")
    os.makedirs(out, exist_ok=True)
    with open(os.path.join(out, name), "w", encoding="utf-8") as fh:
        fh.write(text + "\n")


def test_bench_table2(benchmark, spark):
    result = benchmark.pedantic(
        lambda: table2(spark, scale=SCALE, seed=0), rounds=1, iterations=1
    )
    _save("table2.txt", result.to_text())
    print()
    print(result.to_text())
    assert result.columns["PageRank"]
