"""Shared spark-submit plumbing for the table jobs."""
from __future__ import annotations

import argparse

from pyspark.sql import SparkSession


def session(app: str) -> SparkSession:
    """Session for spark-submit runs (tests use the conftest fixture)."""
    return (
        SparkSession.builder.appName(app)
        .config("spark.sql.execution.arrow.pyspark.enabled", "true")
        .getOrCreate()
    )


def table_args(desc: str) -> argparse.Namespace:
    """--scale / --seed arguments common to every table job."""
    p = argparse.ArgumentParser(description=desc)
    p.add_argument("--scale", type=float, default=1.0, help="dataset scale factor")
    p.add_argument("--seed", type=int, default=0, help="generator seed")
    return p.parse_args()
