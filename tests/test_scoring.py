"""Unit tests for the CycleRank scoring functions σ(n)."""
import math

import pytest
from pyspark.sql import functions as F

from repro.core.scoring import (
    SCORING_FUNCTIONS,
    get_scoring,
    sigma_column,
    sigma_const,
    sigma_exp,
    sigma_lin,
    sigma_quad,
)


@pytest.mark.parametrize("n", [2, 3, 4, 5, 7, 10])
def test_sigma_exp_value(n):
    assert sigma_exp(n) == pytest.approx(math.exp(-n))


@pytest.mark.parametrize("n", [2, 3, 4, 5, 7, 10])
def test_sigma_lin_value(n):
    assert sigma_lin(n) == pytest.approx(1.0 / n)


@pytest.mark.parametrize("n", [2, 3, 4, 5, 7, 10])
def test_sigma_quad_value(n):
    assert sigma_quad(n) == pytest.approx(1.0 / n**2)


@pytest.mark.parametrize("n", [2, 3, 4, 5, 7, 10])
def test_sigma_const_value(n):
    assert sigma_const(n) == 1.0


@pytest.mark.parametrize("name", ["exp", "lin", "quad", "const"])
def test_monotone_nonincreasing(name):
    f = SCORING_FUNCTIONS[name]
    vals = [f(n) for n in range(2, 10)]
    assert all(a >= b for a, b in zip(vals, vals[1:]))


@pytest.mark.parametrize("name", ["exp", "lin", "quad"])
def test_shorter_cycles_weigh_strictly_more(name):
    f = SCORING_FUNCTIONS[name]
    assert f(2) > f(3) > f(4)


def test_get_scoring_by_name():
    assert get_scoring("exp") is sigma_exp
    assert get_scoring("lin") is sigma_lin


def test_get_scoring_passthrough_callable():
    fn = lambda n: 0.5  # noqa: E731
    assert get_scoring(fn) is fn


def test_get_scoring_unknown_raises():
    with pytest.raises(ValueError, match="unknown scoring function"):
        get_scoring("nope")


@pytest.mark.parametrize("name", ["exp", "lin", "quad", "const"])
@pytest.mark.parametrize("n", [2, 3, 5])
def test_sigma_column_matches_python(spark, name, n):
    df = spark.range(1).select(F.lit(n).alias("length"))
    got = df.select(sigma_column(name, F.col("length")).alias("s")).first()["s"]
    assert got == pytest.approx(SCORING_FUNCTIONS[name](n))


def test_sigma_column_unknown_raises():
    with pytest.raises(ValueError, match="no column form"):
        sigma_column("bogus", F.lit(2))
