"""TPC-H-lite generators + DuckDB oracle plumbing (provided substrate)."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.002).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.002).cache()


def test_lineitem_row_count(li):
    assert li.count() == int(6_000_000 * 0.002)


def test_orders_row_count(orders):
    assert orders.count() == int(1_500_000 * 0.002)


def test_deterministic_in_seed(spark):
    a = synth_data.customer(spark, sf=0.001, seed=9).toPandas()
    b = synth_data.customer(spark, sf=0.001, seed=9).toPandas()
    assert a.equals(b)


def test_different_seeds_differ(spark):
    a = synth_data.customer(spark, sf=0.001, seed=1).toPandas()
    b = synth_data.customer(spark, sf=0.001, seed=2).toPandas()
    assert not a.equals(b)


def test_q1_style_aggregate_oracle(spark, li):
    got = li.groupBy("l_returnflag", "l_linestatus").agg(
        {"l_quantity": "sum", "l_extendedprice": "sum"}
    )
    got = (
        got.withColumnRenamed("sum(l_quantity)", "sum_qty")
        .withColumnRenamed("sum(l_extendedprice)", "sum_price")
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, l_linestatus,
               SUM(l_quantity) AS sum_qty,
               SUM(l_extendedprice) AS sum_price
        FROM lineitem GROUP BY l_returnflag, l_linestatus
        """,
        lineitem=li,
    )


def test_join_oracle(spark, li, orders):
    got = (
        li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
        .groupBy("o_orderpriority")
        .count()
        .withColumnRenamed("count", "n")
    )
    assert_equivalent(
        got,
        """
        SELECT o_orderpriority, COUNT(*) AS n
        FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        GROUP BY o_orderpriority
        """,
        lineitem=li,
        orders=orders,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5)
    counts = df.groupBy("k").count().toPandas().set_index("k")["count"]
    assert counts.get(1, 0) > counts.get(50, 0)


def test_uniform_keys_in_range(spark):
    df = synth_data.uniform_keys(spark, n=1000, n_keys=10)
    assert df.toPandas()["k"].between(1, 10).all()


def test_part_and_customer_schemas(spark):
    p = synth_data.part(spark, sf=0.001)
    c = synth_data.customer(spark, sf=0.001)
    assert "p_retailprice" in p.columns
    assert "c_mktsegment" in c.columns


def test_oracle_detects_wrong_result(spark, li):
    wrong = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) + 1 AS n FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_oracle_detects_column_mismatch(spark, li):
    got = li.groupBy("l_returnflag").count()
    with pytest.raises(AssertionError, match="column mismatch"):
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS wrong_name FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )
