"""Provided TPC-H-lite generators + the DuckDB oracle on relational queries.

The reproduction's primary data are road networks, but the shipped
``synth_data`` generators remain part of the toolkit (workload padding /
oracle demos) and are kept working and oracle-checked here.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001, seed=1).cache()


class TestGenerators:
    def test_lineitem_rows(self, li):
        assert li.count() == 6000

    def test_orders_rows(self, orders):
        assert orders.count() == 1500

    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
        b = synth_data.lineitem(spark, sf=0.001, seed=0).toPandas()
        assert a.equals(b)

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100, seed=3).toPandas()
        counts = df["k"].value_counts()
        assert counts.iloc[0] > 3 * counts.iloc[-1]

    def test_uniform_keys_range(self, spark):
        df = synth_data.uniform_keys(spark, n=1000, n_keys=10, seed=4).toPandas()
        assert df["k"].between(1, 10).all()


class TestOracle:
    def test_aggregate_query(self, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("n"),
                F.round(F.sum("l_quantity"), 6).alias("qty"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag, count(*) AS n,
                   round(sum(l_quantity), 6) AS qty
            FROM lineitem GROUP BY l_returnflag
            """,
            lineitem=li,
        )

    def test_join_query(self, spark, li, orders):
        got = (
            li.join(orders, li["l_orderkey"] == orders["o_orderkey"])
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS n
            FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
            GROUP BY o_orderpriority
            """,
            lineitem=li,
            orders=orders,
        )

    def test_oracle_catches_wrong_result(self, li):
        wrong = li.groupBy("l_returnflag").agg((F.count("*") + 1).alias("n"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
                lineitem=li,
            )
