"""Sanity tests for the provided scaffolding: TPC-H-lite generators and
the DuckDB oracle — exercised through real Spark aggregations so a
broken oracle or generator can't silently pass."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data as sd
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return sd.lineitem(spark, sf=0.001, seed=0).cache()


@pytest.fixture(scope="module")
def orders(spark):
    return sd.orders(spark, sf=0.001, seed=1).cache()


class TestGenerators:
    def test_lineitem_size(self, li):
        assert li.count() == 6000

    def test_deterministic(self, spark):
        a = sd.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = sd.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)

    def test_phone_column_formats(self, spark):
        df = sd.phone_column(spark, n=200, n_formats=3, seed=1)
        assert df.count() == 200
        assert df.columns == ["phone"]

    def test_strings_df(self, spark):
        df = sd.strings_df(spark, ["a", "b"], col="x")
        assert [r["x"] for r in df.collect()] == ["a", "b"]


class TestOracle:
    def test_aggregation_query(self, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count(F.lit(1)).alias("n"),
                F.round(F.sum("l_quantity"), 2).alias("sum_qty"),
            )
        )
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS n, "
            "ROUND(SUM(l_quantity), 2) AS sum_qty "
            "FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_query(self, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count(F.lit(1)).alias("n"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, COUNT(*) AS n FROM li "
            "JOIN orders ON l_orderkey = o_orderkey GROUP BY o_orderpriority",
            li=li,
            orders=orders,
        )

    def test_oracle_catches_wrong_result(self, li):
        wrong = li.groupBy("l_returnflag").agg(
            (F.count(F.lit(1)) + 1).alias("n")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )

    def test_oracle_catches_column_mismatch(self, li):
        got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("cnt"))
        with pytest.raises(AssertionError):
            assert_equivalent(
                got,
                "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
                li=li,
            )
