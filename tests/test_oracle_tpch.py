"""Sanity tests for the provided DuckDB oracle + TPC-H-lite generators.

The paper's workloads are KG-shaped (see ``kgdata``); these tests keep the
provided OLAP substrate exercised so oracle regressions surface, and they
double as worked examples of ``assert_equivalent`` usage.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(tuned_spark):
    return synth_data.lineitem(tuned_spark, sf=0.002).localCheckpoint(eager=True)


@pytest.fixture(scope="module")
def orders(tuned_spark):
    return synth_data.orders(tuned_spark, sf=0.002).localCheckpoint(eager=True)


class TestGenerators:
    def test_deterministic(self, tuned_spark):
        a = synth_data.lineitem(tuned_spark, sf=0.001).agg(F.sum("l_quantity")).first()[0]
        b = synth_data.lineitem(tuned_spark, sf=0.001).agg(F.sum("l_quantity")).first()[0]
        assert a == b

    def test_zipf_is_skewed(self, tuned_spark):
        df = synth_data.zipf_keys(tuned_spark, n=20000, n_keys=100)
        top = df.groupBy("k").count().orderBy(F.desc("count")).first()
        assert top["count"] > 20000 / 100 * 3  # head key ≫ uniform share


class TestOracle:
    def test_q1_style_aggregate(self, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.sum("l_quantity").alias("sum_qty"),
                F.count("*").alias("n"),
            )
        )
        sql = """
            SELECT l_returnflag, sum(l_quantity) AS sum_qty, count(*) AS n
            FROM li GROUP BY l_returnflag
        """
        assert_equivalent(got, sql, li=li)

    def test_join_aggregate(self, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        sql = """
            SELECT o_orderpriority, count(*) AS n
            FROM li JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, li=li, orders=orders)

    def test_oracle_catches_wrong_result(self, li):
        wrong = li.groupBy("l_returnflag").agg(
            (F.sum("l_quantity") + 1).alias("sum_qty")
        )
        with pytest.raises(AssertionError):
            assert_equivalent(
                wrong,
                "SELECT l_returnflag, sum(l_quantity) AS sum_qty FROM li GROUP BY 1",
                li=li,
            )

    def test_oracle_catches_column_mismatch(self, li):
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("cnt"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(
                got,
                "SELECT l_returnflag, count(*) AS n FROM li GROUP BY 1",
                li=li,
            )
