"""Sanity + oracle tests for the provided TPC-H-lite substrate
(`repro.synth_data`) — it underlies the scale conventions of the repo."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001).persist()


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.001).persist()


class TestGenerators:
    def test_lineitem_rows(self, li):
        assert li.count() == 6000

    def test_orders_keys_dense(self, orders):
        assert orders.count() == 1500
        assert orders.select(F.min("o_orderkey")).first()[0] == 1

    def test_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3)
        b = synth_data.lineitem(spark, sf=0.0005, seed=3)
        assert a.exceptAll(b).count() == 0

    def test_zipf_skew(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100).groupBy("k").count()
        top = z.orderBy(F.desc("count")).first()
        assert top["count"] > 5000 / 100 * 3  # head much heavier than uniform

    def test_uniform_range(self, spark):
        u = synth_data.uniform_keys(spark, n=1000, n_keys=10)
        assert u.select(F.max("k")).first()[0] <= 10


class TestOracleAgreement:
    def test_aggregate_query(self, spark, li):
        got = (
            li.groupBy("l_returnflag")
            .agg(
                F.count("*").alias("n"),
                F.round(F.sum("l_quantity"), 6).alias("sum_qty"),
            )
        )
        sql = """
            SELECT l_returnflag, COUNT(*) AS n,
                   ROUND(SUM(l_quantity), 6) AS sum_qty
            FROM lineitem GROUP BY l_returnflag
        """
        assert_equivalent(got, sql, lineitem=li)

    def test_join_query(self, spark, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("n"))
        )
        sql = """
            SELECT o_orderpriority, COUNT(*) AS n
            FROM lineitem l JOIN orders o ON l.l_orderkey = o.o_orderkey
            GROUP BY o_orderpriority
        """
        assert_equivalent(got, sql, lineitem=li, orders=orders)
