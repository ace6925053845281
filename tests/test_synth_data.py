"""Provided TPC-H-lite generators: sanity + oracle round-trips.

The paper's evaluation is on graph data, not TPC-H; these tests keep the
provided synth_data module healthy (it is part of the repo contract) and
exercise the DuckDB oracle on classic relational queries.
"""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.001, seed=0)


@pytest.fixture(scope="module")
def orders_df(spark):
    return synth_data.orders(spark, sf=0.001, seed=1)


class TestShapes:
    def test_lineitem_columns(self, li):
        assert {"l_orderkey", "l_quantity", "l_shipdate"} <= set(li.columns)
        assert li.count() == 6000

    def test_orders_keys_unique(self, orders_df):
        n = orders_df.count()
        assert orders_df.select("o_orderkey").distinct().count() == n

    def test_customer_and_part(self, spark):
        c = synth_data.customer(spark, sf=0.001)
        p = synth_data.part(spark, sf=0.001)
        assert c.count() == 150 and p.count() == 200

    def test_zipf_skew(self, spark):
        z = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.3)
        top = z.groupBy("k").count().orderBy("count", ascending=False).first()
        assert top["count"] > 5000 / 100  # head heavier than uniform

    def test_uniform_keys(self, spark):
        u = synth_data.uniform_keys(spark, n=1000, n_keys=10)
        assert u.select("k").distinct().count() == 10


class TestOracleOnRelationalQueries:
    def test_aggregate(self, spark, li):
        got = li.groupBy("l_returnflag").count().selectExpr(
            "l_returnflag", "count as n"
        )
        assert_equivalent(
            got,
            "select l_returnflag, count(*) as n from li group by l_returnflag",
            li=li,
        )

    def test_join(self, spark, li, orders_df):
        got = (
            li.join(orders_df, li.l_orderkey == orders_df.o_orderkey)
            .groupBy("o_orderpriority")
            .count()
            .selectExpr("o_orderpriority", "count as n")
        )
        assert_equivalent(
            got,
            "select o_orderpriority, count(*) as n from li "
            "join orders_df on l_orderkey = o_orderkey group by o_orderpriority",
            li=li,
            orders_df=orders_df,
        )
