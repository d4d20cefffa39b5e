"""Oracle plumbing on the TPC-H-lite substrate.

Exercises the DuckDB result-equality checker (and the disabled-broadcast
shuffle-join path) on relational workloads, so a broken Arrow conversion
or join regression in the session config is caught independently of the
CLIMBER code paths.
"""
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.synth_data import customer, lineitem, orders, part


@pytest.fixture(scope="module")
def tables(spark):
    return {
        "lineitem": lineitem(spark, sf=0.002).cache(),
        "orders": orders(spark, sf=0.002).cache(),
        "customer": customer(spark, sf=0.002).cache(),
        "part": part(spark, sf=0.002).cache(),
    }


class TestAggregations:
    def test_groupby_count(self, tables):
        li = tables["lineitem"]
        got = li.groupBy("l_returnflag").agg(F.count("*").alias("cnt"))
        assert_equivalent(
            got, "SELECT l_returnflag, count(*) AS cnt FROM li GROUP BY l_returnflag", li=li
        )

    def test_sum_avg(self, tables):
        li = tables["lineitem"]
        got = li.groupBy("l_linestatus").agg(
            F.sum("l_quantity").alias("qty"), F.avg("l_extendedprice").alias("avg_price")
        )
        assert_equivalent(
            got,
            "SELECT l_linestatus, sum(l_quantity) AS qty, avg(l_extendedprice) AS avg_price "
            "FROM li GROUP BY l_linestatus",
            li=li,
        )


class TestShuffleJoins:
    def test_lineitem_orders_join(self, spark, tables):
        li, o = tables["lineitem"], tables["orders"]
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            "SELECT o_orderpriority, count(*) AS cnt FROM li JOIN o ON l_orderkey = o_orderkey "
            "GROUP BY o_orderpriority",
            li=li, o=o,
        )

    def test_three_way_join(self, tables):
        li, o, c = tables["lineitem"], tables["orders"], tables["customer"]
        got = (
            li.join(o, li.l_orderkey == o.o_orderkey)
            .join(c, o.o_custkey == c.c_custkey)
            .groupBy("c_mktsegment")
            .agg(F.sum("l_quantity").alias("qty"))
        )
        assert_equivalent(
            got,
            "SELECT c_mktsegment, sum(l_quantity) AS qty FROM li "
            "JOIN o ON l_orderkey = o_orderkey JOIN c ON o_custkey = c_custkey "
            "GROUP BY c_mktsegment",
            li=li, o=o, c=c,
        )

    def test_broadcast_disabled_in_session(self, spark):
        assert spark.conf.get("spark.sql.autoBroadcastJoinThreshold") == "-1"
