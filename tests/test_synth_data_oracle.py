"""Sanity checks of the provided TPC-H-lite generators through the
DuckDB oracle — exercises the repo's canonical correctness harness on a
plain Spark SQL aggregation path."""
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


class TestTPCHLiteOracle:
    def test_filtered_aggregation_matches_duckdb(self, li):
        got = (
            li.filter("l_quantity > 25")
            .groupBy("l_returnflag")
            .agg(
                F.count("*").alias("cnt"),
                F.round(F.sum("l_extendedprice"), 2).alias("total"),
            )
        )
        assert_equivalent(
            got,
            """
            SELECT l_returnflag,
                   count(*) AS cnt,
                   round(sum(l_extendedprice), 2) AS total
            FROM li WHERE l_quantity > 25 GROUP BY l_returnflag
            """,
            li=li,
        )

    def test_join_matches_duckdb(self, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.count("*").alias("cnt"))
        )
        assert_equivalent(
            got,
            """
            SELECT o_orderpriority, count(*) AS cnt
            FROM li JOIN orders ON l_orderkey = o_orderkey
            GROUP BY o_orderpriority
            """,
            li=li,
            orders=orders,
        )
