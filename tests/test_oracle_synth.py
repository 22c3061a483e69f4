"""Oracle integration on the provided TPC-H-lite generators.

Keeps the provided ``synth_data``/``oracle`` scaffolding exercised:
degree-style aggregations over relational data hit the same
Spark-vs-DuckDB diff path the graph metrics tests use.
"""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def li(spark):
    return synth_data.lineitem(spark, sf=0.005).localCheckpoint(eager=True)


@pytest.fixture(scope="module")
def orders(spark):
    return synth_data.orders(spark, sf=0.005).localCheckpoint(eager=True)


class TestOracleOnTpchLite:
    def test_groupby_count(self, spark, li):
        got = li.groupBy("l_returnflag").agg(F.count(F.lit(1)).alias("n"))
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*)::BIGINT AS n FROM li GROUP BY l_returnflag",
            li=li,
        )

    def test_join_aggregate(self, spark, li, orders):
        got = (
            li.join(orders, li.l_orderkey == orders.o_orderkey)
            .groupBy("o_orderpriority")
            .agg(F.sum("l_quantity").alias("qty"))
        )
        assert_equivalent(
            got,
            """SELECT o_orderpriority, sum(l_quantity) AS qty
               FROM li JOIN orders ON l_orderkey = o_orderkey
               GROUP BY o_orderpriority""",
            li=li,
            orders=orders,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=20_000, n_keys=500)
        top = (
            df.groupBy("k").count().orderBy(F.desc("count")).limit(1).first()["count"]
        )
        assert top > 3 * (20_000 / 500)  # hot key well above uniform share

    def test_uniform_keys_flat(self, spark):
        df = synth_data.uniform_keys(spark, n=20_000, n_keys=10)
        counts = [r["count"] for r in df.groupBy("k").count().collect()]
        assert max(counts) < 1.3 * (20_000 / 10)
