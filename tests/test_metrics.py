"""Tests for the five partitioning metrics, checked against DuckDB.

The oracle replays the replica derivation in SQL over the identical
(src, dst, pid) table, so a wrong groupBy/union in the Spark side is
caught as a row diff, not just "it ran" (see repro.oracle).
"""
import math

import duckdb
import pytest
from pyspark.sql import functions as F

from repro.graph.builders import edges_from_pairs
from repro.graph.partitioners import STRATEGIES, partition_edges
from repro.metrics.partition_metrics import (
    compute_metrics,
    edge_partition_sizes,
    per_partition_stats,
    replica_counts,
    replicas,
)
from repro.oracle import assert_equivalent

N_PARTS = 16

ORACLE_METRICS_SQL = """
WITH r AS (
  SELECT DISTINCT id, pid FROM (
    SELECT src AS id, pid FROM e
    UNION ALL
    SELECT dst AS id, pid FROM e
  )
), c AS (
  SELECT id, count(*) AS n FROM r GROUP BY id
)
SELECT
  CAST(sum(CASE WHEN n = 1 THEN 1 ELSE 0 END) AS BIGINT) AS non_cut,
  CAST(sum(CASE WHEN n > 1 THEN 1 ELSE 0 END) AS BIGINT) AS cut,
  CAST(sum(CASE WHEN n > 1 THEN n ELSE 0 END) AS BIGINT) AS comm_cost,
  CAST(count(*) AS BIGINT) AS n_vertices
FROM c
"""


@pytest.fixture(scope="module", params=["RVC", "1D", "2D", "CRVC", "SC", "DC"])
def social_partition(request, spark, social_small_edges):
    strategy = request.param
    ep = partition_edges(social_small_edges, strategy, N_PARTS).localCheckpoint(eager=True)
    return strategy, ep, compute_metrics(ep, N_PARTS)


class TestOracleAgreement:
    def test_counts_vs_duckdb(self, spark, social_partition):
        _, ep, m = social_partition
        got = spark.createDataFrame(
            [(m.non_cut, m.cut, m.comm_cost, m.n_vertices)],
            "non_cut long, cut long, comm_cost long, n_vertices long",
        )
        assert_equivalent(got, ORACLE_METRICS_SQL, e=ep)

    def test_balance_vs_duckdb(self, social_partition):
        _, ep, m = social_partition
        pdf = ep.toPandas()
        con = duckdb.connect()
        con.register("e", pdf)
        mx = con.execute("SELECT max(cnt) FROM (SELECT count(*) cnt FROM e GROUP BY pid)").fetchone()[0]
        con.close()
        avg = len(pdf) / N_PARTS
        assert m.balance == pytest.approx(mx / avg)

    def test_part_stdev_vs_numpy(self, social_partition):
        import numpy as np

        _, ep, m = social_partition
        sizes = np.array(edge_partition_sizes(ep, N_PARTS))
        assert m.part_stdev == pytest.approx(float(np.std(sizes)))


class TestIdentities:
    def test_noncut_plus_cut_is_vertex_count(self, social_partition):
        _, _, m = social_partition
        assert m.non_cut + m.cut == m.n_vertices

    def test_commcost_at_least_twice_cut(self, social_partition):
        # every cut vertex has >= 2 replicas by definition
        _, _, m = social_partition
        assert m.comm_cost >= 2 * m.cut

    def test_balance_at_least_one(self, social_partition):
        _, _, m = social_partition
        assert m.balance >= 1.0

    def test_edges_preserved(self, social_partition, social_small_edges):
        _, _, m = social_partition
        assert m.n_edges == social_small_edges.count()

    def test_commcost_bounded_by_parts(self, social_partition):
        _, _, m = social_partition
        assert m.comm_cost <= m.cut * N_PARTS


class TestSmallClosedForm:
    def test_all_one_partition(self, spark):
        e = edges_from_pairs(spark, [(1, 2), (2, 3), (3, 1)])
        ep = e.withColumn("pid", F.lit(0))
        m = compute_metrics(ep, 4)
        assert m.non_cut == 3 and m.cut == 0 and m.comm_cost == 0
        assert m.balance == pytest.approx(4.0)  # 3 edges all in 1 of 4 parts

    def test_fully_cut_vertex(self, spark):
        # star hub replicated in every partition
        e = edges_from_pairs(spark, [(0, i) for i in range(1, 5)])
        ep = e.withColumn("pid", (F.col("dst") - 1).cast("int"))
        m = compute_metrics(ep, 4)
        assert m.cut == 1  # only the hub
        assert m.non_cut == 4  # each leaf in exactly one partition
        assert m.comm_cost == 4  # hub present in all 4 partitions
        assert m.balance == pytest.approx(1.0)
        assert m.part_stdev == pytest.approx(0.0)

    def test_two_partitions_path(self, spark):
        # path 1-2-3-4, split between edges (2,3): vertices 2.. wait —
        # edges (1,2)->p0, (2,3)->p0, (3,4)->p1: only 3 is cut
        e = edges_from_pairs(spark, [(1, 2), (2, 3), (3, 4)])
        ep = e.withColumn("pid", F.when(F.col("src") >= 3, 1).otherwise(0).cast("int"))
        m = compute_metrics(ep, 2)
        assert m.cut == 1 and m.comm_cost == 2
        assert m.non_cut == 3

    def test_empty_partition_counts_as_zero(self, spark):
        e = edges_from_pairs(spark, [(1, 2), (2, 3)])
        ep = e.withColumn("pid", F.lit(0))
        sizes = edge_partition_sizes(ep, 3)
        assert sizes == [2, 0, 0]
        m = compute_metrics(ep, 3)
        assert m.balance == pytest.approx(2 / (2 / 3))


class TestReplicas:
    def test_replica_pairs_distinct(self, spark):
        e = edges_from_pairs(spark, [(1, 2), (1, 2), (1, 3)])
        ep = e.withColumn("pid", F.lit(0))
        assert replicas(ep).count() == 3  # (1,0),(2,0),(3,0)

    def test_replica_counts(self, spark):
        e = edges_from_pairs(spark, [(1, 2), (1, 3)])
        ep = e.withColumn("pid", (F.col("dst") % 2).cast("int"))
        counts = {r["id"]: r["n_replicas"] for r in replica_counts(ep).collect()}
        assert counts[1] == 2 and counts[2] == 1 and counts[3] == 1

    def test_per_partition_stats_sum(self, social_partition, social_small_edges):
        _, ep, _ = social_partition
        stats = per_partition_stats(ep).toPandas()
        assert stats["m_edges"].sum() == social_small_edges.count()
        # sum over partitions of local degree = 2m per partition sum
        # (each edge contributes one endpoint-occurrence to src and dst)

    def test_sum_deg_sq_star(self, spark):
        # hub + 3 leaves in one partition: local degs = [3,1,1,1]
        e = edges_from_pairs(spark, [(0, 1), (0, 2), (0, 3)])
        ep = e.withColumn("pid", F.lit(0))
        row = per_partition_stats(ep).first()
        assert row["sum_deg_sq"] == 9 + 1 + 1 + 1
        assert row["n_local_vertices"] == 4


class TestAcrossStrategies:
    def test_rvc_lowest_noncut_on_social(self, spark, social_small_edges):
        """The paper's Appendix observation: RVC leaves almost no vertex
        uncut, while modulo/1D partitioners keep far more vertices whole."""
        ms = {}
        for s in ("RVC", "1D", "DC"):
            ep = partition_edges(social_small_edges, s, 64)
            ms[s] = compute_metrics(ep, 64)
        assert ms["RVC"].non_cut <= ms["1D"].non_cut
        assert ms["RVC"].non_cut <= ms["DC"].non_cut

    def test_crvc_cheaper_than_rvc_on_symmetric(self, spark, grid6_edges):
        """On a symmetric graph CRVC collocates both arc directions, so
        its CommCost must undercut RVC's (paper Tables 2/3, road rows)."""
        rvc = compute_metrics(partition_edges(grid6_edges, "RVC", 8), 8)
        crvc = compute_metrics(partition_edges(grid6_edges, "CRVC", 8), 8)
        assert crvc.comm_cost < rvc.comm_cost

    @pytest.mark.parametrize("strategy", STRATEGIES)
    def test_metrics_finite(self, spark, grid6_edges, strategy):
        m = compute_metrics(partition_edges(grid6_edges, strategy, 8), 8)
        assert math.isfinite(m.balance) and math.isfinite(m.part_stdev)
        assert m.n_vertices == 36
