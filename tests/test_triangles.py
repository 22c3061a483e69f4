"""Triangle counting vs closed forms and the DuckDB oracle."""
import pytest
from pyspark.sql import functions as F

from repro.algos.triangles import (
    TRIANGLES_TOTAL_SQL,
    triangle_count_total,
    triangle_counts_per_vertex,
    triangle_df,
    triangles_reference,
)
from repro.graph.builders import edges_from_pairs
from repro.oracle import assert_equivalent


def _clique_pairs(n):
    return [(i, j) for i in range(n) for j in range(n) if i != j]


class TestClosedForms:
    def test_k4_has_4_triangles(self, spark):
        e = edges_from_pairs(spark, _clique_pairs(4))
        assert triangle_count_total(e) == 4

    def test_k5_has_10_triangles(self, spark):
        e = edges_from_pairs(spark, _clique_pairs(5))
        assert triangle_count_total(e) == 10

    def test_square_cycle_none(self, spark):
        e = edges_from_pairs(spark, [(0, 1), (1, 2), (2, 3), (3, 0)])
        assert triangle_count_total(e) == 0

    def test_grid_has_none(self, spark, grid6_edges):
        assert triangle_count_total(grid6_edges) == 0

    def test_star_has_none(self, spark):
        e = edges_from_pairs(spark, [(0, i) for i in range(1, 8)])
        assert triangle_count_total(e) == 0

    def test_direction_and_duplicates_ignored(self, spark):
        # triangle encoded with mixed directions and a duplicate arc
        e = edges_from_pairs(spark, [(0, 1), (2, 1), (0, 2), (0, 2), (2, 0)])
        assert triangle_count_total(e) == 1

    def test_self_loops_ignored(self, spark):
        e = edges_from_pairs(spark, [(0, 0), (0, 1), (1, 2), (2, 0), (1, 1)])
        assert triangle_count_total(e) == 1


class TestPerVertex:
    def test_k4_each_vertex_on_3(self, spark):
        e = edges_from_pairs(spark, _clique_pairs(4))
        counts = {r["id"]: r["n_triangles"] for r in triangle_counts_per_vertex(e).collect()}
        assert counts == {0: 3, 1: 3, 2: 3, 3: 3}

    def test_bowtie(self, spark):
        # two triangles sharing vertex 2
        pairs = [(0, 1), (1, 2), (2, 0), (2, 3), (3, 4), (4, 2)]
        e = edges_from_pairs(spark, pairs)
        counts = {r["id"]: r["n_triangles"] for r in triangle_counts_per_vertex(e).collect()}
        assert counts[2] == 2
        assert counts[0] == counts[1] == counts[3] == counts[4] == 1

    def test_sum_is_three_times_total(self, spark, er_edges):
        total = triangle_count_total(er_edges)
        per_v = triangle_counts_per_vertex(er_edges)
        s = per_v.agg(F.sum("n_triangles").alias("s")).first()["s"] or 0
        assert s == 3 * total

    def test_ordering_invariant(self, spark):
        tri = triangle_df(
            edges_from_pairs(spark, [(5, 3), (3, 1), (1, 5)])
        ).collect()
        assert len(tri) == 1
        r = tri[0]
        assert r["a"] < r["b"] < r["c"]


class TestOracle:
    def test_total_matches_duckdb_er(self, spark, er_edges):
        got = spark.createDataFrame(
            [(triangle_count_total(er_edges),)], "n_triangles long"
        )
        assert_equivalent(got, TRIANGLES_TOTAL_SQL, e=er_edges)

    def test_total_matches_duckdb_social(self, spark, social_small_edges):
        got = spark.createDataFrame(
            [(triangle_count_total(social_small_edges),)], "n_triangles long"
        )
        assert_equivalent(got, TRIANGLES_TOTAL_SQL, e=social_small_edges)

    def test_total_matches_reference(self, er_pairs, spark, er_edges):
        assert triangle_count_total(er_edges) == triangles_reference(er_pairs)
