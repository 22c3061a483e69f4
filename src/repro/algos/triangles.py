"""Triangle counting (paper §3.2, "TR"), GraphX semantics.

GraphX's ``TriangleCount`` canonicalizes the graph (drop self-loops,
treat edges as undirected, dedup) and counts, per vertex, the triangles
passing through it; the global count is the per-vertex sum divided by
three. We enumerate triangles with two ordered self-joins over the
canonical ``src < dst`` edge set — a pure Catalyst plan that the DuckDB
oracle can replay verbatim (tests do exactly that).
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.builders import canonical_undirected

#: The oracle-side SQL equivalent of :func:`triangle_df` + per-vertex
#: expansion, over a table named ``e`` holding the *raw* edge list.
TRIANGLES_TOTAL_SQL = """
WITH canon AS (
  SELECT DISTINCT least(src, dst) AS a, greatest(src, dst) AS b
  FROM e WHERE src <> dst
)
SELECT count(*)::BIGINT AS n_triangles
FROM canon e1
JOIN canon e2 ON e2.a = e1.b
JOIN canon e3 ON e3.a = e1.a AND e3.b = e2.b
"""


def triangle_df(edges: DataFrame) -> DataFrame:
    """All triangles as ``(a, b, c)`` with ``a < b < c``, each exactly once."""
    canon = canonical_undirected(edges).select(
        F.col("src").alias("a"), F.col("dst").alias("b")
    )
    e1 = canon
    e2 = canon.select(F.col("a").alias("b"), F.col("b").alias("c"))
    e3 = canon.select(F.col("a").alias("a3"), F.col("b").alias("c3"))
    return (
        e1.join(e2, "b")
        .join(e3, (F.col("a") == F.col("a3")) & (F.col("c") == F.col("c3")))
        .select("a", "b", "c")
    )


def triangle_count_total(edges: DataFrame) -> int:
    """Total number of distinct triangles in the graph (Table 1 column)."""
    return triangle_df(edges).count()


def triangle_counts_per_vertex(edges: DataFrame) -> DataFrame:
    """Per-vertex triangle counts ``(id, n_triangles)`` (GraphX output).

    Vertices on no triangle are absent (join with the vertex set to get
    zeros if needed).
    """
    tri = triangle_df(edges)
    exploded = (
        tri.select(F.col("a").alias("id"))
        .unionByName(tri.select(F.col("b").alias("id")))
        .unionByName(tri.select(F.col("c").alias("id")))
    )
    return exploded.groupBy("id").agg(F.count(F.lit(1)).alias("n_triangles"))


def triangles_reference(edge_list: list[tuple[int, int]]) -> int:
    """Pure-Python total triangle count, for closed-form test graphs."""
    adj: dict[int, set[int]] = {}
    for s, d in edge_list:
        if s == d:
            continue
        a, b = min(s, d), max(s, d)
        adj.setdefault(a, set()).add(b)
        adj.setdefault(b, set()).add(a)
    count = 0
    for a, nbrs in adj.items():
        for b in nbrs:
            if b <= a:
                continue
            count += sum(1 for c in adj[b] if c > b and c in nbrs)
    return count
