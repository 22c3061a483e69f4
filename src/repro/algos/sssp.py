"""Single-source shortest paths to landmarks (paper §3.2, "SSSP").

GraphX's ``ShortestPaths`` computes, per vertex, hop distances to a set
of landmark vertices with a Pregel frontier expansion (unit edge
weights). The paper averages over 5 randomly chosen sources per
dataset; our harness does the same with a seeded RNG.

Output is the long form ``(id, landmark, dist)`` — one row per
(vertex, reachable landmark) — instead of GraphX's per-vertex map,
because map columns are not orderable for the oracle/reference diff.
Distances follow edge direction (dist from the landmark along arcs),
matching a BFS from the source on the directed graph.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.graph.pregel import PregelResult


def sssp(edges: DataFrame, landmarks: list[int], *, max_iter: int = 50) -> PregelResult:
    """Frontier BFS from each landmark simultaneously.

    State is the long frame ``(id, landmark, dist)`` holding only
    *reached* pairs; each superstep relaxes the arcs leaving the newest
    frontier. Iterates until no distance improves or ``max_iter``.
    """
    spark = edges.sparkSession
    e = edges.select("src", "dst")
    dist = spark.createDataFrame(
        [(int(l), int(l), 0) for l in landmarks], "id long, landmark long, dist int"
    ).localCheckpoint(eager=True)
    frontier = dist
    active: list[int] = []
    it = 0
    for it in range(1, max_iter + 1):
        cand = (
            e.join(frontier.withColumnRenamed("id", "src"), "src")
            .select("dst", "landmark", (F.col("dist") + 1).alias("dist"))
            .groupBy(F.col("dst").alias("id"), "landmark")
            .agg(F.min("dist").alias("dist"))
        )
        improved = (
            cand.join(
                dist.select("id", "landmark", F.col("dist").alias("old")),
                ["id", "landmark"],
                "left_outer",
            )
            .filter(F.col("old").isNull() | (F.col("dist") < F.col("old")))
            .select("id", "landmark", "dist")
            .localCheckpoint(eager=True)
        )
        n = improved.count()
        active.append(n)
        if n == 0:
            break
        dist = (
            dist.join(improved.select("id", "landmark"), ["id", "landmark"], "left_anti")
            .unionByName(improved)
            .localCheckpoint(eager=True)
        )
        frontier = improved
    return PregelResult(vertices=dist, iterations=it, active_per_iter=active)


def sssp_reference(edge_list: list[tuple[int, int]], source: int) -> dict[int, int]:
    """BFS reference (directed, unit weights): vertex -> hop distance."""
    from collections import defaultdict, deque

    adj = defaultdict(list)
    for s, d in edge_list:
        adj[s].append(d)
    dist = {source: 0}
    q = deque([source])
    while q:
        u = q.popleft()
        for v in adj[u]:
            if v not in dist:
                dist[v] = dist[u] + 1
                q.append(v)
    return dist
