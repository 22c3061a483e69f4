"""Graph diameter for Table 1's "Diameter" column.

The paper reports ∞ for graphs with more than one (weakly) connected
component and the longest shortest path otherwise. Exact diameter is
quadratic; like the paper (which quotes published numbers) we report a
**double-sweep BFS lower bound** on the undirected view — exact on
trees and in practice tight on small-diameter social graphs — and
``inf`` whenever the graph is disconnected.
"""
from __future__ import annotations

import math

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.algos.connected_components import connected_components
from repro.algos.sssp import sssp
from repro.graph.builders import symmetrize


def eccentricity_sweep(und_edges: DataFrame, start: int, *, max_iter: int = 200):
    """One BFS sweep: returns (farthest vertex, its distance)."""
    res = sssp(und_edges, [start], max_iter=max_iter)
    row = res.vertices.orderBy(F.desc("dist"), "id").first()
    return int(row["id"]), int(row["dist"])


def diameter(edges: DataFrame, *, max_iter: int = 200) -> float:
    """Double-sweep BFS diameter estimate; ``math.inf`` if disconnected."""
    cc = connected_components(edges, max_iter=max_iter)
    if cc.vertices.select("label").distinct().count() > 1:
        return math.inf
    und = symmetrize(edges.select("src", "dst"))
    start = int(und.select(F.min("src").alias("v")).first()["v"])
    far, _ = eccentricity_sweep(und, start, max_iter=max_iter)
    _, d = eccentricity_sweep(und, far, max_iter=max_iter)
    return float(d)
