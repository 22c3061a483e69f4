"""The paper's five partitioning-characterization metrics (§3.1).

All metrics are computed from a partitioned edge frame
``(src, dst, pid)`` with pure DataFrame aggregations, mirroring how
GraphX reconstructs per-partition vertex lists from its edge
partitions:

- **Balance** — edges in the biggest partition / average edges per
  partition (≥ 1; 1.0 is perfectly balanced).
- **NonCut** — vertices that reside in exactly one partition.
- **Cut** — vertices present in more than one partition.
- **CommCost** — total number of copies of cut vertices (the messages
  exchanged per BSP superstep to sync their state).
- **PartStDev** — population standard deviation of edges per partition.

Empty partitions count as size 0 in Balance/PartStDev (the paper's
denominator is the average over the *requested* number of partitions).
"""
from __future__ import annotations

import math
from dataclasses import dataclass, asdict

from pyspark.sql import DataFrame
from pyspark.sql import functions as F


@dataclass(frozen=True)
class PartitionMetrics:
    """One row of the paper's Tables 2/3 for a (dataset, partitioner) pair."""

    n_parts: int
    n_edges: int
    n_vertices: int
    balance: float
    non_cut: int
    cut: int
    comm_cost: int
    part_stdev: float

    def as_dict(self) -> dict:
        return asdict(self)


def replicas(edges_p: DataFrame) -> DataFrame:
    """Distinct ``(id, pid)`` vertex-replica pairs induced by the edge cut.

    A vertex is materialized in every partition holding at least one of
    its edges — exactly GraphX's per-partition vertex reconstruction.
    """
    return (
        edges_p.select(F.col("src").alias("id"), "pid")
        .unionByName(edges_p.select(F.col("dst").alias("id"), "pid"))
        .distinct()
    )


def replica_counts(edges_p: DataFrame) -> DataFrame:
    """Per-vertex replica count: ``(id, n_replicas)``."""
    return replicas(edges_p).groupBy("id").agg(F.count(F.lit(1)).alias("n_replicas"))


def edge_partition_sizes(edges_p: DataFrame, n_parts: int) -> list[int]:
    """Edges per partition, including zeros for empty pids, length ``n_parts``."""
    rows = edges_p.groupBy("pid").agg(F.count(F.lit(1)).alias("m")).collect()
    sizes = [0] * n_parts
    for r in rows:
        sizes[r["pid"]] = r["m"]
    return sizes


def compute_metrics(edges_p: DataFrame, n_parts: int) -> PartitionMetrics:
    """Compute all five paper metrics for a partitioned edge frame."""
    sizes = edge_partition_sizes(edges_p, n_parts)
    n_edges = sum(sizes)
    mean = n_edges / n_parts
    balance = (max(sizes) / mean) if mean > 0 else 1.0
    var = sum((s - mean) ** 2 for s in sizes) / n_parts
    part_stdev = math.sqrt(var)

    row = (
        replica_counts(edges_p)
        .agg(
            F.sum(F.when(F.col("n_replicas") == 1, 1).otherwise(0)).alias("non_cut"),
            F.sum(F.when(F.col("n_replicas") > 1, 1).otherwise(0)).alias("cut"),
            F.sum(
                F.when(F.col("n_replicas") > 1, F.col("n_replicas")).otherwise(0)
            ).alias("comm_cost"),
            F.count(F.lit(1)).alias("n_vertices"),
        )
        .first()
    )
    return PartitionMetrics(
        n_parts=n_parts,
        n_edges=n_edges,
        n_vertices=int(row["n_vertices"] or 0),
        balance=float(balance),
        non_cut=int(row["non_cut"] or 0),
        cut=int(row["cut"] or 0),
        comm_cost=int(row["comm_cost"] or 0),
        part_stdev=float(part_stdev),
    )


def per_partition_stats(edges_p: DataFrame) -> DataFrame:
    """Per-partition load statistics consumed by the cluster simulator.

    Returns ``(pid, m_edges, n_local_vertices, sum_deg_sq)`` where
    ``sum_deg_sq`` is Σ over local vertices of (local degree)² — the
    wedge-enumeration work the triangle-count cost model charges.
    """
    ends = edges_p.select(F.col("src").alias("id"), "pid").unionByName(
        edges_p.select(F.col("dst").alias("id"), "pid")
    )
    local_deg = ends.groupBy("pid", "id").agg(F.count(F.lit(1)).alias("ldeg"))
    per_vertex = local_deg.groupBy("pid").agg(
        F.count(F.lit(1)).alias("n_local_vertices"),
        F.sum(F.col("ldeg") * F.col("ldeg")).alias("sum_deg_sq"),
    )
    per_edge = edges_p.groupBy("pid").agg(F.count(F.lit(1)).alias("m_edges"))
    return per_edge.join(per_vertex, "pid", "full_outer").select(
        "pid",
        F.coalesce("m_edges", F.lit(0)).alias("m_edges"),
        F.coalesce("n_local_vertices", F.lit(0)).alias("n_local_vertices"),
        F.coalesce("sum_deg_sq", F.lit(0)).alias("sum_deg_sq"),
    )
