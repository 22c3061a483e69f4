"""A minimal Pregel/BSP engine over DataFrames.

GraphX maps BSP supersteps onto RDD joins and aggregations; we do the
same with DataFrames: each superstep joins vertex state onto the edge
frame, emits messages, reduces them per destination vertex, and merges
the reduced message into the vertex state. Lineage is truncated every
iteration with ``localCheckpoint`` so 10–50 iterations stay tractable.

Callers provide three pieces, all expressed at the DataFrame level
(keeping everything inside Catalyst — no Python row UDFs):

- ``send(edges_with_state) -> DataFrame('id', 'msg')`` — given the edge
  frame joined with source state (columns of the vertex frame prefixed
  ``src_``/``dst_`` as requested), produce addressed messages.
- ``agg_expr`` — an aggregate ``Column`` over ``msg`` (e.g. ``F.sum``,
  ``F.min``) used to combine messages per vertex.
- ``update(vertices_joined) -> DataFrame`` — merge the combined ``msg``
  column into the vertex state; must also produce a boolean ``changed``
  column used for convergence detection.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

from pyspark.sql import Column, DataFrame
from pyspark.sql import functions as F


@dataclass
class PregelResult:
    """Final vertex state plus the per-iteration activity trace.

    ``active_per_iter[i]`` is the number of vertices whose state changed
    in superstep ``i`` — the activity schedule the cluster cost
    simulator replays (DESIGN.md §1.7).
    """

    vertices: DataFrame
    iterations: int
    active_per_iter: list[int]


def _attach_state(edges: DataFrame, vertices: DataFrame, side: str) -> DataFrame:
    """Join vertex state onto ``edges`` for one endpoint.

    State columns are prefixed ``src_`` / ``dst_`` (vertex ``id`` key
    excluded).
    """
    prefixed = vertices.select(
        F.col("id").alias(side),
        *[F.col(c).alias(f"{side}_{c}") for c in vertices.columns if c != "id"],
    )
    return edges.join(prefixed, side)


def run_pregel(
    vertices: DataFrame,
    edges: DataFrame,
    send: Callable[[DataFrame], DataFrame],
    agg_expr: Column,
    update: Callable[[DataFrame], DataFrame],
    *,
    max_iter: int,
    attach: tuple[str, ...] = ("src",),
    check_convergence: bool = True,
) -> PregelResult:
    """Run BSP supersteps until convergence or ``max_iter``.

    ``vertices`` must have an ``id`` column plus state columns; its
    state is checkpointed each round. ``attach`` selects which endpoint
    states ``send`` needs on the edge frame.
    """
    state = vertices.localCheckpoint(eager=True)
    active: list[int] = []
    it = 0
    for it in range(1, max_iter + 1):
        e = edges
        for side in attach:
            e = _attach_state(e, state, side)
        msgs = send(e).groupBy("id").agg(agg_expr.alias("msg"))
        joined = state.join(msgs, "id", "left_outer")
        new_state = update(joined)
        new_state = new_state.localCheckpoint(eager=True)
        if check_convergence:
            n_changed = new_state.filter(F.col("changed")).count()
            active.append(n_changed)
            state = new_state.drop("changed")
            if n_changed == 0:
                break
        else:
            active.append(-1)
            state = new_state.drop("changed")
    return PregelResult(vertices=state, iterations=it, active_per_iter=active)
