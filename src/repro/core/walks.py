"""Distributed random-walk machinery shared by URW and BRW.

A walk step is one Catalyst round: join the walk frontier against the
(undirected) edge table, draw ``rand()`` per candidate, and keep the
top-ranked candidate per walk via a window — i.e. each walker moves to one
uniformly random neighbour. Walkers stranded on isolated vertices simply
stop (the join drops them), matching GraphSAINT's sampler. Lineage is cut
with ``localCheckpoint`` so ``h`` iterations don't compound plan depth.
"""
from __future__ import annotations

from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F

from repro.kg.schema import KG


def sample_vertices(vertices: DataFrame, n: int, *, seed: int) -> DataFrame:
    """Uniformly draw ``n`` vertex ids (column ``id``) without replacement —
    ``getInitialVertices`` of Algorithm 1."""
    return vertices.select("id").orderBy(F.rand(seed)).limit(n)


def random_walk_visited(kg: KG, roots: DataFrame, h: int, *, seed: int) -> DataFrame:
    """All vertices visited by length-``h`` uniform random walks started at
    ``roots`` (column ``id``), roots included. Returns one ``id`` column."""
    edges = kg.undirected_edges().persist()
    frontier = (
        roots.select("id")
        .distinct()
        .withColumn("walk", F.row_number().over(Window.orderBy("id")))
        .localCheckpoint(eager=True)
    )
    visited = frontier.select("id")
    w = Window.partitionBy("walk").orderBy("_r")
    for step in range(h):
        cand = frontier.join(edges, frontier.id == edges.src).select(
            "walk", F.col("dst").alias("id")
        )
        frontier = (
            cand.withColumn("_r", F.rand(seed + 1000 * step))
            .withColumn("_rn", F.row_number().over(w))
            .where(F.col("_rn") == 1)
            .select("walk", "id")
            .localCheckpoint(eager=True)
        )
        visited = visited.unionByName(frontier.select("id"))
    out = visited.distinct().localCheckpoint(eager=True)
    edges.unpersist()
    return out
