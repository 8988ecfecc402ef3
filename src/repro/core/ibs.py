"""Influence-based sampling — the paper's Algorithm 2.

The influence score (Eq. 3, an embedding-sensitivity measure) is
approximated with Personalized PageRank from the target vertices, exactly
as the paper does ("adapts the PPR [38] to approximate an influence
score"). We run batched-seed PPR as a DataFrame power iteration over the
undirected edge table:

    p_{t+1} = alpha * seed + (1 - alpha) * A_norm^T p_t

with the approximation threshold ``eps`` pruning negligible mass each
round (the epsilon of the paper's O(N_out / (eps * alpha)) complexity).
Top-k selection keeps the ``k * bs`` most influential non-target vertices
(global rather than per-target pairs — see DESIGN.md §4.4), and KG' is the
induced subgraph over seeds + influential targets + chosen neighbours.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.subgraph import induced_subgraph
from repro.core.walks import sample_vertices
from repro.kg.schema import KG


def personalized_pagerank(
    kg: KG,
    seeds: DataFrame,
    *,
    alpha: float = 0.25,
    eps: float = 2e-4,
    iters: int = 10,
) -> DataFrame:
    """Approximate PPR scores ``(id, score)`` w.r.t. the seed set.

    ``alpha`` is the teleport probability back to the seeds; entries below
    ``eps`` are pruned every iteration so the frontier stays proportional
    to the local cluster around the seeds, not the whole KG.
    """
    edges = kg.undirected_edges().persist()
    deg = edges.groupBy("src").agg(F.count("*").alias("deg")).persist()
    n_seeds = seeds.count()
    p0 = (
        seeds.select("id")
        .distinct()
        .withColumn("seed_mass", F.lit(1.0 / max(1, n_seeds)))
        .persist()
    )
    p = p0.select("id", F.col("seed_mass").alias("score"))
    for it in range(iters):
        contrib = (
            p.join(edges, p.id == edges.src)
            .join(deg, "src")
            .select(F.col("dst").alias("id"), (F.col("score") / F.col("deg")).alias("m"))
            .groupBy("id")
            .agg(F.sum("m").alias("walk_mass"))
        )
        p = (
            contrib.join(p0, "id", "full")
            .select(
                "id",
                (
                    F.lit(alpha) * F.coalesce(F.col("seed_mass"), F.lit(0.0))
                    + F.lit(1 - alpha) * F.coalesce(F.col("walk_mass"), F.lit(0.0))
                ).alias("score"),
            )
            .where(F.col("score") >= eps)
            .localCheckpoint(eager=True)
        )
    edges.unpersist()
    deg.unpersist()
    p0.unpersist()
    return p


def ibs_sample(
    kg: KG,
    targets: DataFrame,
    *,
    bs: int,
    k: int = 16,
    alpha: float = 0.25,
    eps: float = 2e-4,
    iters: int = 10,
    seed: int = 0,
) -> KG:
    """Algorithm 2: PPR from ``bs`` sampled targets, keep influential
    targets plus the top ``k*bs`` influential non-targets, induce KG'."""
    seeds = sample_vertices(targets, bs, seed=seed).persist()
    scores = personalized_pagerank(kg, seeds, alpha=alpha, eps=eps, iters=iters).persist()
    t = targets.select("id").distinct()
    influential_targets = scores.join(t, "id", "semi").select("id")
    top_neighbours = (
        scores.join(t, "id", "anti")
        .orderBy(F.desc("score"), "id")
        .limit(k * bs)
        .select("id")
    )
    chosen = (
        seeds.select("id")
        .unionByName(influential_targets)
        .unionByName(top_neighbours)
        .distinct()
        .localCheckpoint(eager=True)
    )
    out = induced_subgraph(kg, chosen, name=f"{kg.name}-IBS")
    seeds.unpersist()
    scores.unpersist()
    return out
