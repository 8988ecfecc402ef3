"""SPARQL-based TOSG extraction — the paper's main method (Algorithm 3).

The generic pattern (``pattern.TOSGPattern``) is evaluated as a BGP
against the hexastore-style triple indices of ``kg.partition``: hop 1
fetches every triple incident to a target vertex (outgoing leg via the
subject index; incoming leg via the object index when ``d=2``), hop 2
repeats from the hop-1 neighbour frontier, and so on. Matched triples are
unioned and de-duplicated — the "merge" that interlinks per-target stars
into one KG' with longer metapaths (§IV-C).

``extract_tosg_paginated`` mirrors Algorithm 3's batched execution
(executionPlanner → per-batch subqueries → parallel workers → final
``dropDuplicates``): the target set is hash-partitioned into query
batches, each batch's BGP runs independently, results are unioned and
deduplicated. Tests assert it is result-identical to the direct form.
"""
from __future__ import annotations

from functools import reduce

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.core.pattern import TOSGPattern
from repro.core.subgraph import from_triples
from repro.kg.partition import TripleIndex
from repro.kg.schema import KG


def _match_bgp(index: TripleIndex, targets: DataFrame, pattern: TOSGPattern) -> DataFrame:
    """All triples matched by the pattern's UNION legs for ``targets``."""
    frontier = targets.select("id").distinct()
    legs: list[DataFrame] = []
    for _hop in range(pattern.h):
        out = index.outgoing(frontier)
        legs.append(out)
        nxt = out.select(F.col("o").alias("id"))
        if pattern.d == 2:
            inc = index.incoming(frontier)
            legs.append(inc)
            nxt = nxt.unionByName(inc.select(F.col("s").alias("id")))
        frontier = nxt.distinct().localCheckpoint(eager=True)
    return reduce(lambda a, b: a.unionByName(b), legs)


def extract_tosg(
    index: TripleIndex,
    targets: DataFrame,
    pattern: TOSGPattern = TOSGPattern(1, 1),
    *,
    lp_predicate: str | None = None,
    name: str | None = None,
) -> KG:
    """Extract ``KG'`` for a target set with pattern ``(d, h)``.

    For LP tasks, the bridge triple pattern ``⟨?v_Ti, p_T, ?v_Tj⟩`` is
    added so the subgraphs around the two target endpoints stay linked.
    """
    kg = index.kg
    matched = _match_bgp(index, targets, pattern)
    if lp_predicate is not None:
        matched = matched.unionByName(index.predicate(lp_predicate))
    triples = matched.dropDuplicates(["s", "p", "o"])
    return from_triples(
        kg, triples, name=name or f"{kg.name}-TOSA_{pattern.variant}"
    )


def extract_tosg_paginated(
    index: TripleIndex,
    targets: DataFrame,
    pattern: TOSGPattern = TOSGPattern(1, 1),
    *,
    bs: int,
    lp_predicate: str | None = None,
    name: str | None = None,
) -> KG:
    """Algorithm 3's paginated execution plan.

    ``getGraphSize``/``executionPlanner`` (lines 3–4): count the targets
    and derive the number of query batches for batch size ``bs``; each
    batch is an independent subquery (lines 6–9, Spark's task scheduler
    playing the worker pool); line 10's duplicate elimination merges the
    per-batch triple sets.
    """
    kg = index.kg
    t = targets.select("id").distinct().persist()
    count = t.count()  # getGraphSize
    n_batches = max(1, -(-count // bs))  # executionPlanner: ceil(count / bs)
    batched = t.withColumn("_qb", F.pmod(F.hash("id"), F.lit(n_batches)))
    parts = [
        _match_bgp(index, batched.where(F.col("_qb") == i).select("id"), pattern)
        for i in range(n_batches)
    ]
    matched = reduce(lambda a, b: a.unionByName(b), parts)
    if lp_predicate is not None:
        matched = matched.unionByName(index.predicate(lp_predicate))
    triples = matched.dropDuplicates(["s", "p", "o"])
    out = from_triples(
        kg, triples, name=name or f"{kg.name}-TOSA_{pattern.variant}"
    )
    t.unpersist()
    return out
