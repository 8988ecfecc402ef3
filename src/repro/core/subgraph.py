"""Subgraph construction primitives shared by all extraction methods.

``extractSubgraph`` in Algorithms 1 (line 7) and 2 (line 5) is the induced
subgraph over a chosen vertex set — every KG edge whose both endpoints were
selected — implemented as two semi-joins against the vertex set (no shuffle
of the vertex set's payload columns). The SPARQL method instead unions
matched triples; ``from_triples`` rebuilds a typed KG from them.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.kg.schema import KG


def induced_subgraph(kg: KG, vertex_ids: DataFrame, *, name: str | None = None) -> KG:
    """``KG'`` = all triples of ``kg`` with both endpoints in ``vertex_ids``
    (one column ``id``), plus the typed vertex rows."""
    v = vertex_ids.select("id").distinct()
    triples = (
        kg.triples.join(v.withColumnRenamed("id", "s"), "s", "semi")
        .join(v.withColumnRenamed("id", "o"), "o", "semi")
        .select("s", "p", "o")
    )
    nodes = kg.nodes.join(v, "id", "semi")
    return KG(name=name or f"{kg.name}'", nodes=nodes, triples=triples)


def from_triples(kg: KG, triples: DataFrame, *, name: str | None = None) -> KG:
    """Build ``KG'`` from a set of matched triples: vertices are the
    endpoints, types/years looked up from the parent KG (the SPARQL
    method's merge step, §IV-C)."""
    t = triples.select("s", "p", "o").dropDuplicates()
    endpoints = (
        t.select(F.col("s").alias("id"))
        .unionByName(t.select(F.col("o").alias("id")))
        .distinct()
    )
    nodes = kg.nodes.join(endpoints, "id", "semi")
    return KG(name=name or f"{kg.name}'", nodes=nodes, triples=t)


def materialize(kg: KG) -> KG:
    """Persist and force-evaluate a subgraph so downstream metric passes and
    timing measurements don't re-run the extraction lineage."""
    kg.nodes = kg.nodes.persist()
    kg.triples = kg.triples.persist()
    kg.nodes.count(), kg.triples.count()
    return kg
