"""Hexastore-style triple "indices" over Spark DataFrames.

The paper's SPARQL-based extraction (§IV-C) leans on RDF engines' built-in
sextuple indices (SPO, POS, OSP, …, Weiss et al. [41]) so that BGP matching
touches only the triples incident to target vertices instead of scanning
the KG. Our analogue: the triple table repartitioned by the lookup key and
sorted within partitions, so a join against a key set is a partition-local
sorted probe rather than a full shuffle of the KG — the same access-path
idea expressed in Catalyst terms.

``TripleIndex`` materializes three persisted layouts:

- ``by_s``  — subject-keyed (SPO analogue): outgoing-edge lookups,
- ``by_o``  — object-keyed (OPS analogue): incoming-edge lookups,
- ``by_p``  — predicate-keyed (PSO analogue): per-relation scans (LP tasks).
"""
from __future__ import annotations

from dataclasses import dataclass

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.kg.schema import KG


@dataclass
class TripleIndex:
    """Persisted key-partitioned layouts of one KG's triple table."""

    kg: KG
    by_s: DataFrame
    by_o: DataFrame
    by_p: DataFrame

    def outgoing(self, vertex_ids: DataFrame) -> DataFrame:
        """All triples whose subject is in ``vertex_ids`` (column ``id``) —
        the ``?v ?p ?o`` leg of the BGP for a target set."""
        return self.by_s.join(vertex_ids.withColumnRenamed("id", "s"), "s", "semi")

    def incoming(self, vertex_ids: DataFrame) -> DataFrame:
        """All triples whose object is in ``vertex_ids`` — the
        ``?s ?p ?v`` (d=2) leg of the BGP."""
        return self.by_o.join(vertex_ids.withColumnRenamed("id", "o"), "o", "semi")

    def predicate(self, p: str) -> DataFrame:
        """All triples of one predicate — the LP bridge pattern
        ``⟨?v_Ti, p_T, ?v_Tj⟩``."""
        return self.by_p.where(F.col("p") == p)

    def unpersist(self) -> None:
        for df in (self.by_s, self.by_o, self.by_p):
            df.unpersist()


def build_index(kg: KG, *, n_partitions: int = 16) -> TripleIndex:
    """Build and persist the three layouts (the RDF engine's "default
    built-in indices"; built once per KG, amortized over every extraction)."""
    t = kg.triples
    by_s = t.repartition(n_partitions, "s").sortWithinPartitions("s", "p", "o").persist()
    by_o = t.repartition(n_partitions, "o").sortWithinPartitions("o", "p", "s").persist()
    by_p = t.repartition(n_partitions, "p").sortWithinPartitions("p", "s", "o").persist()
    # materialize eagerly so extraction timings don't pay index build cost
    by_s.count(), by_o.count(), by_p.count()
    return TripleIndex(kg=kg, by_s=by_s, by_o=by_o, by_p=by_p)
