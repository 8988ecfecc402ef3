"""KG statistics — the columns of the paper's Table I.

All statistics are computed with DataFrame aggregations (one Spark job per
KG via a single multi-aggregate where possible) and are oracle-checked
against DuckDB in tests.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import functions as F

from repro.kg.schema import KG


def kg_stats(kg: KG) -> dict:
    """``#nodes, #edges, #n-type, #e-type`` for one KG (Table I row)."""
    n = kg.nodes.agg(
        F.count("id").alias("n_nodes"),
        F.countDistinct("ntype").alias("n_ntypes"),
    ).first()
    e = kg.triples.agg(
        F.count("s").alias("n_edges"),
        F.countDistinct("p").alias("n_etypes"),
    ).first()
    return {
        "kg": kg.name,
        "nodes": int(n["n_nodes"]),
        "edges": int(e["n_edges"]),
        "n_type": int(n["n_ntypes"]),
        "e_type": int(e["n_etypes"]),
    }


def degree_stats(kg: KG) -> dict:
    """Average out-degree / in-degree over vertices that have edges."""
    out_deg = kg.triples.groupBy("s").count()
    in_deg = kg.triples.groupBy("o").count()
    return {
        "avg_out_degree": float(out_deg.agg(F.avg("count")).first()[0]),
        "avg_in_degree": float(in_deg.agg(F.avg("count")).first()[0]),
    }


def type_histogram(kg: KG) -> pd.DataFrame:
    """Node count per node type, descending — generator sanity checks."""
    return (
        kg.nodes.groupBy("ntype")
        .count()
        .orderBy(F.desc("count"), "ntype")
        .toPandas()
    )
