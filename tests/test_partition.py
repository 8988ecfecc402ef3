"""Hexastore-style triple indices: every index lookup must equal the
naive full-scan answer (oracle-checked)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def some_targets(mag_bundle):
    t = mag_bundle.kg.vertices_of_type("Paper").limit(50).persist()
    t.count()
    yield t
    t.unpersist()


def test_outgoing_matches_full_scan(mag_index, some_targets):
    got = mag_index.outgoing(some_targets)
    assert_equivalent(
        got.select("s", "p", "o"),
        "SELECT t.s, t.p, t.o FROM t JOIN v ON t.s = v.id",
        t=mag_index.kg.triples,
        v=some_targets,
    )


def test_incoming_matches_full_scan(mag_index, some_targets):
    got = mag_index.incoming(some_targets)
    assert_equivalent(
        got.select("s", "p", "o"),
        "SELECT t.s, t.p, t.o FROM t JOIN v ON t.o = v.id",
        t=mag_index.kg.triples,
        v=some_targets,
    )


@pytest.mark.parametrize("pred", ["hasTopic", "cites", "hasCreator"])
def test_predicate_scan_matches_filter(mag_index, pred):
    got = mag_index.predicate(pred)
    assert_equivalent(
        got.select("s", "p", "o"),
        f"SELECT s, p, o FROM t WHERE p = '{pred}'",
        t=mag_index.kg.triples,
    )


def test_index_layouts_preserve_triple_count(mag_index):
    n = mag_index.kg.triples.count()
    assert mag_index.by_s.count() == n
    assert mag_index.by_o.count() == n
    assert mag_index.by_p.count() == n


def test_outgoing_empty_targets(spark, mag_index):
    empty = spark.createDataFrame(
        pd.DataFrame({"id": pd.array([], dtype="int64")}), schema="id long"
    )
    assert mag_index.outgoing(empty).count() == 0


def test_semi_join_returns_triple_columns_only(mag_index, some_targets):
    assert mag_index.outgoing(some_targets).columns == ["s", "p", "o"]
    assert mag_index.incoming(some_targets).columns == ["o", "s", "p"] or set(
        mag_index.incoming(some_targets).columns
    ) == {"s", "p", "o"}
