"""Induced-subgraph and triple-union subgraph builders — the
``extractSubgraph`` primitive of Algorithms 1/2 — oracle-checked."""
import pytest

from repro.core.subgraph import from_triples, induced_subgraph, materialize
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def vset(mag_bundle):
    v = mag_bundle.kg.nodes.limit(400).select("id").persist()
    v.count()
    yield v
    v.unpersist()


def test_induced_triples_against_oracle(mag_bundle, vset):
    got = induced_subgraph(mag_bundle.kg, vset).triples
    assert_equivalent(
        got,
        """SELECT t.s, t.p, t.o FROM t
           WHERE t.s IN (SELECT id FROM v) AND t.o IN (SELECT id FROM v)""",
        t=mag_bundle.kg.triples,
        v=vset,
    )


def test_induced_keeps_all_chosen_nodes(mag_bundle, vset):
    sub = induced_subgraph(mag_bundle.kg, vset)
    assert sub.nodes.count() == vset.distinct().count()


def test_induced_node_types_from_parent(mag_bundle, vset):
    sub = induced_subgraph(mag_bundle.kg, vset)
    assert_equivalent(
        sub.nodes.select("id", "ntype"),
        "SELECT n.id, n.ntype FROM n WHERE n.id IN (SELECT id FROM v)",
        n=mag_bundle.kg.nodes,
        v=vset,
    )


def test_from_triples_nodes_are_endpoints(mag_bundle):
    some = mag_bundle.kg.triples.limit(300)
    sub = from_triples(mag_bundle.kg, some)
    assert_equivalent(
        sub.nodes.select("id"),
        """SELECT DISTINCT id FROM (
             SELECT s AS id FROM t UNION ALL SELECT o AS id FROM t)""",
        t=some,
    )


def test_from_triples_deduplicates(mag_bundle):
    some = mag_bundle.kg.triples.limit(100)
    doubled = some.unionByName(some)
    sub = from_triples(mag_bundle.kg, doubled)
    assert sub.triples.count() == some.dropDuplicates(["s", "p", "o"]).count()


def test_materialize_preserves_content(mag_bundle, vset):
    sub = induced_subgraph(mag_bundle.kg, vset)
    before = sub.triples.count()
    m = materialize(sub)
    assert m.triples.count() == before
    m.unpersist()


def test_induced_subgraph_of_everything_is_identity(mag_bundle):
    sub = induced_subgraph(mag_bundle.kg, mag_bundle.kg.nodes.select("id"))
    assert sub.triples.count() == mag_bundle.kg.triples.count()
    assert sub.nodes.count() == mag_bundle.kg.nodes.count()
