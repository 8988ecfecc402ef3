"""Distributed random-walk samplers (URW baseline + Algorithm 1 BRW):
invariants rather than exact node sets (the walker is randomized)."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.brw import brw_sample
from repro.core.urw import urw_sample
from repro.core.walks import random_walk_visited, sample_vertices
from repro.kg.schema import make_kg


@pytest.fixture(scope="module")
def path_kg(spark):
    """A directed path 0→1→2→3→4 plus an isolated vertex 9."""
    nodes = pd.DataFrame({"id": [0, 1, 2, 3, 4, 9], "ntype": ["T"] * 6, "year": pd.array([None] * 6, dtype="Int64")})
    triples = pd.DataFrame({"s": [0, 1, 2, 3], "p": ["next"] * 4, "o": [1, 2, 3, 4]})
    kg = make_kg(spark, "path", nodes, triples).persist()
    yield kg
    kg.unpersist()


def test_sample_vertices_size_and_membership(mag_bundle):
    roots = sample_vertices(mag_bundle.kg.nodes, 25, seed=1)
    assert roots.count() == 25
    assert roots.join(mag_bundle.kg.nodes.select("id"), "id", "anti").count() == 0


def test_sample_vertices_no_duplicates(mag_bundle):
    roots = sample_vertices(mag_bundle.kg.nodes, 40, seed=2)
    assert roots.distinct().count() == 40


def test_walk_includes_roots(spark, path_kg):
    roots = spark.createDataFrame(pd.DataFrame({"id": [0, 9]}))
    visited = random_walk_visited(path_kg, roots, h=2, seed=0)
    got = {r["id"] for r in visited.collect()}
    assert {0, 9} <= got


def test_walk_respects_reachability(spark, path_kg):
    """From vertex 0 with h=2 the walk can reach at most {0,1,2} (the walk
    is undirected but a single walker can't pass vertex 2)."""
    roots = spark.createDataFrame(pd.DataFrame({"id": [0]}))
    visited = {r["id"] for r in random_walk_visited(path_kg, roots, h=2, seed=3).collect()}
    assert visited <= {0, 1, 2}
    assert len(visited) >= 2  # vertex 0 must move to 1 (its only neighbour)


def test_isolated_root_stays_put(spark, path_kg):
    roots = spark.createDataFrame(pd.DataFrame({"id": [9]}))
    visited = {r["id"] for r in random_walk_visited(path_kg, roots, h=3, seed=0).collect()}
    assert visited == {9}


def test_visited_bounded_by_walk_budget(mag_bundle):
    bs, h = 20, 3
    roots = sample_vertices(mag_bundle.kg.nodes, bs, seed=5)
    visited = random_walk_visited(mag_bundle.kg, roots, h, seed=5)
    assert visited.count() <= bs * (h + 1)


def test_urw_sample_is_subgraph(mag_bundle):
    sub = urw_sample(mag_bundle.kg, bs=20, h=2, seed=7)
    assert sub.nodes.join(mag_bundle.kg.nodes, "id", "anti").count() == 0
    assert sub.triples.count() <= mag_bundle.kg.triples.count()


def test_brw_roots_come_from_targets(mag_bundle, mag_pv_targets):
    """Every BRW walk starts at a target vertex, so every visited vertex is
    within h hops of a target — the sample must contain targets."""
    sub = brw_sample(mag_bundle.kg, mag_pv_targets, bs=20, h=2, seed=7)
    n_targets = sub.nodes.join(mag_pv_targets, "id", "semi").count()
    assert n_targets > 0
    assert n_targets >= 20  # at least the roots themselves


def test_brw_targets_denser_than_urw(mag_bundle, mag_pv_targets):
    """The paper's central data-sufficiency claim at sampler level."""
    urw = urw_sample(mag_bundle.kg, bs=40, h=3, seed=11)
    brw = brw_sample(mag_bundle.kg, mag_pv_targets, bs=40, h=3, seed=11)

    def ratio(sub):
        return sub.nodes.join(mag_pv_targets, "id", "semi").count() / sub.nodes.count()

    assert ratio(brw) > ratio(urw)


def test_walker_deterministic_given_seed(spark, path_kg):
    roots = spark.createDataFrame(pd.DataFrame({"id": [0, 2]}))
    a = {r["id"] for r in random_walk_visited(path_kg, roots, 3, seed=42).collect()}
    b = {r["id"] for r in random_walk_visited(path_kg, roots, 3, seed=42).collect()}
    assert a == b
