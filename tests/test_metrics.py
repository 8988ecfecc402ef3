"""Quality indicators (Table III columns): BFS distances vs a reference,
hand-computed entropy cases, and sufficiency counts oracle-checked."""
import math

import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.kg.schema import make_kg
from repro.metrics.sufficiency import sufficiency_stats
from repro.metrics.topology import (
    avg_distance_to_targets,
    bfs_distances,
    neighbour_type_entropy,
    target_disconnected_pct,
)
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def line_kg(spark):
    """Path 0-1-2-3-4 plus disconnected pair 7-8. Type T at 0, U elsewhere."""
    nodes = pd.DataFrame(
        {
            "id": [0, 1, 2, 3, 4, 7, 8],
            "ntype": ["T", "U", "U", "U", "U", "U", "U"],
            "year": pd.array([None] * 7, dtype="Int64"),
        }
    )
    triples = pd.DataFrame(
        {"s": [0, 1, 2, 3, 7], "p": ["e"] * 5, "o": [1, 2, 3, 4, 8]}
    )
    kg = make_kg(spark, "line", nodes, triples).persist()
    yield kg
    kg.unpersist()


@pytest.fixture(scope="module")
def t_of(spark):
    def make(ids):
        return spark.createDataFrame(pd.DataFrame({"id": ids}))

    return make


def test_bfs_distances_exact(line_kg, t_of):
    d = {r["id"]: r["dist"] for r in bfs_distances(line_kg, t_of([0])).collect()}
    assert d == {0: 0, 1: 1, 2: 2, 3: 3, 4: 4}


def test_bfs_multi_source_takes_minimum(line_kg, t_of):
    d = {r["id"]: r["dist"] for r in bfs_distances(line_kg, t_of([0, 4])).collect()}
    assert d[2] == 2 and d[1] == 1 and d[3] == 1


def test_bfs_respects_max_hops(line_kg, t_of):
    d = bfs_distances(line_kg, t_of([0]), max_hops=2)
    assert d.agg(F.max("dist")).first()[0] == 2
    assert d.count() == 3


def test_bfs_is_undirected(line_kg, t_of):
    d = {r["id"]: r["dist"] for r in bfs_distances(line_kg, t_of([4])).collect()}
    assert d[0] == 4  # edges point 0→4 but BFS walks both ways


def test_disconnected_pct_exact(line_kg, t_of):
    # targets {0}: non-targets are 1,2,3,4 (connected) and 7,8 (not) → 2/6
    pct = target_disconnected_pct(line_kg, t_of([0]))
    assert pct == pytest.approx(100 * 2 / 6)


def test_disconnected_pct_zero_when_all_connected(spark, t_of):
    nodes = pd.DataFrame({"id": [0, 1], "ntype": ["T", "U"], "year": pd.array([None, None], dtype="Int64")})
    triples = pd.DataFrame({"s": [0], "p": ["e"], "o": [1]})
    kg = make_kg(spark, "pair", nodes, triples)
    assert target_disconnected_pct(kg, t_of([0])) == 0.0


def test_disconnected_pct_hundred_when_no_target_present(line_kg, t_of):
    # target id 99 is not in the graph at all
    assert target_disconnected_pct(line_kg, t_of([99])) == 100.0


def test_avg_distance_on_path(line_kg, t_of):
    # single target 0: distances of connected non-targets are 1,2,3,4 → 2.5
    d = avg_distance_to_targets(line_kg, t_of([0]), n_sources=1, seed=0)
    assert d == pytest.approx(2.5)


def test_avg_distance_nan_without_targets(line_kg, t_of):
    assert math.isnan(avg_distance_to_targets(line_kg, t_of([99])))


def test_entropy_uniform_counts_is_zero(spark):
    """All vertices with the same neighbour-type count → H = 0."""
    nodes = pd.DataFrame({"id": [0, 1], "ntype": ["A", "B"], "year": pd.array([None, None], dtype="Int64")})
    triples = pd.DataFrame({"s": [0], "p": ["e"], "o": [1]})
    kg = make_kg(spark, "h0", nodes, triples)
    assert neighbour_type_entropy(kg) == pytest.approx(0.0)


def test_entropy_hand_computed(spark):
    """Star: center 0 (type A) with neighbours of types B and C; leaves see
    1 type; counts = [2, 1, 1] → H = -(1/3·log2(1/3)·1 + 2/3·log2(2/3))."""
    nodes = pd.DataFrame({"id": [0, 1, 2], "ntype": ["A", "B", "C"], "year": pd.array([None] * 3, dtype="Int64")})
    triples = pd.DataFrame({"s": [0, 0], "p": ["e", "e"], "o": [1, 2]})
    kg = make_kg(spark, "star", nodes, triples)
    expect = -(1 / 3) * math.log2(1 / 3) - (2 / 3) * math.log2(2 / 3)
    assert neighbour_type_entropy(kg) == pytest.approx(expect)


def test_entropy_counts_isolated_vertices(spark):
    nodes = pd.DataFrame({"id": [0, 1, 9], "ntype": ["A", "B", "A"], "year": pd.array([None] * 3, dtype="Int64")})
    triples = pd.DataFrame({"s": [0], "p": ["e"], "o": [1]})
    kg = make_kg(spark, "iso", nodes, triples)
    # counts: [1, 1, 0] → p = [2/3, 1/3]
    expect = -(1 / 3) * math.log2(1 / 3) - (2 / 3) * math.log2(2 / 3)
    assert neighbour_type_entropy(kg) == pytest.approx(expect)


def test_sufficiency_counts_against_oracle(spark, mag_d1h1, mag_pv_targets):
    s = sufficiency_stats(mag_d1h1, mag_pv_targets)
    got = spark.createDataFrame(pd.DataFrame([{"V_T": s["V_T"], "nodes": s["nodes"], "ct": s["C'"], "rt": s["R'"]}]))
    assert_equivalent(
        got,
        """SELECT (SELECT COUNT(*) FROM n WHERE id IN (SELECT id FROM g)) AS V_T,
                  (SELECT COUNT(*) FROM n) AS nodes,
                  (SELECT COUNT(DISTINCT ntype) FROM n) AS ct,
                  (SELECT COUNT(DISTINCT p) FROM t) AS rt""",
        n=mag_d1h1.nodes,
        t=mag_d1h1.triples,
        g=mag_pv_targets,
    )


def test_sufficiency_pct_consistent(mag_d1h1, mag_pv_targets):
    s = sufficiency_stats(mag_d1h1, mag_pv_targets)
    assert s["V_T_pct"] == pytest.approx(100 * s["V_T"] / s["nodes"])
    assert 0 < s["V_T_pct"] <= 100
