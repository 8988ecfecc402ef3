"""Influence-based sampling (Algorithm 2): the distributed PPR power
iteration is verified against a dense numpy reference, then the sampler's
selection invariants."""
import numpy as np
import pandas as pd
import pytest

from repro.core.ibs import ibs_sample, personalized_pagerank
from repro.kg.schema import make_kg


@pytest.fixture(scope="module")
def small_kg(spark):
    """A 6-vertex graph with known structure for exact PPR comparison."""
    nodes = pd.DataFrame({"id": range(6), "ntype": ["T"] * 3 + ["U"] * 3, "year": pd.array([None] * 6, dtype="Int64")})
    triples = pd.DataFrame(
        {
            "s": [0, 0, 1, 2, 3, 4],
            "p": ["e"] * 6,
            "o": [1, 2, 3, 3, 4, 5],
        }
    )
    kg = make_kg(spark, "small", nodes, triples).persist()
    yield kg
    kg.unpersist()


def _reference_ppr(triples: pd.DataFrame, n: int, seeds: list[int], alpha: float, iters: int) -> np.ndarray:
    """Dense power iteration on the undirected transition matrix."""
    A = np.zeros((n, n))
    for s, o in zip(triples.s, triples.o):
        A[s, o] = 1.0
        A[o, s] = 1.0
    deg = A.sum(axis=1)
    P = np.divide(A, deg[:, None], out=np.zeros_like(A), where=deg[:, None] > 0)
    p0 = np.zeros(n)
    p0[seeds] = 1.0 / len(seeds)
    p = p0.copy()
    for _ in range(iters):
        p = alpha * p0 + (1 - alpha) * (P.T @ p)
    return p


def test_ppr_matches_dense_reference(spark, small_kg):
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0]}))
    got = personalized_pagerank(small_kg, seeds, alpha=0.25, eps=0.0, iters=6).toPandas()
    ref = _reference_ppr(small_kg.triples.toPandas(), 6, [0], 0.25, 6)
    got_full = np.zeros(6)
    got_full[got.id.to_numpy()] = got.score.to_numpy()
    np.testing.assert_allclose(got_full, ref, atol=1e-9)


def test_ppr_mass_bounded(spark, small_kg):
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0, 1]}))
    p = personalized_pagerank(small_kg, seeds, eps=0.0, iters=8).toPandas()
    assert p.score.sum() <= 1.0 + 1e-9
    assert (p.score >= 0).all()


def test_ppr_seed_scores_dominate(spark, small_kg):
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0]}))
    p = personalized_pagerank(small_kg, seeds, eps=0.0, iters=8).toPandas().set_index("id")["score"]
    assert p[0] == p.max()


def test_ppr_eps_prunes(spark, small_kg):
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0]}))
    dense = personalized_pagerank(small_kg, seeds, eps=0.0, iters=6).count()
    pruned = personalized_pagerank(small_kg, seeds, eps=0.05, iters=6).count()
    assert pruned <= dense


def test_ppr_unreachable_gets_no_mass(spark):
    nodes = pd.DataFrame({"id": [0, 1, 2], "ntype": ["T"] * 3, "year": pd.array([None] * 3, dtype="Int64")})
    triples = pd.DataFrame({"s": [0], "p": ["e"], "o": [1]})
    kg = make_kg(spark, "disc", nodes, triples)
    seeds = spark.createDataFrame(pd.DataFrame({"id": [0]}))
    p = personalized_pagerank(kg, seeds, eps=0.0, iters=5).toPandas()
    assert 2 not in set(p.id)


def test_ibs_contains_seed_targets(mag_bundle, mag_pv_targets):
    sub = ibs_sample(mag_bundle.kg, mag_pv_targets, bs=20, k=8, iters=5, seed=3)
    assert sub.nodes.join(mag_pv_targets, "id", "semi").count() >= 20


def test_ibs_subgraph_is_induced(mag_bundle, mag_pv_targets):
    from repro.oracle import assert_equivalent

    sub = ibs_sample(mag_bundle.kg, mag_pv_targets, bs=15, k=8, iters=5, seed=4)
    assert_equivalent(
        sub.triples,
        """SELECT t.s, t.p, t.o FROM t
           WHERE t.s IN (SELECT id FROM v) AND t.o IN (SELECT id FROM v)""",
        t=mag_bundle.kg.triples,
        v=sub.nodes.select("id"),
    )


def test_ibs_neighbour_budget(mag_bundle, mag_pv_targets):
    """Non-target vertices are capped at k*bs (the top-k selection)."""
    bs, k = 15, 4
    sub = ibs_sample(mag_bundle.kg, mag_pv_targets, bs=bs, k=k, iters=5, seed=5)
    non_targets = sub.nodes.join(mag_pv_targets, "id", "anti").count()
    assert non_targets <= k * bs


def test_ibs_excludes_noise(mag_bundle, mag_pv_targets):
    from pyspark.sql import functions as F

    sub = ibs_sample(mag_bundle.kg, mag_pv_targets, bs=15, k=8, iters=5, seed=6)
    assert sub.nodes.where(F.col("ntype").startswith("magN")).count() == 0
