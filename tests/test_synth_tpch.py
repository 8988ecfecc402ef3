"""Provided TPC-H-lite generators: determinism, scaling, and an oracle
round-trip exercising a shuffle join + aggregation at test scale."""
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


@pytest.mark.parametrize("gen,count_col", [
    (synth_data.lineitem, "l_orderkey"),
    (synth_data.orders, "o_orderkey"),
    (synth_data.customer, "c_custkey"),
    (synth_data.part, "p_partkey"),
])
def test_row_counts_scale_with_sf(spark, gen, count_col):
    small = gen(spark, sf=0.001).count()
    big = gen(spark, sf=0.002).count()
    assert big == pytest.approx(2 * small, rel=0.01)


@pytest.mark.parametrize("gen", [synth_data.lineitem, synth_data.orders])
def test_deterministic_in_seed(spark, gen):
    a = gen(spark, sf=0.001).toPandas()
    b = gen(spark, sf=0.001).toPandas()
    assert a.equals(b)


def test_join_agg_against_oracle(spark):
    li = synth_data.lineitem(spark, sf=0.002)
    o = synth_data.orders(spark, sf=0.002)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .agg(F.count("*").alias("n"), F.round(F.sum("l_quantity"), 2).alias("qty"))
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, COUNT(*) AS n, ROUND(SUM(l_quantity), 2) AS qty
           FROM lineitem JOIN orders ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        lineitem=li,
        orders=o,
    )


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).groupBy("k").count()
    top = df.orderBy(F.desc("count")).first()
    assert top["k"] <= 3  # low ranks dominate under zipf
    assert top["count"] > 5000 / 100 * 3


def test_uniform_keys_cover_range(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=10)
    ks = {r["k"] for r in df.select("k").distinct().collect()}
    assert ks == set(range(1, 11))
