"""Benchmark: Table I — generate the five benchmark KGs and compute their
statistics. Prints the reproduced table (vs the paper's numbers)."""
from repro.bench.tables import table1, to_markdown


def test_table1(spark, benchmark, bench_sf, save_table):
    df = benchmark.pedantic(
        lambda: table1(spark, sf=bench_sf), rounds=1, iterations=1
    )
    save_table("table1", df, "[Table I] benchmark statistics (ours vs paper)")
    assert len(df) == 5
