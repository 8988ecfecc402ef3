"""Benchmark: Table II — the nine benchmark tasks with measured split
ratios from the time/stratified splitters."""
from repro.bench.tables import table2, to_markdown


def test_table2(spark, benchmark, bench_sf, save_table):
    df = benchmark.pedantic(
        lambda: table2(spark, sf=bench_sf), rounds=1, iterations=1
    )
    save_table("table2", df, "[Table II] GNN task summary (ours vs paper ratio)")
    assert len(df) == 9
