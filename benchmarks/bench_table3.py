"""Benchmark: Table III — URW vs BRW vs IBS vs KG-TOSA_d1h1 subgraph
quality indicators plus SAINT-RGCN accuracy on four tasks."""
from repro.bench.tables import table3, to_markdown


def test_table3(spark, benchmark, bench_sf, save_table):
    df = benchmark.pedantic(
        lambda: table3(spark, sf=bench_sf, with_accuracy=True), rounds=1, iterations=1
    )
    save_table("table3", df, "[Table III] extraction quality (ours vs paper)")
    assert len(df) == 16
