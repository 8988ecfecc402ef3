"""Benchmark: Table IV — FG vs KG'_d1h1 cost breakdown (extraction /
transformation / training time, accuracy, model size, inference time,
training memory) for the six NC tasks."""
from repro.bench.tables import table4, to_markdown


def test_table4(spark, benchmark, bench_sf, save_table):
    df = benchmark.pedantic(
        lambda: table4(spark, sf=bench_sf), rounds=1, iterations=1
    )
    cols = [
        "task",
        "kgp_extract_s", "fg_transform_s", "kgp_transform_s",
        "fg_train_s", "kgp_train_s", "fg_total_s", "kgp_total_s",
        "fg_acc", "kgp_acc", "fg_params", "kgp_params",
        "fg_infer_s", "kgp_infer_s", "fg_mem_mb", "kgp_mem_mb",
    ]
    save_table("table4", df[cols], "[Table IV] FG vs KG' cost breakdown")
    assert len(df) == 6
