"""Table III analog benchmark: dataset generation + Spark stats aggregation."""
from repro.experiments import table3_datasets


def test_bench_table3(spark, benchmark):
    df = benchmark.pedantic(
        lambda: table3_datasets.run(spark, scale=1.0), rounds=1, iterations=1
    )
    assert len(df) == 10
