"""Exp 3 (Fig 7): 10k random queries per dataset, three engines."""
from benchmarks.common_bench import BENCH_SCALE
from repro.experiments import exp3_query_time


def test_bench_exp3_query_time(spark, benchmark):
    df = benchmark.pedantic(
        lambda: exp3_query_time.run(spark, scale=BENCH_SCALE, n_queries=10_000),
        rounds=1,
        iterations=1,
    )
    assert (df["us_seq"] > 0).all()
