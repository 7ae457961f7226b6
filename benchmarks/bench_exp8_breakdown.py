"""Exp 8 (Fig 13): Order / LL / LC breakdown of the PSPC+ Spark build."""
from benchmarks.common_bench import BENCH_SCALE
from repro.experiments import exp8_breakdown


def test_bench_exp8_breakdown(spark, benchmark):
    df = benchmark.pedantic(
        lambda: exp8_breakdown.run(spark, scale=BENCH_SCALE), rounds=1, iterations=1
    )
    assert (df["LC_frac"] > 0.5).all()
