"""Exp 2 (Fig 6): index sizes (PSPC == PSPC+ identity asserted inside)."""
from benchmarks.common_bench import BENCH_SCALE
from repro.experiments import exp2_index_size


def test_bench_exp2_index_size(spark, benchmark):
    df = benchmark.pedantic(
        lambda: exp2_index_size.run(spark, scale=BENCH_SCALE, with_spark=False),
        rounds=1,
        iterations=1,
    )
    assert (df["entries_PSPC"] == df["entries_HP-SPC_s"]).all()
