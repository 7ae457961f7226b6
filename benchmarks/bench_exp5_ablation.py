"""Exp 5 (Fig 10): LL/NLL, schedule plans, node orders."""
from benchmarks.common_bench import BENCH_SCALE
from repro.experiments import exp5_ablation


def test_bench_exp5_ablation(benchmark):
    df = benchmark.pedantic(
        lambda: exp5_ablation.run(scale=BENCH_SCALE), rounds=1, iterations=1
    )
    assert (df["sched_dynamic_20t"] <= df["sched_static_20t"]).all()
