"""Exp 7 (Fig 12): landmark-count sweep."""
from benchmarks.common_bench import BENCH_SCALE
from repro.experiments import exp7_landmarks


def test_bench_exp7_landmarks(benchmark):
    df = benchmark.pedantic(
        lambda: exp7_landmarks.run(scale=BENCH_SCALE), rounds=1, iterations=1
    )
    assert df["entries"].groupby(df["dataset"]).nunique().eq(1).all()
