"""Exp 6 (Fig 11): hybrid-order threshold sweep."""
from repro.experiments import exp6_delta


def test_bench_exp6_delta(benchmark):
    df = benchmark.pedantic(
        lambda: exp6_delta.run(scale=0.5), rounds=1, iterations=1
    )
    assert len(df) == len(exp6_delta.EXP6_CODES) * len(exp6_delta.DELTAS)
