"""Benchmark conventions: each paper table gets one pytest-benchmark target
that executes the experiment once (``pedantic(rounds=1, iterations=1)`` — the
experiments time their phases internally and persist their table under
``results/``; the benchmark wall-clock is the end-to-end harness cost)."""

#: dataset scale used by the benchmark suite (≈half of DESIGN.md §4 sizes,
#: keeps the full suite in minutes while every dataset stays non-trivial).
BENCH_SCALE = 0.4
