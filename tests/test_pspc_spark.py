"""PSPC⁺ (Spark distributed builder): the index must be bit-identical to the
sequential engines under every schedule/landmark configuration — the paper's
"same index for any thread count" invariant, on real distributed rounds.

These run real multi-round Spark jobs, so the graphs are kept small and the
configurations few-but-decisive.
"""
import pytest

from repro.core.hpspc import build_hpspc
from repro.core.pspc_local import build_pspc_local
from repro.core.pspc_spark import build_pspc_spark
from repro.ordering.degree import degree_order
from repro.ordering.hybrid import hybrid_order
from tests.util import small_graph


@pytest.mark.parametrize("kind,seed", [("er", 3), ("ba", 0)])
def test_spark_identical_to_sequential(spark, kind, seed):
    g = small_graph(kind, seed, n=40)
    order = degree_order(g)
    hp = build_hpspc(g, order)
    sp, stats = build_pspc_spark(spark, g, order)
    assert hp.sorted_tuples() == sp.sorted_tuples()
    assert stats.rounds >= 1
    assert stats.round_candidates[-1] == 0  # loop ended because frontier dried up


def test_spark_schedules_and_landmarks_same_index(spark):
    g = small_graph("ws", 1, n=36)
    order = hybrid_order(g, 3)
    ref, _ = build_pspc_local(g, order)
    a, _ = build_pspc_spark(spark, g, order, schedule="static", n_landmarks=0)
    b, _ = build_pspc_spark(spark, g, order, schedule="dynamic", n_landmarks=8)
    assert ref.sorted_tuples() == a.sorted_tuples() == b.sorted_tuples()


def test_spark_restores_shuffle_partitions(spark):
    before = spark.conf.get("spark.sql.shuffle.partitions")
    g = small_graph("er", 5, n=25)
    build_pspc_spark(spark, g, degree_order(g))
    assert spark.conf.get("spark.sql.shuffle.partitions") == before


def test_spark_rejects_bad_schedule(spark):
    g = small_graph("er", 5, n=20)
    with pytest.raises(ValueError):
        build_pspc_spark(spark, g, degree_order(g), schedule="magic")
