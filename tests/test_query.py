"""Query evaluation: the python scan, the Spark batch path and the DuckDB
oracle must agree — ``assert_equivalent`` is the arbiter for every
DataFrame-shaped query result."""
import numpy as np
import pandas as pd
import pytest

from repro.core.bfs_oracle import all_pairs_spc
from repro.core.pspc_local import build_pspc_local
from repro.core.query import (
    DUCKDB_QUERY_SQL,
    query_batch_spark,
    query_many,
    query_single,
    random_pairs,
)
from repro.oracle import assert_equivalent
from repro.ordering.degree import degree_order
from tests.util import small_graph


def _index_and_pairs(kind, seed, n=32, q=60):
    g = small_graph(kind, seed, n=n)
    index, _ = build_pspc_local(g, degree_order(g))
    pairs = random_pairs(g.n, q, seed=seed)
    return g, index, pairs


@pytest.mark.parametrize("kind,seed", [("er", 0), ("er", 1), ("ba", 0), ("ws", 0)])
def test_spark_batch_matches_duckdb_oracle(spark, kind, seed):
    """The Spark 2-hop batch evaluation vs the identical SQL in DuckDB."""
    g, index, pairs = _index_and_pairs(kind, seed)
    labels = index.to_pandas()
    queries = pd.DataFrame({"qid": np.arange(len(pairs)), "s": pairs[:, 0], "t": pairs[:, 1]})
    got = query_batch_spark(spark, spark.createDataFrame(labels), spark.createDataFrame(queries))
    assert_equivalent(got, DUCKDB_QUERY_SQL, labels=labels, queries=queries)


@pytest.mark.parametrize("seed", range(3))
def test_spark_batch_matches_python(spark, seed):
    g, index, pairs = _index_and_pairs("er", seed)
    queries = pd.DataFrame({"qid": np.arange(len(pairs)), "s": pairs[:, 0], "t": pairs[:, 1]})
    got = (
        query_batch_spark(
            spark,
            spark.createDataFrame(index.to_pandas()),
            spark.createDataFrame(queries),
        )
        .toPandas()
        .sort_values("qid")
        .reset_index(drop=True)
    )
    ref = query_many(index, pairs)
    assert len(got) == len(ref)
    assert np.array_equal(got["dist"].to_numpy(), ref["dist"].to_numpy())
    assert np.allclose(got["spc"].to_numpy(), ref["spc"].to_numpy())


@pytest.mark.parametrize("seed", range(4))
def test_query_many_matches_oracle(seed):
    g, index, pairs = _index_and_pairs("ba", seed)
    D, C = all_pairs_spc(g)
    res = query_many(index, pairs)
    for row in res.itertuples():
        assert row.dist == D[row.s, row.t]
        assert abs(row.spc - C[row.s, row.t]) < 1e-6


def test_query_identity_pair():
    g, index, _ = _index_and_pairs("er", 0)
    assert query_single(index, 3, 3) == (0, 1.0)


def test_random_pairs_deterministic():
    a = random_pairs(100, 50, seed=1)
    b = random_pairs(100, 50, seed=1)
    assert np.array_equal(a, b)
    assert a.shape == (50, 2)
