"""The DuckDB oracle itself: passes on equal results, fails loudly on row or
column drift — so a green oracle check means something."""
import pandas as pd
import pytest

from repro.oracle import assert_equivalent
from repro.synth_data import lineitem, orders


def test_oracle_passes_on_equal(spark):
    li = lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "cnt")
    assert_equivalent(
        got,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_detects_wrong_rows(spark):
    li = lineitem(spark, sf=0.001)
    wrong = (
        li.groupBy("l_returnflag")
        .count()
        .withColumnRenamed("count", "cnt")
        .selectExpr("l_returnflag", "cnt + 1 AS cnt")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_detects_column_mismatch(spark):
    li = lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").count()
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li,
        )


def test_oracle_accepts_pandas_tables(spark):
    pdf = pd.DataFrame({"k": [1, 1, 2], "v": [1.0, 2.0, 3.0]})
    got = spark.createDataFrame(pdf).groupBy("k").sum("v").withColumnRenamed("sum(v)", "s")
    assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k", t=pdf)


def test_synth_orders_deterministic(spark):
    a = orders(spark, sf=0.001).toPandas()
    b = orders(spark, sf=0.001).toPandas()
    pd.testing.assert_frame_equal(a, b)
