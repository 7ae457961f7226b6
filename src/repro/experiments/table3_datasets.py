"""Table III analog: statistics of the synthetic *-lite datasets.

Columns mirror the paper's Table III (|V|, |E|, d_avg) side by side with the
original graphs' numbers, computed with a Spark aggregation over the edge
DataFrame (oracle-checked in tests against DuckDB).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession
from pyspark.sql import functions as F

from repro.experiments.common import DEFAULT_SCALE, emit, load_datasets
from repro.graphgen.datasets import DATASETS


def run(spark: SparkSession, scale: float = DEFAULT_SCALE, save: bool = True) -> pd.DataFrame:
    rows = []
    for code, g in load_datasets(scale=scale).items():
        spec = DATASETS[code]
        agg = (
            g.edges_df(spark)
            .agg(
                (F.count("*") / 2).cast("long").alias("m"),
                F.countDistinct("src").alias("n"),
            )
            .collect()[0]
        )
        rows.append(
            {
                "code": code,
                "dataset": spec.paper_name,
                "V_paper": spec.paper_n,
                "E_paper": spec.paper_m,
                "davg_paper": spec.paper_avg_deg,
                "V_lite": int(agg["n"]),
                "E_lite": int(agg["m"]),
                "davg_lite": round(2 * agg["m"] / agg["n"], 1),
            }
        )
    return emit(pd.DataFrame(rows), "table3_datasets", save)
