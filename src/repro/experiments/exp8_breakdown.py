"""Exp 8 (Fig 13): breakdown of PSPC⁺ indexing time into Order / LL / LC.

Order = vertex ordering, LL = landmark labeling (BFS from landmarks), LC =
label construction (the distance rounds). The paper's takeaway — LC dominates
— is what the fractions here reproduce. Uses the Spark builder's phase
timers; ordering is timed around the order function itself.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.pspc_spark import build_pspc_spark
from repro.experiments.common import (
    DEFAULT_DELTA,
    DEFAULT_LANDMARKS,
    DEFAULT_SCALE,
    emit,
    load_datasets,
    order_for,
    timed,
)


def run(
    spark: SparkSession,
    codes: list[str] | None = None,
    scale: float = DEFAULT_SCALE,
    n_landmarks: int = DEFAULT_LANDMARKS,
    delta: int = DEFAULT_DELTA,
    save: bool = True,
) -> pd.DataFrame:
    rows = []
    for code, g in load_datasets(codes, scale).items():
        with timed() as t:
            order = order_for(g, "hybrid", delta)
        t_order = t()
        _, stats = build_pspc_spark(spark, g, order, n_landmarks=n_landmarks)
        total = t_order + stats.t_landmarks + stats.t_construction
        rows.append(
            {
                "dataset": code,
                "order_s": round(t_order, 2),
                "LL_s": round(stats.t_landmarks, 2),
                "LC_s": round(stats.t_construction, 2),
                "LC_frac": round(stats.t_construction / total, 2),
                "rounds": stats.rounds,
            }
        )
    return emit(pd.DataFrame(rows), "exp8_breakdown", save)
