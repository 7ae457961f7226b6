"""Exp 2 (Fig 6): index size for the three algorithms.

The paper's key observation: PSPC and PSPC⁺ return the **same** index for any
thread count (round results carry no intra-round dependency), and HP-SPC_s is
comparable. In this reproduction all three are provably identical label sets
(asserted here), so the table reports one size per dataset for the three
algorithms plus the §IV reduced-index size for context.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.hpspc import build_hpspc
from repro.core.landmark import build_landmarks
from repro.core.pspc_local import build_pspc_local
from repro.core.pspc_spark import build_pspc_spark
from repro.core.reduction import build_reduced
from repro.experiments.common import (
    DEFAULT_DELTA,
    DEFAULT_LANDMARKS,
    DEFAULT_SCALE,
    emit,
    load_datasets,
    order_for,
)
from repro.ordering.hybrid import hybrid_order


def run(
    spark: SparkSession,
    codes: list[str] | None = None,
    scale: float = DEFAULT_SCALE,
    n_landmarks: int = DEFAULT_LANDMARKS,
    delta: int = DEFAULT_DELTA,
    with_spark: bool = True,
    save: bool = True,
) -> pd.DataFrame:
    rows = []
    for code, g in load_datasets(codes, scale).items():
        order = order_for(g, "hybrid", delta)
        hp = build_hpspc(g, order)
        lm = build_landmarks(g, n_landmarks)
        ps, _ = build_pspc_local(g, order, landmarks=lm)
        assert hp.sorted_tuples() == ps.sorted_tuples(), code
        if with_spark:
            sp, _ = build_pspc_spark(spark, g, order, n_landmarks=n_landmarks)
            assert ps.sorted_tuples() == sp.sorted_tuples(), code
        red = build_reduced(g, lambda rg: hybrid_order(rg, delta))
        rows.append(
            {
                "dataset": code,
                "entries_HP-SPC_s": hp.n_entries,
                "entries_PSPC": ps.n_entries,
                "entries_PSPC+": ps.n_entries,  # identical by the assert above
                "MB": round(hp.size_mb, 3),
                "avg_label": round(hp.avg_label_len, 1),
                "entries_reduced": red.n_entries,
            }
        )
    return emit(pd.DataFrame(rows), "exp2_index_size", save)
