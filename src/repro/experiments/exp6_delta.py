"""Exp 6 (Fig 11): effect of the hybrid-order threshold δ.

Sweeps δ over the paper's range and reports index time, index size and query
time per dataset. The paper observes a U-shape (decrease then increase) with
the sweet spot at δ = 5 — small δ ≈ pure degree order (weak on low-degree
fringes), large δ ≈ pure elimination order (expensive fill-in, poor hub
choice in the dense core). RD (road grid) is included because the
tree-decomposition side of the hybrid targets road networks.
"""
from __future__ import annotations

import pandas as pd

from repro.core.landmark import build_landmarks
from repro.core.pspc_local import build_pspc_local
from repro.core.query import query_many, random_pairs
from repro.experiments.common import (
    DEFAULT_LANDMARKS,
    DEFAULT_SCALE,
    emit,
    load_datasets,
    timed,
)
from repro.ordering.hybrid import hybrid_order

EXP6_CODES = ["RD", "GW", "FB"]
DELTAS = [0, 1, 2, 5, 10, 20, 50]


def run(
    spark=None,
    codes: list[str] | None = None,
    scale: float = DEFAULT_SCALE,
    deltas: list[int] | None = None,
    n_landmarks: int = DEFAULT_LANDMARKS,
    n_queries: int = 2_000,
    save: bool = True,
) -> pd.DataFrame:
    rows = []
    for code, g in load_datasets(codes or EXP6_CODES, scale).items():
        lm = build_landmarks(g, n_landmarks)
        pairs = random_pairs(g.n, n_queries, seed=11)
        for delta in deltas or DELTAS:
            with timed() as t:
                order = hybrid_order(g, delta)
                index, _ = build_pspc_local(g, order, landmarks=lm)
            t_index = t()
            with timed() as t:
                query_many(index, pairs)
            us_query = t() / n_queries * 1e6
            rows.append(
                {
                    "dataset": code,
                    "delta": delta,
                    "index_s": round(t_index, 2),
                    "entries": index.n_entries,
                    "MB": round(index.size_mb, 3),
                    "query_us": round(us_query, 1),
                }
            )
    return emit(pd.DataFrame(rows), "exp6_delta", save)
