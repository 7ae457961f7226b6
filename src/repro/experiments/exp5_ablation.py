"""Exp 5 (Fig 10): ablation of the acceleration techniques at 20 threads.

Three sub-tables, matching the paper's sub-figures:

* (a) **LL vs NLL** — PSPC indexing time with and without landmark-based
  filtering (paper: LL slightly faster);
* (b) **dynamic vs static schedule** — modelled 20-thread index time from the
  measured work vectors under the two §III-F plans (paper: dynamic somewhat
  faster);
* (c) **node order** — indexing time (order time included) under degree,
  tree-decomposition and hybrid orders (paper: hybrid fastest).
"""
from __future__ import annotations

import pandas as pd

from repro.core.landmark import build_landmarks
from repro.core.pspc_local import build_pspc_local
from repro.experiments.common import (
    DEFAULT_DELTA,
    DEFAULT_LANDMARKS,
    DEFAULT_SCALE,
    emit,
    load_datasets,
    order_for,
    timed,
)
from repro.sim.threads import simulate_index_time

EXP5_CODES = ["FB", "GW", "WI", "YT"]


def run(
    spark=None,
    codes: list[str] | None = None,
    scale: float = DEFAULT_SCALE,
    n_landmarks: int = DEFAULT_LANDMARKS,
    delta: int = DEFAULT_DELTA,
    save: bool = True,
) -> pd.DataFrame:
    rows = []
    for code, g in load_datasets(codes or EXP5_CODES, scale).items():
        order = order_for(g, "hybrid", delta)
        # (a) landmark labeling on/off.
        with timed() as t:
            lm = build_landmarks(g, n_landmarks)
            _, stats_ll = build_pspc_local(g, order, landmarks=lm, collect_work=True)
        t_ll = t()
        with timed() as t:
            build_pspc_local(g, order, landmarks=None)
        t_nll = t()
        # (b) schedule plans, modelled at 20 threads on the measured work.
        rank = _rank_of(order, g.n)
        t20_dyn = simulate_index_time(stats_ll.work, 20, "dynamic", rank, g.n)
        t20_sta = simulate_index_time(stats_ll.work, 20, "static", rank, g.n)
        # (c) node orders (ordering time included, as in Exp 1).
        t_orders = {}
        for scheme in ("degree", "treedec", "hybrid"):
            with timed() as t:
                o = order_for(g, scheme, delta)
                build_pspc_local(g, o, landmarks=lm)
            t_orders[scheme] = t()
        rows.append(
            {
                "dataset": code,
                "LL_s": round(t_ll, 2),
                "NLL_s": round(t_nll, 2),
                "sched_dynamic_20t": round(t20_dyn, 0),
                "sched_static_20t": round(t20_sta, 0),
                "order_degree_s": round(t_orders["degree"], 2),
                "order_treedec_s": round(t_orders["treedec"], 2),
                "order_hybrid_s": round(t_orders["hybrid"], 2),
            }
        )
    return emit(pd.DataFrame(rows), "exp5_ablation", save)


def _rank_of(order, n):
    import numpy as np

    rank = np.empty(n, dtype=np.int64)
    rank[np.asarray(order)] = np.arange(n)
    return rank
