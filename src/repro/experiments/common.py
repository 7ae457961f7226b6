"""Shared harness for the Exp 1–8 / Table III reproductions.

Every experiment module exposes ``run(...) -> pandas.DataFrame`` printing the
same rows the paper reports and (optionally) persisting them under
``results/`` so EXPERIMENTS.md can cite a concrete file. Defaults (scale,
query counts, landmark budget δ=5, 100 landmarks) follow the paper's
settings, shrunk to the single-node sizes of DESIGN.md §3.
"""
from __future__ import annotations

import os
import time
from contextlib import contextmanager

import numpy as np
import pandas as pd

from repro.graph.gframe import Graph
from repro.graphgen.datasets import TABLE3_CODES, load
from repro.ordering.degree import degree_order
from repro.ordering.hybrid import hybrid_order
from repro.ordering.treedec import elimination_order

#: default dataset scale for benchmarks (DESIGN.md §4 sizes × 0.5).
DEFAULT_SCALE = 0.5
#: paper defaults: 100 landmarks, δ = 5.
DEFAULT_LANDMARKS = 100
DEFAULT_DELTA = 5
#: thread counts of the Exp 4 sweep (20 = the paper's machine).
THREAD_COUNTS = [1, 2, 4, 8, 16, 20]

RESULTS_DIR = os.path.join(os.path.dirname(__file__), "..", "..", "..", "results")


@contextmanager
def timed():
    """``with timed() as t: ...; t()`` → elapsed seconds."""
    t0 = time.perf_counter()
    yield lambda: time.perf_counter() - t0


def order_for(g: Graph, scheme: str, delta: int = DEFAULT_DELTA) -> np.ndarray:
    """Vertex order by scheme name (the Exp 5(c) axis)."""
    if scheme == "degree":
        return degree_order(g)
    if scheme == "hybrid":
        return hybrid_order(g, delta)
    if scheme == "treedec":
        return elimination_order(g, max_fill_degree=64)
    raise ValueError(f"unknown ordering scheme {scheme!r}")


def load_datasets(codes: list[str] | None = None, scale: float = DEFAULT_SCALE) -> dict[str, Graph]:
    return {c: load(c, scale) for c in (codes or TABLE3_CODES)}


def emit(df: pd.DataFrame, name: str, save: bool = True) -> pd.DataFrame:
    """Print the table (the deliverable) and persist it to results/."""
    print(f"\n== {name} ==")
    print(df.to_string(index=False))
    if save:
        os.makedirs(RESULTS_DIR, exist_ok=True)
        df.to_csv(os.path.join(RESULTS_DIR, f"{name}.csv"), index=False)
    return df
