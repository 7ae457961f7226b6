"""Degree-based vertex ordering (§III-G).

Highest degree gets the highest rank (rank 0): high-degree vertices sit on
many shortest paths, so ranking them first lets the pruned searches stop
early and keeps label sets small on social networks. Deterministic tie-break
by vertex id.
"""
from __future__ import annotations

import numpy as np

from repro.graph.gframe import Graph


def degree_order(g: Graph) -> np.ndarray:
    """``order[i]`` = vertex of rank ``i`` (descending degree)."""
    deg = g.degrees()
    return np.lexsort((np.arange(g.n), -deg)).astype(np.int64)
