"""Landmark-based filtering (§III-H).

Landmarks are the highest-degree vertices (the paper selects by a degree
threshold θ with a default budget of 100 landmarks; we take the top-``k`` by
degree, which is the same selection expressed as a budget). For each landmark
an exact BFS distance array is precomputed — the "LL" phase of Exp 8.

During propagation, a candidate ``(u, w, d)`` can be discarded without the
2-hop label query whenever some landmark ℓ certifies
``dist(u, ℓ) + dist(ℓ, w) < d`` — a sound upper bound by the triangle
inequality, so filtering never changes the index (tested). Because landmarks
are exactly the top-ranked hubs under degree-style orders, their labels
dominate each round and the filter hits often — the paper's motivation.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graph.gframe import Graph
from repro.graph.algorithms import bfs_levels

INF_I32 = np.iinfo(np.int32).max


@dataclass
class LandmarkIndex:
    """Exact distances from ``k`` landmarks: ``dist[i, v]``."""

    landmarks: np.ndarray  # (k,) vertex ids
    dist: np.ndarray  # (k, n) int32

    @property
    def k(self) -> int:
        return len(self.landmarks)

    def upper_bound(self, u: int, w: int) -> int:
        """min over landmarks of ``d(u,ℓ)+d(ℓ,w)`` — an upper bound on
        ``dist(u, w)`` (equality if some shortest path passes a landmark)."""
        if self.k == 0:
            return INF_I32
        s = self.dist[:, u].astype(np.int64) + self.dist[:, w].astype(np.int64)
        return int(s.min())

    def bound_from(self, u: int, ws: np.ndarray) -> np.ndarray:
        """Vectorized bounds from one vertex ``u`` to many hubs ``ws`` — the
        per-vertex batch used inside a propagation round."""
        if self.k == 0:
            return np.full(len(ws), INF_I32, dtype=np.int64)
        du = self.dist[:, u].astype(np.int64)[:, None]  # (k, 1)
        return (du + self.dist[:, ws].astype(np.int64)).min(axis=0)

    def bound_matrix(self, us: np.ndarray, ws: np.ndarray) -> np.ndarray:
        """Vectorized :meth:`upper_bound` for candidate arrays."""
        if self.k == 0:
            return np.full(len(us), INF_I32, dtype=np.int64)
        du = self.dist[:, us].astype(np.int64)  # (k, q)
        dw = self.dist[:, ws].astype(np.int64)
        return (du + dw).min(axis=0)


def build_landmarks(g: Graph, k: int, seed: int = 0) -> LandmarkIndex:
    """Top-``k``-degree landmark selection + one BFS per landmark."""
    if k <= 0:
        return LandmarkIndex(np.array([], dtype=np.int64), np.zeros((0, g.n), dtype=np.int32))
    deg = g.degrees()
    # Stable, deterministic tie-break by vertex id.
    top = np.lexsort((np.arange(g.n), -deg))[: min(k, g.n)]
    dist = np.stack([bfs_levels(g, int(v)) for v in top]).astype(np.int32)
    return LandmarkIndex(landmarks=top.astype(np.int64), dist=dist)
