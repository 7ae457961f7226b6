"""Ground-truth shortest-path counting via BFS (Brandes-style forward pass).

This is the correctness oracle for every index implementation in the repo:
``spc_from(g, s)`` returns exact distances and path counts from ``s`` to all
vertices; ``spc(g, s, t)`` the single pair. The weighted variant supports the
neighbourhood-equivalence reduction (§IV-B), where a path's count is the
product of the multiplicities of its *internal* vertices.

Pure python/numpy on the CSR adjacency — O(n+m) per source, only ever run on
test/bench-sized graphs.
"""
from __future__ import annotations

import numpy as np

from repro.graph.gframe import Graph

UNREACHED = np.iinfo(np.int32).max


def spc_from(g: Graph, s: int, weights: np.ndarray | None = None) -> tuple[np.ndarray, np.ndarray]:
    """``(dist, count)`` arrays from source ``s``.

    ``count[v]`` = number of shortest ``s→v`` paths; with ``weights`` given,
    each path contributes the product of ``weights`` over its internal
    vertices (endpoints excluded) — the semantics needed after vertex
    contraction with multiplicities.
    """
    indptr, nbrs = g.adj()
    dist = np.full(g.n, UNREACHED, dtype=np.int64)
    count = np.zeros(g.n, dtype=np.float64)
    dist[s] = 0
    count[s] = 1.0
    frontier = [s]
    d = 0
    while frontier:
        d += 1
        nxt: dict[int, float] = {}
        for v in frontier:
            # Contribution flowing out of v: paths ending at v times v's own
            # multiplicity (v becomes internal once the path continues) —
            # except the source, which stays an endpoint.
            w_out = count[v] * (1.0 if (weights is None or v == s) else float(weights[v]))
            for u in nbrs[indptr[v] : indptr[v + 1]]:
                u = int(u)
                if dist[u] >= d:  # unreached (UNREACHED) or same level
                    if dist[u] == UNREACHED:
                        dist[u] = d
                    if dist[u] == d:
                        nxt[u] = nxt.get(u, 0.0) + w_out
        for u, c in nxt.items():
            count[u] = c
        frontier = list(nxt.keys())
    return dist, count


def spc(g: Graph, s: int, t: int) -> tuple[int, int]:
    """Exact ``(dist, #shortest-paths)`` for one pair; ``(UNREACHED, 0)`` if
    disconnected."""
    dist, count = spc_from(g, s)
    return int(dist[t]), int(round(count[t]))


def all_pairs_spc(g: Graph) -> tuple[np.ndarray, np.ndarray]:
    """All-pairs ``(dist, count)`` matrices — tiny graphs only (tests)."""
    D = np.empty((g.n, g.n), dtype=np.int64)
    C = np.empty((g.n, g.n), dtype=np.float64)
    for s in range(g.n):
        d, c = spc_from(g, s)
        D[s], C[s] = d, c
    return D, C
