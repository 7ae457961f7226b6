"""Deterministic synthetic graph generators (numpy, seed-reproducible).

Every generator returns an undirected simple graph as a canonical numpy edge
array of shape ``(m, 2)`` with ``src < dst`` per row, no self-loops and no
duplicates, over the vertex set ``0..n-1``. ``largest_component`` relabels the
giant component to a compact id range so downstream code can assume a
connected graph with contiguous ids.

The generators cover the topology classes of the paper's 10 datasets
(Table III): preferential-attachment social graphs (Barabási–Albert),
small-world graphs (Watts–Strogatz), skewed web graphs (R-MAT) and
road-network-like planar grids (``grid_road``).
"""
from __future__ import annotations

import numpy as np


def _canonical(edges: np.ndarray) -> np.ndarray:
    """Dedupe + drop self-loops + orient rows as ``src < dst``."""
    e = np.asarray(edges, dtype=np.int64).reshape(-1, 2)
    e = e[e[:, 0] != e[:, 1]]
    lo = np.minimum(e[:, 0], e[:, 1])
    hi = np.maximum(e[:, 0], e[:, 1])
    e = np.unique(np.stack([lo, hi], axis=1), axis=0)
    return e


def erdos_renyi(n: int, p: float, seed: int = 0) -> np.ndarray:
    """G(n, p) via geometric skipping over the upper-triangle edge stream."""
    g = np.random.default_rng(seed)
    total = n * (n - 1) // 2
    # Expected edges p*total; sample indices of present pairs directly.
    k = g.binomial(total, p)
    idx = g.choice(total, size=min(k, total), replace=False)
    # Decode linear upper-triangle index -> (i, j).
    i = (n - 2 - np.floor(np.sqrt(-8 * idx + 4 * n * (n - 1) - 7) / 2.0 - 0.5)).astype(np.int64)
    j = (idx + i + 1 - i * (2 * n - i - 1) // 2).astype(np.int64)
    return _canonical(np.stack([i, j], axis=1))


def barabasi_albert(n: int, m_attach: int, seed: int = 0) -> np.ndarray:
    """Preferential attachment: each new vertex attaches to ``m_attach``
    existing vertices sampled ∝ degree (repeated-target list trick)."""
    if n <= m_attach:
        raise ValueError("n must exceed m_attach")
    g = np.random.default_rng(seed)
    repeated: list[int] = list(range(m_attach))  # degree-proportional pool
    edges: list[tuple[int, int]] = []
    for v in range(m_attach, n):
        pool = np.asarray(repeated, dtype=np.int64)
        chosen = np.unique(g.choice(pool, size=m_attach))
        for t in chosen:
            edges.append((v, int(t)))
            repeated.append(int(t))
            repeated.append(v)
    return _canonical(np.asarray(edges, dtype=np.int64))


def watts_strogatz(n: int, k: int, p: float, seed: int = 0) -> np.ndarray:
    """Ring lattice with ``k`` nearest neighbours (k even), each edge rewired
    with probability ``p`` — the classic small-world construction."""
    if k % 2 or k >= n:
        raise ValueError("k must be even and < n")
    g = np.random.default_rng(seed)
    base = []
    for d in range(1, k // 2 + 1):
        u = np.arange(n, dtype=np.int64)
        base.append(np.stack([u, (u + d) % n], axis=1))
    e = np.concatenate(base)
    rewire = g.random(len(e)) < p
    new_dst = g.integers(0, n, size=int(rewire.sum()))
    e[rewire, 1] = new_dst
    return _canonical(e)


def rmat(n: int, m: int, seed: int = 0, a: float = 0.57, b: float = 0.19, c: float = 0.19) -> np.ndarray:
    """Kronecker/R-MAT edge sampling (skewed web-graph degree law).

    ``n`` is rounded up to a power of two internally; endpoints outside
    ``[0, n)`` are folded back with a modulo so the requested vertex-count
    budget holds.
    """
    g = np.random.default_rng(seed)
    scale = max(1, int(np.ceil(np.log2(max(2, n)))))
    # Oversample: dedup + self-loop removal loses some edges.
    k = int(m * 1.35) + 16
    src = np.zeros(k, dtype=np.int64)
    dst = np.zeros(k, dtype=np.int64)
    for bit in range(scale):
        r = g.random(k)
        # Quadrant probabilities (a, b, c, d).
        right = (r >= a + b) & (r < a + b + c) | (r >= a + b + c)
        down = (r >= a) & (r < a + b) | (r >= a + b + c)
        src += down.astype(np.int64) << bit
        dst += right.astype(np.int64) << bit
    e = _canonical(np.stack([src % n, dst % n], axis=1))
    if len(e) > m:
        idx = g.choice(len(e), size=m, replace=False)
        e = e[np.sort(idx)]
    return _canonical(e)


def grid_road(rows: int, cols: int, drop_p: float = 0.05, diag_p: float = 0.03, seed: int = 0) -> np.ndarray:
    """Road-network-like 2-D lattice: 4-neighbour grid with a few edges
    dropped and a few diagonal shortcuts added. Low average degree, large
    diameter — the regime where the paper's tree-decomposition order wins."""
    g = np.random.default_rng(seed)
    vid = np.arange(rows * cols, dtype=np.int64).reshape(rows, cols)
    horiz = np.stack([vid[:, :-1].ravel(), vid[:, 1:].ravel()], axis=1)
    vert = np.stack([vid[:-1, :].ravel(), vid[1:, :].ravel()], axis=1)
    e = np.concatenate([horiz, vert])
    e = e[g.random(len(e)) >= drop_p]
    diag = np.stack([vid[:-1, :-1].ravel(), vid[1:, 1:].ravel()], axis=1)
    diag = diag[g.random(len(diag)) < diag_p]
    return _canonical(np.concatenate([e, diag]))


def largest_component(edges: np.ndarray, n: int | None = None) -> tuple[np.ndarray, int]:
    """Restrict to the largest connected component, relabel to ``0..n'-1``.

    Returns ``(edges', n')``. Isolated vertices never survive (they carry no
    edges), which matches the paper's setting of connected query graphs.
    """
    e = _canonical(edges)
    if n is None:
        n = int(e.max()) + 1 if len(e) else 0
    parent = np.arange(n, dtype=np.int64)

    def find(x: int) -> int:
        root = x
        while parent[root] != root:
            root = parent[root]
        while parent[x] != root:  # path compression
            parent[x], x = root, parent[x]
        return root

    for u, v in e:
        ru, rv = find(int(u)), find(int(v))
        if ru != rv:
            parent[ru] = rv
    roots = np.fromiter((find(int(i)) for i in range(n)), dtype=np.int64, count=n)
    if len(e) == 0:
        return e, 0
    comp_ids, counts = np.unique(roots, return_counts=True)
    big = comp_ids[np.argmax(counts)]
    keep = roots == big
    relabel = -np.ones(n, dtype=np.int64)
    relabel[np.flatnonzero(keep)] = np.arange(int(keep.sum()))
    mask = keep[e[:, 0]] & keep[e[:, 1]]
    e2 = relabel[e[mask]]
    return _canonical(e2), int(keep.sum())
