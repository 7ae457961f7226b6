"""Index-size reductions (§IV): 1-shell peeling and neighbourhood-equivalence
contraction, composed into a :class:`ReducedIndex` whose queries stay exact.

Pipeline: peel pendant trees (the 1-shell) off the graph, contract
neighbourhood-equivalent twins in the remaining core (each representative
carries its class size as a multiplicity weight), build the ESPC index on the
reduced graph with **weighted** counting (a path contributes the product of
its internal vertices' multiplicities — exactly the count of its expansions
in the original graph), and answer queries by case analysis:

* both endpoints in the same pendant tree → the unique tree path (count 1);
* endpoints in different trees / core → tree depths + weighted 2-hop query
  between the anchors' representatives;
* equivalent twins → distance 1 (adjacent) or 2 with one shortest path per
  common core neighbour (the paper's warning about "grossly underestimated"
  results is what the multiplicity weighting fixes for pass-through paths).
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.core.labels import LabelIndex
from repro.core.landmark import build_landmarks
from repro.core.pspc_local import build_pspc_local
from repro.core.query import query_single
from repro.graph.gframe import Graph
from repro.graph.algorithms import equivalence_classes, one_shell_peel


@dataclass
class ReducedIndex:
    """ESPC index over the 1-shell-peeled, twin-contracted graph, plus the
    bookkeeping to answer exact queries on the *original* graph."""

    g: Graph
    core_mask: np.ndarray
    parent: np.ndarray  # pendant-tree parent (towards core), -1 in core
    anchor: np.ndarray  # nearest core vertex (self in core)
    depth: np.ndarray  # tree distance to anchor (0 in core)
    rep: np.ndarray  # core vertex -> class representative (original ids)
    to_red: np.ndarray  # original id -> reduced id (-1 if dropped)
    weights: np.ndarray  # per reduced id: class multiplicity
    index: LabelIndex  # ESPC over reduced ids, weighted counting
    core_adj: dict[int, set]  # core-graph adjacency (original ids)

    # ---- accounting --------------------------------------------------
    @property
    def n_entries(self) -> int:
        return self.index.n_entries

    # ---- query -------------------------------------------------------
    def _tree_pair(self, s: int, t: int) -> tuple[int, float]:
        """Both endpoints in the same pendant tree: unique path via the LCA."""
        up_s = {}
        x, d = s, 0
        while True:
            up_s[x] = d
            if self.depth[x] == 0:
                break
            x, d = int(self.parent[x]), d + 1
        x, d = t, 0
        while x not in up_s:
            x, d = int(self.parent[x]), d + 1
        return up_s[x] + d, 1.0

    def _core_query(self, x: int, y: int) -> tuple[int, float]:
        """Exact SPC between two core vertices (original ids)."""
        if x == y:
            return 0, 1.0
        rx, ry = int(self.rep[x]), int(self.rep[y])
        if rx == ry:
            # Equivalent twins: adjacent → the single edge; non-adjacent →
            # one 2-path per common core neighbour (their shared nbr set).
            if y in self.core_adj[x]:
                return 1, 1.0
            return 2, float(len(self.core_adj[x] & self.core_adj[y]))
        d, c = query_single(
            self.index, int(self.to_red[rx]), int(self.to_red[ry]), weights=self.weights
        )
        return d, c

    def query(self, s: int, t: int) -> tuple[int, float]:
        """Exact ``(dist, count)`` on the original graph."""
        if s == t:
            return 0, 1.0
        a_s, a_t = int(self.anchor[s]), int(self.anchor[t])
        ds, dt = int(self.depth[s]), int(self.depth[t])
        if a_s == a_t and (ds > 0 or dt > 0):
            return self._tree_pair(s, t)
        d, c = self._core_query(a_s, a_t)
        return d + ds + dt, c


def build_reduced(
    g: Graph, order_fn, n_landmarks: int = 0
) -> ReducedIndex:
    """Peel + contract + build the weighted ESPC index on the reduced graph.

    ``order_fn(graph) -> order`` is applied to the *reduced* graph, matching
    the paper's construction where reductions precede ordering.
    """
    shell = one_shell_peel(g)
    core_mask = shell["core_mask"]
    core_vs = np.flatnonzero(core_mask)
    core_set = set(map(int, core_vs))
    core_adj: dict[int, set] = {
        int(v): {int(u) for u in g.neighbors(int(v)) if int(u) in core_set}
        for v in core_vs
    }
    # Equivalence classes on the core-induced subgraph.
    relabel = -np.ones(g.n, dtype=np.int64)
    relabel[core_vs] = np.arange(len(core_vs))
    core_edges = [
        (relabel[v], relabel[u])
        for v in core_vs
        for u in core_adj[int(v)]
        if int(v) < u
    ]
    core_g = Graph.from_edges(np.asarray(core_edges, dtype=np.int64), n=len(core_vs))
    cls = equivalence_classes(core_g)  # over core-subgraph ids
    rep = np.arange(g.n, dtype=np.int64)
    rep[core_vs] = core_vs[cls]  # representative in original ids
    reps = np.unique(rep[core_vs])
    to_red = -np.ones(g.n, dtype=np.int64)
    to_red[reps] = np.arange(len(reps))
    weights = np.zeros(len(reps), dtype=np.float64)
    for v in core_vs:
        weights[to_red[rep[v]]] += 1.0
    # Reduced graph: edges between representatives (self-loops dropped —
    # adjacent twins are the special case in _core_query).
    red_edges = set()
    for v in core_vs:
        for u in core_adj[int(v)]:
            a, b = int(to_red[rep[int(v)]]), int(to_red[rep[u]])
            if a != b:
                red_edges.add((min(a, b), max(a, b)))
    red_g = Graph.from_edges(np.asarray(sorted(red_edges), dtype=np.int64), n=len(reps))
    order = order_fn(red_g)
    lm = build_landmarks(red_g, n_landmarks) if n_landmarks > 0 else None
    index, _ = build_pspc_local(red_g, order, landmarks=lm, weights=weights)
    return ReducedIndex(
        g=g,
        core_mask=core_mask,
        parent=shell["parent"],
        anchor=shell["anchor"],
        depth=shell["depth"],
        rep=rep,
        to_red=to_red,
        weights=weights,
        index=index,
        core_adj=core_adj,
    )
