"""PSPC — the paper's parallel algorithm, single-thread reference engine.

This is the "PSPC (1 thread)" row of Exp 1: the *same* distance-iteration
label propagation that PSPC⁺ runs distributed, executed as a python loop.
Round ``d`` (Definition 8, pull paradigm):

1. every vertex ``u`` pulls the round-``(d-1)`` labels of its neighbours and
   **merges duplicates** (Label Merging: same hub ⇒ counts add — realized by
   the dict aggregation; Label Elimination is implicit because a hub already
   present in ``L(u)`` at a smaller distance is pruned by the query below);
2. candidates with ``rank(hub) >= rank(u)`` are dropped (Lemma 3);
3. a candidate ``(u, w, d)`` is dropped iff ``Query(w, u, L_{<d}) < d``
   (Lemma 4) — optionally short-circuited by the landmark filter;
4. survivors become ``L_d(u)`` and the next round's frontier.

No candidate in round ``d`` reads anything written in round ``d`` — the
distance dependency (Theorem 3) replaced the order dependency, which is the
entire point of the paper. The engine also records ``work[d][u]`` = number of
candidate entries vertex ``u`` processed in round ``d``; the thread-scaling
experiments (Exp 4/5b) replay these work vectors through
:mod:`repro.sim.threads`.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from repro.core.labels import LabelIndex
from repro.core.landmark import LandmarkIndex
from repro.graph.gframe import Graph

INF = float("inf")


@dataclass
class BuildStats:
    """Per-round instrumentation emitted by :func:`build_pspc_local`."""

    rounds: int = 0
    #: work[d] is a dict vertex -> candidate entries processed in round d+1
    work: list[dict[int, int]] = field(default_factory=list)
    candidates_total: int = 0
    pruned_by_landmark: int = 0
    pruned_by_query: int = 0


def build_pspc_local(
    g: Graph,
    order: np.ndarray,
    landmarks: LandmarkIndex | None = None,
    weights: np.ndarray | None = None,
    collect_work: bool = False,
) -> tuple[LabelIndex, BuildStats]:
    """Distance-round ESPC construction; returns the index plus round stats.

    ``weights`` enables multiplicity-weighted counting for the equivalence
    reduction (§IV-B): extending a path through vertex ``v`` multiplies its
    count by ``weights[v]``.
    """
    n = g.n
    rank = np.empty(n, dtype=np.int64)
    rank[np.asarray(order)] = np.arange(n)
    indptr, nbrs = g.adj()
    maps: list[dict[int, tuple[int, float]]] = [{u: (0, 1.0)} for u in range(n)]
    # frontier[u]: dict hub -> count of trough paths of length d-1
    frontier: list[dict[int, float]] = [{u: 1.0} for u in range(n)]
    stats = BuildStats()
    d = 0
    while True:
        d += 1
        nxt: list[dict[int, float]] = [dict() for _ in range(n)]
        work: dict[int, int] = {}
        alive = False
        for u in range(n):
            ru = rank[u]
            cand: dict[int, float] = {}
            n_seen = 0
            for v in nbrs[indptr[u] : indptr[u + 1]]:
                v = int(v)
                fv = frontier[v]
                if not fv:
                    continue
                # Path u–v–…–w: v becomes internal (unless v == w, i.e. the
                # one-edge path), so its multiplicity scales the counts.
                wv = 1.0 if weights is None else float(weights[v])
                for w, c in fv.items():
                    if rank[w] >= ru:  # Lemma 3 (covers w == u too)
                        continue
                    n_seen += 1
                    f = 1.0 if w == v else wv
                    cand[w] = cand.get(w, 0.0) + c * f  # Label Merging
            if not cand:
                continue
            stats.candidates_total += len(cand)
            if collect_work:
                work[u] = n_seen
            Lu = maps[u]
            # Landmark prefilter, batched per vertex: an exact distance
            # through any landmark below d certifies dist(u, w) < d without
            # touching labels (§III-H).
            if landmarks is not None and landmarks.k > 0:
                ws_arr = np.fromiter(cand.keys(), dtype=np.int64, count=len(cand))
                bounds = landmarks.bound_from(u, ws_arr)
                keep = bounds >= d
                stats.pruned_by_landmark += int((~keep).sum())
                cand = {int(w): cand[int(w)] for w in ws_arr[keep]}
            for w, c in cand.items():
                # Query(w, u, L_{<d}) — scan the smaller label map.
                Lw = maps[w]
                a, b = (Lu, Lw) if len(Lu) <= len(Lw) else (Lw, Lu)
                q = INF
                for h, (d1, _) in a.items():
                    hit = b.get(h)
                    if hit is not None and d1 + hit[0] < q:
                        q = d1 + hit[0]
                        if q < d:
                            break
                if q < d:
                    stats.pruned_by_query += 1
                    continue
                nxt[u][w] = c
                alive = True
        if collect_work:
            stats.work.append(work)
        if not alive:
            break
        stats.rounds = d
        # Commit round d: labels at distance exactly d (no intra-round reads
        # happened above — Theorem 3's independence).
        for u in range(n):
            for w, c in nxt[u].items():
                maps[u][w] = (d, c)
        frontier = nxt
    return LabelIndex(n=n, rank=rank, maps=maps), stats
