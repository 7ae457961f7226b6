"""Thread-scaling cost model (Exp 4 / Exp 5(b) substrate).

A shared ``local[*]`` SparkSession cannot be relaunched with 1..20 cores per
measurement, so the thread sweep is reproduced the way the paper's numbers
actually arise: per round, the work of a vertex is the number of candidate
label entries it processes (measured by :mod:`repro.core.pspc_local` on the
real run), threads execute vertex tasks under a schedule plan, and each round
ends with a synchronization barrier.

* ``static`` (§III-F "node-order-based"): thread ``i`` owns the contiguous
  rank block ``[i·n/t, (i+1)·n/t)`` — Example 3's imbalanced plan (the top
  block receives almost no candidates by Lemma 3, low-rank blocks receive
  most).
* ``dynamic`` ("cost-function-based"): tasks are dispatched
  longest-processing-time-first to the least-loaded thread — an optimistic
  but standard model of the paper's dynamic allocation.

Speedup(t) = T(1)/T(t) with T(t) = Σ_rounds (makespan_round(t) + barrier),
barrier charged only for t > 1. The barrier fraction (default 2% of the mean
round's work) is what bends the curves from the ideal 20× to the paper's
12–17× band.
"""
from __future__ import annotations

import heapq

import numpy as np


def round_makespan(
    tasks: dict[int, int],
    threads: int,
    schedule: str,
    rank: np.ndarray | None = None,
    n: int | None = None,
) -> float:
    """Makespan of one round's vertex tasks on ``threads`` workers."""
    if not tasks:
        return 0.0
    if threads <= 1:
        return float(sum(tasks.values()))
    if schedule == "static":
        if rank is None or n is None:
            raise ValueError("static schedule needs rank and n")
        loads = np.zeros(threads)
        block = max(1, -(-n // threads))  # ceil(n / t)
        for v, w in tasks.items():
            loads[min(threads - 1, rank[v] // block)] += w
        return float(loads.max())
    if schedule == "dynamic":
        heap = [0.0] * threads
        heapq.heapify(heap)
        for w in sorted(tasks.values(), reverse=True):
            heapq.heappush(heap, heapq.heappop(heap) + w)
        return float(max(heap))
    raise ValueError(f"unknown schedule {schedule!r}")


def simulate_index_time(
    work: list[dict[int, int]],
    threads: int,
    schedule: str = "dynamic",
    rank: np.ndarray | None = None,
    n: int | None = None,
    barrier_frac: float = 0.02,
) -> float:
    """Modelled index-construction time (work units) for ``threads`` workers."""
    total = sum(sum(r.values()) for r in work)
    rounds = max(1, sum(1 for r in work if r))
    barrier = barrier_frac * total / rounds if threads > 1 else 0.0
    t = 0.0
    for r in work:
        if not r:
            continue
        t += round_makespan(r, threads, schedule, rank, n) + barrier
    return t


def speedup_curve(
    work: list[dict[int, int]],
    thread_counts: list[int],
    schedule: str = "dynamic",
    rank: np.ndarray | None = None,
    n: int | None = None,
    barrier_frac: float = 0.02,
) -> dict[int, float]:
    """``{t: speedup}`` with speedup(1) ≡ 1 (the paper's definition)."""
    t1 = simulate_index_time(work, 1, schedule, rank, n, barrier_frac)
    return {
        t: t1 / simulate_index_time(work, t, schedule, rank, n, barrier_frac)
        for t in thread_counts
    }


def simulate_query_speedup(
    costs: np.ndarray, thread_counts: list[int], barrier_frac: float = 0.001
) -> dict[int, float]:
    """Query-workload scaling (Fig 9): queries are independent tasks, cost =
    scanned label entries; dynamic dispatch, one final barrier."""
    total = float(costs.sum())
    out = {}
    for t in thread_counts:
        if t <= 1:
            out[t] = 1.0
            continue
        heap = [0.0] * t
        heapq.heapify(heap)
        for w in np.sort(costs)[::-1]:
            heapq.heappush(heap, heapq.heappop(heap) + float(w))
        out[t] = total / (max(heap) + barrier_frac * total)
    return out
