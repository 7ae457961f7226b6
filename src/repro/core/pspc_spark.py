"""PSPC⁺ — the parallel label construction as a Spark DataFrame job.

This is the reproduction's realization of the paper's multi-thread algorithm
as distributed dataflow (the ``repro`` target): every distance round is a
bulk-synchronous step whose intra-round tasks are independent (Theorem 3), so
each round maps onto Catalyst-planned joins and aggregations:

==================================  =========================================
paper concept                       dataflow realization
==================================  =========================================
pull-based propagation (Def. 10)    ``frontier ⋈ edges`` on ``src`` →
                                    re-keyed to the destination vertex
Label Merging / Elimination         ``groupBy(vertex, hub).sum(cnt)`` —
                                    distributed aggregation releases the
                                    dependencies between index partitions
rank pruning (Lemma 3)              join with the rank table, filter
                                    ``rank(hub) < rank(vertex)``
landmark filtering (§III-H)         ``mapInPandas`` batch filter over the
                                    broadcast-closure distance matrix
query pruning (Lemma 4)             2-hop witness self-join on the
                                    accumulated labels + left-anti join
schedule plan (§III-F)              ``static``: range-partition candidates by
                                    vertex rank blocks; ``dynamic``: hash
                                    partitioning (Spark's task stealing)
round barrier                       ``localCheckpoint`` (materialize + cut
                                    lineage) per round
==================================  =========================================

The result is bit-identical to the sequential engines regardless of
parallelism — the paper's Exp 2 invariant, enforced by tests.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field
from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.labels import LabelIndex
from repro.core.landmark import LandmarkIndex, build_landmarks
from repro.graph.gframe import Graph


@dataclass
class SparkBuildStats:
    """Wall-clock phase breakdown + per-round candidate counts (Exp 8)."""

    rounds: int = 0
    round_candidates: list[int] = field(default_factory=list)
    t_order: float = 0.0
    t_landmarks: float = 0.0
    t_construction: float = 0.0


def _landmark_filter(cand: DataFrame, lm: LandmarkIndex, d: int) -> DataFrame:
    """Drop candidates ``(vertex, hub)`` whose landmark bound proves
    ``dist < d``. The (k × n) distance matrix rides in the task closure."""
    dist = lm.dist  # int32 (k, n)
    schema = cand.schema

    def flt(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                yield pdf
                continue
            us = pdf["vertex"].to_numpy()
            ws = pdf["hub"].to_numpy()
            bound = (dist[:, us].astype(np.int64) + dist[:, ws].astype(np.int64)).min(axis=0)
            yield pdf[bound >= d]

    return cand.mapInPandas(flt, schema=schema)


def build_pspc_spark(
    spark: SparkSession,
    g: Graph,
    order: np.ndarray,
    n_landmarks: int = 0,
    schedule: str = "dynamic",
    n_blocks: int = 16,
    max_rounds: int = 256,
) -> tuple[LabelIndex, SparkBuildStats]:
    """Build the ESPC index with distance-round distributed propagation.

    Parameters mirror the paper's knobs: ``n_landmarks`` (0 disables the LL
    phase), ``schedule`` ∈ {"static", "dynamic"} (§III-F), and the vertex
    ``order`` computed by any scheme in :mod:`repro.ordering`.
    """
    if schedule not in ("static", "dynamic"):
        raise ValueError(f"unknown schedule {schedule!r}")
    stats = SparkBuildStats()
    n = g.n
    rank = np.empty(n, dtype=np.int64)
    rank[np.asarray(order)] = np.arange(n)

    t0 = time.perf_counter()
    lm = build_landmarks(g, n_landmarks) if n_landmarks > 0 else None
    stats.t_landmarks = time.perf_counter() - t0

    # Small-cluster tuning: the round loop runs dozens of tiny shuffles, so
    # the session-level 64-partition default is pure overhead here. The
    # runtime conf is set for the duration of the build and restored after.
    old_parts = spark.conf.get("spark.sql.shuffle.partitions")
    spark.conf.set("spark.sql.shuffle.partitions", str(n_blocks))
    try:
        return _build(spark, g, order, rank, lm, schedule, n_blocks, max_rounds, stats)
    finally:
        spark.conf.set("spark.sql.shuffle.partitions", old_parts)


def _build(
    spark: SparkSession,
    g: Graph,
    order: np.ndarray,
    rank: np.ndarray,
    lm: LandmarkIndex | None,
    schedule: str,
    n_blocks: int,
    max_rounds: int,
    stats: SparkBuildStats,
) -> tuple[LabelIndex, SparkBuildStats]:
    n = g.n
    t0 = time.perf_counter()
    edges = g.edges_df(spark).localCheckpoint()
    ranks = spark.createDataFrame(
        pd.DataFrame({"vertex": np.arange(n, dtype=np.int64), "rank": rank})
    ).localCheckpoint()

    init = spark.createDataFrame(
        pd.DataFrame(
            {
                "vertex": np.arange(n, dtype=np.int64),
                "hub": np.arange(n, dtype=np.int64),
                "dist": np.zeros(n, dtype=np.int32),
                "cnt": np.ones(n, dtype=np.float64),
            }
        )
    )
    labels = init.localCheckpoint()
    frontier = labels

    for d in range(1, max_rounds + 1):
        # 1. Pull + Label Merging: neighbours' round-(d-1) labels, counts
        #    summed per (vertex, hub) by distributed aggregation.
        cand = (
            frontier.select(F.col("vertex").alias("src"), "hub", "cnt")
            .join(edges, on="src")
            .select(F.col("dst").alias("vertex"), "hub", "cnt")
            .groupBy("vertex", "hub")
            .agg(F.sum("cnt").alias("cnt"))
        )
        # 2. Rank pruning (Lemma 3).
        ru = ranks.select(F.col("vertex"), F.col("rank").alias("rank_u"))
        rw = ranks.select(F.col("vertex").alias("hub"), F.col("rank").alias("rank_w"))
        cand = (
            cand.join(ru, on="vertex")
            .join(rw, on="hub")
            .where(F.col("rank_w") < F.col("rank_u"))
        )
        # Schedule plan: static = contiguous rank blocks per task (the
        # imbalanced plan of Example 3); dynamic = hash partitions drained by
        # whichever core is free.
        if schedule == "static":
            cand = cand.repartitionByRange(n_blocks, "rank_u")
        else:
            cand = cand.repartition(n_blocks, "vertex")
        cand = cand.select("vertex", "hub", "cnt")
        # 3. Landmark prefilter (§III-H) — sound, never changes the index.
        if lm is not None:
            cand = _landmark_filter(cand, lm, d)
        # 4. Query pruning (Lemma 4): a witness hub h with
        #    dist(u,h)+dist(h,w) < d certifies dist(u,w) < d.
        la = labels.select("vertex", F.col("hub").alias("h"), F.col("dist").alias("d1"))
        lb = labels.select(
            F.col("vertex").alias("hub"), F.col("hub").alias("h"), F.col("dist").alias("d2")
        )
        witness = (
            cand.select("vertex", "hub")
            .join(la, on="vertex")
            .join(lb, on=["hub", "h"])
            .where(F.col("d1") + F.col("d2") < F.lit(d))
            .select("vertex", "hub")
            .distinct()
        )
        new_labels = (
            cand.join(witness, on=["vertex", "hub"], how="left_anti")
            .select(
                "vertex",
                "hub",
                F.lit(d).cast("int").alias("dist"),
                "cnt",
            )
            .localCheckpoint()  # round barrier: materialize, cut lineage
        )
        n_new = new_labels.count()
        stats.round_candidates.append(n_new)
        if n_new == 0:
            break
        stats.rounds = d
        # ``labels`` stays a union of per-round checkpointed blocks: lineage
        # depth is one, only the plan width grows (bounded by the diameter).
        labels = labels.unionByName(new_labels)
        frontier = new_labels
    stats.t_construction = time.perf_counter() - t0

    pdf = labels.toPandas()
    index = LabelIndex.from_records(n, rank, pdf)
    return index, stats
