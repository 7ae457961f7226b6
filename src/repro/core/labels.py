"""ESPC label index model shared by HP-SPC_s, PSPC and PSPC⁺.

A label entry ``(w, d, c)`` in ``L(u)`` means: ``d = dist(u, w)`` and ``c``
counts the *trough* shortest ``u–w`` paths — those on which ``w`` is the
highest-ranked vertex under the index's total vertex order. The index is an
Exact Shortest Path Covering (Definition 2 of the paper): every shortest
``s–t`` path is covered exactly once by its highest-ranked vertex, so the
2-hop query (Equations 1–2) returns the exact count.

``LabelIndex`` is the in-driver representation (per-vertex hub→(dist, count)
maps, optimal for the µs-level query loop the paper times); conversion to and
from the Spark/pandas relational form ``(vertex, hub, dist, cnt)`` bridges to
the distributed builder and to the DuckDB oracle.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

#: accounting size of one label entry, matching the paper's C++ layout
#: (int32 hub, uint8 dist, int64 count, padded) — used for the MB column.
BYTES_PER_ENTRY = 16


@dataclass
class LabelIndex:
    """ESPC index over vertices ``0..n-1`` under the total order ``rank``.

    ``rank[v]`` is the position of ``v`` in the order — **smaller rank means
    higher priority** (rank 0 is the top hub). ``maps[u]`` maps hub ``w`` to
    ``(dist, count)``.
    """

    n: int
    rank: np.ndarray
    maps: list[dict[int, tuple[int, float]]] = field(repr=False)

    # ---- accounting --------------------------------------------------
    @property
    def n_entries(self) -> int:
        return sum(len(m) for m in self.maps)

    @property
    def size_mb(self) -> float:
        return self.n_entries * BYTES_PER_ENTRY / (1024 * 1024)

    @property
    def avg_label_len(self) -> float:
        return self.n_entries / self.n if self.n else 0.0

    # ---- canonical forms --------------------------------------------
    def sorted_tuples(self) -> list[tuple[int, int, int, float]]:
        """Canonical ``(vertex, hub, dist, count)`` list for equality tests
        across builders (HP-SPC_s == PSPC == PSPC⁺ must hold)."""
        out = []
        for u, m in enumerate(self.maps):
            for w, (d, c) in m.items():
                out.append((u, w, int(d), float(c)))
        out.sort()
        return out

    def to_pandas(self) -> pd.DataFrame:
        rows = self.sorted_tuples()
        return pd.DataFrame(rows, columns=["vertex", "hub", "dist", "cnt"])

    def to_spark(self, spark: SparkSession) -> DataFrame:
        return spark.createDataFrame(self.to_pandas())

    @classmethod
    def from_records(
        cls, n: int, rank: np.ndarray, records: "pd.DataFrame | list[tuple]"
    ) -> "LabelIndex":
        """Build from relational rows ``(vertex, hub, dist, cnt)`` — the shape
        the Spark builder produces."""
        maps: list[dict[int, tuple[int, float]]] = [dict() for _ in range(n)]
        if isinstance(records, pd.DataFrame):
            it = records[["vertex", "hub", "dist", "cnt"]].itertuples(index=False)
        else:
            it = iter(records)
        for v, w, d, c in it:
            maps[int(v)][int(w)] = (int(d), float(c))
        return cls(n=n, rank=np.asarray(rank), maps=maps)
