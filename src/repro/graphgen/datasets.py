"""Registry of the paper's 10 evaluation graphs as synthetic *-lite twins.

Table III of the paper lists 10 real graphs (Facebook .. Indochina,
63k–7.4M vertices). They are not downloadable in this offline container, so
each is re-created with a generator from the same topology class, sized for a
single-node run and tuned to the original's **average degree** — the property
that, together with the small-world diameter, drives hub-labeling behaviour.
See DESIGN.md §3/§4 for the substitution rationale.

``load(code, scale=1.0)`` is deterministic: same code+scale → same graph.
``RD`` (road grid) is an extra, non-Table-III dataset exercising the paper's
road-network ordering machinery.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np

from repro.graph.gframe import Graph
from repro.graphgen import generators as gen


@dataclass(frozen=True)
class DatasetSpec:
    """One row of the Table III analog."""

    code: str
    paper_name: str
    paper_n: int
    paper_m: int
    paper_avg_deg: float
    kind: str  # 'social' | 'web' | 'geo-social' | 'coauthor' | 'road'
    build: Callable[[float, int], np.ndarray]  # (scale, seed) -> edges
    seed: int


def _ba(n: int, m_attach: int):
    return lambda scale, seed: gen.barabasi_albert(max(m_attach + 2, int(n * scale)), m_attach, seed)


def _ws(n: int, k: int, p: float):
    return lambda scale, seed: gen.watts_strogatz(max(k + 2, int(n * scale)), k, p, seed)


def _rmat(n: int, avg_deg: float):
    return lambda scale, seed: gen.rmat(
        max(8, int(n * scale)), int(max(8, int(n * scale)) * avg_deg / 2), seed
    )


def _grid(side: int):
    return lambda scale, seed: gen.grid_road(
        max(4, int(side * np.sqrt(scale))), max(4, int(side * np.sqrt(scale))), seed=seed
    )


DATASETS: dict[str, DatasetSpec] = {
    s.code: s
    for s in [
        DatasetSpec("FB", "Facebook", 63_731, 817_035, 25.6, "social", _ba(1000, 13), 11),
        DatasetSpec("GW", "Gowalla", 196_591, 950_327, 9.7, "geo-social", _ws(1200, 10, 0.10), 12),
        DatasetSpec("WI", "WikiConflict", 118_100, 2_027_871, 34.3, "social", _ba(900, 17), 13),
        DatasetSpec("GO", "Google", 875_713, 4_322_051, 9.9, "web", _rmat(1400, 9.9), 14),
        DatasetSpec("DB", "DBLP", 1_314_050, 5_326_414, 8.1, "coauthor", _ws(1500, 8, 0.05), 15),
        DatasetSpec("BE", "Berkstan", 685_230, 6_649_470, 19.4, "web", _rmat(1100, 19.4), 16),
        DatasetSpec("YT", "Youtube", 3_223_589, 9_375_374, 5.8, "social", _ba(1600, 3), 17),
        DatasetSpec("PE", "Petster", 623_766, 15_695_166, 50.3, "social", _ba(800, 25), 18),
        DatasetSpec("FL", "Flickr", 2_302_925, 22_838_276, 19.8, "social", _ba(1300, 10), 19),
        DatasetSpec("IN", "Indochina", 7_414_866, 150_984_819, 40.7, "web", _rmat(1500, 40.7), 20),
        DatasetSpec("RD", "(road grid)", 0, 0, 2.7, "road", _grid(30), 21),
    ]
}

TABLE3_CODES = ["FB", "GW", "WI", "GO", "DB", "BE", "YT", "PE", "FL", "IN"]


def load(code: str, scale: float = 1.0) -> Graph:
    """Build the dataset's graph: generate, keep the giant component,
    relabel to compact ids. Deterministic in (code, scale)."""
    spec = DATASETS[code]
    edges = spec.build(scale, spec.seed)
    edges, n = gen.largest_component(edges)
    return Graph(n=n, edges=edges, name=f"{spec.code}-lite")


def load_all(scale: float = 1.0, codes: list[str] | None = None) -> dict[str, Graph]:
    return {c: load(c, scale) for c in (codes or TABLE3_CODES)}
