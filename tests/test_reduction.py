"""§IV reductions: 1-shell + equivalence contraction must keep every query
exact, shrink the index, and survive the degenerate shapes (pure trees,
twin-heavy graphs)."""
import numpy as np
import pytest

from repro.core.bfs_oracle import all_pairs_spc
from repro.core.pspc_local import build_pspc_local
from repro.core.reduction import build_reduced
from repro.graph.gframe import Graph
from repro.graphgen import generators as gen
from repro.ordering.degree import degree_order
from tests.util import path_graph, small_graph


def _check_exact(g, ri):
    D, C = all_pairs_spc(g)
    for s in range(g.n):
        for t in range(g.n):
            d, c = ri.query(s, t)
            assert d == D[s, t], (s, t, d, D[s, t])
            assert abs(c - C[s, t]) < 1e-6, (s, t, c, C[s, t])


@pytest.mark.parametrize("seed", range(6))
def test_reduced_exact_sparse(seed):
    e, n = gen.largest_component(gen.erdos_renyi(45, 0.055, seed))
    g = Graph(n=n, edges=e)
    _check_exact(g, build_reduced(g, degree_order))


@pytest.mark.parametrize("kind,seed", [("ba", 0), ("ws", 0), ("grid", 0), ("grid", 1)])
def test_reduced_exact_topologies(kind, seed):
    g = small_graph(kind, seed, n=36)
    _check_exact(g, build_reduced(g, degree_order))


@pytest.mark.parametrize("seed", range(3))
def test_reduced_exact_tree(seed):
    e, n = gen.largest_component(gen.barabasi_albert(40, 1, seed))
    g = Graph(n=n, edges=e)
    ri = build_reduced(g, degree_order)
    assert ri.core_mask.sum() == 1  # a tree peels to one core vertex
    _check_exact(g, ri)


def test_reduced_exact_twin_heavy():
    """Star of twin leaves + a 4-cycle: exercises both reductions at once."""
    edges = [(0, i) for i in range(1, 6)]  # 5 twin leaves on hub 0 (1-shell)
    edges += [(0, 6), (6, 7), (7, 8), (8, 0)]  # cycle core
    edges += [(6, 9), (6, 10)]  # two more twin leaves
    g = Graph.from_edges(np.asarray(edges), n=11)
    _check_exact(g, build_reduced(g, degree_order))


def test_reduced_exact_parallel_twins():
    """Open twins inside the core (diamond chain): weighted counting must
    restore the multiplicity the contraction removed."""
    edges = [(0, 1), (0, 2), (1, 3), (2, 3), (3, 4), (4, 5), (3, 6), (6, 5)]
    g = Graph.from_edges(np.asarray(edges), n=7)
    _check_exact(g, build_reduced(g, degree_order))


def test_reduced_index_is_smaller():
    g = small_graph("er", 7, n=60)
    ri = build_reduced(g, degree_order)
    full, _ = build_pspc_local(g, degree_order(g))
    assert ri.n_entries <= full.n_entries


def test_path_graph_all_tree():
    g = path_graph(10)
    ri = build_reduced(g, degree_order)
    for s in range(10):
        for t in range(10):
            assert ri.query(s, t) == (abs(s - t), 1.0)
