"""The BFS counting oracle is itself validated against brute-force path
enumeration — everything else in the repo is then checked against the oracle."""
import numpy as np
import pytest

from repro.core import bfs_oracle as bo
from tests.util import brute_force_spc, complete_graph, cycle_graph, path_graph, small_graph


@pytest.mark.parametrize("seed", range(8))
def test_oracle_vs_brute_force(seed):
    g = small_graph("er", seed, n=14)
    for s in range(g.n):
        d, c = bo.spc_from(g, s)
        for t in range(g.n):
            bd, bc = brute_force_spc(g, s, t)
            assert d[t] == bd or (d[t] == bo.UNREACHED and bc == 0)
            if bc:
                assert int(round(c[t])) == bc


def test_oracle_path_graph():
    g = path_graph(6)
    d, c = bo.spc_from(g, 0)
    assert list(d) == [0, 1, 2, 3, 4, 5]
    assert (c == 1).all()


def test_oracle_cycle_even():
    """Even cycle: antipodal vertices have exactly 2 shortest paths."""
    g = cycle_graph(8)
    d, c = bo.spc_from(g, 0)
    assert d[4] == 4 and c[4] == 2
    assert c[1] == 1 and c[3] == 1


def test_oracle_complete():
    g = complete_graph(7)
    d, c = bo.spc_from(g, 0)
    assert (d[1:] == 1).all() and (c[1:] == 1).all()


def test_oracle_diamond_multiplicity():
    """s–{a,b}–t diamond: two shortest paths of length 2."""
    from repro.graph.gframe import Graph

    g = Graph.from_edges(np.array([[0, 1], [0, 2], [1, 3], [2, 3]]), n=4)
    assert bo.spc(g, 0, 3) == (2, 2)


def test_oracle_weighted_expansion():
    """Weighted counting == unweighted counting on the expanded graph.

    Contract the diamond's two middle vertices into one with weight 2: the
    weighted count through it must equal the original 2."""
    from repro.graph.gframe import Graph

    contracted = Graph.from_edges(np.array([[0, 1], [1, 2]]), n=3)
    w = np.array([1.0, 2.0, 1.0])
    d, c = bo.spc_from(contracted, 0, weights=w)
    assert d[2] == 2 and c[2] == 2.0


@pytest.mark.parametrize("seed", range(4))
def test_oracle_weight_one_is_noop(seed):
    g = small_graph("ba", seed, n=30)
    d0, c0 = bo.spc_from(g, 0)
    d1, c1 = bo.spc_from(g, 0, weights=np.ones(g.n))
    assert np.array_equal(d0, d1) and np.allclose(c0, c1)


def test_all_pairs_symmetry():
    g = small_graph("ws", 1, n=24)
    D, C = bo.all_pairs_spc(g)
    assert np.array_equal(D, D.T)
    assert np.allclose(C, C.T)
