"""Vertex-ordering schemes: permutation property, determinism and the
semantics each scheme promises."""
import numpy as np
import pytest

from repro.ordering.degree import degree_order
from repro.ordering.hybrid import hybrid_order
from repro.ordering.sigpath import sigpath_order
from repro.ordering.treedec import elimination_order
from tests.util import complete_graph, path_graph, small_graph

SCHEMES = {
    "degree": degree_order,
    "treedec": lambda g: elimination_order(g, max_fill_degree=32),
    "hybrid": lambda g: hybrid_order(g, 5),
    "sigpath": sigpath_order,
}


@pytest.mark.parametrize("scheme", sorted(SCHEMES))
@pytest.mark.parametrize("kind", ["er", "ba", "grid"])
@pytest.mark.parametrize("seed", range(3))
def test_order_is_permutation(scheme, kind, seed):
    g = small_graph(kind, seed, n=36)
    order = SCHEMES[scheme](g)
    assert sorted(map(int, order)) == list(range(g.n))


@pytest.mark.parametrize("scheme", sorted(SCHEMES))
def test_order_deterministic(scheme):
    g = small_graph("ba", 2, n=36)
    assert np.array_equal(SCHEMES[scheme](g), SCHEMES[scheme](g))


def test_degree_order_descending():
    g = small_graph("ba", 0, n=40)
    deg = g.degrees()
    order = degree_order(g)
    d = deg[order]
    assert (np.diff(d) <= 0).all(), "rank 0 must be the max-degree vertex"


def test_degree_order_starts_at_hub():
    g = small_graph("ba", 1, n=40)
    assert g.degrees()[degree_order(g)[0]] == g.degrees().max()


def test_hybrid_delta0_is_degree_order_on_positive_degrees():
    """δ=0 puts every vertex (degree ≥ 1) in the core → pure degree order."""
    g = small_graph("er", 0, n=36)
    assert np.array_equal(hybrid_order(g, 0), degree_order(g))


def test_hybrid_core_outranks_fringe():
    g = small_graph("ba", 0, n=50)
    delta = 4
    order = hybrid_order(g, delta)
    deg = g.degrees()
    seen_fringe = False
    for v in order:
        if deg[v] <= delta:
            seen_fringe = True
        else:
            assert not seen_fringe, "core vertex ranked below a fringe vertex"


def test_elimination_order_path():
    """On a path, min-degree elimination always peels a current endpoint, so
    the first-eliminated (lowest-rank) vertex is an original endpoint."""
    g = path_graph(15)
    order = elimination_order(g)
    assert int(order[-1]) in (0, 14)
    assert sorted(map(int, order)) == list(range(15))


def test_elimination_order_complete_capped():
    g = complete_graph(10)
    order = elimination_order(g, max_fill_degree=3)
    assert sorted(map(int, order)) == list(range(10))


def test_sigpath_starts_at_max_degree():
    g = small_graph("ba", 3, n=40)
    assert g.degrees()[sigpath_order(g)[0]] == g.degrees().max()
