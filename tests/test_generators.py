"""Generator substrate tests: canonical form, determinism, component
extraction and the dataset registry's degree targets."""
import numpy as np
import pytest

from repro.graphgen import generators as gen
from repro.graphgen.datasets import DATASETS, TABLE3_CODES, load
from repro.graph.gframe import Graph

GENS = {
    "er": lambda s: gen.erdos_renyi(80, 0.08, s),
    "ba": lambda s: gen.barabasi_albert(80, 4, s),
    "ws": lambda s: gen.watts_strogatz(80, 6, 0.1, s),
    "rmat": lambda s: gen.rmat(80, 300, s),
    "grid": lambda s: gen.grid_road(9, 9, seed=s),
}


@pytest.mark.parametrize("kind", sorted(GENS))
@pytest.mark.parametrize("seed", range(5))
def test_canonical_form(kind, seed):
    e = GENS[kind](seed)
    assert e.ndim == 2 and e.shape[1] == 2
    assert (e[:, 0] < e[:, 1]).all(), "rows must be oriented src < dst"
    assert len(np.unique(e, axis=0)) == len(e), "no duplicate edges"


@pytest.mark.parametrize("kind", sorted(GENS))
@pytest.mark.parametrize("seed", range(3))
def test_deterministic(kind, seed):
    a, b = GENS[kind](seed), GENS[kind](seed)
    assert np.array_equal(a, b)


@pytest.mark.parametrize("kind", sorted(GENS))
def test_seeds_differ(kind):
    a, b = GENS[kind](0), GENS[kind](1)
    assert a.shape != b.shape or not np.array_equal(a, b)


@pytest.mark.parametrize("kind", sorted(GENS))
@pytest.mark.parametrize("seed", range(3))
def test_largest_component_connected(kind, seed):
    e, n = gen.largest_component(GENS[kind](seed))
    g = Graph(n=n, edges=e)
    # BFS from 0 must reach everything after extraction.
    from repro.graph.algorithms import bfs_levels, UNREACHED

    d = bfs_levels(g, 0)
    assert (d != UNREACHED).all()
    assert e.min() == 0 and e.max() == n - 1


@pytest.mark.parametrize("code", TABLE3_CODES + ["RD"])
def test_dataset_loads_connected(code):
    g = load(code, scale=0.3)
    from repro.graph.algorithms import bfs_levels, UNREACHED

    assert g.n > 50
    assert (bfs_levels(g, 0) != UNREACHED).all()


@pytest.mark.parametrize("code", TABLE3_CODES)
def test_dataset_degree_matches_paper_class(code):
    """Average degree of the lite twin within a factor ~2 of the original —
    the property the substitution is built to preserve."""
    g = load(code, scale=1.0)
    target = DATASETS[code].paper_avg_deg
    assert 0.45 * target <= g.avg_degree <= 2.1 * target


@pytest.mark.parametrize("code", ["FB", "RD", "YT"])
def test_dataset_deterministic(code):
    a, b = load(code, 0.4), load(code, 0.4)
    assert a.n == b.n and np.array_equal(a.edges, b.edges)


def test_scale_changes_size():
    assert load("FB", 0.3).n < load("FB", 0.8).n


def test_grid_low_degree_high_diameter():
    from repro.graph.algorithms import diameter_estimate

    g = load("RD", 1.0)
    assert g.avg_degree < 5
    assert diameter_estimate(g, probes=3) > 20
