"""Tests for pSim (Eq. 1) and the union variant (Eq. 4)."""
import numpy as np
import pytest

from repro.eval.similarity import psim, psim_union
from repro.roadnet.generator import make_city
from repro.roadnet.shortest_path import dijkstra


@pytest.fixture(scope="module")
def city():
    return make_city(grid_n=12, cell_m=200.0, seed=5)


@pytest.fixture(scope="module")
def some_path(city):
    return dijkstra(city.net, 0, city.net.n_vertices - 1, city.net.dist)[0]


def test_identical_paths(city, some_path):
    assert psim(city.net, some_path, some_path) == pytest.approx(1.0)
    assert psim_union(city.net, some_path, some_path) == pytest.approx(1.0)


def test_disjoint_paths(city):
    n = city.grid_n
    p1 = [0, 1, 2]
    p2 = [n * (n - 1), n * (n - 1) + 1]
    assert psim(city.net, p1, p2) == 0.0
    assert psim_union(city.net, p1, p2) == 0.0


def test_partial_overlap_eq1(city):
    """Eq. 1 = shared length / GT length."""
    net = city.net
    gt = [0, 1, 2, 3]
    cand = [0, 1, 2]
    eids_gt = net.path_edges(gt)
    eids_c = net.path_edges(cand)
    expect = net.dist[eids_c].sum() / net.dist[eids_gt].sum()
    assert psim(net, gt, cand) == pytest.approx(expect)


def test_partial_overlap_eq4_smaller(city, some_path):
    """The union denominator makes Eq. 4 ≤ Eq. 1 for any candidate."""
    cand = some_path[: len(some_path) // 2]
    assert psim_union(city.net, some_path, cand) <= psim(city.net, some_path, cand)


@pytest.mark.parametrize("k", [1, 2, 5, 10])
def test_prefix_monotone(city, some_path, k):
    """Longer shared prefixes cannot reduce similarity."""
    shorter = some_path[: max(2, len(some_path) - 2 * k)]
    longer = some_path[: max(2, len(some_path) - k)]
    assert psim(city.net, some_path, longer) >= psim(city.net, some_path, shorter)


def test_symmetric_union(city, some_path):
    cand = some_path[: len(some_path) // 2] if len(some_path) > 3 else some_path
    assert psim_union(city.net, some_path, cand) == pytest.approx(
        psim_union(city.net, cand, some_path)
    )


def test_single_vertex_paths(city):
    assert psim(city.net, [0], [0]) == 1.0
    assert psim(city.net, [0], [0, 1]) == 0.0
    assert psim_union(city.net, [0], [0]) == 1.0


def test_direction_invariance(city, some_path):
    """An undirected network: a reversed path shares the same edges."""
    assert psim(city.net, some_path, some_path[::-1]) == pytest.approx(1.0)
