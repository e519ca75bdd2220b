"""Randomized-topology invariants: every index family stays exact on
random connected graphs (not just corridor grids), including the BFS
region-growing partitioner path of PMHL (no coordinates available)."""
import random

import pytest

from repro.graphs.graph import Graph
from repro.core.dijkstra import floyd_warshall
from repro.core.ch import CHIndex
from repro.core.h2h import H2HIndex
from repro.psp.pmhl import PMHLIndex
from repro.psp.postmhl import PostMHLIndex
from repro.baselines.toain import TOAINIndex


def random_connected(n: int, extra: int, seed: int) -> Graph:
    """Random spanning tree + `extra` random chords, random weights."""
    rnd = random.Random(seed)
    g = Graph(n)
    order = list(range(n))
    rnd.shuffle(order)
    for i in range(1, n):
        g.add_edge(order[i], order[rnd.randrange(i)], rnd.randint(10, 100))
    added = 0
    while added < extra:
        u, v = rnd.randrange(n), rnd.randrange(n)
        if u != v and not g.has_edge(u, v):
            g.add_edge(u, v, rnd.randint(10, 200))
            added += 1
    return g


CASES = [(40, 20, 0), (60, 40, 1), (80, 30, 2), (50, 80, 3)]


def _pairs(n, seed, count=40):
    rnd = random.Random(seed)
    return [(rnd.randrange(n), rnd.randrange(n)) for _ in range(count)]


@pytest.mark.parametrize("n,extra,seed", CASES)
def test_ch_and_h2h_on_random_graphs(n, extra, seed):
    g = random_connected(n, extra, seed)
    fw = floyd_warshall(g)
    ch, h2h = CHIndex(g.copy()), H2HIndex(g.copy())
    for s, t in _pairs(n, seed):
        assert ch.query(s, t) == pytest.approx(fw[s][t])
        assert h2h.query(s, t) == pytest.approx(fw[s][t])


@pytest.mark.parametrize("n,extra,seed", CASES)
def test_pmhl_bfs_partitioner_on_random_graphs(n, extra, seed):
    g = random_connected(n, extra, seed)
    fw = floyd_warshall(g)
    idx = PMHLIndex(g.copy(), 3, coords=None)  # BFS region growing
    for s, t in _pairs(n, seed + 1):
        assert idx.query_pch(s, t) == pytest.approx(fw[s][t])
        assert idx.query_postboundary(s, t) == pytest.approx(fw[s][t])
        assert idx.query_cross(s, t) == pytest.approx(fw[s][t])


@pytest.mark.parametrize("n,extra,seed", CASES)
def test_postmhl_on_random_graphs(n, extra, seed):
    g = random_connected(n, extra, seed)
    fw = floyd_warshall(g)
    idx = PostMHLIndex(g.copy(), tau=10, k_e=3, beta_l=0.05)
    for s, t in _pairs(n, seed + 2):
        assert idx.query(s, t) == pytest.approx(fw[s][t])
        assert idx.query_postboundary(s, t) == pytest.approx(fw[s][t])


@pytest.mark.parametrize("n,extra,seed", CASES[:2])
def test_dynamic_random_graphs(n, extra, seed):
    """Random updates on random topology: all families stay exact."""
    rnd = random.Random(seed + 9)
    g = random_connected(n, extra, seed)
    pm = PMHLIndex(g.copy(), 3, coords=None)
    po = PostMHLIndex(g.copy(), tau=10, k_e=3, beta_l=0.05)
    to = TOAINIndex(g.copy(), core_frac=0.3)
    for _ in range(3):
        edges = list(g.edges())
        batch = []
        for u, v, w in rnd.sample(edges, 15):
            batch.append((u, v, max(1.0, w * rnd.choice([0.5, 2.0]))))
        g.apply_updates(batch)
        pm.apply_batch(batch)
        po.apply_batch(batch)
        to.apply_batch(batch)
        fw = floyd_warshall(g)
        for s, t in _pairs(n, seed + 5, 25):
            assert pm.query_cross(s, t) == pytest.approx(fw[s][t])
            assert po.query(s, t) == pytest.approx(fw[s][t])
            assert to.query(s, t) == pytest.approx(fw[s][t])
