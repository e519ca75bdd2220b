"""Tests for the synthetic road-network generator and workloads."""
import numpy as np
import pytest

from repro.graphs.generator import (
    DATASETS,
    random_queries,
    road_network,
    update_batches,
)
from repro.core.dijkstra import dijkstra


@pytest.mark.parametrize("seed", [0, 1, 7])
def test_deterministic(seed):
    g1, c1 = road_network(10, 4, seed=seed)
    g2, c2 = road_network(10, 4, seed=seed)
    assert sorted(g1.edges()) == sorted(g2.edges())
    assert (c1 == c2).all()


def test_seed_changes_weights():
    g1, _ = road_network(10, 4, seed=0)
    g2, _ = road_network(10, 4, seed=1)
    assert sorted(g1.edges()) != sorted(g2.edges())


@pytest.mark.parametrize("w,h", [(5, 3), (12, 6), (30, 8)])
def test_size_and_connectivity(w, h):
    g, coords = road_network(w, h, seed=2)
    assert g.n == w * h
    assert coords.shape == (g.n, 2)
    # connected: Dijkstra from 0 reaches everything
    assert len(dijkstra(g, 0)) == g.n


def test_lattice_edges_present():
    g, _ = road_network(6, 3, seed=0)
    # vertex id = x*h + y; horizontal neighbor exists
    assert g.has_edge(0, 3) and g.has_edge(0, 1)


def test_positive_weights():
    g, _ = road_network(15, 5, seed=3)
    assert all(w > 0 for _, _, w in g.edges())


def test_registry_mirrors_table1():
    assert list(DATASETS) == ["NY", "GD", "FLA", "SC", "EC", "W", "CTR", "USA"]
    ns = [s.n for s in DATASETS.values()]
    assert ns == sorted(ns), "lite sizes keep the paper's ordering"
    for s in DATASETS.values():
        assert s.paper_n > 100 * s.n, "lite graphs are >=100x smaller than the paper's"


def test_random_queries_distinct_endpoints():
    qs = random_queries(100, 50, seed=5)
    assert len(qs) == 50
    assert all(s != t for s, t in qs)
    assert qs == random_queries(100, 50, seed=5)


@pytest.mark.parametrize("volume", [5, 20])
def test_update_batches_protocol(volume):
    g, _ = road_network(10, 5, seed=4)
    batches = update_batches(g, batches=4, volume=volume, seed=9)
    assert len(batches) == 4 and all(len(b) == volume for b in batches)
    for b in batches:
        for u, v, w in b:
            assert g.has_edge(u, v)
            assert w >= 1.0


def test_update_batches_halve_or_double():
    g, _ = road_network(10, 5, seed=4)
    (batch,) = update_batches(g, batches=1, volume=30, seed=9)
    for u, v, w in batch:
        old = g.weight(u, v)
        assert np.isclose(w, old * 0.5) or np.isclose(w, old * 2.0)


def test_update_batches_sequential_semantics():
    """Batch i+1 perturbs post-batch-i weights (live-system semantics)."""
    g, _ = road_network(8, 4, seed=4)
    batches = update_batches(g, batches=6, volume=g.m, seed=9)
    g2 = g.copy()
    for b in batches:
        for u, v, w in b:
            old = g2.weight(u, v)
            assert np.isclose(w, old * 0.5) or np.isclose(w, old * 2.0) or w == 1.0
        g2.apply_updates(b)


def test_dataset_build_smallest():
    g, coords = DATASETS["NY"].build()
    assert g.n == DATASETS["NY"].n == 1920
    assert len(dijkstra(g, 0)) == g.n
