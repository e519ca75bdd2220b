"""Shared test fixtures/helpers: small graphs with cached ground truth."""
from __future__ import annotations

from functools import lru_cache

from repro.graphs.generator import road_network, update_batches
from repro.core.dijkstra import floyd_warshall


@lru_cache(maxsize=32)
def small_case(seed: int, width: int = 14, height: int = 5):
    """(graph, coords, all-pairs ground truth) for a small road network."""
    g, coords = road_network(width, height, seed=seed)
    return g, coords, floyd_warshall(g)


@lru_cache(maxsize=32)
def updated_case(seed: int, width: int = 14, height: int = 5, batches: int = 3, volume: int = 20):
    """Graph + update batches + ground truth after each batch."""
    g, coords, _ = small_case(seed, width, height)
    ups = update_batches(g, batches=batches, volume=volume, seed=seed + 100)
    g2 = g.copy()
    truths = []
    for b in ups:
        g2.apply_updates(b)
        truths.append(floyd_warshall(g2))
    return g, coords, ups, truths


def pairs_for(n: int, count: int, seed: int = 0):
    import random

    rnd = random.Random(seed)
    out = []
    while len(out) < count:
        s, t = rnd.randrange(n), rnd.randrange(n)
        if s != t:
            out.append((s, t))
    return out
