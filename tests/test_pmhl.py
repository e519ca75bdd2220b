"""PMHL: all five query stages exact, Theorem 2, Lemma 2, maintenance."""
import math

import pytest

from repro.core.dijkstra import floyd_warshall
from repro.psp.pmhl import PMHLIndex, hub_query
from tests.util import pairs_for, small_case, updated_case

import numpy as np


@pytest.fixture(scope="module", params=[(0, 3), (1, 4), (2, 5)])
def built(request):
    seed, k = request.param
    g, coords, fw = small_case(seed, 20, 5)
    return PMHLIndex(g.copy(), k, coords), g, fw, seed


STAGES = ["query_pch", "query_noboundary", "query_postboundary", "query_cross"]


@pytest.mark.parametrize("stage", STAGES)
def test_stage_queries_exact(built, stage):
    idx, g, fw, seed = built
    q = getattr(idx, stage)
    for s, t in pairs_for(g.n, 50, seed):
        assert q(s, t) == pytest.approx(fw[s][t]), (stage, s, t)


def test_same_partition_queries(built):
    idx, g, fw, seed = built
    for i in range(idx.k):
        vs = idx.part.parts[i]
        for s, t in zip(vs[:6], vs[-6:]):
            if s == t:
                continue
            for stage in STAGES:
                assert getattr(idx, stage)(s, t) == pytest.approx(fw[s][t])


def test_theorem2_overlay_preserves_boundary_distances(built):
    """Overlay H2H distances between boundary vertices = global ones."""
    idx, g, fw, _ = built
    bs = idx.part.boundary_all
    for a in bs[::3]:
        for b in bs[::4]:
            if a != b:
                assert idx._ov_query_g(a, b) == pytest.approx(fw[a][b])


def test_lemma2_cross_boundary_2hop_cover(built):
    """L* hub arrays satisfy the 2-hop cover for cross-partition pairs."""
    idx, g, fw, seed = built
    cnt = 0
    for s, t in pairs_for(g.n, 120, seed + 9):
        if idx.part.pid[s] == idx.part.pid[t]:
            continue
        h1, d1 = idx._hubs_of(s)
        h2, d2 = idx._hubs_of(t)
        assert hub_query(h1, d1, h2, d2) == pytest.approx(fw[s][t])
        cnt += 1
    assert cnt > 10


def test_lstar_entries_upper_bound_distance(built):
    """Every L* label entry is a real path length (≥ true distance)."""
    idx, g, fw, _ = built
    u = idx.units[0]
    for v, (hubs, dists) in list(u.lstar.items())[:10]:
        gv = u.vertices[v]
        for h, d in zip(hubs, dists):
            if math.isfinite(d):
                assert d >= fw[gv][h] - 1e-9


def test_boundary_first_property(built):
    """In each partition tree, boundary ranks above non-boundary."""
    idx, _, _, _ = built
    for u in idx.units:
        if not u.b_set:
            continue
        max_nb = max(
            (u.td.rank[l] for l in range(u.gl.n) if l not in u.b_set), default=-1
        )
        assert all(u.td.rank[b] > max_nb for b in u.b_set)


def test_disB_values_exact(built):
    idx, g, fw, _ = built
    for u in idx.units:
        for v in range(0, u.gl.n, 5):
            if v in u.b_set or u.disB[v] is None:
                continue
            gv = u.vertices[v]
            for j, b in enumerate(u.b_local):
                assert u.disB[v][j] == pytest.approx(fw[gv][u.vertices[b]])


@pytest.mark.parametrize("seed,k", [(0, 3), (1, 4)])
def test_maintenance_all_stages(seed, k):
    g, coords, ups, truths = updated_case(seed, 20, 5)
    idx = PMHLIndex(g.copy(), k, coords)
    for batch, fw in zip(ups, truths):
        times = idx.apply_batch(batch)
        assert {"u1", "u2", "u3", "u4", "u5"} <= set(times)
        for s, t in pairs_for(g.n, 25, seed + 7):
            d = fw[s][t]
            assert idx.query_bidij(s, t) == pytest.approx(d)
            for stage in STAGES:
                assert getattr(idx, stage)(s, t) == pytest.approx(d), stage


def test_maintenance_increase_only():
    """Pure weight-increase batch (the hard DH2H direction)."""
    g, coords, fw0 = small_case(6, 20, 5)
    idx = PMHLIndex(g.copy(), 4, coords)
    batch = [(u, v, w * 3) for u, v, w in list(g.edges())[::4]]
    idx.apply_batch(batch)
    g2 = g.copy()
    g2.apply_updates(batch)
    fw = floyd_warshall(g2)
    for s, t in pairs_for(g.n, 40, 3):
        for stage in STAGES:
            assert getattr(idx, stage)(s, t) == pytest.approx(fw[s][t]), stage


def test_index_size_grows_with_level():
    g, coords, _ = small_case(0, 20, 5)
    full = PMHLIndex(g.copy(), 4, coords)
    assert full.index_size() > 0
    assert full.build_times["post"] and full.build_times["cross"]


def test_hub_query_disjoint_returns_inf():
    h1 = np.array([1, 2]); d1 = np.array([1.0, 2.0])
    h2 = np.array([3, 4]); d2 = np.array([1.0, 2.0])
    assert hub_query(h1, d1, h2, d2) == math.inf
