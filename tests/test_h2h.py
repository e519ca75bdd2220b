"""H2H index + DH2H maintenance + multi-stage (MHL) queries."""
import numpy as np
import pytest

from repro.core.h2h import H2HIndex, prune_to_subtree_roots
from repro.core.treedec import build_labels, build_treedec
from tests.util import pairs_for, small_case, updated_case


@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_h2h_query_exact(seed):
    g, _, fw = small_case(seed)
    idx = H2HIndex(g.copy())
    for s, t in pairs_for(g.n, 60, seed):
        assert idx.query(s, t) == pytest.approx(fw[s][t])


@pytest.mark.parametrize("seed", [0, 1])
def test_mhl_stage_queries_agree(seed):
    """MHL = same structure answers via BiDijkstra, CH, and H2H."""
    g, _, fw = small_case(seed)
    idx = H2HIndex(g.copy())
    for s, t in pairs_for(g.n, 25, seed + 3):
        d = fw[s][t]
        assert idx.query_bidij(s, t) == pytest.approx(d)
        assert idx.query_ch(s, t) == pytest.approx(d)
        assert idx.query(s, t) == pytest.approx(d)


@pytest.mark.parametrize("seed", [0, 1, 2])
def test_dh2h_maintenance_exact(seed):
    g, _, ups, truths = updated_case(seed)
    idx = H2HIndex(g.copy())
    for batch, fw in zip(ups, truths):
        phases = idx.apply_batch(batch)
        assert set(phases) == {"edge", "shortcut", "label"}
        for s, t in pairs_for(g.n, 30, seed + 2):
            assert idx.query(s, t) == pytest.approx(fw[s][t])
            assert idx.query_ch(s, t) == pytest.approx(fw[s][t])


def test_dh2h_labels_equal_full_rebuild():
    """Subtree-rooted label maintenance == from-scratch labels."""
    g, _, ups, _ = updated_case(5)
    idx = H2HIndex(g.copy())
    for batch in ups:
        idx.apply_batch(batch)
    fresh = build_labels(idx.td)
    for v in range(g.n):
        assert np.allclose(idx.dis[v], fresh[v])


def test_prune_to_subtree_roots():
    g, _, _ = small_case(0)
    td = build_treedec(g)
    deepest = max(range(g.n), key=lambda v: td.depth[v])
    anc = td.ancestors(deepest)
    # the whole root path collapses to its highest member
    assert prune_to_subtree_roots(td, set(anc)) == [anc[0]]
    # two unrelated nodes both stay
    r = td.roots[0]
    kids = td.children[r]
    if len(kids) >= 2:
        assert sorted(prune_to_subtree_roots(td, {kids[0], kids[1]})) == sorted(kids[:2])


def test_label_size_matches_tree_depth():
    g, _, _ = small_case(1)
    idx = H2HIndex(g.copy())
    for v in range(g.n):
        assert len(idx.dis[v]) == idx.td.depth[v] + 1
        assert idx.dis[v][-1] == 0.0


def test_index_size_counts_labels_and_shortcuts():
    g, _, _ = small_case(1)
    idx = H2HIndex(g.copy())
    labels = sum(int(idx.td.depth[v]) + 1 for v in range(g.n))
    assert idx.index_size() == labels + sum(len(nb) for nb in idx.td.neigh)
