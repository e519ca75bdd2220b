"""Graph partitioning (PUNCH substitute) invariants."""
import pytest

from repro.graphs.generator import road_network
from repro.partition.partitioner import partition_bfs, partition_by_coords, partition_graph


@pytest.fixture(scope="module")
def case():
    g, coords = road_network(24, 6, seed=2)
    return g, coords


@pytest.mark.parametrize("k", [2, 4, 8])
def test_vertex_disjoint_cover(case, k):
    g, coords = case
    p = partition_graph(g, k, coords)
    seen = [v for part in p.parts for v in part]
    assert sorted(seen) == list(range(g.n))
    assert all(0 <= p.pid[v] < k for v in range(g.n))


@pytest.mark.parametrize("k", [2, 4, 8])
def test_balance(case, k):
    g, coords = case
    p = partition_graph(g, k, coords)
    sizes = [len(part) for part in p.parts]
    assert max(sizes) - min(sizes) <= g.n // k  # coordinate chunks are near-equal


def test_boundary_definition(case):
    g, coords = case
    p = partition_graph(g, 4, coords)
    bset = set(p.boundary_all)
    for u, v, _ in g.edges():
        if p.pid[u] != p.pid[v]:
            assert u in bset and v in bset
    # every boundary vertex really has a cross-partition neighbor
    for b in bset:
        assert any(p.pid[x] != p.pid[b] for x in g.adj[b])


def test_inter_edges_complete(case):
    g, coords = case
    p = partition_graph(g, 4, coords)
    expect = sum(1 for u, v, _ in g.edges() if p.pid[u] != p.pid[v])
    assert len(p.inter_edges) == expect


def test_column_cut_small_boundary(case):
    """Coordinate cuts of a corridor graph have O(height) boundaries."""
    g, coords = case
    p = partition_by_coords(g, 4, coords)
    for bs in p.boundary:
        assert len(bs) <= 4 * 6  # a few columns worth


def test_bfs_fallback_cover(case):
    g, _ = case
    p = partition_bfs(g, 4, seed=3)
    seen = [v for part in p.parts for v in part]
    assert sorted(seen) == list(range(g.n))
    assert all(len(part) > 0 for part in p.parts)
