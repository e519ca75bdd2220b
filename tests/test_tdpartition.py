"""TD-partitioning (Algorithm 2) invariants."""
import pytest

from repro.core.treedec import build_treedec
from repro.graphs.generator import road_network
from repro.partition.tdpartition import td_partition


@pytest.fixture(scope="module")
def case():
    g, _ = road_network(40, 6, seed=3)
    return g, build_treedec(g)


def test_partitions_are_disjoint_subtrees(case):
    g, td = case
    r = td_partition(td, tau=10, k_e=6)
    assert r.k >= 2
    seen = set()
    for root, part in zip(r.roots, r.parts):
        assert root in part
        for v in part:
            assert v not in seen
            seen.add(v)
        # every member's root path passes through the partition root
        for v in part:
            anc = td.ancestors(v)
            assert root in anc


def test_boundary_is_root_neighborhood(case):
    g, td = case
    r = td_partition(td, tau=10, k_e=6)
    for root, bs in zip(r.roots, r.boundary):
        assert bs == list(td.neigh[root])
        assert len(bs) <= 10  # bandwidth constraint
        assert all(b in r.overlay for b in bs)


def test_overlay_upward_closed(case):
    g, td = case
    r = td_partition(td, tau=10, k_e=6)
    for v in r.overlay:
        p = int(td.parent[v])
        if p != -1:
            assert p in r.overlay


def test_partition_size_bounds(case):
    g, td = case
    beta_l, beta_u, ke = 0.1, 2.0, 6
    r = td_partition(td, tau=10, k_e=ke, beta_l=beta_l, beta_u=beta_u)
    for part in r.parts:
        assert beta_l * g.n / ke <= len(part) <= beta_u * g.n / ke


def test_pid_consistency(case):
    g, td = case
    r = td_partition(td, tau=10, k_e=6)
    for i, part in enumerate(r.parts):
        assert all(r.pid[v] == i for v in part)
    assert all(r.pid[v] == -1 for v in r.overlay)


def test_minimum_overlay_prefers_high_roots(case):
    """Scanning in decreasing order keeps ancestors over descendants."""
    g, td = case
    r = td_partition(td, tau=10, k_e=6)
    root_set = set(r.roots)
    for root in r.roots:
        for a in td.ancestors(root)[:-1]:
            assert a not in root_set


def test_larger_tau_smaller_overlay(case):
    g, td = case
    small = td_partition(td, tau=7, k_e=6)
    large = td_partition(td, tau=20, k_e=6)
    assert len(large.overlay) <= len(small.overlay)


def test_infeasible_params_degenerate():
    g, _ = road_network(6, 3, seed=0)
    td = build_treedec(g)
    r = td_partition(td, tau=0, k_e=2)  # no candidate can satisfy τ=0
    assert r.k == 0 and len(r.overlay) == g.n


def test_root_never_a_partition():
    """An empty separator (the tree root) cannot bound a partition."""
    g, _ = road_network(20, 4, seed=1)
    td = build_treedec(g)
    r = td_partition(td, tau=64, k_e=1, beta_l=0.0, beta_u=10.0)
    for root in r.roots:
        assert len(td.neigh[root]) > 0
