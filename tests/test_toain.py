"""TOAIN baseline (core-CH hybrid): correctness across core sizes."""
import pytest

from repro.baselines.toain import TOAINIndex
from tests.util import pairs_for, small_case, updated_case


@pytest.mark.parametrize("frac", [0.0, 0.05, 0.3, 1.0])
def test_query_exact_any_core(frac):
    g, _, fw = small_case(0, 16, 5)
    idx = TOAINIndex(g.copy(), core_frac=frac)
    for s, t in pairs_for(g.n, 40, 1):
        assert idx.query(s, t) == pytest.approx(fw[s][t]), (frac, s, t)


def test_extremes_match_bidij_and_ch():
    from repro.core.ch import CHIndex
    from repro.core.dijkstra import bidijkstra

    g, _, _ = small_case(1, 16, 5)
    full = TOAINIndex(g.copy(), core_frac=1.0)
    none = TOAINIndex(g.copy(), core_frac=0.0)
    ch = CHIndex(g.copy())
    for s, t in pairs_for(g.n, 20, 2):
        assert full.query(s, t) == pytest.approx(ch.query(s, t))
        assert none.query(s, t) == pytest.approx(bidijkstra(g, s, t))


def test_tune_returns_valid_frac():
    g, _, _ = small_case(2, 16, 5)
    idx = TOAINIndex(g.copy())
    f = idx.tune(pairs_for(g.n, 10, 3), fracs=(0.1, 0.5, 1.0))
    assert f in (0.1, 0.5, 1.0)
    assert idx.kappa == int(f * g.n)


@pytest.mark.parametrize("seed", [0, 1])
def test_maintenance(seed):
    g, _, ups, truths = updated_case(seed, 16, 5)
    idx = TOAINIndex(g.copy(), core_frac=0.3)
    for batch, fw in zip(ups, truths):
        idx.apply_batch(batch)
        for s, t in pairs_for(g.n, 25, seed):
            assert idx.query(s, t) == pytest.approx(fw[s][t])
