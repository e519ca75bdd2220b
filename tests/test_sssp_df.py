"""Iterative DataFrame SSSP (Bellman–Ford rounds) vs Dijkstra."""
import pytest

from repro.core.dijkstra import dijkstra_all
from repro.graphs.generator import road_network
from repro.sparkdist.sssp_df import edges_pdf, sssp_df


def test_edges_pdf_bidirected():
    g, _ = road_network(6, 3, seed=0)
    pdf = edges_pdf(g)
    assert len(pdf) == 2 * g.m


@pytest.mark.parametrize("source", [0, 11])
def test_sssp_matches_dijkstra(spark, source):
    g, _ = road_network(8, 4, seed=1)
    got = {int(r["v"]): float(r["d"]) for r in sssp_df(spark, g, source).collect()}
    ref = dijkstra_all(g, source)
    assert len(got) == g.n
    for v in range(g.n):
        assert got[v] == pytest.approx(ref[v])
