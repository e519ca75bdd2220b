"""Synthetic road-network generator and the Table-I-like dataset registry.

The paper evaluates on 8 DIMACS/NaviInfo road networks (0.26M–24M
vertices). Those are unavailable offline and too large for Python
kernels, so we substitute *strip-grid corridor networks*: a W×H lattice
(H small) with randomly perturbed travel-time weights and extra local
diagonal edges. Real road networks are characterized by small treewidth
and strong natural cuts; strip grids share both (treewidth ≤ H+1,
natural column cuts), so every code path the paper exercises —
contraction, boundary sets, overlay graphs, multi-stage maintenance —
behaves the same way at ~1/100 scale. See DESIGN.md §4.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.graph import Graph


def road_network(
    width: int,
    height: int,
    *,
    seed: int = 0,
    diag_prob: float = 0.08,
    w_low: float = 10.0,
    w_high: float = 100.0,
) -> tuple[Graph, np.ndarray]:
    """Generate a W×H strip-grid road network.

    Returns ``(graph, coords)`` where ``coords[v] = (x, y)`` grid
    coordinates (used by the coordinate partitioner). Vertex id is
    ``x * height + y`` so contiguous x-ranges are contiguous id ranges.
    Weights are uniform in ``[w_low, w_high)`` — integerized to avoid
    float-tie ambiguity between Dijkstra and index queries.
    """
    g = np.random.default_rng(seed)
    n = width * height
    coords = np.empty((n, 2), dtype=np.int64)
    graph = Graph(n)

    def vid(x: int, y: int) -> int:
        return x * height + y

    for x in range(width):
        for y in range(height):
            coords[vid(x, y)] = (x, y)
    # Lattice edges (roads along the corridor grid).
    for x in range(width):
        for y in range(height):
            v = vid(x, y)
            if x + 1 < width:
                graph.add_edge(v, vid(x + 1, y), float(g.integers(w_low, w_high)))
            if y + 1 < height:
                graph.add_edge(v, vid(x, y + 1), float(g.integers(w_low, w_high)))
    # Local diagonals (junction ramps) — keep cuts small, add cycles.
    for x in range(width - 1):
        for y in range(height - 1):
            if g.random() < diag_prob:
                if g.random() < 0.5:
                    graph.add_edge(vid(x, y), vid(x + 1, y + 1), float(g.integers(w_low, 2 * w_high)))
                else:
                    graph.add_edge(vid(x, y + 1), vid(x + 1, y), float(g.integers(w_low, 2 * w_high)))
    return graph, coords


@dataclass(frozen=True)
class DatasetSpec:
    """One row of our Table-I-like registry (lite-scale counterpart)."""

    name: str
    paper_name: str
    paper_n: int
    paper_m: int
    width: int
    height: int
    k: int      # PMHL partition number (paper Table I col k)
    k_e: int    # PostMHL expected partition number
    tau: int    # PostMHL bandwidth
    seed: int = 7

    def build(self) -> tuple[Graph, np.ndarray]:
        return road_network(self.width, self.height, seed=self.seed)

    @property
    def n(self) -> int:
        return self.width * self.height


# Lite registry mirroring Table I at ~1/100–1/1000 scale. k and k_e
# follow the paper's per-dataset defaults; τ is scaled to our MDE
# neighborhood sizes (paper τ=100..400 bounds |B_i| against treewidths
# of a few hundred on multi-million-vertex networks; our lite graphs
# have MDE widths ~40–60, so τ scales to 24–48 — see Exp 8 sweep).
DATASETS: dict[str, DatasetSpec] = {
    s.name: s
    for s in [
        DatasetSpec("NY", "New York City", 264_346, 730_100, 192, 10, 8, 32, 24),
        DatasetSpec("GD", "Guangdong", 938_957, 2_452_156, 300, 12, 8, 32, 24),
        DatasetSpec("FLA", "Florida", 1_070_376, 2_687_902, 384, 12, 8, 32, 24),
        DatasetSpec("SC", "South China", 1_326_091, 3_388_770, 448, 12, 32, 64, 32),
        DatasetSpec("EC", "East China", 3_008_173, 7_793_146, 680, 12, 16, 32, 32),
        DatasetSpec("W", "Western USA", 6_262_104, 15_119_284, 1024, 12, 16, 32, 40),
        DatasetSpec("CTR", "Central USA", 14_081_816, 33_866_826, 1500, 12, 32, 128, 48),
        DatasetSpec("USA", "Full USA", 23_947_347, 57_708_624, 2048, 12, 32, 128, 48),
    ]
}


def random_queries(n: int, count: int, *, seed: int = 11) -> list[tuple[int, int]]:
    """Random distinct s-t pairs (the paper's random query workload)."""
    g = np.random.default_rng(seed)
    out = []
    while len(out) < count:
        s, t = int(g.integers(0, n)), int(g.integers(0, n))
        if s != t:
            out.append((s, t))
    return out


def update_batches(
    graph: Graph, *, batches: int, volume: int, seed: int = 13
) -> list[list[tuple[int, int, float]]]:
    """Generate update batches per the paper's protocol (§VII-A).

    Each batch selects ``volume`` random edges; each selected edge's
    weight is halved or doubled with equal probability. Weights are read
    from ``graph`` *as batches would be applied in sequence*, so batch i+1
    perturbs the post-batch-i weights (matching a live system).
    """
    g = np.random.default_rng(seed)
    edges = list(graph.edges())
    shadow = {(u, v): w for u, v, w in edges}
    keys = list(shadow)
    out = []
    for _ in range(batches):
        batch = []
        idx = g.choice(len(keys), size=min(volume, len(keys)), replace=False)
        for i in idx:
            u, v = keys[i]
            w = shadow[(u, v)]
            new = w * 0.5 if g.random() < 0.5 else w * 2.0
            new = max(1.0, float(new))
            shadow[(u, v)] = new
            batch.append((u, v, new))
        out.append(batch)
    return out
