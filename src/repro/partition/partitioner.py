"""Graph partitioning for planar PSP indexes (PUNCH substitute).

The paper partitions road networks with PUNCH [61] (natural cuts).
Offline substitute (DESIGN.md §4): coordinate column-block partitioning
for generated grid networks (natural cuts of a corridor network are its
column cross-sections), with a BFS region-growing fallback for graphs
without coordinates. PMHL only consumes the properties both provide:
balanced vertex-disjoint partitions with small boundary sets.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphs.graph import Graph


@dataclass
class Partition:
    """A planar partitioning of a graph (§III-C)."""

    k: int
    pid: np.ndarray                      # vertex -> partition id
    parts: list[list[int]]               # partition id -> sorted global vertex ids
    boundary: list[list[int]]            # partition id -> sorted boundary vertices
    inter_edges: list[tuple[int, int, float]]  # edges between partitions

    @property
    def boundary_all(self) -> list[int]:
        return sorted(b for bs in self.boundary for b in bs)


def _finish(graph: Graph, pid: np.ndarray, k: int) -> Partition:
    parts: list[list[int]] = [[] for _ in range(k)]
    for v in range(graph.n):
        parts[int(pid[v])].append(v)
    inter = []
    is_boundary = np.zeros(graph.n, dtype=bool)
    for u, v, w in graph.edges():
        if pid[u] != pid[v]:
            inter.append((u, v, w))
            is_boundary[u] = True
            is_boundary[v] = True
    boundary = [[v for v in p if is_boundary[v]] for p in parts]
    return Partition(k=k, pid=pid, parts=parts, boundary=boundary, inter_edges=inter)


def partition_by_coords(graph: Graph, k: int, coords: np.ndarray) -> Partition:
    """Cut into k contiguous equal-size blocks along the x coordinate."""
    order = np.lexsort((coords[:, 1], coords[:, 0]))
    pid = np.empty(graph.n, dtype=np.int64)
    bounds = np.linspace(0, graph.n, k + 1).astype(int)
    for i in range(k):
        pid[order[bounds[i] : bounds[i + 1]]] = i
    return _finish(graph, pid, k)


def partition_bfs(graph: Graph, k: int, *, seed: int = 0) -> Partition:
    """Region-growing fallback: k BFS fronts grown to balanced sizes."""
    g = np.random.default_rng(seed)
    target = graph.n / k
    pid = np.full(graph.n, -1, dtype=np.int64)
    seeds = g.choice(graph.n, size=k, replace=False)
    from collections import deque

    queues = [deque([int(s)]) for s in seeds]
    sizes = [0] * k
    for i, s in enumerate(seeds):
        pid[s] = i
        sizes[i] = 1
    active = True
    while active:
        active = False
        for i in range(k):
            if sizes[i] >= target * 1.5:
                continue
            steps = 0
            while queues[i] and steps < 4:
                u = queues[i].popleft()
                for v in graph.adj[u]:
                    if pid[v] == -1:
                        pid[v] = i
                        sizes[i] += 1
                        queues[i].append(v)
                        steps += 1
                active = True
    # Sweep leftovers (disconnected bits) onto a neighboring partition.
    for v in range(graph.n):
        if pid[v] == -1:
            nb = [pid[u] for u in graph.adj[v] if pid[u] != -1]
            pid[v] = nb[0] if nb else 0
    return _finish(graph, pid, k)


def partition_graph(graph: Graph, k: int, coords: np.ndarray | None = None, *, seed: int = 0) -> Partition:
    if coords is not None:
        return partition_by_coords(graph, k, coords)
    return partition_bfs(graph, k, seed=seed)
