"""Index-free shortest-path searches: Dijkstra and BiDijkstra.

These are both the ground truth for every index test and the Q-Stage-1
query algorithm of PMHL/PostMHL (queries answered directly on the
updated graph while all indexes are stale).
"""
from __future__ import annotations

import heapq
import math

from repro.graphs.graph import Graph

INF = math.inf


def dijkstra(graph: Graph, s: int, targets: set[int] | None = None) -> dict[int, float]:
    """Single-source shortest distances from ``s``.

    If ``targets`` is given, stops once all targets are settled and
    returns distances for (at least) the settled set.
    """
    dist: dict[int, float] = {s: 0.0}
    settled: set[int] = set()
    pq: list[tuple[float, int]] = [(0.0, s)]
    remaining = set(targets) if targets is not None else None
    while pq:
        d, u = heapq.heappop(pq)
        if u in settled:
            continue
        settled.add(u)
        if remaining is not None:
            remaining.discard(u)
            if not remaining:
                break
        for v, w in graph.adj[u].items():
            nd = d + w
            if nd < dist.get(v, INF):
                dist[v] = nd
                heapq.heappush(pq, (nd, v))
    return dist


def dijkstra_all(graph: Graph, s: int) -> list[float]:
    """Dense distance vector from ``s`` (INF for unreachable)."""
    d = dijkstra(graph, s)
    return [d.get(v, INF) for v in range(graph.n)]


def bidijkstra(graph: Graph, s: int, t: int) -> float:
    """Bidirectional Dijkstra point-to-point distance (Nicholson 1966).

    Alternates forward/backward expansions; terminates when the sum of
    the two frontier minima reaches the best meeting distance.
    """
    if s == t:
        return 0.0
    df: dict[int, float] = {s: 0.0}
    db: dict[int, float] = {t: 0.0}
    pf: list[tuple[float, int]] = [(0.0, s)]
    pb: list[tuple[float, int]] = [(0.0, t)]
    seen_f: set[int] = set()
    seen_b: set[int] = set()
    best = INF
    while pf or pb:
        top_f = pf[0][0] if pf else INF
        top_b = pb[0][0] if pb else INF
        if top_f + top_b >= best:
            break
        # Expand the side with the smaller frontier minimum.
        if top_f <= top_b:
            d, u = heapq.heappop(pf)
            if u in seen_f:
                continue
            seen_f.add(u)
            if u in db:
                best = min(best, d + db[u])
            for v, w in graph.adj[u].items():
                nd = d + w
                if nd < df.get(v, INF):
                    df[v] = nd
                    heapq.heappush(pf, (nd, v))
                    if v in db:
                        best = min(best, nd + db[v])
        else:
            d, u = heapq.heappop(pb)
            if u in seen_b:
                continue
            seen_b.add(u)
            if u in df:
                best = min(best, d + df[u])
            for v, w in graph.adj[u].items():
                nd = d + w
                if nd < db.get(v, INF):
                    db[v] = nd
                    heapq.heappush(pb, (nd, v))
                    if v in df:
                        best = min(best, nd + df[v])
    return best


def floyd_warshall(graph: Graph) -> list[list[float]]:
    """Dense all-pairs distances — O(n^3), tiny-graph test oracle only."""
    n = graph.n
    d = [[INF] * n for _ in range(n)]
    for i in range(n):
        d[i][i] = 0.0
    for u, v, w in graph.edges():
        d[u][v] = min(d[u][v], w)
        d[v][u] = min(d[v][u], w)
    for k in range(n):
        dk = d[k]
        for i in range(n):
            dik = d[i][k]
            if dik == INF:
                continue
            di = d[i]
            for j in range(n):
                nd = dik + dk[j]
                if nd < di[j]:
                    di[j] = nd
    return d
