"""Per-dataset measurement runner: builds every algorithm, applies the
update batches, measures per-stage query times — the raw material for
experiment tables T2–T7 (Exp 2–6 of the paper).

Scale mapping (DESIGN.md §4): datasets are the lite registry; defaults
|U|=100 (paper 1000), δt=10 s (paper 120 s), R_q*=0.1 s (paper 1.0 s),
p=16 workers (paper 140 threads) — the same ×~1/10 time scaling the
paper itself applies to its largest datasets (δt 600, R_q* 5).
"""
from __future__ import annotations

import json
import os
import time
from dataclasses import dataclass, field

from repro.graphs.generator import DATASETS, random_queries, update_batches
from repro.core.ch import CHIndex
from repro.core.h2h import H2HIndex
from repro.baselines.toain import TOAINIndex
from repro.psp.pmhl import PMHLIndex
from repro.psp.strategies import NCHPIndex, PTDPIndex
from repro.psp.postmhl import PostMHLIndex
from repro.experiments.harness import (
    QueryStats,
    lpt,
    mean_walls,
    measure_queries,
    pmhl_stage_walls,
    postmhl_stage_walls,
)
from repro.throughput.queue_model import Stage, multistage_throughput

ALGOS = ["BiDij", "DCH", "DH2H", "TOAIN", "N-CH-P", "P-TD-P", "PMHL", "PostMHL"]

# Default lite-scale system parameters (see module docstring).
DEFAULTS = dict(volume=100, dt=10.0, rq=0.1, p=16, n_batches=5, n_queries=100)
# Per-dataset overrides mirroring the paper's slacked setting for CTR/USA
# (δt=600, R_q*=5 there; ×5 here).
SLACKED = {"CTR": dict(dt=50.0, rq=0.5), "USA": dict(dt=50.0, rq=0.5)}


@dataclass
class AlgoResult:
    """Everything measured for one algorithm on one dataset."""

    name: str
    t_build: float
    size: int
    # Query stats per stage, in availability order; the last is the
    # fully-updated index. Keys depend on the algorithm.
    stage_q: dict[str, QueryStats]
    # Mean stage availability walls within an interval, already
    # LPT-scheduled at the runner's p (seconds from interval start).
    walls: list[float]
    # Stage names matching walls+final for timeline/throughput building.
    stage_names: list[str] = field(default_factory=list)
    raw_batches: list[dict] = field(default_factory=list)  # per-batch timings

    def stages_for(self, dt: float) -> list[Stage]:
        """Stage list over one update interval for the queue model."""
        out: list[Stage] = []
        prev = 0.0
        qs = [self.stage_q[n] for n in self.stage_names]
        # stage i serves from walls[i-1]..walls[i]; stage 0 from 0.
        bounds = list(self.walls) + [dt]
        for q, b in zip(qs, bounds):
            b = min(b, dt)
            if b > prev:
                out.append(Stage(b - prev, q.mean, q.var))
                prev = b
        if not out:  # maintenance exceeds the interval
            out = [Stage(dt, float("inf"))]
        return out

    def throughput(self, dt: float, rq: float) -> float:
        tu = self.walls[-1] if self.walls else 0.0
        if tu >= dt:
            return 0.0
        return multistage_throughput(self.stages_for(dt), dt, rq)

    @property
    def tu(self) -> float:
        return self.walls[-1] if self.walls else 0.0

    @property
    def tq(self) -> float:
        return self.stage_q[self.stage_names[-1]].mean


def _timed_build(cls, *args, **kw):
    t0 = time.perf_counter()
    idx = cls(*args, **kw)
    return idx, time.perf_counter() - t0


def measure_dataset(
    name: str,
    algos: list[str] | None = None,
    *,
    volume: int | None = None,
    n_batches: int | None = None,
    n_queries: int | None = None,
    p: int | None = None,
    seed: int = 11,
) -> dict[str, AlgoResult]:
    """Build, update, and measure every requested algorithm on a dataset."""
    spec = DATASETS[name]
    cfg = {**DEFAULTS, **SLACKED.get(name, {})}
    volume = volume or cfg["volume"]
    n_batches = n_batches or cfg["n_batches"]
    n_queries = n_queries or cfg["n_queries"]
    p = p or cfg["p"]
    algos = list(algos or ALGOS)
    if "BiDij" not in algos:
        algos = ["BiDij"] + algos  # every algorithm falls back to BiDijkstra

    graph, coords = spec.build()
    pairs = random_queries(graph.n, n_queries, seed=seed)
    batches = update_batches(graph, batches=n_batches, volume=volume, seed=seed + 1)
    out: dict[str, AlgoResult] = {}

    if "BiDij" in algos:
        g = graph.copy()
        from repro.core.dijkstra import bidijkstra

        for b in batches:
            g.apply_updates(b)
        q = measure_queries(lambda s, t: bidijkstra(g, s, t), pairs)
        out["BiDij"] = AlgoResult("BiDij", 0.0, 0, {"bidij": q}, [], ["bidij"])

    if "DCH" in algos:
        idx, tb = _timed_build(CHIndex, graph.copy())
        walls = [[idx.apply_batch(b)] for b in batches]
        qb = measure_queries(idx.query, pairs)
        qf = out["BiDij"].stage_q["bidij"]
        out["DCH"] = AlgoResult(
            "DCH", tb, idx.index_size(), {"bidij": qf, "ch": qb}, mean_walls(walls), ["bidij", "ch"]
        )

    if "DH2H" in algos:
        idx, tb = _timed_build(H2HIndex, graph.copy())
        walls = []
        for b in batches:
            t = idx.apply_batch(b)
            walls.append([t["edge"] + t["shortcut"] + t["label"]])
        qh = measure_queries(idx.query, pairs)
        qf = out["BiDij"].stage_q["bidij"]
        out["DH2H"] = AlgoResult(
            "DH2H", tb, idx.index_size(), {"bidij": qf, "h2h": qh}, mean_walls(walls), ["bidij", "h2h"]
        )

    if "TOAIN" in algos:
        idx, tb = _timed_build(TOAINIndex, graph.copy())
        tb += 0.0
        t0 = time.perf_counter()
        idx.tune(pairs[: min(20, len(pairs))])
        tb += time.perf_counter() - t0  # self-configuration is part of construction
        walls = [[idx.apply_batch(b)] for b in batches]
        qt = measure_queries(idx.query, pairs)
        qf = out["BiDij"].stage_q["bidij"]
        out["TOAIN"] = AlgoResult(
            "TOAIN", tb, idx.index_size(), {"bidij": qf, "toain": qt}, mean_walls(walls), ["bidij", "toain"]
        )

    if "N-CH-P" in algos:
        idx, tb = _timed_build(NCHPIndex, graph.copy(), spec.k, coords)
        walls = []
        for b in batches:
            t = idx.apply_batch(b)
            walls.append([t["u1"] + lpt(t["u2"]["parts"].values(), p) + t["u2"]["overlay"]])
        qp = measure_queries(idx.query_pch, pairs)
        qf = out["BiDij"].stage_q["bidij"]
        out["N-CH-P"] = AlgoResult(
            "N-CH-P", tb, idx.index_size(), {"bidij": qf, "pch": qp}, mean_walls(walls), ["bidij", "pch"]
        )

    if "P-TD-P" in algos:
        idx, tb = _timed_build(PTDPIndex, graph.copy(), spec.k, coords)
        walls = []
        for b in batches:
            t = idx.apply_batch(b)
            w = pmhl_stage_walls(t, p)
            walls.append([w[2]])  # available after U4 (post-boundary)
        qq = measure_queries(idx.query_postboundary, pairs)
        qf = out["BiDij"].stage_q["bidij"]
        out["P-TD-P"] = AlgoResult(
            "P-TD-P", tb, idx.index_size(), {"bidij": qf, "post": qq}, mean_walls(walls), ["bidij", "post"]
        )

    if "PMHL" in algos:
        idx, tb = _timed_build(PMHLIndex, graph.copy(), spec.k, coords)
        raw = [idx.apply_batch(b) for b in batches]
        walls = [pmhl_stage_walls(t, p) for t in raw]
        stage_q = {
            "bidij": out["BiDij"].stage_q["bidij"],
            "pch": measure_queries(idx.query_pch, pairs),
            "noboundary": measure_queries(idx.query_noboundary, pairs),
            "postboundary": measure_queries(idx.query_postboundary, pairs),
            "cross": measure_queries(idx.query_cross, pairs),
        }
        out["PMHL"] = AlgoResult(
            "PMHL", tb, idx.index_size(), stage_q, mean_walls(walls),
            ["bidij", "pch", "noboundary", "postboundary", "cross"], raw,
        )

    if "PostMHL" in algos:
        idx, tb = _timed_build(PostMHLIndex, graph.copy(), tau=spec.tau, k_e=spec.k_e)
        raw = [idx.apply_batch(b) for b in batches]
        walls = [postmhl_stage_walls(t, p) for t in raw]
        stage_q = {
            "bidij": out["BiDij"].stage_q["bidij"],
            "pch": measure_queries(idx.query_pch, pairs),
            "postboundary": measure_queries(idx.query_postboundary, pairs),
            "h2h": measure_queries(idx.query, pairs),
        }
        out["PostMHL"] = AlgoResult(
            "PostMHL", tb, idx.index_size(), stage_q, mean_walls(walls),
            ["bidij", "pch", "postboundary", "h2h"], raw,
        )
    return out


_RECORD_CACHE: dict = {}


def get_records(names: list[str], algos: list[str] | None = None, **kw) -> dict[str, dict[str, AlgoResult]]:
    """Memoized measure_dataset across experiments in one process."""
    out = {}
    for n in names:
        key = (n, tuple(algos) if algos else None, tuple(sorted(kw.items())))
        if key not in _RECORD_CACHE:
            _RECORD_CACHE[key] = measure_dataset(n, algos, **kw)
        out[n] = _RECORD_CACHE[key]
    return out


# ----------------------------------------------------------------------
# JSON result cache so tables can be regenerated without re-measuring
# ----------------------------------------------------------------------
RESULTS_DIR = os.path.join(os.path.dirname(os.path.dirname(os.path.dirname(os.path.dirname(__file__)))), "results")


def save_results(tag: str, rows: list[dict]) -> str:
    os.makedirs(RESULTS_DIR, exist_ok=True)
    path = os.path.join(RESULTS_DIR, f"{tag}.json")
    with open(path, "w") as f:
        json.dump(rows, f, indent=1)
    return path


def fmt_table(rows: list[dict], cols: list[str], title: str) -> str:
    """Plain fixed-width table for experiment outputs."""
    widths = {c: max(len(c), *(len(_fmt(r.get(c))) for r in rows)) if rows else len(c) for c in cols}
    lines = [title, "  ".join(c.ljust(widths[c]) for c in cols)]
    lines.append("  ".join("-" * widths[c] for c in cols))
    for r in rows:
        lines.append("  ".join(_fmt(r.get(c)).ljust(widths[c]) for c in cols))
    return "\n".join(lines)


def _fmt(v) -> str:
    if v is None:
        return "-"
    if isinstance(v, float):
        if v == 0:
            return "0"
        if abs(v) >= 1000 or abs(v) < 0.001:
            return f"{v:.3g}"
        return f"{v:.4g}"
    return str(v)
