"""Discrete-event M/G/1 simulator for the batch-update query system.

Validates the analytic bounds of :mod:`repro.throughput.queue_model`
and produces the paper's measurement protocol (§VII-A): run the system
for ``n_intervals × δt`` simulated seconds at arrival rate λ, updates
installed at each interval start, queries served FIFO by the fastest
stage available at service start; gradually increase λ until QoS (mean
response time) is violated — the last passing λ is the measured
throughput λ_q*.

Simulated time only — service durations come from measured stage query
times, nothing sleeps.
"""
from __future__ import annotations

import math

import numpy as np

from repro.throughput.queue_model import Stage


def _stage_tq_at(stages: list[Stage], t_in_interval: float) -> float:
    """Service time of the stage active at offset t within the interval."""
    acc = 0.0
    for s in stages:
        acc += s.duration
        if t_in_interval < acc:
            return s.tq
    return stages[-1].tq


def simulate_mean_response(
    stages: list[Stage],
    dt: float,
    lam: float,
    *,
    n_intervals: int = 10,
    seed: int = 0,
    max_events: int = 400_000,
) -> float:
    """Mean response time (wait + service) at arrival rate λ."""
    g = np.random.default_rng(seed)
    horizon = n_intervals * dt
    n = min(max_events, int(lam * horizon * 1.2) + 10)
    gaps = g.exponential(1.0 / lam, size=n)
    arrivals = np.cumsum(gaps)
    arrivals = arrivals[arrivals < horizon]
    if len(arrivals) == 0:
        return 0.0
    server_free = 0.0
    total_resp = 0.0
    for a in arrivals:
        start = max(a, server_free)
        tq = _stage_tq_at(stages, start % dt)
        finish = start + tq
        server_free = finish
        total_resp += finish - a
    return total_resp / len(arrivals)


def measured_throughput(
    stages: list[Stage],
    dt: float,
    rq: float,
    *,
    lam_hint: float | None = None,
    n_intervals: int = 10,
    seed: int = 0,
) -> float:
    """Binary-search the largest λ whose simulated mean response ≤ R_q*."""
    tq_final = stages[-1].tq
    hi = lam_hint if lam_hint else 1.0 / tq_final
    # Grow hi until violated (or clearly saturated).
    while simulate_mean_response(stages, dt, hi, n_intervals=n_intervals, seed=seed) <= rq:
        hi *= 2.0
        if hi > 1e9:
            return hi
    lo = 0.0
    for _ in range(20):
        mid = (lo + hi) / 2.0
        if mid <= 0:
            break
        r = simulate_mean_response(stages, dt, mid, n_intervals=n_intervals, seed=seed)
        if r <= rq:
            lo = mid
        else:
            hi = mid
    return lo


def qps_timeline(stages: list[Stage], dt: float) -> list[tuple[float, float]]:
    """(stage start offset, QPS = 1/tq) points — the paper's Exp 4 curve."""
    out = []
    acc = 0.0
    for s in stages:
        qps = 0.0 if math.isinf(s.tq) or s.tq <= 0 else 1.0 / s.tq
        out.append((acc, qps))
        acc += s.duration
    return out
