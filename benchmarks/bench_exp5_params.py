"""T6 bench (Exp 5 / Fig 14): throughput vs |U|, δt, R_q*."""
from repro.experiments.exp_tables import t6_rows
from repro.graphs.generator import DATASETS, update_batches
from repro.core.h2h import H2HIndex
from benchmarks.util import BENCH_DATASETS, emit


def test_exp5_params(benchmark):
    rows = t6_rows(BENCH_DATASETS[:1], volumes=(50, 100, 300))
    emit(rows, ["dataset", "sweep", "value", "algo", "lambda_qps"],
         "T6 — throughput vs |U|, δt, R_q* (Exp 5)", "t6_params")
    g, _ = DATASETS["NY"].build()
    idx = H2HIndex(g.copy())
    batch = update_batches(g, batches=1, volume=100, seed=3)[0]
    benchmark.pedantic(lambda: idx.apply_batch(batch), rounds=3, iterations=1)
