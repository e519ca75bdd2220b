"""T3 bench (Exp 3 / Fig 12): maximum average throughput."""
from repro.experiments.exp_tables import t3_rows
from repro.graphs.generator import DATASETS, update_batches
from repro.psp.pmhl import PMHLIndex
from benchmarks.util import BENCH_DATASETS, emit


def test_exp3_throughput(benchmark):
    rows = t3_rows(BENCH_DATASETS)
    emit(rows, ["dataset", "algo", "lambda_qps"],
         "T3 — maximum average throughput λ_q* (Exp 3)", "t3_throughput")
    spec = DATASETS["NY"]
    g, coords = spec.build()
    idx = PMHLIndex(g.copy(), spec.k, coords)
    batch = update_batches(g, batches=1, volume=100, seed=3)[0]
    benchmark.pedantic(lambda: idx.apply_batch(batch), rounds=3, iterations=1)
