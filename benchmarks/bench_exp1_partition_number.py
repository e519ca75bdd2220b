"""T4 bench (Exp 1 / Fig 10): PMHL vs partition number k."""
from repro.experiments.exp_tables import t4_rows
from repro.graphs.generator import DATASETS
from repro.psp.pmhl import PMHLIndex
from benchmarks.util import BENCH_DATASETS, emit


def test_exp1_partition_number(benchmark):
    rows = t4_rows(BENCH_DATASETS[:1], ks=(4, 8, 16, 32))
    emit(rows, ["dataset", "k", "t_u_s", "lambda_qps"],
         "T4 — PMHL vs partition number k (Exp 1)", "t4_partition_number")
    spec = DATASETS["NY"]
    g, coords = spec.build()
    benchmark.pedantic(lambda: PMHLIndex(g.copy(), 8, coords), rounds=3, iterations=1)
