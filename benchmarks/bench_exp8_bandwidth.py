"""T9 bench (Exp 8 / Fig 18): PostMHL vs bandwidth τ."""
from repro.experiments.exp_tables import t9_rows
from benchmarks.util import BENCH_DATASETS, emit


def test_exp8_bandwidth(benchmark):
    name = BENCH_DATASETS[0]
    rows = t9_rows([name], taus=(12, 16, 24, 32))
    emit(rows, ["dataset", "tau", "k_actual", "overlay_n", "tq_stage3_ms", "t_u_s", "lambda_qps"],
         "T9 — PostMHL vs bandwidth τ (Exp 8)", "t9_bandwidth")
    benchmark(lambda: sorted(r["t_u_s"] for r in rows))
