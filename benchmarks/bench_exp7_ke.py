"""T8 bench (Exp 7 / Fig 17): PostMHL vs expected partition number k_e."""
from repro.experiments.exp_tables import t8_rows
from benchmarks.util import BENCH_DATASETS, emit


def test_exp7_ke(benchmark):
    name = BENCH_DATASETS[-1]
    rows = t8_rows([name], kes=(8, 16, 32, 64))
    emit(rows, ["dataset", "k_e", "k_actual", "t_u_s", "lambda_qps"],
         "T8 — PostMHL vs k_e (Exp 7)", "t8_ke")
    benchmark(lambda: sorted(r["lambda_qps"] for r in rows))
