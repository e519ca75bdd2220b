"""T7 bench (Exp 6 / Fig 15): speedup when varying worker count p."""
from repro.experiments.exp_tables import t7_rows
from repro.experiments.harness import lpt
from benchmarks.util import BENCH_DATASETS, emit


def test_exp6_threads(benchmark):
    rows = t7_rows(BENCH_DATASETS)
    emit(rows, ["dataset", "algo", "p", "t_u_s", "update_speedup", "lambda_qps", "throughput_speedup"],
         "T7 — update/throughput speedup vs p (Exp 6)", "t7_threads")
    ds = [r["t_u_s"] for r in rows]
    benchmark(lambda: lpt(ds, 16))
