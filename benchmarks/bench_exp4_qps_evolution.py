"""T5 bench (Exp 4 / Fig 13): QPS evolution during the update interval."""
from repro.experiments.exp_tables import t5_rows
from repro.experiments.runner import get_records
from benchmarks.util import BENCH_DATASETS, emit


def test_exp4_qps_evolution(benchmark):
    rows = t5_rows(BENCH_DATASETS)
    emit(rows, ["dataset", "algo", "t_start_s", "qps"],
         "T5 — QPS evolution over the update interval (Exp 4)", "t5_qps_evolution")
    rec = get_records(BENCH_DATASETS[:1])[BENCH_DATASETS[0]]["PostMHL"]
    benchmark(lambda: rec.stages_for(10.0))
