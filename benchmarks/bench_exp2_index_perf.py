"""T2 bench (Exp 2 / Fig 11): index performance comparison."""
from repro.experiments.exp_tables import t2_rows
from repro.graphs.generator import DATASETS
from repro.psp.postmhl import PostMHLIndex
from benchmarks.util import BENCH_DATASETS, emit


def test_exp2_index_performance(benchmark):
    rows = t2_rows(BENCH_DATASETS)
    emit(rows, ["dataset", "algo", "t_c_s", "size_entries", "t_q_ms", "t_u_s"],
         "T2 — index performance (Exp 2)", "t2_index_perf")
    spec = DATASETS["NY"]
    g, _ = spec.build()
    benchmark.pedantic(
        lambda: PostMHLIndex(g.copy(), tau=spec.tau, k_e=spec.k_e), rounds=3, iterations=1
    )
