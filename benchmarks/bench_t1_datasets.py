"""T1 bench: dataset registry generation."""
from repro.graphs.generator import DATASETS
from repro.experiments.exp_tables import t1_rows
from benchmarks.util import emit


def test_t1_datasets(benchmark):
    rows = t1_rows()
    emit(rows, ["name", "paper", "paper_V", "paper_E", "V", "E", "k", "k_e", "tau"],
         "T1 — datasets (lite registry vs paper Table I)", "t1_datasets")
    benchmark(lambda: DATASETS["NY"].build())
