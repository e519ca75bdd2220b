"""Benchmark-side table emission: print + persist under results/."""
from __future__ import annotations

import os

from repro.experiments.runner import fmt_table, save_results

BENCH_DATASETS = os.environ.get("REPRO_BENCH_DATASETS", "NY,FLA").split(",")


def emit(rows: list[dict], cols: list[str], title: str, tag: str) -> None:
    text = fmt_table(rows, cols, title)
    print("\n" + text)
    save_results(tag, rows)
    os.makedirs(os.path.dirname(_txt(tag)), exist_ok=True)
    with open(_txt(tag), "w") as f:
        f.write(text + "\n")


def _txt(tag: str) -> str:
    from repro.experiments.runner import RESULTS_DIR

    return os.path.join(RESULTS_DIR, f"{tag}.txt")
