"""T10 bench: Spark fan-out build + distributed 2-hop batch queries."""
import time

from repro.graphs.generator import DATASETS, random_queries
from repro.partition.partitioner import partition_graph
from repro.core.h2h import H2HIndex
from repro.sparkdist.labels_df import h2h_label_rows, spark_batch_query
from repro.sparkdist.parallel_build import local_residuals, spark_residuals
from benchmarks.util import emit


def test_spark_build_and_query(spark, benchmark):
    spec = DATASETS["NY"]
    graph, coords = spec.build()
    part = partition_graph(graph, spec.k, coords)

    t0 = time.perf_counter()
    n_spark = spark_residuals(spark, graph, part).count()
    t_spark = time.perf_counter() - t0
    t0 = time.perf_counter()
    n_local = len(local_residuals(graph, part))
    t_local = time.perf_counter() - t0

    idx = H2HIndex(graph.copy())
    rows = h2h_label_rows(idx.td, idx.dis)
    pairs = random_queries(graph.n, 2000)
    t0 = time.perf_counter()
    n_ans = spark_batch_query(spark, rows, pairs).count()
    t_batch = time.perf_counter() - t0

    emit(
        [
            dict(step="residual_fanout_spark", n=n_spark, seconds=t_spark),
            dict(step="residual_local", n=n_local, seconds=t_local),
            dict(step="label_join_batch_query", n=n_ans, seconds=t_batch, qps=n_ans / t_batch),
        ],
        ["step", "n", "seconds", "qps"],
        "T10 — distributed build & batch query engine", "t10_spark_build",
    )
    benchmark.pedantic(
        lambda: spark_batch_query(spark, rows, pairs[:500]).count(), rounds=3, iterations=1
    )
