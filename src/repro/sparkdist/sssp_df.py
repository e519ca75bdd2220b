"""Single-source shortest paths as iterative DataFrame relaxation.

Bellman–Ford over an edge table: each round joins the current distance
frontier with the (bidirected) edge table, min-merges, and stops when no
distance improves. A Spark-native ground-truth generator exercising the
shuffle path; validated against Dijkstra in tests.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs.graph import Graph


def edges_pdf(graph: Graph) -> pd.DataFrame:
    """Both directions of every edge, as a relational table."""
    rows = []
    for u, v, w in graph.edges():
        rows.append((u, v, w))
        rows.append((v, u, w))
    return pd.DataFrame(rows, columns=["u", "v", "w"])


def sssp_df(spark: SparkSession, graph: Graph, source: int, *, max_rounds: int = 64) -> DataFrame:
    """Distances from ``source`` as a DataFrame (v, d)."""
    edges = spark.createDataFrame(edges_pdf(graph)).cache()
    dist = spark.createDataFrame(pd.DataFrame({"v": [source], "d": [0.0]}))
    for _ in range(max_rounds):
        cand = (
            dist.join(edges, dist["v"] == edges["u"])
            .select(edges["v"].alias("v"), (dist["d"] + edges["w"]).alias("d"))
        )
        new = dist.union(cand).groupBy("v").agg(F.min("d").alias("d"))
        new = new.localCheckpoint()  # truncate lineage between rounds
        improved = (
            new.alias("n")
            .join(dist.alias("o"), "v", "left")
            .where(F.col("o.d").isNull() | (F.col("n.d") < F.col("o.d")))
            .count()
        )
        dist = new
        if improved == 0:
            break
    edges.unpersist()
    return dist
