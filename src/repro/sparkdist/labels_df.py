"""Distributed 2-hop label storage and batch query engine (DataFrame API).

The throughput workload of the paper — answer a large batch of
point-to-point distance queries over a hub-labeling index — is a pure
relational job once the labels are materialized as a table
``labels(v, hub, d)``: join the query batch with the source-side and
target-side labels on the shared hub and take the min of ``ds + dt``.
This module expresses that as a Catalyst plan and, for correctness,
mirrors it as SQL so the DuckDB oracle (`repro.oracle.assert_equivalent`)
can replay the identical computation over the identical tables.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

# The exact relational semantics of a 2-hop-cover batch query; used by
# the DuckDB oracle against the same `labels` / `queries` tables.
TWO_HOP_SQL = """
    SELECT q.qid AS qid, MIN(ls.d + lt.d) AS dist
    FROM queries q
    JOIN labels ls ON ls.v = q.s
    JOIN labels lt ON lt.v = q.t AND lt.hub = ls.hub
    GROUP BY q.qid
"""


def h2h_label_rows(td, dis, id_map=None) -> pd.DataFrame:
    """Flatten H2H labels into (v, hub, d) rows.

    Hubs of ``v`` are its tree ancestors (the canonical hierarchical
    labeling), so the flat table is a valid 2-hop cover. ``id_map``
    translates local vertex ids to global ones.
    """
    vs, hubs, ds = [], [], []
    for v in range(td.n):
        if dis[v] is None:
            continue
        anc = td.ancestors(v)
        for j, a in enumerate(anc):
            vs.append(v if id_map is None else id_map[v])
            hubs.append(a if id_map is None else id_map[a])
            ds.append(float(dis[v][j]))
    return pd.DataFrame({"v": np.array(vs, dtype=np.int64), "hub": np.array(hubs, dtype=np.int64), "d": ds})


def hub_label_rows(hubs: dict[int, tuple[np.ndarray, np.ndarray]]) -> pd.DataFrame:
    """Flatten {v: (hub_array, dist_array)} maps (PMHL's L*) into rows."""
    vs, hs, ds = [], [], []
    for v, (h, d) in hubs.items():
        vs.append(np.full(len(h), v, dtype=np.int64))
        hs.append(h.astype(np.int64))
        ds.append(d)
    return pd.DataFrame(
        {"v": np.concatenate(vs), "hub": np.concatenate(hs), "d": np.concatenate(ds)}
    )


def queries_pdf(pairs: list[tuple[int, int]]) -> pd.DataFrame:
    return pd.DataFrame(
        {
            "qid": np.arange(len(pairs), dtype=np.int64),
            "s": np.array([p[0] for p in pairs], dtype=np.int64),
            "t": np.array([p[1] for p in pairs], dtype=np.int64),
        }
    )


def batch_query_df(labels: DataFrame, queries: DataFrame) -> DataFrame:
    """The Catalyst plan equivalent to ``TWO_HOP_SQL``."""
    ls = labels.select(F.col("v").alias("s"), "hub", F.col("d").alias("ds"))
    lt = labels.select(F.col("v").alias("t"), "hub", F.col("d").alias("dt"))
    return (
        queries.join(ls, "s")
        .join(lt, ["t", "hub"])
        .groupBy("qid")
        .agg(F.min(F.col("ds") + F.col("dt")).alias("dist"))
    )


def spark_batch_query(
    spark: SparkSession, label_pdf: pd.DataFrame, pairs: list[tuple[int, int]]
) -> DataFrame:
    """Answer a query batch over a flat label table; returns (qid, dist)."""
    labels = spark.createDataFrame(label_pdf)
    queries = spark.createDataFrame(queries_pdf(pairs))
    return batch_query_df(labels, queries)
