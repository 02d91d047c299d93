"""PPSD query answering over a hub labeling.

Two paths:

* ``QueryIndex`` — numpy per-vertex sorted hub arrays; a query is a
  sorted-array intersection + min of distance sums. This is the kernel
  the §6 query modes (QLSN/QFDL/QDOL) run on each simulated node.
* ``spark_query_df`` — the DataFrame/Spark SQL expression of the same
  computation (labels self-join on hub), used so every query-result test
  can be diffed against DuckDB via ``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.labels import INF, LABEL_BYTES, LabelStore


class QueryIndex:
    """Per-vertex (hub, dist) arrays sorted by hub id, for fast intersection.

    May hold only a *subset* of labels (a node's shard in QFDL/QDOL); a
    partial index returns the min over the labels it has (INF if none),
    which is exactly the per-node partial result that the distributed
    modes min-reduce.
    """

    def __init__(self, n: int, triplets):
        self.n = n
        by_v: list[list[tuple[int, int]]] = [[] for _ in range(n)]
        for v, h, d in triplets:
            by_v[v].append((h, d))
        self.hubs: list[np.ndarray] = []
        self.dists: list[np.ndarray] = []
        for pairs in by_v:
            pairs.sort()
            self.hubs.append(np.fromiter((p[0] for p in pairs), dtype=np.int64, count=len(pairs)))
            self.dists.append(np.fromiter((p[1] for p in pairs), dtype=np.int64, count=len(pairs)))

    @classmethod
    def from_store(cls, store: LabelStore) -> "QueryIndex":
        return cls(store.n, store.triplets())

    def query(self, u: int, v: int) -> int:
        """min over common hubs of d(u,h)+d(v,h); INF if none known here."""
        hu, hv = self.hubs[u], self.hubs[v]
        if len(hu) == 0 or len(hv) == 0:
            return INF
        common, iu, iv = np.intersect1d(hu, hv, assume_unique=True, return_indices=True)
        if len(common) == 0:
            return INF
        return int((self.dists[u][iu] + self.dists[v][iv]).min())

    def query_batch(self, pairs: np.ndarray) -> np.ndarray:
        """Vector of answers for an (m, 2) array of query pairs."""
        return np.fromiter(
            (self.query(int(u), int(v)) for u, v in pairs),
            dtype=np.int64,
            count=len(pairs),
        )

    def num_labels(self) -> int:
        return int(sum(len(h) for h in self.hubs))

    def bytes(self) -> int:
        """Footprint under the paper's 8-bytes-per-label storage model."""
        return self.num_labels() * LABEL_BYTES


def labels_spark_df(spark: SparkSession, store: LabelStore) -> DataFrame:
    """Label table as a Spark DataFrame (v, hub, dist)."""
    return spark.createDataFrame(store.to_pandas())


def spark_query_df(
    spark: SparkSession, labels: DataFrame, pairs: pd.DataFrame
) -> DataFrame:
    """Answer PPSD queries with Spark SQL: self-join the label table on hub.

    ``pairs`` has columns (u, v); output has one row per input row —
    (qid, u, v, dist), qid being the input position, with dist = INF for
    pairs sharing no hub (so unreachable pairs stay comparable).
    """
    p = pairs[["u", "v"]].reset_index(drop=True).copy()
    p["qid"] = p.index.astype("int64")
    q = spark.createDataFrame(p)
    a = labels.select(
        F.col("v").alias("u"), F.col("hub").alias("hub_a"), F.col("dist").alias("du")
    )
    b = labels.select(
        F.col("v").alias("v2"), F.col("hub").alias("hub_b"), F.col("dist").alias("dv")
    )
    joined = (
        q.join(a, on="u", how="left")
        .join(b, (F.col("v") == F.col("v2")) & (F.col("hub_a") == F.col("hub_b")), how="left")
        .groupBy("qid", "u", "v")
        .agg(F.min(F.col("du") + F.col("dv")).alias("raw"))
    )
    return joined.select(
        "qid",
        "u",
        "v",
        F.coalesce(F.col("raw"), F.lit(INF)).cast("long").alias("dist"),
    )
