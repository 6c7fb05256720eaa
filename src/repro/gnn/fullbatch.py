"""Full-batch GraphSage over Spark DataFrames — the DistGNN substrate.

DistGNN trains full-batch GraphSage on a vertex-cut partitioned graph; the
expensive primitive is the per-layer neighbor aggregation, whose
cross-partition half is exactly the replica synchronization the paper's
replication factor measures. Here the aggregation + dense update are
expressed as a Catalyst plan (join -> posexplode -> groupBy avg ->
array rebuild -> mapInPandas dense math), so the distributed dataflow is
really executed; tests verify the result equals the numpy reference layer
for all three model kinds' shared mean-aggregation core, and the DuckDB
oracle checks the aggregation SQL directly.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql import types as T

FEATURE_SCHEMA = T.StructType(
    [
        T.StructField("vertex", T.LongType(), False),
        T.StructField("h", T.ArrayType(T.DoubleType()), False),
    ]
)


def features_to_spark(spark: SparkSession, h: np.ndarray) -> DataFrame:
    """(n, d) feature matrix -> (vertex, h array) DataFrame."""
    pdf = pd.DataFrame(
        {"vertex": np.arange(h.shape[0], dtype=np.int64), "h": list(map(list, h))}
    )
    return spark.createDataFrame(pdf, schema=FEATURE_SCHEMA)


def mean_aggregate(edges: DataFrame, feats: DataFrame) -> DataFrame:
    """Mean of in-neighbor feature vectors per destination vertex.

    ``edges`` is directed (src -> dst); ``feats`` is (vertex, h). Returns
    (vertex, agg) where ``agg`` is the element-wise mean over in-neighbors.
    Vertices without in-edges are absent — callers left-join and fill zero.
    """
    msg = edges.join(feats.withColumnRenamed("vertex", "src"), "src").select(
        F.col("dst").alias("vertex"), "h"
    )
    exploded = msg.select("vertex", F.posexplode("h").alias("pos", "val"))
    per_dim = exploded.groupBy("vertex", "pos").agg(F.avg("val").alias("val"))
    return per_dim.groupBy("vertex").agg(
        F.transform(
            F.array_sort(F.collect_list(F.struct("pos", "val"))), lambda x: x["val"]
        ).alias("agg")
    )


def sage_layer_spark(
    edges: DataFrame,
    feats: DataFrame,
    w_self: np.ndarray,
    w_neigh: np.ndarray,
    *,
    activation: bool = True,
) -> DataFrame:
    """One GraphSage-mean layer as a DataFrame transformation.

    The dense update runs in ``mapInPandas`` with the weight matrices
    closed over (they are model-sized, not data-sized — this mirrors how
    every worker in DistGNN holds a model replica).
    """
    d_in = w_self.shape[0]
    agg = mean_aggregate(edges, feats)
    joined = feats.join(agg, "vertex", "left")

    def _update(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in batches:
            if len(pdf) == 0:
                continue
            h = np.vstack(pdf["h"].to_numpy())
            a = np.vstack(
                [
                    np.asarray(x, dtype=np.float64)
                    if x is not None and len(x) == d_in
                    else np.zeros(d_in)
                    for x in pdf["agg"]
                ]
            )
            out = h @ w_self + a @ w_neigh
            if activation:
                out = np.maximum(0.0, out)
            yield pd.DataFrame({"vertex": pdf["vertex"], "h": list(map(list, out))})

    return joined.mapInPandas(_update, schema=FEATURE_SCHEMA)


def forward_spark(
    edges: DataFrame,
    feats: DataFrame,
    weights: list[dict[str, np.ndarray]],
) -> DataFrame:
    """Full-batch multi-layer GraphSage forward pass on Spark."""
    h = feats
    for w in weights:
        h = sage_layer_spark(edges, h, w["W_self"], w["W_neigh"])
    return h
