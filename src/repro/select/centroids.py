"""Centroid-based selection (paper Alg 2, lines 11–18).

Clusters a set of vectors with MLlib KMeans and returns, per cluster,
the id of the *actual* vector nearest the cluster center — "select the
centroids as rows and columns that represent diverse patterns".

Works on a DataFrame of (id, vec array<double>) so the same code path
serves distributed row selection (n vectors) and driver-built column
selection (m vectors).
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.ml.clustering import KMeans
from pyspark.ml.functions import array_to_vector
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql import types as T


def select_centroids(
    vec_df: DataFrame,
    *,
    k: int,
    id_col: str,
    vec_col: str = "vec",
    seed: int = 0,
) -> list:
    """Cluster into ≤k groups and return the nearest-to-center ids.

    If there are ≤ k distinct vectors' ids, all ids are returned. If
    KMeans leaves some clusters empty (rare), the result simply has
    fewer ids — callers pad if they need exactly k.
    """
    # Cache: KMeans re-evaluates its input once per iteration; without
    # this the upstream row-vector scan would rerun ~20 times.
    feat = vec_df.withColumn("__features", array_to_vector(vec_col)).persist()
    n = feat.count()
    if n <= k:
        ids = [r[id_col] for r in feat.select(id_col).collect()]
        feat.unpersist()
        return ids
    # solver="row": the 4.1 block solver hits an ArrayIndexOutOfBounds
    # when k-means|| init yields fewer than k distinct centers (small or
    # duplicate-heavy inputs) — the row solver handles that fine.
    model = KMeans(
        k=k,
        seed=seed,
        featuresCol="__features",
        predictionCol="__cluster",
        solver="row",
    ).fit(feat)
    centers = np.stack([np.asarray(c) for c in model.clusterCenters()])
    pred = model.transform(feat)

    @F.pandas_udf(T.DoubleType())
    def dist(vec: pd.Series, cluster: pd.Series) -> pd.Series:
        v = np.stack(vec.to_numpy())
        c = centers[cluster.to_numpy()]
        return pd.Series(np.linalg.norm(v - c, axis=1))

    ranked = pred.withColumn("__dist", dist(F.col(vec_col), F.col("__cluster")))
    w = Window.partitionBy("__cluster").orderBy("__dist", id_col)
    best = (
        ranked.withColumn("__rank", F.row_number().over(w))
        .filter(F.col("__rank") == 1)
        .select(id_col)
        .collect()
    )
    feat.unpersist()
    return [r[id_col] for r in best]
