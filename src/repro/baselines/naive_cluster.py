"""NC — naive clustering baseline (paper §6.1 baseline 2).

No embedding: rows are one-hot/raw-numeric vectors clustered directly
with KMeans ("it relies on a one-hot-encoding of the data, which does
not capture the underlying patterns", §5.2). Columns are clustered
analogously on value-profile vectors over a row sample.

Deliberately scale-sensitive: numeric columns enter KMeans with their
raw magnitudes, so large-valued columns dominate the distance — this is
the mechanism behind NC's poor quality in the paper's experiments.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.ml.clustering import KMeans
from pyspark.ml.feature import OneHotEncoder, StringIndexer, VectorAssembler
from pyspark.ml.functions import vector_to_array
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.select.centroids import select_centroids
from repro.util import RID, data_columns, rng


def _row_features(df: DataFrame) -> DataFrame:
    """(rid, vec array<double>): raw numerics (NaN→0) + one-hot categoricals."""
    numeric, categorical = [], []
    for f in df.schema.fields:
        if f.name == RID:
            continue
        (numeric if isinstance(f.dataType, T.NumericType) else categorical).append(
            f.name
        )
    out = df
    feat_cols: list[str] = []
    for c in numeric:
        out = out.withColumn(
            f"__n_{c}",
            F.coalesce(
                F.nanvl(F.col(c).cast("double"), F.lit(0.0)), F.lit(0.0)
            ),
        )
        feat_cols.append(f"__n_{c}")
    for c in categorical:
        out = out.withColumn(
            f"__s_{c}", F.coalesce(F.col(c).cast("string"), F.lit("__null__"))
        )
        idx = StringIndexer(
            inputCol=f"__s_{c}", outputCol=f"__i_{c}", handleInvalid="keep"
        )
        out = idx.fit(out).transform(out)
        ohe = OneHotEncoder(inputCols=[f"__i_{c}"], outputCols=[f"__o_{c}"])
        out = ohe.fit(out).transform(out)
        feat_cols.append(f"__o_{c}")
    assembled = VectorAssembler(
        inputCols=feat_cols, outputCol="__feat"
    ).transform(out)
    return assembled.select(RID, vector_to_array("__feat").alias("vec"))


def _column_profiles(
    df: DataFrame, *, sample_rows: int = 256, seed: int = 0
) -> pd.DataFrame:
    """Each column as a vector of its values over a fixed row sample:
    numerics raw, categoricals frequency-encoded — the 'analogous'
    column clustering of §6.1."""
    n = df.count()
    frac = min(1.0, (sample_rows * 1.5) / max(n, 1))
    pdf = (df.sample(frac, seed=seed) if frac < 1.0 else df).toPandas()
    pdf = pdf.head(sample_rows)
    cols = [c for c in pdf.columns if c != RID]
    profiles = []
    for c in cols:
        s = pdf[c]
        if pd.api.types.is_numeric_dtype(s):
            v = s.astype(float).fillna(0.0).to_numpy()
        else:
            freq = s.astype(str).value_counts(normalize=True)
            v = s.astype(str).map(freq).fillna(0.0).to_numpy()
        profiles.append(v)
    return pd.DataFrame({"col": cols, "vec": [list(map(float, p)) for p in profiles]})


def naive_cluster_select(
    df: DataFrame,
    k: int,
    l: int,
    *,
    targets: Sequence[str] = (),
    seed: int = 0,
) -> tuple[list[int], list[str]]:
    """NC sub-table: KMeans centroids over one-hot rows and value-profile
    columns. Returns (row ids, columns, original column order)."""
    feats = _row_features(df)
    rids = [int(r) for r in select_centroids(feats, k=k, id_col=RID, seed=seed)]
    if len(rids) < k:
        extra = (
            df.filter(~F.col(RID).isin(rids))
            .select(RID)
            .orderBy(RID)
            .limit(k - len(rids))
            .collect()
        )
        rids += [int(r[RID]) for r in extra]
    all_cols = data_columns(df)
    targets = [t for t in targets if t in all_cols]
    if l >= len(all_cols):
        cols = all_cols
    else:
        free = [c for c in all_cols if c not in targets]
        budget = max(l - len(targets), 0)
        if budget == 0:
            cols = list(targets)
        else:
            prof = _column_profiles(df.select(RID, *free), seed=seed)
            cdf = df.sparkSession.createDataFrame(prof)
            chosen = select_centroids(cdf, k=budget, id_col="col", seed=seed)
            if len(chosen) < budget:
                chosen += [c for c in free if c not in chosen][
                    : budget - len(chosen)
                ]
            keep = set(chosen) | set(targets)
            cols = [c for c in all_cols if c in keep]
    return sorted(rids), cols
