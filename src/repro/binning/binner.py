"""Binning substrate (paper §3.1 Def 3.2, §5.1 pre-processing step 1).

Maps every column of a Spark DataFrame to a small set of named bins so
that downstream rule mining, metrics and embedding see a uniform
token-per-cell representation:

* **continuous** columns: bin edges from kernel-density valleys computed
  on a driver-side sample (the paper uses scipy KDE; we implement a
  Gaussian KDE with Silverman bandwidth in NumPy since scipy is not
  available offline), falling back to quantile edges when the density
  has too few/many valleys. Applied distributedly with
  ``pyspark.ml.feature.Bucketizer``.
* **categorical** columns: the top ``n_bins - 1`` frequent values keep
  their identity; the rest collapse into ``"other"`` (Example 3.3's
  airline-by-continent grouping stand-in).
* **NaN / NULL** is always its own bin (``"NaN"``) — the flights
  motivating example depends on NaN co-occurrence patterns.

The result is a :class:`BinnedTable` carrying both the raw table and the
binned token table, sharing the ``__rid`` row-id column.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.ml.feature import Bucketizer
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from repro.util import RID, data_columns, with_rid

NAN_LABEL = "NaN"
OTHER_LABEL = "other"
# Human-readable ordinal labels for continuous bins, low → high.
_ORDINAL = ["very_low", "low", "medium", "high", "very_high"]


def _bin_labels(n: int) -> list[str]:
    """Ordinal labels for ``n`` continuous bins (``b0``.. beyond 5)."""
    if n <= len(_ORDINAL):
        # Spread the canonical 5 labels evenly over n bins.
        idx = np.linspace(0, len(_ORDINAL) - 1, n).round().astype(int)
        return [_ORDINAL[i] for i in idx]
    return [f"b{i}" for i in range(n)]


def _gaussian_kde_valleys(x: np.ndarray, n_bins: int) -> list[float] | None:
    """Interior bin edges at the valleys of a Gaussian KDE of ``x``.

    Accepts between 1 and ``n_bins − 1`` valleys (the density decides
    how many modes the column actually has — the paper's KDE binning is
    likewise data-driven); returns ``None`` when there are none or too
    many, signalling the quantile fallback.
    """
    x = x[np.isfinite(x)]
    if x.size < 10 or np.unique(x).size < n_bins:
        return None
    std = x.std()
    if std == 0:
        return None
    # Silverman's rule of thumb.
    bw = 1.06 * std * x.size ** (-1 / 5)
    grid = np.linspace(x.min(), x.max(), 256)
    # Vectorized KDE on a capped sample — O(256 * |x|) driver work.
    diffs = (grid[:, None] - x[None, :]) / bw
    dens = np.exp(-0.5 * diffs**2).sum(axis=1)
    interior = np.arange(1, 255)
    is_valley = (dens[interior] < dens[interior - 1]) & (
        dens[interior] <= dens[interior + 1]
    )
    valleys = grid[interior[is_valley]]
    if not 1 <= len(valleys) <= n_bins - 1:
        return None
    edges = sorted(set(float(v) for v in valleys))
    return edges or None


def _quantile_edges(x: np.ndarray, n_bins: int) -> list[float]:
    """Interior equal-frequency edges; deduplicated so splits increase."""
    x = x[np.isfinite(x)]
    qs = np.quantile(x, np.linspace(0, 1, n_bins + 1)[1:-1])
    edges: list[float] = []
    for q in qs:
        q = float(q)
        if not edges or q > edges[-1]:
            edges.append(q)
    return edges


@dataclass
class ColumnBins:
    """Binning of one column: its kind, bin labels, and how to apply it."""

    kind: str  # "continuous" | "categorical"
    labels: list[str]
    edges: list[float] | None = None  # interior edges (continuous only)
    categories: list[str] = field(default_factory=list)  # kept values (categorical)

    @property
    def n_bins(self) -> int:
        return len(self.labels)


@dataclass
class BinnedTable:
    """Raw + binned views of a table sharing the ``__rid`` id column.

    ``binned`` holds one string bin-label per original cell. ``token()``
    gives the fully-qualified ``col=label`` cell token used by rules,
    metrics and the embedding corpus.
    """

    raw: DataFrame
    binned: DataFrame
    bins: dict[str, ColumnBins]
    n_rows: int

    @property
    def columns(self) -> list[str]:
        return list(self.bins.keys())

    @staticmethod
    def token(col: str, label: str) -> str:
        return f"{col}={label}"

    def binned_pandas(self) -> pd.DataFrame:
        """Driver-side binned table, indexed by row id (tests / small data)."""
        pdf = self.binned.toPandas().set_index(RID).sort_index()
        return pdf[self.columns]

    def restrict_rids(self, rids: DataFrame | list[int]) -> "BinnedTable":
        """View of this table restricted to the given row ids.

        Used to turn a selection query's result back into a BinnedTable
        (the SP-query path of Alg 2 — cell vectors are reused upstream).
        """
        if isinstance(rids, DataFrame):
            keys = rids.select(RID)
        else:
            keys = self.raw.sparkSession.createDataFrame(
                [(int(r),) for r in rids], f"{RID} long"
            )
        raw = self.raw.join(keys, RID, "semi")
        binned = self.binned.join(keys, RID, "semi")
        n = binned.count()
        return BinnedTable(raw=raw, binned=binned, bins=self.bins, n_rows=n)


def _is_numeric(dtype: T.DataType) -> bool:
    return isinstance(dtype, T.NumericType)


def fit_bins(
    df: DataFrame,
    *,
    n_bins: int = 5,
    sample_rows: int = 20_000,
    use_kde: bool = True,
    seed: int = 0,
) -> dict[str, ColumnBins]:
    """Fit a binning function 𝓑 (Def 3.2) from a driver-side sample.

    Numeric columns with more than ``n_bins`` distinct sampled values are
    treated as continuous; everything else is categorical with top-(n-1)
    retention. Edges are computed on the sample only — bin *application*
    is fully distributed.
    """
    cols = data_columns(df)
    n = df.count()
    frac = min(1.0, sample_rows / max(n, 1))
    sample = (df.sample(frac, seed=seed) if frac < 1.0 else df).toPandas()
    bins: dict[str, ColumnBins] = {}
    dtypes = dict(df.dtypes)
    schema = {f.name: f.dataType for f in df.schema.fields}
    for c in cols:
        s = sample[c]
        if _is_numeric(schema[c]):
            vals = pd.to_numeric(s, errors="coerce").to_numpy(dtype="float64")
            finite = vals[np.isfinite(vals)]
            if np.unique(finite).size > n_bins:
                edges = None
                if use_kde:
                    edges = _gaussian_kde_valleys(
                        finite[: min(len(finite), 5000)], n_bins
                    )
                if edges is None:
                    edges = _quantile_edges(finite, n_bins)
                bins[c] = ColumnBins(
                    kind="continuous",
                    labels=_bin_labels(len(edges) + 1),
                    edges=edges,
                )
                continue
        # Categorical path (strings, booleans, low-cardinality numerics).
        counts = s.dropna().astype(str).value_counts()
        if len(counts) <= n_bins:
            cats = sorted(counts.index.tolist())
        else:
            cats = sorted(counts.index[: n_bins - 1].tolist())
        labels = list(cats) + ([OTHER_LABEL] if len(counts) > n_bins else [])
        bins[c] = ColumnBins(kind="categorical", labels=labels, categories=cats)
    return bins


def apply_bins(df: DataFrame, bins: dict[str, ColumnBins]) -> DataFrame:
    """Replace every cell by its bin label (distributed; Bucketizer + CASE).

    NULL/NaN cells get the ``"NaN"`` label in every column kind.
    """
    df = with_rid(df)
    out = df
    buckets: list[tuple[str, str, list[float], list[str]]] = []
    for c, cb in bins.items():
        if cb.kind == "continuous":
            splits = [float("-inf")] + list(cb.edges or []) + [float("inf")]
            tmp = f"__bkt_{c}"
            buckets.append((c, tmp, splits, cb.labels))
            # Arrow-created frames surface NaN as NULL; Bucketizer's
            # handleInvalid only catches NaN, so normalize NULL → NaN.
            col = F.col(c).cast("double")
            out = out.withColumn(
                c, F.when(col.isNull(), F.lit(float("nan"))).otherwise(col)
            )
        else:
            col = F.col(c).cast("string")
            expr = F.when(col.isNull(), F.lit(NAN_LABEL))
            for cat in cb.categories:
                expr = expr.when(col == cat, F.lit(cat))
            expr = expr.otherwise(
                F.lit(OTHER_LABEL if OTHER_LABEL in cb.labels else NAN_LABEL)
            )
            out = out.withColumn(c, expr)
    if buckets:
        bucketizer = Bucketizer(
            splitsArray=[b[2] for b in buckets],
            inputCols=[b[0] for b in buckets],
            outputCols=[b[1] for b in buckets],
            handleInvalid="keep",  # NaN → extra bucket at index len(labels)
        )
        out = bucketizer.transform(out)
        for c, tmp, _, labels in buckets:
            arr = F.array(*[F.lit(l) for l in labels + [NAN_LABEL]])
            out = out.withColumn(
                c,
                F.coalesce(arr[F.col(tmp).cast("int")], F.lit(NAN_LABEL)),
            ).drop(tmp)
    return out.select(RID, *bins.keys())


def bin_table(
    df: DataFrame,
    *,
    n_bins: int = 5,
    sample_rows: int = 20_000,
    use_kde: bool = True,
    seed: int = 0,
) -> BinnedTable:
    """End-to-end pre-processing step 1: fit 𝓑 on ``df`` and apply it."""
    df = with_rid(df)
    bins = fit_bins(
        df, n_bins=n_bins, sample_rows=sample_rows, use_kde=use_kde, seed=seed
    )
    binned = apply_bins(df, bins).cache()
    n = binned.count()
    return BinnedTable(raw=df, binned=binned, bins=bins, n_rows=n)
