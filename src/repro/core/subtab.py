"""SubTab — the paper's practical algorithm (Alg 2).

Two phases, matching Figure 1's architecture:

* :meth:`SubTab.preprocess` — run once when the table is loaded:
  normalize + bin (``repro.binning``), serialize to tabular sentences
  (``repro.embedding.corpus``) and train the Word2Vec cell embedding
  (``repro.embedding.word2vec``).
* :meth:`SubTab.select` — run per display (the full table or any
  selection-projection query result): average cell vectors into row
  vectors (distributed scan) and column vectors (one aggregation),
  KMeans-cluster each, pick the rows/columns nearest the centroids, and
  always include the target columns (which are held out of clustering,
  Alg 2 lines 13–17). Cell vectors are *reused* across queries — only
  this cheap phase re-runs, which is the paper's interactivity claim.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.binning.binner import BinnedTable, bin_table
from repro.embedding.corpus import build_corpus
from repro.embedding.word2vec import (
    CellVectors,
    column_identity,
    train_cell_vectors,
)
from repro.select.centroids import select_centroids
from repro.util import RID, timer


@dataclass
class SubTable:
    """A selected k×l sub-table: row ids + column names of the input."""

    rids: list[int]
    cols: list[str]

    def raw_pandas(self, bt: BinnedTable) -> pd.DataFrame:
        """The displayed sub-table: original values, selected cells only."""
        pdf = (
            bt.raw.filter(F.col(RID).isin([int(r) for r in self.rids]))
            .select(RID, *self.cols)
            .toPandas()
            .set_index(RID)
            .sort_index()
        )
        return pdf

    def binned_pandas(self, bt: BinnedTable) -> pd.DataFrame:
        """The binned view of the sub-table (what the metrics consume)."""
        pdf = (
            bt.binned.filter(F.col(RID).isin([int(r) for r in self.rids]))
            .select(RID, *self.cols)
            .toPandas()
            .set_index(RID)
            .sort_index()
        )
        return pdf


@dataclass
class SubTab:
    """The SubTab framework: preprocess once, select per query."""

    n_bins: int = 5
    vector_size: int = 32
    window: int = 25
    chunk: int = 200
    corpus_cap: int = 100_000
    # 4 epochs: 1 underfits the co-occurrence structure measurably
    # (≈0.08 cell coverage lost on the SP surrogate at 10K rows).
    max_iter: int = 4
    # Relative weight of the analytic column-identity component (the
    # windowSize=max{n,m} limit; see embedding.word2vec.column_identity).
    col_identity_weight: float = 0.75
    use_kde: bool = True
    seed: int = 0

    bt: BinnedTable | None = None
    vectors: CellVectors | None = None
    timings: dict[str, float] = field(default_factory=dict)

    # -- phase 1 -------------------------------------------------------------
    def preprocess(self, df: DataFrame) -> "SubTab":
        """Bin + embed (Alg 2 lines 1–4). Cached on the instance."""
        with timer() as t_bin:
            self.bt = bin_table(
                df, n_bins=self.n_bins, use_kde=self.use_kde, seed=self.seed
            )
        self.timings["bin"] = t_bin()
        with timer() as t_emb:
            corpus = build_corpus(
                self.bt, chunk=self.chunk, cap=self.corpus_cap, seed=self.seed
            )
            self.vectors = train_cell_vectors(
                corpus,
                vector_size=self.vector_size,
                window=self.window,
                max_iter=self.max_iter,
                seed=self.seed,
            )
        self.timings["embed"] = t_emb()
        self.timings["preprocess"] = self.timings["bin"] + self.timings["embed"]
        return self

    def with_vectors(self, bt: BinnedTable, vectors: CellVectors) -> "SubTab":
        """Inject pre-computed binning/vectors (used by the EmbDI baseline,
        which swaps only the embedding and reuses the selection phase)."""
        self.bt = bt
        self.vectors = vectors
        return self

    # -- vector aggregation ----------------------------------------------
    def row_vectors(self, binned: DataFrame, cols: Sequence[str]) -> DataFrame:
        """Tuple-vectors: per-row component-wise average of cell vectors
        (Alg 2 lines 8–10). One distributed scan; the token→vector map is
        tiny and shipped in the task closure."""
        vecs = self.vectors.vectors
        dim = self.vectors.dim
        cols = list(cols)

        def agg(parts: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
            for pdf in parts:
                n = len(pdf)
                if n == 0:
                    continue
                total = np.zeros((n, dim))
                cnt = np.zeros(n)
                for c in cols:
                    labels = pdf[c].astype(str).to_numpy()
                    uniq, inv = np.unique(labels, return_inverse=True)
                    mat = np.zeros((len(uniq), dim))
                    known = np.zeros(len(uniq))
                    for i, lab in enumerate(uniq):
                        v = vecs.get(f"{c}={lab}")
                        if v is not None:
                            mat[i] = v
                            known[i] = 1.0
                    total += mat[inv]
                    cnt += known[inv]
                cnt = np.maximum(cnt, 1.0)
                out = total / cnt[:, None]
                yield pd.DataFrame(
                    {RID: pdf[RID].to_numpy(), "vec": list(out)}
                )

        return binned.mapInPandas(agg, schema=f"{RID} long, vec array<double>")

    def column_vectors(
        self, binned: DataFrame, cols: Sequence[str]
    ) -> pd.DataFrame:
        """Column-vectors: frequency-weighted average of the column's cell
        vectors over the (possibly query-restricted) rows (Alg 2 l. 13–15)."""
        pairs = (
            binned.select(
                F.explode(
                    F.array(
                        *[
                            F.struct(
                                F.lit(c).alias("col"),
                                F.col(c).cast("string").alias("label"),
                            )
                            for c in cols
                        ]
                    )
                ).alias("p")
            )
            .select("p.col", "p.label")
            .groupBy("col", "label")
            .count()
            .collect()
        )
        sums: dict[str, np.ndarray] = {c: np.zeros(self.vectors.dim) for c in cols}
        weights: dict[str, float] = {c: 0.0 for c in cols}
        for r in pairs:
            v = self.vectors.get(f"{r['col']}={r['label']}")
            if v is not None:
                sums[r["col"]] += r["count"] * v
                weights[r["col"]] += r["count"]
        vecs = {
            c: (sums[c] / weights[c] if weights[c] else sums[c]) for c in cols
        }
        # windowSize=max{n,m} limit: add the column-identity component
        # (see embedding.word2vec.column_identity), scaled to dominate.
        gamma = self.col_identity_weight * float(
            np.median([np.linalg.norm(v) for v in vecs.values()]) or 1.0
        )
        return pd.DataFrame(
            {
                "col": list(cols),
                "vec": [
                    vecs[c] + gamma * column_identity(c, self.vectors.dim)
                    for c in cols
                ],
            }
        )

    # -- phase 2 -------------------------------------------------------------
    def select(
        self,
        k: int,
        l: int,
        *,
        where: str | None = None,
        use_cols: Sequence[str] | None = None,
        targets: Sequence[str] = (),
        seed: int | None = None,
    ) -> SubTable:
        """Centroid-based selection over T or an SP-query result Q(T).

        ``where`` is a Spark SQL predicate over the raw table (the S of
        the SP query); ``use_cols`` its projection (the P). Target
        columns are always included in the output (Alg 2 line 17).
        """
        assert self.bt is not None and self.vectors is not None, (
            "call preprocess() first"
        )
        seed = self.seed if seed is None else seed
        with timer() as t_sel:
            cols = list(use_cols) if use_cols else list(self.bt.columns)
            for tcol in targets:
                if tcol not in cols:
                    cols.append(tcol)
            binned = self.bt.binned
            if where is not None:
                rids = self.bt.raw.filter(where).select(RID)
                binned = binned.join(rids, RID, "semi")
            binned = binned.select(RID, *cols)

            # Rows: cluster tuple-vectors, take centroid rows.
            rvecs = self.row_vectors(binned, cols)
            sel_rids = [
                int(r) for r in select_centroids(rvecs, k=k, id_col=RID, seed=seed)
            ]
            if len(sel_rids) < k:
                extra = (
                    binned.filter(~F.col(RID).isin(sel_rids))
                    .select(RID)
                    .orderBy(RID)
                    .limit(k - len(sel_rids))
                    .collect()
                )
                sel_rids += [int(r[RID]) for r in extra]

            # Columns: cluster column-vectors of non-target columns.
            targets = [t for t in targets if t in cols]
            if l >= len(cols):
                sel_cols = cols
            else:
                free = [c for c in cols if c not in targets]
                budget = max(l - len(targets), 0)
                if budget == 0:
                    sel_cols = list(targets)
                else:
                    cvecs = self.column_vectors(binned, free)
                    spark = binned.sparkSession
                    cdf = spark.createDataFrame(
                        pd.DataFrame(
                            {
                                "col": cvecs["col"],
                                "vec": [list(map(float, v)) for v in cvecs["vec"]],
                            }
                        )
                    )
                    chosen = select_centroids(
                        cdf, k=budget, id_col="col", seed=seed
                    )
                    if len(chosen) < budget:
                        chosen += [
                            c for c in free if c not in chosen
                        ][: budget - len(chosen)]
                    keep = set(chosen) | set(targets)
                    sel_cols = [c for c in cols if c in keep]
        self.timings["select"] = t_sel()
        return SubTable(rids=sorted(sel_rids), cols=sel_cols)
