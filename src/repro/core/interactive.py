"""Interactive (per-query) selection over pre-computed vectors.

The paper's headline performance claim (Fig 1, §6.3) is that after the
one-time pre-processing, each exploratory query's sub-table costs only
"a few seconds": re-derive row/column vectors for Q(T) from the cached
cell vectors, re-cluster, pick centroids. This module is that hot path,
operating on driver-side NumPy state so that replaying hundreds of
queries (Fig 6) measures the algorithm rather than job scheduling:

* :class:`InteractiveSubTab` — SubTab's selection phase over collected
  row vectors / binned labels;
* :func:`nc_select_pdf` — the NC baseline's one-hot + KMeans, same
  in-process style, for the session replay comparison.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd

from repro.binning.binner import BinnedTable
from repro.core.subtab import SubTab, SubTable
from repro.embedding.word2vec import column_identity
from repro.select.np_kmeans import centroid_points
from repro.util import RID


@dataclass
class InteractiveSubTab:
    """SubTab selection phase over driver-side state.

    Built once from a preprocessed :class:`SubTab` (cell vectors +
    binned table collected); then :meth:`select` serves any
    selection-projection query result given as a row-position mask.
    """

    binned_pdf: pd.DataFrame  # indexed by rid
    row_vecs: np.ndarray  # n × dim, aligned with binned_pdf rows
    token_vecs: dict[str, np.ndarray]
    dim: int
    seed: int = 0
    col_identity_weight: float = 0.75

    @classmethod
    def from_subtab(cls, st: SubTab, *, seed: int = 0) -> "InteractiveSubTab":
        """Collect the preprocessed state (one Spark scan for row vectors)."""
        bt = st.bt
        binned_pdf = bt.binned_pandas()
        rv = (
            st.row_vectors(bt.binned, bt.columns)
            .toPandas()
            .set_index(RID)
            .sort_index()
        )
        assert (rv.index == binned_pdf.index).all()
        row_vecs = np.stack(rv["vec"].to_numpy())
        return cls(
            binned_pdf=binned_pdf,
            row_vecs=row_vecs,
            token_vecs=st.vectors.vectors,
            dim=st.vectors.dim,
            seed=seed,
            col_identity_weight=st.col_identity_weight,
        )

    def _column_vectors(
        self, rows: np.ndarray, cols: list[str]
    ) -> np.ndarray:
        out = np.zeros((len(cols), self.dim))
        for i, c in enumerate(cols):
            labels, counts = np.unique(
                self.binned_pdf[c].astype(str).to_numpy()[rows],
                return_counts=True,
            )
            total = 0.0
            for lab, cnt in zip(labels, counts):
                v = self.token_vecs.get(f"{c}={lab}")
                if v is not None:
                    out[i] += cnt * v
                    total += cnt
            if total:
                out[i] /= total
        # windowSize=max{n,m} limit — same construction as SubTab's
        # distributed path (core.subtab.SubTab.column_vectors).
        gamma = self.col_identity_weight * float(
            np.median(np.linalg.norm(out, axis=1)) or 1.0
        )
        for i, c in enumerate(cols):
            out[i] += gamma * column_identity(c, self.dim)
        return out

    def select(
        self,
        k: int,
        l: int,
        *,
        rows: np.ndarray | None = None,
        use_cols: list[str] | None = None,
        targets: tuple[str, ...] = (),
        seed: int | None = None,
    ) -> SubTable:
        """Alg 2 selection over the query result given by row positions."""
        seed = self.seed if seed is None else seed
        n = len(self.binned_pdf)
        rows = np.arange(n) if rows is None else np.asarray(rows)
        cols = list(use_cols) if use_cols else list(self.binned_pdf.columns)
        for t in targets:
            if t not in cols:
                cols.append(t)
        # Rows: cluster the (precomputed) tuple-vectors of the result.
        picked = centroid_points(self.row_vecs[rows], k, seed=seed)
        sel_rows = rows[picked]
        if len(sel_rows) < min(k, len(rows)):
            rest = np.setdiff1d(rows, sel_rows)[: k - len(sel_rows)]
            sel_rows = np.concatenate([sel_rows, rest])
        rids = sorted(int(self.binned_pdf.index[r]) for r in sel_rows)
        # Columns: cluster query-scoped column vectors of non-targets.
        targets = tuple(t for t in targets if t in cols)
        if l >= len(cols):
            sel_cols = cols
        else:
            free = [c for c in cols if c not in targets]
            budget = max(l - len(targets), 0)
            if budget == 0:
                sel_cols = list(targets)
            else:
                cvecs = self._column_vectors(rows, free)
                chosen_idx = centroid_points(cvecs, budget, seed=seed)
                chosen = [free[i] for i in chosen_idx]
                if len(chosen) < budget:
                    chosen += [c for c in free if c not in chosen][
                        : budget - len(chosen)
                    ]
                keep = set(chosen) | set(targets)
                sel_cols = [c for c in cols if c in keep]
        return SubTable(rids=rids, cols=sel_cols)


def nc_select_pdf(
    raw_pdf: pd.DataFrame,
    k: int,
    l: int,
    *,
    rows: np.ndarray | None = None,
    targets: tuple[str, ...] = (),
    seed: int = 0,
    max_onehot: int = 30,
) -> SubTable:
    """NC baseline, in-process: one-hot categoricals + raw numerics →
    KMeans rows; value-profile vectors → KMeans columns. The deliberate
    scale-sensitivity of NC (§5.2) is preserved: no standardization."""
    cols = [c for c in raw_pdf.columns if c != RID]
    rows = np.arange(len(raw_pdf)) if rows is None else np.asarray(rows)
    sub = raw_pdf.iloc[rows]
    feats = []
    for c in cols:
        s = sub[c]
        if pd.api.types.is_numeric_dtype(s):
            feats.append(s.astype(float).fillna(0.0).to_numpy()[:, None])
        else:
            vals = s.astype(str).fillna("__null__")
            top = vals.value_counts().index[:max_onehot]
            oh = np.stack([(vals == t).to_numpy(float) for t in top], axis=1)
            feats.append(oh)
    x = np.concatenate(feats, axis=1)
    picked = centroid_points(x, k, seed=seed)
    sel_rows = rows[picked]
    if len(sel_rows) < min(k, len(rows)):
        rest = np.setdiff1d(rows, sel_rows)[: k - len(sel_rows)]
        sel_rows = np.concatenate([sel_rows, rest])
    rids = sorted(int(raw_pdf.index[r]) for r in sel_rows)
    targets = tuple(t for t in targets if t in cols)
    if l >= len(cols):
        sel_cols = cols
    else:
        free = [c for c in cols if c not in targets]
        budget = max(l - len(targets), 0)
        profiles = []
        sample = sub.head(256)
        for c in free:
            s = sample[c]
            if pd.api.types.is_numeric_dtype(s):
                profiles.append(s.astype(float).fillna(0.0).to_numpy())
            else:
                freq = s.astype(str).value_counts(normalize=True)
                profiles.append(s.astype(str).map(freq).fillna(0.0).to_numpy())
        if budget == 0 or not free:
            sel_cols = list(targets)
        else:
            chosen_idx = centroid_points(np.stack(profiles), budget, seed=seed)
            chosen = [free[i] for i in chosen_idx]
            if len(chosen) < budget:
                chosen += [c for c in free if c not in chosen][
                    : budget - len(chosen)
                ]
            keep = set(chosen) | set(targets)
            sel_cols = [c for c in cols if c in keep]
    return SubTable(rids=rids, cols=sel_cols)
