"""Fast in-memory evaluator for Eq 3 — the inner loop of search baselines.

RAN, Greedy and MAB evaluate thousands of candidate sub-tables; running
a Spark scan per candidate would be absurd, and the paper itself runs
these baselines in memory (they are the *slow* baselines even so). This
evaluator pre-materializes, from the binned table:

* an integer code matrix (n×m) for O(k²·l) diversity,
* per-rule-itemset matching-row index arrays + packed bitsets (memory-
  lean: a few bytes per matching row, one bit per row for membership),
  from which flattened cell-index unions are computed on demand.

It is validated in tests to agree exactly with the Spark implementation
in :mod:`repro.metrics.coverage` / :mod:`repro.metrics.diversity`.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd

from repro.metrics.combined import DEFAULT_ALPHA, Scores
from repro.rules.apriori import Item

Itemset = tuple[Item, ...]


class FastEvaluator:
    """Vectorized cellCov/divers/combined over a driver-side binned table.

    ``binned_pdf`` must be indexed by row id (``BinnedTable.binned_pandas``
    produces exactly this shape).
    """

    def __init__(
        self,
        binned_pdf: pd.DataFrame,
        itemsets: Sequence[Itemset],
        *,
        alpha: float = DEFAULT_ALPHA,
    ) -> None:
        self.alpha = alpha
        self.columns: list[str] = list(binned_pdf.columns)
        self.col_idx = {c: i for i, c in enumerate(self.columns)}
        self.rids = binned_pdf.index.to_numpy()
        self._rid_pos = {int(r): i for i, r in enumerate(self.rids)}
        self.n, self.m = binned_pdf.shape
        # Integer codes per column for fast equality (diversity).
        self.codes = np.empty((self.n, self.m), dtype=np.int32)
        self._labels: dict[str, dict[str, int]] = {}
        for j, c in enumerate(self.columns):
            vals = binned_pdf[c].astype(str)
            codes, uniques = pd.factorize(vals)
            self.codes[:, j] = codes
            self._labels[c] = {str(u): i for i, u in enumerate(uniques)}
        # Per-itemset structures for coverage.
        self.itemsets: list[Itemset] = list(itemsets)
        self.itemset_cols: list[frozenset[str]] = []
        self.itemset_colidx: list[np.ndarray] = []
        self.itemset_rowidx: list[np.ndarray] = []  # matching row positions
        self._rowbits: list[np.ndarray] = []  # packed membership bitset
        for its in self.itemsets:
            mask = np.ones(self.n, dtype=bool)
            for c, v in its:
                code = self._labels[c].get(str(v), -2)
                mask &= self.codes[:, self.col_idx[c]] == code
            rows = mask.nonzero()[0].astype(np.int32)
            cidx = np.array(sorted(self.col_idx[c] for c, _ in its))
            self.itemset_cols.append(frozenset(c for c, _ in its))
            self.itemset_colidx.append(cidx)
            self.itemset_rowidx.append(rows)
            self._rowbits.append(np.packbits(mask))
        self._scratch = np.zeros(self.n * self.m, dtype=bool)
        self.upcov_cells = self._union_cells(range(len(self.itemsets)))

    # -- plumbing ----------------------------------------------------------
    def positions(self, rids: Sequence[int]) -> np.ndarray:
        """Row ids → row positions in the code matrix."""
        return np.array([self._rid_pos[int(r)] for r in rids], dtype=np.int64)

    def itemset_flat(self, i: int) -> np.ndarray:
        """Flattened cell indices (row·m + col) of itemset ``i``'s cells."""
        rows = self.itemset_rowidx[i].astype(np.int64)
        return (rows[:, None] * self.m + self.itemset_colidx[i][None, :]).ravel()

    def _union_cells(self, itemset_ids) -> int:
        self._scratch[:] = False
        marked = False
        for i in itemset_ids:
            self._scratch[self.itemset_flat(i)] = True
            marked = True
        return int(self._scratch.sum()) if marked else 0

    def has_row(self, i: int, row_pos: np.ndarray) -> bool:
        """Does itemset ``i`` hold on any of the given row positions?"""
        bits = self._rowbits[i]
        return bool(
            ((bits[row_pos >> 3] >> (7 - (row_pos & 7))) & 1).any()
        )

    def eligible(self, cols: Sequence[str]) -> list[int]:
        """Itemsets whose columns are all selected (candidate covered rules)."""
        sel = set(cols)
        return [i for i, cs in enumerate(self.itemset_cols) if cs <= sel]

    def covered_ids(
        self, row_pos: np.ndarray, cols: Sequence[str]
    ) -> list[int]:
        """Itemsets covered by the sub-table (Def 3.6 d1)."""
        row_pos = np.asarray(row_pos, dtype=np.int64)
        return [i for i in self.eligible(cols) if self.has_row(i, row_pos)]

    # -- metrics -----------------------------------------------------------
    def coverage(self, row_pos: np.ndarray, cols: Sequence[str]) -> float:
        """cellCov of the sub-table given by row positions × column names."""
        if self.upcov_cells == 0:
            return 0.0
        cells = self._union_cells(self.covered_ids(row_pos, cols))
        return cells / self.upcov_cells

    def diversity(self, row_pos: np.ndarray, cols: Sequence[str]) -> float:
        if len(row_pos) < 2 or not cols:
            return 1.0
        cidx = [self.col_idx[c] for c in cols]
        sub = self.codes[np.ix_(np.asarray(row_pos, dtype=np.int64), cidx)]
        k = len(sub)
        sims = [
            float((sub[i] == sub[j]).mean())
            for i in range(k)
            for j in range(i + 1, k)
        ]
        return float(1.0 - np.mean(sims))

    def score(self, row_pos: np.ndarray, cols: Sequence[str]) -> Scores:
        return Scores(
            cell_coverage=self.coverage(row_pos, cols),
            diversity=self.diversity(row_pos, cols),
            alpha=self.alpha,
        )

    def combined(self, row_pos: np.ndarray, cols: Sequence[str]) -> float:
        return self.score(row_pos, cols).combined

    # -- convenience -------------------------------------------------------
    def score_rids(self, rids: Sequence[int], cols: Sequence[str]) -> Scores:
        """Score a sub-table given by row *ids* (as returned by selectors)."""
        return self.score(self.positions(rids), cols)
