"""Diversity metric (paper Def 3.7).

``divers(T_sub, B) = 1 − avg over distinct row pairs of the bin-level
Jaccard similarity`` — the fraction of selected columns where the two
rows fall in the same bin (Example 3.8 averages over the 3 unordered
pairs of a 3-row sub-table, which fixes the ambiguous "avg_{t,t'}").

The sub-table is k×l with k, l small, so this is driver-side NumPy.
"""
from __future__ import annotations

import numpy as np
import pandas as pd


def pairwise_jaccard(sub_pdf: pd.DataFrame) -> np.ndarray:
    """Upper-triangle vector of pairwise same-bin ratios (k·(k−1)/2)."""
    vals = sub_pdf.astype(str).to_numpy()
    k = len(vals)
    sims = []
    for i in range(k):
        for j in range(i + 1, k):
            sims.append(float((vals[i] == vals[j]).mean()))
    return np.array(sims, dtype=float)


def diversity(sub_pdf: pd.DataFrame) -> float:
    """divers(T_sub, B) ∈ [0, 1]; a single-row sub-table is fully diverse."""
    if len(sub_pdf) < 2 or sub_pdf.shape[1] == 0:
        return 1.0
    return float(1.0 - pairwise_jaccard(sub_pdf).mean())
