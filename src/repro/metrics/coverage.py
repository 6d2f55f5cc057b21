"""Cell coverage metric (paper Def 3.6) — distributed implementation.

``cellCov_R(T, T_sub)`` = |union of cell(R, T) over rules R covered by
T_sub| / upcov, where ``cell(R, T) = T_R × U_R`` and ``upcov`` is the
same union over *all* rules.

Key observation (also exploited by the paper's examples): a cell
⟨t, u⟩ is covered iff *some* covered rule holds on ``t`` and uses column
``u`` — so the union decomposes per row, and the count is a single
distributed scan: for each row, OR together the column sets of the
covered rules that hold on it. Rules sharing an itemset are identical
for this metric (same U_R and T_R), so we deduplicate to itemsets.
"""
from __future__ import annotations

from typing import Iterable, Iterator, Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame

from repro.binning.binner import BinnedTable
from repro.rules.apriori import Item, Rule, distinct_rule_itemsets
from repro.util import RID

Itemset = tuple[Item, ...]


def covered_itemsets(
    sub_pdf: pd.DataFrame, itemsets: Sequence[Itemset]
) -> list[Itemset]:
    """Rules covered by the sub-table (Def 3.6 d1): all rule columns are
    selected AND some selected row satisfies every item.

    ``sub_pdf`` is the k×l *binned* sub-table (driver-side; k, l are
    small by construction).
    """
    cols = set(sub_pdf.columns)
    out: list[Itemset] = []
    for its in itemsets:
        if not {c for c, _ in its} <= cols:
            continue
        mask = np.ones(len(sub_pdf), dtype=bool)
        for c, v in its:
            mask &= sub_pdf[c].astype(str).to_numpy() == v
        if mask.any():
            out.append(its)
    return out


def count_described_cells(
    binned: DataFrame, columns: Sequence[str], itemsets: Sequence[Itemset]
) -> int:
    """|union of cell(R, T)| for the given rule itemsets — one Spark scan.

    Per partition, each itemset contributes a row mask (AND of per-item
    equality) and a column index set; per-row covered-column booleans are
    OR-accumulated and summed. Partition partials are summed globally.
    """
    if not itemsets:
        return 0
    col_idx = {c: i for i, c in enumerate(columns)}
    rules_bc = [
        (list(its), sorted(col_idx[c] for c, _ in its)) for its in itemsets
    ]
    m = len(columns)

    def scan(parts: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in parts:
            n = len(pdf)
            if n == 0:
                continue
            vals = {c: pdf[c].astype(str).to_numpy() for c in columns}
            covered = np.zeros((n, m), dtype=bool)
            for items, cidx in rules_bc:
                mask = np.ones(n, dtype=bool)
                for c, v in items:
                    mask &= vals[c] == v
                if mask.any():
                    covered[np.ix_(mask.nonzero()[0], cidx)] = True
            yield pd.DataFrame({"cells": [int(covered.sum())]})

    partial = binned.mapInPandas(scan, schema="cells long")
    rows = partial.collect()
    return int(sum(r["cells"] for r in rows))


def upcov(bt: BinnedTable, rules: Iterable[Rule]) -> int:
    """Normalization factor: cells describable by *any* rule in R."""
    return count_described_cells(
        bt.binned, bt.columns, distinct_rule_itemsets(rules)
    )


def cell_coverage(
    bt: BinnedTable,
    rules: Sequence[Rule],
    sub_rids: Sequence[int],
    sub_cols: Sequence[str],
    *,
    upcov_cells: int | None = None,
) -> float:
    """cellCov_R(T, T_sub) per Def 3.6, evaluated with Spark scans.

    ``upcov_cells`` can be passed to amortize the normalization scan
    across many sub-table evaluations of the same (T, R) pair.
    """
    itemsets = distinct_rule_itemsets(rules)
    if upcov_cells is None:
        upcov_cells = count_described_cells(bt.binned, bt.columns, itemsets)
    if upcov_cells == 0:
        return 0.0
    rid_set = [int(r) for r in sub_rids]
    sub_pdf = (
        bt.binned.filter(bt.binned[RID].isin(rid_set))
        .toPandas()
        .set_index(RID)[list(sub_cols)]
    )
    covered = covered_itemsets(sub_pdf, itemsets)
    cells = count_described_cells(bt.binned, bt.columns, covered)
    return cells / upcov_cells
