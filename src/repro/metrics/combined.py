"""Combined informativeness score (paper Eq 3).

``combined = α·cellCov + (1−α)·divers`` with α = 0.5 by default (§6.1).
This module glues the Spark coverage scan and the driver-side diversity
computation into the one number the optimization problem maximizes.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

from repro.binning.binner import BinnedTable
from repro.metrics.coverage import cell_coverage, upcov
from repro.metrics.diversity import diversity
from repro.rules.apriori import Rule
from repro.util import RID

DEFAULT_ALPHA = 0.5


@dataclass
class Scores:
    """The three numbers every quality experiment reports."""

    cell_coverage: float
    diversity: float
    alpha: float = DEFAULT_ALPHA

    @property
    def combined(self) -> float:
        return self.alpha * self.cell_coverage + (1 - self.alpha) * self.diversity


def score_subtable(
    bt: BinnedTable,
    rules: Sequence[Rule],
    sub_rids: Sequence[int],
    sub_cols: Sequence[str],
    *,
    alpha: float = DEFAULT_ALPHA,
    upcov_cells: int | None = None,
) -> Scores:
    """Evaluate a sub-table under Eq 3 (Spark coverage + driver diversity)."""
    cov = cell_coverage(
        bt, rules, sub_rids, sub_cols, upcov_cells=upcov_cells
    )
    rid_set = [int(r) for r in sub_rids]
    sub_pdf = (
        bt.binned.filter(bt.binned[RID].isin(rid_set))
        .toPandas()
        .set_index(RID)[list(sub_cols)]
    )
    return Scores(cell_coverage=cov, diversity=diversity(sub_pdf), alpha=alpha)
