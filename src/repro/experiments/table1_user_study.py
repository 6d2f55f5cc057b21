"""Table 1 reproduction: the (simulated) user study.

15 participants, split evenly across SubTab / RAN / NC, each exploring
the SP, FL and BL datasets through the sub-tables their assigned
baseline displays for the task's exploratory queries. Insights are
derived by the behavioural model in :mod:`repro.study.analyst` and
graded against full-table statistics.

Paper's Table 1 (averaged across datasets):
  # correct insights:   SubTab 4 (85%) | RAN 1.2 (30%) | NC 0.2 (6%)
  % users w/o insights: SubTab 0%      | RAN 12%       | NC 89%
  # total insights:     SubTab 4.5     | RAN 3.67      | NC 1.5
The shape to reproduce: SubTab ≫ RAN ≫ NC on correct insights and
correctness rate; NC's users mostly fail to find anything.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.random_search import random_best_positions
from repro.core.interactive import InteractiveSubTab, nc_select_pdf
from repro.core.subtab import SubTable
from repro.experiments.common import prepare, ran_draws
from repro.study.analyst import UserOutcome, aggregate_study, simulate_user

# Exploration tasks: per dataset, the queries whose results are displayed
# (None = the full table; (col, binlabel) = a selection on that bin).
TASKS: dict[str, list[tuple[str, str] | None]] = {
    "SP": [None, ("genre", "pop"), ("popularity", "very_high")],
    "FL": [None, ("CANCELLED", "1"), ("DISTANCE", "very_high")],
    "BL": [None, ("loan_status", "Charged Off")],
}
BASELINES = ("SubTab", "RAN", "NC")


def _task_subtables(
    p, *, k: int, l: int, ran_budget: float, seed: int
) -> dict[str, list[pd.DataFrame]]:
    """Displayed (binned) sub-tables per baseline for one dataset task."""
    ist = InteractiveSubTab.from_subtab(p.st, seed=seed)
    binned = ist.binned_pdf
    raw = p.raw_pandas()
    out: dict[str, list[pd.DataFrame]] = {b: [] for b in BASELINES}
    for q in TASKS[p.ds.name]:
        if q is None:
            rows = np.arange(len(binned))
        else:
            col, lab = q
            rows = np.flatnonzero(binned[col].astype(str).to_numpy() == lab)
            if len(rows) == 0:
                rows = np.arange(len(binned))
        targets = p.ds.targets
        subs = {
            "SubTab": ist.select(k, l, rows=rows, targets=targets, seed=seed)
        }
        rpos, rcols, _ = random_best_positions(
            p.fe, k, l, targets=targets, row_pool=rows,
            time_budget=ran_budget, max_iters=ran_draws(p.ds.name), seed=seed,
        )
        subs["RAN"] = SubTable(
            rids=[int(p.fe.rids[i]) for i in rpos], cols=rcols
        )
        subs["NC"] = nc_select_pdf(raw, k, l, rows=rows, targets=targets, seed=seed)
        for b, sub in subs.items():
            out[b].append(binned.loc[sub.rids, sub.cols])
    return out


def run(
    spark: SparkSession,
    *,
    n_rows: dict[str, int] | None = None,
    n_users: int = 15,
    k: int = 10,
    l: int = 10,
    effort: int = 6,
    ran_budget: float = 5.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Produce the Table 1 aggregate rows (one per baseline)."""
    n_rows = n_rows or {}
    per_user = max(n_users // len(BASELINES), 1)
    outcomes: dict[str, list[UserOutcome]] = {b: [] for b in BASELINES}
    for name in TASKS:
        p = prepare(spark, name, n_rows=n_rows.get(name), seed=seed)
        subs = _task_subtables(
            p, k=k, l=l, ran_budget=ran_budget, seed=seed
        )
        full_binned = p.fe and p.bt.binned_pandas()
        for b in BASELINES:
            for u in range(per_user):
                outcomes[b].append(
                    simulate_user(
                        subs[b],
                        full_binned,
                        seed=seed * 1000 + u * 17 + sum(map(ord, name)),
                        effort=effort,
                    )
                )
    return aggregate_study(outcomes)
