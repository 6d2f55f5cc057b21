"""Simulated user study (paper §6.2.1, Table 1).

The paper's 15 human participants are unavailable, so we model what a
participant can actually do with a displayed k×l sub-table: notice
co-occurrence patterns among its visible (binned) cells and report them
as insights. The model is deliberately simple and identical across
baselines — only the displayed sub-table differs:

* **candidate claims** — pairs of (column=bin) cells that co-occur in at
  least ``min_cooccur`` of the displayed rows (what a human can "see");
* **reporting** — each simulated user examines up to ``effort`` claims
  (sampled ∝ how many displayed rows exhibit them) and reports each
  with probability ``report_prob`` (attention noise);
* **grading** — a reported claim is *correct* iff it is a real pattern
  of the full table: support ≥ ``min_support``, directional confidence
  ≥ ``min_conf`` and lift ≥ ``min_lift`` (the lift bound rejects
  "insights" that merely restate near-constant columns — the paper's
  graders likewise discarded statistically incorrect conclusions).

Table 1's three aggregates are produced per baseline: avg # correct
insights (and % correct), % of user-tasks with no insights, avg total
insights.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations

import numpy as np
import pandas as pd

from repro.util import rng

Claim = tuple[tuple[str, str], tuple[str, str]]


def candidate_claims(
    sub_binned: pd.DataFrame,
    *,
    min_cooccur: int = 2,
    max_modal_share: float = 0.75,
) -> list[tuple[Claim, int]]:
    """Visible co-occurrence patterns: ((c1,v1),(c2,v2), #rows showing it).

    A value filling ≥ ``max_modal_share`` of a displayed column is
    wallpaper, not a pattern — an analyst does not report "these two
    always-present values co-occur" (e.g. two NaN-dominated delay
    columns). Only non-modal co-occurrences are candidate insights.
    """
    cols = list(sub_binned.columns)
    vals = sub_binned.astype(str)
    n = max(len(vals), 1)
    wallpaper = {
        c: set(
            vc.index[(vc / n) >= max_modal_share]
        )
        for c, vc in ((c, vals[c].value_counts()) for c in cols)
    }
    out: list[tuple[Claim, int]] = []
    for c1, c2 in combinations(cols, 2):
        pairs = vals.groupby([c1, c2], dropna=False).size()
        for (v1, v2), cnt in pairs.items():
            if cnt < min_cooccur:
                continue
            if str(v1) in wallpaper[c1] or str(v2) in wallpaper[c2]:
                continue
            out.append((((c1, str(v1)), (c2, str(v2))), int(cnt)))
    return out


def claim_is_correct(
    full_binned: pd.DataFrame,
    claim: Claim,
    *,
    min_support: float = 0.03,
    min_conf: float = 0.5,
    min_lift: float = 1.2,
) -> bool:
    """Grade a claim against the full table's statistics."""
    (c1, v1), (c2, v2) = claim
    a = full_binned[c1].astype(str).to_numpy() == v1
    b = full_binned[c2].astype(str).to_numpy() == v2
    n = len(full_binned)
    both = float((a & b).sum())
    if n == 0 or both / n < min_support:
        return False
    pa, pb = float(a.sum()), float(b.sum())
    conf = max(both / pa if pa else 0.0, both / pb if pb else 0.0)
    lift = (both * n) / (pa * pb) if pa and pb else 0.0
    return conf >= min_conf and lift >= min_lift


@dataclass
class UserOutcome:
    """One (user, dataset-task) cell of the study."""

    n_reported: int
    n_correct: int


def simulate_user(
    sub_tables: list[pd.DataFrame],
    full_binned: pd.DataFrame,
    *,
    seed: int,
    effort: int = 6,
    report_prob: float = 0.9,
    min_cooccur: int = 2,
) -> UserOutcome:
    """One simulated participant examining the task's displayed sub-tables."""
    g = rng(seed)
    pool: dict[Claim, int] = {}
    for sub in sub_tables:
        for claim, cnt in candidate_claims(sub, min_cooccur=min_cooccur):
            pool[claim] = max(pool.get(claim, 0), cnt)
    if not pool:
        return UserOutcome(n_reported=0, n_correct=0)
    claims = list(pool.keys())
    weights = np.array([pool[c] for c in claims], dtype=float)
    weights /= weights.sum()
    take = min(effort, len(claims))
    idx = g.choice(len(claims), size=take, replace=False, p=weights)
    reported = [claims[i] for i in idx if g.random() < report_prob]
    correct = sum(claim_is_correct(full_binned, c) for c in reported)
    return UserOutcome(n_reported=len(reported), n_correct=int(correct))


def aggregate_study(
    outcomes: dict[str, list[UserOutcome]]
) -> pd.DataFrame:
    """Table 1 rows: per baseline, averaged over (user, dataset) tasks."""
    rows = []
    for baseline, outs in outcomes.items():
        total = np.array([o.n_reported for o in outs], dtype=float)
        correct = np.array([o.n_correct for o in outs], dtype=float)
        rows.append(
            {
                "baseline": baseline,
                "avg_correct_insights": float(correct.mean()),
                "pct_correct": 100.0
                * float(correct.sum() / max(total.sum(), 1.0)),
                "pct_users_no_insights": 100.0
                * float((total == 0).mean()),
                "avg_total_insights": float(total.mean()),
            }
        )
    return pd.DataFrame(rows)
