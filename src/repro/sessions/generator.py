"""Simulated EDA sessions + replay (paper §6.2.2, Fig 6).

The paper replays 122 recorded analysis sessions [22] over the CY
dataset and asks: does the sub-table shown for query *i* contain the
fragments (selection column, selection value, group-by column) of query
*i+1*? The recordings are not available offline, so we simulate the
analyst with the same behavioural assumption the paper's result relies
on: *next steps follow prominent data patterns*. Each next-query
fragment is drawn from a mined prominent rule itemset with probability
``p_pattern`` (weighted by support), otherwise uniformly at random —
the uniform tail is why even wide sub-tables cannot capture everything
("practically any value ... can be used as a selection term").

Replay runs on the interactive in-process path (DESIGN.md §5): SubTab
selection over precomputed vectors, NC over one-hot vectors, RAN under
a per-query time budget (scaled down from the paper's 60 s).
"""
from __future__ import annotations

import time
from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd

from repro.core.interactive import InteractiveSubTab, nc_select_pdf
from repro.core.subtab import SubTable
from repro.metrics.fast_eval import FastEvaluator, Itemset
from repro.util import rng

Fragment = tuple  # ("col", c) | ("val", c, label)


@dataclass
class Query:
    """One exploratory step: a selection plus a group-by intent."""

    filter_col: str
    filter_label: str
    groupby_col: str

    def fragments(self) -> set[Fragment]:
        return {
            ("col", self.filter_col),
            ("val", self.filter_col, self.filter_label),
            ("col", self.groupby_col),
        }


def generate_sessions(
    binned_pdf: pd.DataFrame,
    itemsets: Sequence[Itemset],
    supports: Sequence[float],
    *,
    fe: "FastEvaluator | None" = None,
    n_sessions: int = 122,
    min_len: int = 3,
    max_len: int = 6,
    p_pattern: float = 0.75,
    seed: int = 0,
) -> list[list[Query]]:
    """Generate sessions whose steps follow prominent patterns.

    With ``fe`` given, each next step is drawn from patterns prominent
    *within the current query's result* (support × overlap with the
    current slice): analysts follow the thread they are exploring, which
    is the behavioural premise behind the paper's Fig 6 measurement.
    """
    g = rng(seed)
    cols = list(binned_pdf.columns)
    labels = {c: binned_pdf[c].astype(str).unique().tolist() for c in cols}
    base_w = np.asarray(supports, dtype=float)
    base_w = base_w if base_w.sum() else None
    n = len(binned_pdf)
    col_arrays = {c: binned_pdf[c].astype(str).to_numpy() for c in cols}
    sessions: list[list[Query]] = []
    for _ in range(n_sessions):
        length = int(g.integers(min_len, max_len + 1))
        queries: list[Query] = []
        slice_mask = np.ones(n, dtype=bool)
        for _ in range(length):
            if itemsets and base_w is not None and g.random() < p_pattern:
                w = base_w.copy()
                if fe is not None and not slice_mask.all():
                    for i in range(len(itemsets)):
                        rows = fe.itemset_rowidx[i]
                        frac = (
                            float(slice_mask[rows].mean()) if len(rows) else 0.0
                        )
                        w[i] *= frac + 0.05  # small floor: topic drift
                if w.sum() <= 0:
                    w = base_w
                its = itemsets[int(g.choice(len(itemsets), p=w / w.sum()))]
                fi = int(g.integers(len(its)))
                fcol, flab = its[fi]
                others = [c for c, _ in its if c != fcol]
                gcol = others[int(g.integers(len(others)))] if others else str(
                    g.choice(cols)
                )
            else:
                fcol = str(g.choice(cols))
                flab = str(g.choice(labels[fcol]))
                gcol = str(g.choice(cols))
            queries.append(
                Query(filter_col=fcol, filter_label=flab, groupby_col=gcol)
            )
            mask = col_arrays[fcol] == flab
            slice_mask = mask if mask.any() else np.ones(n, dtype=bool)
        sessions.append(queries)
    return sessions


def _captured(sub_binned: pd.DataFrame, frags: set[Fragment]) -> int:
    got = 0
    for f in frags:
        if f[0] == "col":
            got += f[1] in sub_binned.columns
        else:
            _, c, lab = f
            got += (
                c in sub_binned.columns
                and (sub_binned[c].astype(str) == lab).any()
            )
    return got


def replay_sessions(
    ist: InteractiveSubTab,
    fe: FastEvaluator,
    raw_pdf: pd.DataFrame,
    sessions: list[list[Query]],
    *,
    widths: Sequence[int] = (3, 4, 5, 6, 7),
    k: int = 10,
    ran_budget: float = 0.3,
    seed: int = 0,
) -> pd.DataFrame:
    """Fig 6 harness: % of next-query fragments captured, per algorithm
    and sub-table width; also the average combined score (§6.2.3)."""
    from repro.baselines.random_search import random_best_positions

    binned = ist.binned_pdf
    n = len(binned)
    results = []
    for w in widths:
        stats = {a: [0, 0] for a in ("SubTab", "RAN", "NC")}
        scores = {a: [] for a in ("SubTab", "RAN", "NC")}
        for si, session in enumerate(sessions):
            for qi in range(len(session) - 1):
                q, q_next = session[qi], session[qi + 1]
                rows = np.flatnonzero(
                    binned[q.filter_col].astype(str).to_numpy()
                    == q.filter_label
                )
                if len(rows) == 0:
                    rows = np.arange(n)
                frags = q_next.fragments()
                subs: dict[str, SubTable] = {}
                subs["SubTab"] = ist.select(k, w, rows=rows, seed=seed + si)
                rpos, rcols, _ = random_best_positions(
                    fe,
                    k,
                    w,
                    row_pool=rows,
                    time_budget=ran_budget,
                    max_iters=10,
                    seed=seed + si,
                )
                subs["RAN"] = SubTable(
                    rids=[int(fe.rids[i]) for i in rpos], cols=rcols
                )
                subs["NC"] = nc_select_pdf(
                    raw_pdf, k, w, rows=rows, seed=seed + si
                )
                for a, sub in subs.items():
                    sub_binned = binned.loc[sub.rids, sub.cols]
                    stats[a][0] += _captured(sub_binned, frags)
                    stats[a][1] += len(frags)
                    scores[a].append(
                        fe.score_rids(sub.rids, sub.cols).combined
                    )
        for a, (got, tot) in stats.items():
            results.append(
                {
                    "algorithm": a,
                    "width": w,
                    "pct_captured": 100.0 * got / max(tot, 1),
                    "avg_combined": float(np.mean(scores[a])),
                }
            )
    return pd.DataFrame(results)
