"""Multi-Armed Bandit baseline (paper §6.1 baseline 4).

Rows and columns are arms; each iteration plays the k rows and l
columns with the highest UCB1 index [Lai & Robbins 1985 / UCB], scores
the resulting sub-table with the combined metric, and credits the
reward to every participating arm. ε-greedy jitter on the row side
keeps the huge row-arm space from starving (UCB over tens of thousands
of never-pulled arms would otherwise just enumerate them).

The paper reports MAB as the worst-quality slow baseline; the shape to
reproduce is "long runtime, lowest combined score" (Fig 7).
"""
from __future__ import annotations

import time
from typing import Sequence

import numpy as np

from repro.metrics.fast_eval import FastEvaluator
from repro.util import rng


def mab_select(
    fe: FastEvaluator,
    k: int,
    l: int,
    *,
    targets: Sequence[str] = (),
    time_budget: float = 15.0,
    min_iters: int = 30,
    max_iters: int | None = None,
    max_candidate_rows: int | None = None,
    epsilon: float = 0.3,
    seed: int = 0,
) -> tuple[list[int], list[str], float]:
    """UCB1 sub-table search: returns (row ids, columns, combined score).

    ``max_iters`` caps the pulls independently of wall-clock — used to
    equalize search effort with the paper's slow in-Python evaluator
    (see EXPERIMENTS.md "Search-effort calibration").
    """
    g = rng(seed)
    # Every row is an arm by default (the paper's MAB explores the full
    # row space, which is exactly why it converges poorly — Fig 7).
    n_rows = fe.n if max_candidate_rows is None else min(fe.n, max_candidate_rows)
    row_arms = (
        np.sort(g.choice(fe.n, size=n_rows, replace=False))
        if fe.n > n_rows
        else np.arange(fe.n)
    )
    free_cols = [c for c in fe.columns if c not in targets]
    n_free = max(l - len(targets), 0)

    r_cnt = np.zeros(n_rows)
    r_sum = np.zeros(n_rows)
    c_cnt = np.zeros(len(free_cols))
    c_sum = np.zeros(len(free_cols))

    def ucb(cnt: np.ndarray, total: np.ndarray, t: int) -> np.ndarray:
        mean = np.where(cnt > 0, total / np.maximum(cnt, 1), np.inf)
        bonus = np.sqrt(2 * np.log(max(t, 1)) / np.maximum(cnt, 1))
        return np.where(cnt > 0, mean + bonus, np.inf)

    best_score, best = -1.0, None
    deadline = time.perf_counter() + time_budget
    t = 0
    while t < min_iters or time.perf_counter() < deadline:
        if max_iters is not None and t >= max_iters:
            break
        t += 1
        if g.random() < epsilon:
            rows_idx = g.choice(n_rows, size=min(k, n_rows), replace=False)
        else:
            scores = ucb(r_cnt, r_sum, t) + g.random(n_rows) * 1e-9
            rows_idx = np.argpartition(-scores, min(k, n_rows) - 1)[: min(k, n_rows)]
        if n_free and free_cols:
            cscores = ucb(c_cnt, c_sum, t) + g.random(len(free_cols)) * 1e-9
            take = min(n_free, len(free_cols))
            cols_idx = np.argpartition(-cscores, take - 1)[:take]
            cols = list(targets) + [free_cols[i] for i in cols_idx]
        else:
            cols_idx = np.array([], dtype=int)
            cols = list(targets)
        rows = row_arms[rows_idx]
        # §6.1: "the reward (i.e. the cell coverage score) is given to
        # all the columns and rows that participated in the sub-table".
        reward = fe.coverage(rows, cols)
        r_cnt[rows_idx] += 1
        r_sum[rows_idx] += reward
        c_cnt[cols_idx] += 1
        c_sum[cols_idx] += reward
        if reward > best_score:
            best_score, best = reward, (rows, cols)
        if t >= min_iters and time.perf_counter() >= deadline:
            break
    rows, cols = best
    rids = [int(fe.rids[i]) for i in rows]
    ordered = [c for c in fe.columns if c in set(cols)]
    return rids, ordered, fe.combined(rows, ordered)
