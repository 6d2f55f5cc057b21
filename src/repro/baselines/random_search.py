"""RAN baseline (paper §6.1 baseline 1).

Repeatedly draws uniformly-random k×l sub-tables for a wall-clock
budget (the paper iterates "for one minute") and keeps the draw with
the highest combined score. Scoring uses the in-memory evaluator —
thousands of candidate evaluations per run.
"""
from __future__ import annotations

import time
from typing import Sequence

import numpy as np

from repro.metrics.fast_eval import FastEvaluator
from repro.util import rng


def random_best_positions(
    fe: FastEvaluator,
    k: int,
    l: int,
    *,
    targets: Sequence[str] = (),
    row_pool: np.ndarray | None = None,
    time_budget: float = 10.0,
    min_iters: int = 20,
    max_iters: int | None = None,
    seed: int = 0,
) -> tuple[np.ndarray, list[str], float]:
    """Best-of-random sub-table over row *positions*.

    ``row_pool`` restricts the draw to a query result's rows (session
    replay). ``max_iters`` caps the number of draws regardless of the
    time budget: the paper's RAN ran "for one minute" on an in-Python
    metric (~1 eval/s); our vectorized evaluator is ~30× faster, so
    experiments cap draws to keep the search effort comparable.
    Returns (row positions, columns in table order, combined score).
    """
    g = rng(seed)
    pool = np.arange(fe.n) if row_pool is None else np.asarray(row_pool)
    free_cols = [c for c in fe.columns if c not in targets]
    n_free = max(l - len(targets), 0)
    best_score = -1.0
    best: tuple[np.ndarray, list[str]] | None = None
    deadline = time.perf_counter() + time_budget
    it = 0
    while it < min_iters or time.perf_counter() < deadline:
        if max_iters is not None and it >= max_iters:
            break
        it += 1
        rows = g.choice(pool, size=min(k, len(pool)), replace=False)
        cols = list(targets) + (
            list(
                g.choice(
                    free_cols,
                    size=min(n_free, len(free_cols)),
                    replace=False,
                )
            )
            if n_free
            else []
        )
        s = fe.combined(rows, cols)
        if s > best_score:
            best_score, best = s, (rows, cols)
        if it >= min_iters and time.perf_counter() >= deadline:
            break
    rows, cols = best
    ordered = [c for c in fe.columns if c in set(cols)]
    return rows, ordered, best_score


def random_best(
    fe: FastEvaluator,
    k: int,
    l: int,
    *,
    targets: Sequence[str] = (),
    time_budget: float = 10.0,
    min_iters: int = 20,
    max_iters: int | None = None,
    seed: int = 0,
) -> tuple[list[int], list[str], float]:
    """Best-of-random sub-table: returns (row ids, columns, combined score)."""
    rows, cols, score = random_best_positions(
        fe,
        k,
        l,
        targets=targets,
        time_budget=time_budget,
        min_iters=min_iters,
        max_iters=max_iters,
        seed=seed,
    )
    rids = [int(fe.rids[i]) for i in rows]
    return rids, cols, score
