"""Greedy / semi-greedy sub-table selection (paper Alg 1, §4.2, §6.1).

``greedy_rows`` is the inner GreedyRowSelection of Alg 1: for a fixed
column set it adds, k times, the row with the largest marginal cell-
coverage gain. Coverage is monotone submodular in rows (Prop 4.3), so
lazy (priority-queue) greedy is exact and carries the (1 − 1/e)
guarantee — verified against exhaustive search in tests.

``semi_greedy`` is the §6.1 baseline 5 variation: traverse the
:math:`\\binom{m}{l}` column combinations in random order under a
wall-clock budget, run greedy row selection for each, keep the best
sub-table found. The paper runs this for 5–48 hours; we expose the
budget as a parameter and run minutes-scale (DESIGN.md §5).
"""
from __future__ import annotations

import heapq
import time
from itertools import combinations
from typing import Sequence

import numpy as np

from repro.metrics.fast_eval import FastEvaluator
from repro.util import rng


def greedy_rows(
    fe: FastEvaluator,
    cols: Sequence[str],
    k: int,
    *,
    candidate_rows: np.ndarray | None = None,
) -> tuple[list[int], float]:
    """Exact lazy-greedy row selection maximizing cellCov for fixed cols.

    Returns (row positions, cellCov). ``candidate_rows`` restricts the
    candidate pool (rows outside any eligible rule contribute 0 gain and
    are only used to pad up to k).
    """
    eligible = fe.eligible(cols)
    covered = np.zeros(fe.n * fe.m, dtype=bool)
    covered_ids: set[int] = set()
    # Rows that can ever contribute: members of some eligible itemset —
    # also an inverted row → eligible-itemset index for O(1) gain lookups.
    row_items: dict[int, list[int]] = {}
    for i in eligible:
        for r in fe.itemset_rowidx[i]:
            row_items.setdefault(int(r), []).append(i)
    pool = np.array(sorted(row_items), dtype=np.int64)
    if candidate_rows is not None:
        pool = np.intersect1d(pool, candidate_rows)

    def gain(row: int) -> tuple[float, list[int]]:
        new_ids = [i for i in row_items.get(row, ()) if i not in covered_ids]
        if not new_ids:
            return 0.0, []
        flats = np.unique(
            np.concatenate([fe.itemset_flat(i) for i in new_ids])
        )
        return float((~covered[flats]).sum()), new_ids

    # Lazy greedy: heap of (−stale_gain, row); recompute the top until
    # its gain is fresh — exact for submodular objectives.
    heap: list[tuple[float, int]] = []
    for r in pool:
        g0, _ = gain(int(r))
        if g0 > 0:
            heap.append((-g0, int(r)))
    heapq.heapify(heap)
    chosen: list[int] = []
    total = 0.0
    while len(chosen) < k and heap:
        neg_g, r = heapq.heappop(heap)
        g, new_ids = gain(r)
        if heap and g < -heap[0][0]:
            if g > 0:
                heapq.heappush(heap, (-g, r))
            continue
        if g <= 0:
            break
        chosen.append(r)
        total += g
        covered_ids.update(new_ids)
        for i in new_ids:
            covered[fe.itemset_flat(i)] = True
    # Pad with arbitrary unused rows (gain 0) to reach k.
    if len(chosen) < k:
        for r in range(fe.n):
            if r not in chosen:
                chosen.append(r)
            if len(chosen) >= min(k, fe.n):
                break
    cov = total / fe.upcov_cells if fe.upcov_cells else 0.0
    return chosen, cov


def semi_greedy(
    fe: FastEvaluator,
    k: int,
    l: int,
    *,
    targets: Sequence[str] = (),
    time_budget: float = 30.0,
    max_candidate_rows: int | None = 3000,
    seed: int = 0,
    exhaustive: bool = False,
) -> tuple[list[int], list[str], float]:
    """Alg 1 with random-order column traversal under a time budget.

    Column subsets always include the targets; among the greedy
    sub-tables found before the budget expires, the one with the best
    *combined* score is returned (rids, cols, combined).
    ``exhaustive=True`` ignores the budget and enumerates every subset
    (test-scale only — this is the ColumnSelection loop of Alg 1).
    """
    g = rng(seed)
    free = [c for c in fe.columns if c not in targets]
    budget_cols = max(l - len(targets), 0)
    combos = list(combinations(free, min(budget_cols, len(free))))
    order = g.permutation(len(combos))
    cand = None
    if max_candidate_rows is not None and fe.n > max_candidate_rows:
        cand = np.sort(g.choice(fe.n, size=max_candidate_rows, replace=False))
    best_score, best = -1.0, None
    deadline = time.perf_counter() + time_budget
    for idx in order:
        cols = list(targets) + list(combos[idx])
        rows, _cov = greedy_rows(fe, cols, k, candidate_rows=cand)
        s = fe.combined(np.array(rows, dtype=np.int64), cols)
        if s > best_score:
            best_score, best = s, (rows, cols)
        if not exhaustive and time.perf_counter() > deadline:
            break
    rows, cols = best
    rids = [int(fe.rids[i]) for i in rows]
    ordered = [c for c in fe.columns if c in set(cols)]
    return rids, ordered, best_score
