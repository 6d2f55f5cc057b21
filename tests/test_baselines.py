"""Tests for RAN, NC, Greedy (Alg 1) and MAB baselines."""
from itertools import combinations

import numpy as np
import pandas as pd
import pytest

from repro.baselines.greedy import greedy_rows, semi_greedy
from repro.baselines.mab import mab_select
from repro.baselines.naive_cluster import naive_cluster_select
from repro.baselines.random_search import random_best, random_best_positions
from repro.metrics.fast_eval import FastEvaluator
from repro.util import RID, rng


@pytest.fixture(scope="module")
def toy_fe():
    """Small table with known structure for exact optimization checks."""
    g = rng(11)
    n = 120
    a = g.choice(["a1", "a2", "a3"], n)
    b = g.choice(["b1", "b2"], n)
    c = g.choice(["c1", "c2", "c3"], n)
    d = g.choice(["d1", "d2"], n)
    m1 = g.random(n) < 0.35
    a[m1], b[m1], c[m1] = "a1", "b1", "c1"
    m2 = (~m1) & (g.random(n) < 0.3)
    a[m2], c[m2], d[m2] = "a2", "c2", "d1"
    pdf = pd.DataFrame(
        {"A": a, "B": b, "C": c, "D": d},
        index=pd.Index(range(n), name=RID),
    )
    from repro.rules.bruteforce import bf_frequent_itemsets

    sups = bf_frequent_itemsets(pdf, min_support=0.15, max_len=3)
    itemsets = [tuple(sorted(s)) for s in sups if len(s) >= 2]
    return FastEvaluator(pdf, itemsets)


# ------------------------------------------------------------------- RAN
def test_random_best_shapes(toy_fe):
    rids, cols, score = random_best(
        toy_fe, 5, 3, time_budget=0.2, min_iters=10, seed=0
    )
    assert len(rids) == 5 and len(cols) == 3
    assert 0 <= score <= 1
    assert score == pytest.approx(toy_fe.score_rids(rids, cols).combined)


def test_random_best_targets(toy_fe):
    _, cols, _ = random_best(
        toy_fe, 5, 2, targets=("A",), time_budget=0.1, min_iters=5, seed=0
    )
    assert "A" in cols


def test_random_best_max_iters(toy_fe):
    r1 = random_best(toy_fe, 5, 3, time_budget=10.0, max_iters=5, seed=1)
    r2 = random_best(toy_fe, 5, 3, time_budget=10.0, max_iters=5, seed=1)
    assert r1[0] == r2[0] and r1[1] == r2[1]  # deterministic given cap


def test_random_best_more_iters_not_worse(toy_fe):
    _, _, s_small = random_best(
        toy_fe, 5, 3, time_budget=0.0, min_iters=3, max_iters=3, seed=2
    )
    _, _, s_big = random_best(
        toy_fe, 5, 3, time_budget=0.0, min_iters=200, max_iters=200, seed=2
    )
    assert s_big >= s_small


def test_random_best_positions_row_pool(toy_fe):
    pool = np.arange(10)
    rows, _, _ = random_best_positions(
        toy_fe, 4, 3, row_pool=pool, time_budget=0.05, min_iters=5, seed=0
    )
    assert set(rows) <= set(pool)


# ---------------------------------------------------------------- Greedy
def test_greedy_rows_matches_naive_greedy(toy_fe):
    """Lazy greedy must equal the textbook greedy step by step in score."""
    cols = toy_fe.columns
    rows, cov = greedy_rows(toy_fe, cols, 4)
    # Naive greedy reimplementation.
    chosen: list[int] = []
    for _ in range(4):
        best_gain, best_r = -1.0, None
        base = toy_fe.coverage(np.array(chosen, dtype=np.int64), cols)
        for r in range(toy_fe.n):
            if r in chosen:
                continue
            cand = np.array(chosen + [r], dtype=np.int64)
            gain = toy_fe.coverage(cand, cols) - base
            if gain > best_gain:
                best_gain, best_r = gain, r
        if best_gain <= 0:
            break
        chosen.append(best_r)
    naive_cov = toy_fe.coverage(np.array(chosen, dtype=np.int64), cols)
    assert cov == pytest.approx(naive_cov)


def test_greedy_rows_coverage_reported_correctly(toy_fe):
    cols = toy_fe.columns
    rows, cov = greedy_rows(toy_fe, cols, 5)
    assert cov == pytest.approx(
        toy_fe.coverage(np.array(rows[: len(rows)], dtype=np.int64), cols)
    )


def test_greedy_approximation_guarantee(toy_fe):
    """Greedy ≥ (1 − 1/e)·OPT for row selection (Prop 4.3), verified
    against exhaustive search over all row pairs."""
    cols = toy_fe.columns
    _, greedy_cov = greedy_rows(toy_fe, cols, 2)
    opt = max(
        toy_fe.coverage(np.array(pair, dtype=np.int64), cols)
        for pair in combinations(range(toy_fe.n), 2)
    )
    assert greedy_cov >= (1 - 1 / np.e) * opt - 1e-9


def test_greedy_rows_pads_to_k(toy_fe):
    rows, _ = greedy_rows(toy_fe, ["D"], 6)  # no eligible itemsets on D alone
    assert len(rows) == 6


def test_semi_greedy_exhaustive_beats_random(toy_fe):
    rids, cols, s_greedy = semi_greedy(
        toy_fe, 5, 3, time_budget=60.0, exhaustive=True, seed=0
    )
    assert len(rids) == 5 and len(cols) == 3
    _, _, s_ran = random_best(
        toy_fe, 5, 3, time_budget=0.0, min_iters=50, max_iters=50, seed=0
    )
    assert s_greedy >= s_ran - 0.05


def test_semi_greedy_targets(toy_fe):
    _, cols, _ = semi_greedy(
        toy_fe, 4, 2, targets=("B",), time_budget=5.0, seed=0
    )
    assert "B" in cols


def test_semi_greedy_candidate_sampling(toy_fe):
    rids, cols, s = semi_greedy(
        toy_fe, 4, 3, time_budget=2.0, max_candidate_rows=30, seed=0
    )
    assert len(rids) == 4 and 0 <= s <= 1


# ------------------------------------------------------------------- MAB
def test_mab_shapes_and_validity(toy_fe):
    rids, cols, score = mab_select(
        toy_fe, 5, 3, time_budget=0.3, min_iters=20, seed=0
    )
    assert len(rids) == 5 and len(cols) == 3
    assert score == pytest.approx(toy_fe.score_rids(rids, cols).combined)


def test_mab_targets(toy_fe):
    _, cols, _ = mab_select(
        toy_fe, 4, 2, targets=("A",), time_budget=0.2, min_iters=10, seed=0
    )
    assert "A" in cols


def test_mab_improves_over_first_draw(toy_fe):
    """The best-seen *coverage* (the UCB reward) is monotone in pulls."""
    r1, c1, _ = mab_select(toy_fe, 5, 3, time_budget=0.0, min_iters=1, seed=3)
    r100, c100, _ = mab_select(
        toy_fe, 5, 3, time_budget=0.0, min_iters=150, seed=3
    )
    cov1 = toy_fe.score_rids(r1, c1).cell_coverage
    cov100 = toy_fe.score_rids(r100, c100).cell_coverage
    assert cov100 >= cov1


# -------------------------------------------------------------------- NC
def test_naive_cluster_shapes(prep_sp):
    rids, cols = naive_cluster_select(
        prep_sp.ds.df, 8, 6, targets=prep_sp.ds.targets, seed=0
    )
    assert len(rids) == 8 and len(cols) == 6
    assert "popularity" in cols
    assert len(set(rids)) == 8


def test_naive_cluster_l_all(prep_sp):
    _, cols = naive_cluster_select(prep_sp.ds.df, 5, 99, seed=0)
    assert set(cols) == set(prep_sp.bt.columns)
