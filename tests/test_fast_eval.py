"""Unit tests for the in-memory evaluator's internal structures."""
import numpy as np
import pandas as pd
import pytest

from repro.metrics.fast_eval import FastEvaluator
from repro.util import RID

PDF = pd.DataFrame(
    {
        "A": ["x", "x", "y", "y", "x"],
        "B": ["p", "p", "q", "q", "q"],
        "C": ["1", "2", "1", "2", "1"],
    },
    index=pd.Index([10, 20, 30, 40, 50], name=RID),
)
ITEMSETS = [
    (("A", "x"), ("B", "p")),  # rows 0,1
    (("A", "y"), ("B", "q")),  # rows 2,3
    (("A", "x"), ("B", "q"), ("C", "1")),  # row 4
]


@pytest.fixture(scope="module")
def fe():
    return FastEvaluator(PDF, ITEMSETS)


def test_shapes(fe):
    assert (fe.n, fe.m) == (5, 3)
    assert fe.columns == ["A", "B", "C"]
    assert list(fe.rids) == [10, 20, 30, 40, 50]


def test_positions_roundtrip(fe):
    assert list(fe.positions([30, 10])) == [2, 0]


def test_itemset_rows(fe):
    assert list(fe.itemset_rowidx[0]) == [0, 1]
    assert list(fe.itemset_rowidx[1]) == [2, 3]
    assert list(fe.itemset_rowidx[2]) == [4]


def test_itemset_flat(fe):
    # Itemset 0: rows {0,1} × cols {A=0, B=1} → flats {0,1,3,4}.
    assert sorted(fe.itemset_flat(0)) == [0, 1, 3, 4]


def test_upcov(fe):
    # Union: rows0-1×{A,B} (4) + rows2-3×{A,B} (4) + row4×{A,B,C} (3).
    assert fe.upcov_cells == 11


def test_has_row_bitset(fe):
    assert fe.has_row(0, np.array([0]))
    assert fe.has_row(0, np.array([3, 1]))
    assert not fe.has_row(0, np.array([2, 3, 4]))


def test_eligible(fe):
    assert fe.eligible(["A", "B"]) == [0, 1]
    assert fe.eligible(["A", "B", "C"]) == [0, 1, 2]
    assert fe.eligible(["A"]) == []


def test_covered_ids(fe):
    assert fe.covered_ids(np.array([0]), ["A", "B"]) == [0]
    assert fe.covered_ids(np.array([0, 2]), ["A", "B"]) == [0, 1]
    assert fe.covered_ids(np.array([4]), ["A", "B", "C"]) == [2]


def test_coverage_values(fe):
    assert fe.coverage(np.array([0]), ["A", "B"]) == pytest.approx(4 / 11)
    assert fe.coverage(np.array([0, 2, 4]), ["A", "B", "C"]) == pytest.approx(1.0)
    assert fe.coverage(np.array([0]), ["C"]) == 0.0


def test_diversity_values(fe):
    # Rows 0,1 differ only in C → similarity 2/3.
    assert fe.diversity(np.array([0, 1]), ["A", "B", "C"]) == pytest.approx(1 / 3)
    assert fe.diversity(np.array([0, 3]), ["A", "B", "C"]) == pytest.approx(1.0)


def test_combined_alpha():
    fe2 = FastEvaluator(PDF, ITEMSETS, alpha=1.0)
    assert fe2.combined(np.array([0]), ["A", "B"]) == pytest.approx(4 / 11)


def test_score_rids(fe):
    s = fe.score_rids([10, 30], ["A", "B"])
    assert s.cell_coverage == pytest.approx(8 / 11)


def test_unknown_label_matches_nothing():
    its = [(("A", "zz"), ("B", "p"))]
    fe3 = FastEvaluator(PDF, its)
    assert fe3.upcov_cells == 0
    assert fe3.coverage(np.array([0, 1]), ["A", "B"]) == 0.0


def test_no_itemsets():
    fe4 = FastEvaluator(PDF, [])
    assert fe4.upcov_cells == 0
    assert fe4.coverage(np.array([0]), ["A"]) == 0.0
    assert fe4.combined(np.array([0, 1]), ["A", "B"]) >= 0.0


def test_large_random_consistency(prep_cy):
    """covered_ids via bitsets equals a direct recomputation."""
    fe = prep_cy.fe
    g = np.random.default_rng(7)
    rows = g.choice(fe.n, size=10, replace=False)
    cols = list(g.choice(fe.columns, size=8, replace=False))
    got = set(fe.covered_ids(rows, cols))
    sel = set(cols)
    exp = set()
    for i, its in enumerate(fe.itemsets):
        if not {c for c, _ in its} <= sel:
            continue
        if np.intersect1d(fe.itemset_rowidx[i], rows).size:
            exp.add(i)
    assert got == exp
