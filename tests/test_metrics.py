"""Metric tests — anchored on the paper's own worked example.

Figure 3 / Examples 3.8–3.9 give exact numbers for the example table T̂:
36 describable cells, sub-table 1 covers 28 (cellCov 0.78), sub-table 2
covers 26 (0.72), sub-table 3 covers 24; diversities 0.83 / 0.92 and
combined scores 0.80 / 0.79. We rebuild T̂ verbatim and assert every one
of those numbers against both metric implementations.
"""
from itertools import combinations

import numpy as np
import pandas as pd
import pytest

from repro.binning.binner import BinnedTable
from repro.metrics.combined import Scores, score_subtable
from repro.metrics.coverage import (
    cell_coverage,
    count_described_cells,
    covered_itemsets,
)
from repro.metrics.diversity import diversity, pairwise_jaccard
from repro.metrics.fast_eval import FastEvaluator
from repro.rules.apriori import Rule
from repro.util import RID

COLS = ["CANCELLED", "DEP_TIME", "YEAR", "SCHED_DEP", "DISTANCE"]
T_HAT = pd.DataFrame(
    [
        ["1", "NaN", "2015", "afternoon", "short"],
        ["1", "NaN", "2015", "afternoon", "medium"],
        ["1", "NaN", "2015", "morning", "medium"],
        ["1", "NaN", "2015", "morning", "short"],
        ["0", "morning", "2016", "morning", "medium"],
        ["0", "morning", "2015", "morning", "medium"],
        ["0", "evening", "2015", "evening", "long"],
        ["0", "evening", "2015", "afternoon", "long"],
    ],
    columns=COLS,
    index=pd.Index(range(1, 9), name=RID),
)


def paper_itemsets():
    """R of Fig 3: rules with CANCELLED on the right and ≥2 columns on
    the left, holding for ≥2 rows — as itemsets (coverage-equivalent)."""
    others = [c for c in COLS if c != "CANCELLED"]
    out = []
    for r in range(2, len(others) + 1):
        for lhs_cols in combinations(others, r):
            groups = T_HAT.groupby(list(lhs_cols) + ["CANCELLED"]).size()
            for vals, cnt in groups.items():
                if cnt >= 2:
                    items = tuple(
                        sorted(
                            list(zip(lhs_cols, vals[:-1]))
                            + [("CANCELLED", vals[-1])]
                        )
                    )
                    out.append(items)
    return sorted(set(out))


@pytest.fixture(scope="module")
def that_bt(spark) -> BinnedTable:
    pdf = T_HAT.reset_index()
    df = spark.createDataFrame(pdf)
    # T̂ values are already bin names: identity "binning".
    return BinnedTable(raw=df, binned=df, bins={c: None for c in COLS}, n_rows=8)


@pytest.fixture(scope="module")
def that_fe() -> FastEvaluator:
    return FastEvaluator(T_HAT, paper_itemsets())


SUB1 = ([1, 5, 7], ["CANCELLED", "DEP_TIME", "YEAR", "DISTANCE"])
SUB2 = ([1, 5, 7], ["CANCELLED", "DEP_TIME", "YEAR", "SCHED_DEP"])
SUB3 = ([1, 5, 7], ["CANCELLED", "DEP_TIME", "SCHED_DEP", "DISTANCE"])


def test_upcov_is_36(that_bt, that_fe):
    assert that_fe.upcov_cells == 36
    assert (
        count_described_cells(that_bt.binned, COLS, paper_itemsets()) == 36
    )


@pytest.mark.parametrize(
    "sub,cells", [(SUB1, 28), (SUB2, 26), (SUB3, 24)], ids=["T1", "T2", "T3"]
)
def test_paper_covered_cells(that_bt, that_fe, sub, cells):
    rids, cols = sub
    pos = that_fe.positions(rids)
    assert that_fe.coverage(pos, cols) == pytest.approx(cells / 36)
    covered = covered_itemsets(T_HAT.loc[rids, cols], paper_itemsets())
    assert count_described_cells(that_bt.binned, COLS, covered) == cells


@pytest.mark.parametrize(
    "sub,div",
    [(SUB1, 1 - (0.25 + 0 + 0.25) / 3), (SUB3, 1 - 0.25 / 3)],
    ids=["T1", "T3"],
)
def test_paper_diversity(that_fe, sub, div):
    rids, cols = sub
    assert diversity(T_HAT.loc[rids, cols]) == pytest.approx(div)
    assert that_fe.diversity(that_fe.positions(rids), cols) == pytest.approx(div)


@pytest.mark.parametrize(
    "sub,combined,paper",
    [
        (SUB1, 0.5 * 28 / 36 + 0.5 * (1 - 1 / 6), 0.80),
        (SUB3, 0.5 * 24 / 36 + 0.5 * (1 - 1 / 12), 0.79),
    ],
    ids=["T1", "T3"],
)
def test_paper_combined(that_fe, sub, combined, paper):
    rids, cols = sub
    s = that_fe.score(that_fe.positions(rids), cols)
    assert s.combined == pytest.approx(combined)
    # Example 3.9 reports 0.80 and 0.79 (the paper rounds 0.8056 → 0.80).
    assert abs(s.combined - paper) < 0.011


def test_sub1_beats_sub3_exactly_as_paper(that_fe):
    s1 = that_fe.score(that_fe.positions(SUB1[0]), SUB1[1]).combined
    s3 = that_fe.score(that_fe.positions(SUB3[0]), SUB3[1]).combined
    assert s1 > s3


def test_spark_cell_coverage_matches_paper(that_bt):
    itemsets = paper_itemsets()
    rules = [
        Rule(lhs=its[:-1], rhs=its[-1:], support=0.5, confidence=1.0, lift=1.0)
        for its in itemsets
    ]
    cov = cell_coverage(that_bt, rules, SUB1[0], SUB1[1])
    assert cov == pytest.approx(28 / 36)


def test_score_subtable_spark(that_bt):
    itemsets = paper_itemsets()
    rules = [
        Rule(lhs=its[:-1], rhs=its[-1:], support=0.5, confidence=1.0, lift=1.0)
        for its in itemsets
    ]
    s = score_subtable(that_bt, rules, SUB1[0], SUB1[1])
    assert s.cell_coverage == pytest.approx(28 / 36)
    assert s.diversity == pytest.approx(1 - 1 / 6)


# ------------------------------------------------------------ unit pieces
def test_covered_requires_all_columns():
    its = [(("A", "x"), ("B", "y"))]
    sub = pd.DataFrame({"A": ["x"], "C": ["z"]})
    assert covered_itemsets(sub, its) == []


def test_covered_requires_matching_row():
    its = [(("A", "x"), ("B", "y"))]
    sub = pd.DataFrame({"A": ["x", "q"], "B": ["z", "y"]})
    assert covered_itemsets(sub, its) == []
    sub2 = pd.DataFrame({"A": ["x"], "B": ["y"]})
    assert covered_itemsets(sub2, its) == its


def test_diversity_bounds():
    same = pd.DataFrame({"A": ["x", "x"], "B": ["y", "y"]})
    assert diversity(same) == 0.0
    diff = pd.DataFrame({"A": ["x", "q"], "B": ["y", "z"]})
    assert diversity(diff) == 1.0
    single = pd.DataFrame({"A": ["x"]})
    assert diversity(single) == 1.0


def test_pairwise_jaccard_count():
    sub = pd.DataFrame({"A": list("abc"), "B": list("xyz")})
    assert len(pairwise_jaccard(sub)) == 3


def test_scores_combined_weights():
    s = Scores(cell_coverage=1.0, diversity=0.0, alpha=0.7)
    assert s.combined == pytest.approx(0.7)


def test_empty_rule_set(that_bt):
    assert cell_coverage(that_bt, [], [1, 5], COLS) == 0.0


def test_count_described_cells_empty(that_bt):
    assert count_described_cells(that_bt.binned, COLS, []) == 0


# --------------------------------------- Spark vs fast evaluator agreement
@pytest.mark.parametrize("seed", [0, 1, 2, 3])
def test_fast_matches_spark_on_surrogate(prep_sp, seed):
    g = np.random.default_rng(seed)
    fe = prep_sp.fe
    rids = [int(r) for r in g.choice(fe.rids, size=8, replace=False)]
    cols = list(g.choice(fe.columns, size=7, replace=False))
    fast = fe.score_rids(rids, cols)
    spark_s = score_subtable(prep_sp.bt, prep_sp.rules, rids, cols)
    assert fast.cell_coverage == pytest.approx(spark_s.cell_coverage)
    assert fast.diversity == pytest.approx(spark_s.diversity)


def test_upcov_matches_spark(prep_sp):
    from repro.metrics.coverage import upcov

    assert prep_sp.fe.upcov_cells == upcov(prep_sp.bt, prep_sp.rules)
