"""Tests for the EDA-session substrate (generator + replay, Fig 6)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.interactive import InteractiveSubTab
from repro.experiments.common import itemset_supports
from repro.sessions.generator import (
    Query,
    _captured,
    generate_sessions,
    replay_sessions,
)


def test_query_fragments():
    q = Query(filter_col="A", filter_label="x", groupby_col="B")
    assert q.fragments() == {("col", "A"), ("val", "A", "x"), ("col", "B")}


def test_captured_counting():
    sub = pd.DataFrame({"A": ["x", "y"], "B": ["p", "q"]})
    frags = {("col", "A"), ("val", "A", "x"), ("col", "C"), ("val", "B", "z")}
    assert _captured(sub, frags) == 2  # A present, A=x visible; C and B=z not


def test_generate_sessions_shape(prep_cy):
    binned = prep_cy.bt.binned_pandas()
    sessions = generate_sessions(
        binned, prep_cy.itemsets, itemset_supports(prep_cy),
        n_sessions=10, seed=0,
    )
    assert len(sessions) == 10
    for s in sessions:
        assert 3 <= len(s) <= 6
        for q in s:
            assert q.filter_col in binned.columns
            assert q.groupby_col in binned.columns


def test_generate_sessions_deterministic(prep_cy):
    binned = prep_cy.bt.binned_pandas()
    args = (binned, prep_cy.itemsets, itemset_supports(prep_cy))
    a = generate_sessions(*args, n_sessions=5, seed=3)
    b = generate_sessions(*args, n_sessions=5, seed=3)
    assert a == b


def test_pattern_queries_use_rule_labels(prep_cy):
    """With p_pattern=1, every filter must come from a mined itemset."""
    binned = prep_cy.bt.binned_pandas()
    sessions = generate_sessions(
        binned, prep_cy.itemsets, itemset_supports(prep_cy),
        n_sessions=5, p_pattern=1.0, seed=0,
    )
    items = {(c, v) for its in prep_cy.itemsets for c, v in its}
    for s in sessions:
        for q in s:
            assert (q.filter_col, q.filter_label) in items


def test_replay_sessions_output(prep_cy):
    ist = InteractiveSubTab.from_subtab(prep_cy.st, seed=0)
    sessions = generate_sessions(
        ist.binned_pdf, prep_cy.itemsets, itemset_supports(prep_cy),
        n_sessions=4, seed=0,
    )
    out = replay_sessions(
        ist, prep_cy.fe, prep_cy.raw_pandas(), sessions,
        widths=(3, 5), k=6, ran_budget=0.02, seed=0,
    )
    assert set(out["algorithm"]) == {"SubTab", "RAN", "NC"}
    assert set(out["width"]) == {3, 5}
    assert len(out) == 6
    assert out["pct_captured"].between(0, 100).all()
    assert out["avg_combined"].between(0, 1).all()


def test_wider_subtables_capture_more(prep_cy):
    """Monotone-ish: width 7 captures at least as much as width 3 for
    SubTab (the paper's Fig 6 trend)."""
    ist = InteractiveSubTab.from_subtab(prep_cy.st, seed=0)
    sessions = generate_sessions(
        ist.binned_pdf, prep_cy.itemsets, itemset_supports(prep_cy),
        n_sessions=12, seed=1,
    )
    out = replay_sessions(
        ist, prep_cy.fe, prep_cy.raw_pandas(), sessions,
        widths=(3, 7), k=8, ran_budget=0.02, seed=1,
    )
    st = out[out.algorithm == "SubTab"].set_index("width")["pct_captured"]
    assert st[7] >= st[3]
