"""Tests for the simulated-analyst substrate (Table 1)."""
import pandas as pd
import pytest

from repro.study.analyst import (
    UserOutcome,
    aggregate_study,
    candidate_claims,
    claim_is_correct,
    simulate_user,
)


def _sub(rows):
    return pd.DataFrame(rows, columns=["A", "B", "C"])


def test_candidate_claims_cooccurrence():
    sub = _sub([["x", "p", "1"], ["x", "p", "2"], ["y", "q", "1"]])
    claims = dict(candidate_claims(sub, min_cooccur=2))
    assert ((("A", "x"), ("B", "p"))) in claims
    assert claims[(("A", "x"), ("B", "p"))] == 2
    # Pairs seen only once are not visible patterns.
    assert ((("A", "y"), ("B", "q"))) not in claims


def test_candidate_claims_empty_when_diverse():
    sub = _sub([["x", "p", "1"], ["y", "q", "2"], ["z", "r", "3"]])
    assert candidate_claims(sub, min_cooccur=2) == []


FULL = pd.DataFrame(
    {
        "A": ["x"] * 40 + ["y"] * 60,
        "B": ["p"] * 40 + ["q"] * 60,
        "C": [str(i % 3) for i in range(100)],
    }
)


def test_claim_is_correct_true_pattern():
    assert claim_is_correct(FULL, (("A", "x"), ("B", "p")))


def test_claim_is_correct_rejects_weak_support():
    assert not claim_is_correct(
        FULL, (("A", "x"), ("C", "0")), min_support=0.5
    )


def test_claim_is_correct_rejects_independent_pair():
    # A=y and C=0 co-occur only at the independence rate (lift ≈ 1).
    assert not claim_is_correct(FULL, (("A", "y"), ("C", "0")))


def test_claim_is_correct_rejects_absent_value():
    assert not claim_is_correct(FULL, (("A", "zz"), ("B", "p")))


def test_simulate_user_no_claims():
    sub = _sub([["x", "p", "1"], ["y", "q", "2"]])
    out = simulate_user([sub], FULL, seed=0)
    assert out == UserOutcome(n_reported=0, n_correct=0)


def test_simulate_user_reports_real_pattern():
    # 3/5 rows show the (x, p) pattern — visible but not wallpaper.
    sub = _sub(
        [["x", "p", "1"], ["x", "p", "2"], ["x", "p", "0"],
         ["y", "q", "1"], ["z", "r", "2"]]
    )
    out = simulate_user([sub], FULL, seed=0, effort=10, report_prob=1.0)
    assert out.n_reported >= 1
    assert out.n_correct >= 1


def test_wallpaper_values_are_not_claims():
    # The (x, p) pair fills every row: wallpaper, not an insight.
    sub = _sub([["x", "p", str(i % 3)] for i in range(6)])
    assert candidate_claims(sub) == []


def test_simulate_user_effort_caps_reports():
    rows = [["x", "p", "1"], ["x", "p", "2"], ["y", "q", "1"],
            ["y", "q", "2"], ["z", "r", "0"]]
    sub = _sub(rows)
    out = simulate_user([sub], FULL, seed=0, effort=2, report_prob=1.0)
    assert out.n_reported <= 2


def test_simulate_user_deterministic():
    sub = _sub([["x", "p", "1"], ["x", "p", "2"], ["y", "p", "1"]])
    a = simulate_user([sub], FULL, seed=5)
    b = simulate_user([sub], FULL, seed=5)
    assert a == b


def test_aggregate_study_math():
    outs = {
        "X": [UserOutcome(4, 4), UserOutcome(2, 1), UserOutcome(0, 0)],
    }
    df = aggregate_study(outs).set_index("baseline")
    assert df.loc["X", "avg_correct_insights"] == pytest.approx(5 / 3)
    assert df.loc["X", "pct_correct"] == pytest.approx(100 * 5 / 6)
    assert df.loc["X", "pct_users_no_insights"] == pytest.approx(100 / 3)
    assert df.loc["X", "avg_total_insights"] == pytest.approx(2.0)
