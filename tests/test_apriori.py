"""Tests for the distributed Apriori miner vs the brute-force reference."""
import numpy as np
import pandas as pd
import pytest

from repro.binning.binner import bin_table
from repro.rules.apriori import (
    Rule,
    distinct_rule_itemsets,
    mine_frequent_itemsets,
    mine_rules,
    prominent_rules,
    rules_from_itemsets,
    transactions,
)
from repro.rules.bruteforce import bf_frequent_itemsets, bf_rules
from repro.util import RID, rng


def _tiny_table(spark, seed=0, n=200):
    """Categorical table with a planted pattern (a1 & b1 → c1)."""
    g = rng(seed)
    a = g.choice(["a1", "a2", "a3"], n)
    b = g.choice(["b1", "b2"], n)
    c = g.choice(["c1", "c2"], n)
    planted = g.random(n) < 0.4
    a[planted], b[planted], c[planted] = "a1", "b1", "c1"
    pdf = pd.DataFrame({RID: np.arange(n), "A": a, "B": b, "C": c})
    return spark.createDataFrame(pdf), pdf


@pytest.fixture(scope="module")
def tiny(spark):
    df, pdf = _tiny_table(spark)
    return bin_table(df, n_bins=5, seed=0), pdf.set_index(RID)


def test_transactions_shape(tiny):
    bt, pdf = tiny
    tx = transactions(bt).toPandas()
    assert len(tx) == len(pdf)
    assert all(len(items) == 3 for items in tx["items"])
    assert all(
        any(t.startswith("A=") for t in items) for items in tx["items"]
    )


@pytest.mark.parametrize("min_support", [0.05, 0.1, 0.3])
def test_itemsets_match_bruteforce(tiny, min_support):
    bt, _ = tiny
    got = mine_frequent_itemsets(bt, min_support=min_support, max_len=3)
    exp = bf_frequent_itemsets(
        bt.binned_pandas(), min_support=min_support, max_len=3
    )
    assert set(got) == set(exp)
    for k in got:
        assert got[k] == pytest.approx(exp[k])


@pytest.mark.parametrize("min_conf", [0.3, 0.6, 0.9])
def test_rules_match_bruteforce(tiny, min_conf):
    bt, _ = tiny
    got = mine_rules(bt, min_support=0.1, min_confidence=min_conf)
    exp = bf_rules(bt.binned_pandas(), min_support=0.1, min_confidence=min_conf)
    key = lambda r: (r.lhs, r.rhs)
    assert sorted(map(key, got)) == sorted(map(key, exp))


def test_planted_rule_is_found(tiny):
    bt, _ = tiny
    rules = mine_rules(bt, min_support=0.2, min_confidence=0.6, min_rule_len=3)
    itemsets = {r.items for r in rules}
    assert (("A", "a1"), ("B", "b1"), ("C", "c1")) in itemsets


def test_support_matches_oracle(tiny, spark):
    """Itemset support counts agree with a DuckDB GROUP BY."""
    from repro.oracle import assert_equivalent

    bt, _ = tiny
    got = (
        bt.binned.groupBy("A", "B", "C").count().withColumnRenamed("count", "n")
    )
    assert_equivalent(
        got,
        "SELECT A, B, C, COUNT(*) AS n FROM t GROUP BY A, B, C",
        t=bt.binned.select("A", "B", "C"),
    )
    supports = mine_frequent_itemsets(bt, min_support=0.2, max_len=3)
    pdf = bt.binned_pandas()
    for itemset, sup in supports.items():
        mask = np.ones(len(pdf), dtype=bool)
        for c, v in itemset:
            mask &= (pdf[c] == v).to_numpy()
        assert sup == pytest.approx(mask.mean())


def test_rule_confidence_and_lift(tiny):
    bt, _ = tiny
    rules = mine_rules(bt, min_support=0.1, min_confidence=0.3)
    pdf = bt.binned_pandas()
    n = len(pdf)
    for r in rules[:20]:
        lhs_mask = np.ones(n, dtype=bool)
        for c, v in r.lhs:
            lhs_mask &= (pdf[c] == v).to_numpy()
        rhs_mask = np.ones(n, dtype=bool)
        for c, v in r.rhs:
            rhs_mask &= (pdf[c] == v).to_numpy()
        both = (lhs_mask & rhs_mask).mean()
        assert r.support == pytest.approx(both)
        assert r.confidence == pytest.approx(both / lhs_mask.mean())
        assert r.lift == pytest.approx(r.confidence / rhs_mask.mean())


def test_min_rule_len_respected(tiny):
    bt, _ = tiny
    rules = mine_rules(bt, min_support=0.05, min_confidence=0.1, min_rule_len=3)
    assert all(len(r.items) >= 3 for r in rules)


def test_one_item_per_column(tiny):
    bt, _ = tiny
    supports = mine_frequent_itemsets(bt, min_support=0.05, max_len=3)
    for itemset in supports:
        cols = [c for c, _ in itemset]
        assert len(cols) == len(set(cols))


def test_targets_filter():
    sups = {
        frozenset({("A", "x"), ("B", "y"), ("C", "z")}): 0.5,
        frozenset({("A", "x"), ("B", "y"), ("D", "w")}): 0.5,
        frozenset({("A", "x"), ("B", "y")}): 0.6,
        frozenset({("A", "x")}): 0.7,
        frozenset({("B", "y")}): 0.7,
        frozenset({("C", "z")}): 0.6,
        frozenset({("A", "x"), ("C", "z")}): 0.5,
        frozenset({("B", "y"), ("C", "z")}): 0.5,
        frozenset({("D", "w")}): 0.6,
        frozenset({("A", "x"), ("D", "w")}): 0.5,
        frozenset({("B", "y"), ("D", "w")}): 0.5,
    }
    rules = rules_from_itemsets(sups, min_confidence=0.0, targets=("C",))
    assert rules and all("C" in r.columns for r in rules)


def test_rule_holds():
    r = Rule(
        lhs=(("A", "x"),), rhs=(("B", "y"),), support=0.5, confidence=0.8, lift=1.1
    )
    assert r.holds({"A": "x", "B": "y", "C": "q"})
    assert not r.holds({"A": "x", "B": "z"})
    assert r.columns == frozenset({"A", "B"})


def test_distinct_rule_itemsets_dedupes():
    r1 = Rule((("A", "x"),), (("B", "y"),), 0.5, 0.8, 1.0)
    r2 = Rule((("B", "y"),), (("A", "x"),), 0.5, 0.7, 1.0)
    assert len(distinct_rule_itemsets([r1, r2])) == 1


def test_prominent_rules_cap():
    rules = [
        Rule((("A", str(i)),), (("B", str(i)), ("C", str(i))), 0.1 + i / 100, 0.9, 1.0)
        for i in range(10)
    ]
    kept = prominent_rules(rules, 3)
    assert len({r.items for r in kept}) == 3
    # Highest-support itemsets survive.
    assert max(r.support for r in rules) == max(r.support for r in kept)


def test_empty_table(spark):
    pdf = pd.DataFrame({RID: [0], "A": ["x"]})
    bt = bin_table(spark.createDataFrame(pdf), seed=0)
    sups = mine_frequent_itemsets(bt, min_support=0.5)
    assert frozenset({("A", "x")}) in sups


def test_mining_on_planted_dataset(prep_sp):
    """The SP surrogate's dance-pop regime must surface as rules."""
    itemsets = {frozenset(i) for i in prep_sp.itemsets}
    cols_seen = {c for its in itemsets for c, _ in its}
    assert "popularity" in cols_seen  # target-filtered mining
    assert len(prep_sp.rules) > 10
