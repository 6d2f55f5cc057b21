"""Exhaustive reference miner for tiny tables — test oracle for Apriori.

Enumerates every itemset up to ``max_len`` over a pandas binned table and
counts supports directly. Quadratic-ish and driver-only by design; used
solely in tests to validate :mod:`repro.rules.apriori` output exactly.
"""
from __future__ import annotations

from itertools import combinations

import pandas as pd

from repro.rules.apriori import Item, Rule, rules_from_itemsets


def bf_frequent_itemsets(
    binned: pd.DataFrame, *, min_support: float = 0.1, max_len: int = 4
) -> dict[frozenset[Item], float]:
    """All frequent itemsets by brute force over a pandas binned table."""
    n = len(binned)
    cols = list(binned.columns)
    supports: dict[frozenset[Item], float] = {}
    for k in range(1, max_len + 1):
        for col_combo in combinations(cols, k):
            counts = binned.groupby(list(col_combo), dropna=False).size()
            for vals, cnt in counts.items():
                if cnt / n < min_support:
                    continue
                vals = (vals,) if k == 1 else vals
                itemset = frozenset(
                    (c, str(v)) for c, v in zip(col_combo, vals)
                )
                supports[itemset] = cnt / n
    return supports


def bf_rules(
    binned: pd.DataFrame,
    *,
    min_support: float = 0.1,
    min_confidence: float = 0.6,
    min_rule_len: int = 3,
    max_len: int = 4,
    targets: tuple[str, ...] = (),
) -> list[Rule]:
    """Reference rule mining (same rule-generation code as production)."""
    supports = bf_frequent_itemsets(
        binned, min_support=min_support, max_len=max_len
    )
    return rules_from_itemsets(
        supports,
        min_confidence=min_confidence,
        min_rule_len=min_rule_len,
        targets=targets,
    )
