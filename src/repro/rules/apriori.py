"""Distributed Apriori association-rule mining (paper §3.1 Def 3.4, §6.1).

The paper mines rules with the Apriori algorithm [Agrawal & Srikant 1994]
over the *binned* table (one item per column per row, item =
``"col=binlabel"``). We implement level-wise Apriori on Spark:

* transactions = one token array per row, built from the binned table;
* support counting is distributed (``mapInPandas`` with vectorized
  per-token boolean masks — AND of masks counts an itemset);
* candidate generation runs on the driver: after support pruning the
  frequent-itemset lattice is tiny (hundreds of sets), which is the
  standard Apriori structure.

Defaults follow §6.1: support 0.1, confidence 0.6, minimum rule size 3.
``targets`` filters to rules whose columns intersect the target set —
the paper splits the data by target bins and mines per subset; filtering
globally-mined rules to target-containing ones yields the same rule
*family* for coverage purposes (coverage only depends on a rule's
itemset: its columns and matching rows), and is documented in DESIGN.md.
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import combinations
from typing import Iterable, Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.binning.binner import BinnedTable
from repro.util import RID

Item = tuple[str, str]  # (column, bin label)


@dataclass(frozen=True)
class Rule:
    """An association rule LHS → RHS over binned items (Def 3.4)."""

    lhs: tuple[Item, ...]
    rhs: tuple[Item, ...]
    support: float  # support of the full itemset lhs ∪ rhs
    confidence: float
    lift: float

    @property
    def items(self) -> tuple[Item, ...]:
        return tuple(sorted(self.lhs + self.rhs))

    @property
    def columns(self) -> frozenset[str]:
        """U_R — the set of columns used in the rule."""
        return frozenset(c for c, _ in self.items)

    def holds(self, row: dict[str, str]) -> bool:
        """Whether the rule holds for a binned row (all items match)."""
        return all(row.get(c) == v for c, v in self.items)


def transactions(bt: BinnedTable) -> DataFrame:
    """Binned table → (``__rid``, ``items`` array<string>) transactions."""
    toks = [
        F.concat(F.lit(f"{c}="), F.col(c).cast("string")).alias(c)
        for c in bt.columns
    ]
    return bt.binned.select(RID, F.array(*toks).alias("items"))


def _token(item: Item) -> str:
    return f"{item[0]}={item[1]}"


def _untoken(tok: str) -> Item:
    col, _, lab = tok.partition("=")
    return (col, lab)


def _count_candidates(
    tx: DataFrame, candidates: list[frozenset[str]]
) -> np.ndarray:
    """Distributed support counts for candidate itemsets (token sets)."""
    cand_lists = [sorted(c) for c in candidates]
    needed = sorted({t for c in candidates for t in c})
    schema = "cid long, cnt long"

    def count(parts: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        for pdf in parts:
            rows = pdf["items"].tolist()
            n = len(rows)
            if n == 0:
                continue
            masks = {t: np.zeros(n, dtype=bool) for t in needed}
            for i, items in enumerate(rows):
                for t in items:
                    m = masks.get(t)
                    if m is not None:
                        m[i] = True
            counts = []
            for cid, cand in enumerate(cand_lists):
                m = masks[cand[0]].copy()
                for t in cand[1:]:
                    m &= masks[t]
                counts.append((cid, int(m.sum())))
            yield pd.DataFrame(counts, columns=["cid", "cnt"])

    partial = tx.mapInPandas(count, schema=schema)
    agg = partial.groupBy("cid").agg(F.sum("cnt").alias("cnt")).collect()
    out = np.zeros(len(candidates), dtype=np.int64)
    for r in agg:
        out[r["cid"]] = r["cnt"]
    return out


def _gen_candidates(
    frequent_k: list[frozenset[str]], all_frequent: set[frozenset[str]]
) -> list[frozenset[str]]:
    """Apriori-gen: join frequent (k)-itemsets, prune by subset frequency
    and by the one-item-per-column invariant of binned transactions."""
    cands: set[frozenset[str]] = set()
    fk = [tuple(sorted(s)) for s in frequent_k]
    fk.sort()
    for i in range(len(fk)):
        for j in range(i + 1, len(fk)):
            a, b = fk[i], fk[j]
            if a[:-1] != b[:-1]:
                continue
            cand = frozenset(a) | frozenset(b)
            cols = [t.partition("=")[0] for t in cand]
            if len(set(cols)) != len(cols):
                continue
            if any(
                frozenset(s) not in all_frequent
                for s in combinations(sorted(cand), len(cand) - 1)
            ):
                continue
            cands.add(cand)
    return sorted(cands, key=sorted)


def mine_frequent_itemsets(
    bt: BinnedTable,
    *,
    min_support: float = 0.1,
    max_len: int = 3,
) -> dict[frozenset[Item], float]:
    """All frequent itemsets up to ``max_len`` with their supports.

    Returns ``{itemset: support}`` where support is the fraction of rows
    containing the itemset. The transaction scan per level is a Spark
    job; the lattice bookkeeping is driver-side.
    """
    n = bt.n_rows
    if n == 0:
        return {}
    min_cnt = min_support * n
    tx = transactions(bt).cache()
    try:
        # L1 — plain explode/groupBy.
        l1 = (
            tx.select(F.explode("items").alias("t"))
            .groupBy("t")
            .count()
            .filter(F.col("count") >= min_cnt)
            .collect()
        )
        supports: dict[frozenset[str], float] = {
            frozenset([r["t"]]): r["count"] / n for r in l1
        }
        frontier = [s for s in supports]
        all_frequent = set(frontier)
        k = 1
        while frontier and k < max_len:
            cands = _gen_candidates(frontier, all_frequent)
            if not cands:
                break
            counts = _count_candidates(tx, cands)
            frontier = []
            for cand, cnt in zip(cands, counts):
                if cnt >= min_cnt:
                    supports[cand] = cnt / n
                    frontier.append(cand)
                    all_frequent.add(cand)
            k += 1
    finally:
        tx.unpersist()
    return {
        frozenset(_untoken(t) for t in s): sup for s, sup in supports.items()
    }


def rules_from_itemsets(
    supports: dict[frozenset[Item], float],
    *,
    min_confidence: float = 0.6,
    min_rule_len: int = 3,
    targets: Iterable[str] = (),
) -> list[Rule]:
    """Enumerate LHS→RHS splits of frequent itemsets (standard Apriori
    rule generation) meeting the confidence threshold and minimum total
    rule size; optionally keep only rules touching a target column."""
    targets = set(targets)
    rules: list[Rule] = []
    for itemset, sup in supports.items():
        if len(itemset) < min_rule_len:
            continue
        if targets and not ({c for c, _ in itemset} & targets):
            continue
        items = sorted(itemset)
        for r in range(1, len(items)):
            for lhs in combinations(items, r):
                lhs_set = frozenset(lhs)
                rhs_set = itemset - lhs_set
                lhs_sup = supports.get(lhs_set)
                rhs_sup = supports.get(rhs_set)
                if lhs_sup is None or lhs_sup <= 0:
                    continue
                conf = sup / lhs_sup
                if conf < min_confidence:
                    continue
                lift = conf / rhs_sup if rhs_sup else float("nan")
                rules.append(
                    Rule(
                        lhs=tuple(sorted(lhs_set)),
                        rhs=tuple(sorted(rhs_set)),
                        support=sup,
                        confidence=conf,
                        lift=lift,
                    )
                )
    return rules


def mine_rules(
    bt: BinnedTable,
    *,
    min_support: float = 0.1,
    min_confidence: float = 0.6,
    min_rule_len: int = 3,
    max_len: int = 3,
    targets: Iterable[str] = (),
) -> list[Rule]:
    """End-to-end §6.1 rule mining over a binned table."""
    supports = mine_frequent_itemsets(
        bt, min_support=min_support, max_len=max_len
    )
    return rules_from_itemsets(
        supports,
        min_confidence=min_confidence,
        min_rule_len=min_rule_len,
        targets=targets,
    )


def mine_rules_per_target_bin(
    bt: BinnedTable,
    targets: Iterable[str],
    *,
    min_support: float = 0.1,
    min_rule_len: int = 3,
    max_len: int = 4,
    min_lift: float = 1.3,
    max_itemsets_per_bin: int | None = None,
) -> list[Rule]:
    """§6.1's target-aware mining: split the table by each target
    column's bins, mine each subset separately (support relative to the
    subset), and attach the target condition as the rule's RHS.

    This is what lets minority-class patterns (e.g. the 2–6% of
    cancelled flights, whose in-flight columns are NaN) surface as
    rules at support 0.1 — globally they would be far below threshold.
    ``Rule.support`` is the overall (whole-table) support so the metric
    math stays consistent; prominence capping is applied per bin so the
    minority bins keep their share.

    ``min_lift`` gates the LHS itemset's *internal* association within
    the subset (observed support / independence expectation): without
    it, any two near-uniform 3-bin columns pass support 0.1 by chance
    (1/9 ≈ 0.11) and flood the rule family with noise — the paper's
    "prominent" rules are exactly the ones with real lift (cf. Fig 2's
    rule annotations).
    """
    from pyspark.sql import functions as F

    n_total = bt.n_rows
    rules: list[Rule] = []
    for u in targets:
        bins = [
            r[u]
            for r in bt.binned.select(u).distinct().collect()
            if r[u] is not None
        ]
        for b in sorted(bins):
            rids = bt.binned.filter(F.col(u) == b).select(RID)
            sub = bt.restrict_rids(rids)
            if sub.n_rows == 0:
                continue
            frac = sub.n_rows / n_total
            sub_bins = {c: v for c, v in bt.bins.items() if c != u}
            sub = BinnedTable(
                raw=sub.raw,
                binned=sub.binned.drop(u),
                bins=sub_bins,
                n_rows=sub.n_rows,
            )
            supports = mine_frequent_itemsets(
                sub, min_support=min_support, max_len=max(max_len - 1, 1)
            )
            bin_rules: list[Rule] = []
            for itemset, sup in supports.items():
                if len(itemset) + 1 < min_rule_len:
                    continue
                # Internal association of the LHS within the subset:
                # *minimum pairwise* lift. An aggregate lift lets a
                # near-constant column (e.g. CANCELLATION_REASON = NaN
                # given CANCELLED = 0) piggyback on any genuinely
                # associated pair, bloating U_R with a column no
                # sub-table selects; requiring every pair to be
                # associated prunes exactly those.
                lift = float("inf")
                items = sorted(itemset)
                for ai in range(len(items)):
                    for bi in range(ai + 1, len(items)):
                        pair = supports.get(frozenset([items[ai], items[bi]]))
                        pa = supports.get(frozenset([items[ai]]), 1.0)
                        pb = supports.get(frozenset([items[bi]]), 1.0)
                        if pair is None:
                            lift = 0.0
                        elif pa * pb > 0:
                            lift = min(lift, pair / (pa * pb))
                if len(itemset) >= 2 and lift < min_lift:
                    continue
                bin_rules.append(
                    Rule(
                        lhs=tuple(sorted(itemset)),
                        rhs=((u, str(b)),),
                        support=sup * frac,
                        confidence=sup,
                        lift=lift,
                    )
                )
            if max_itemsets_per_bin is not None:
                bin_rules = prominent_rules(bin_rules, max_itemsets_per_bin)
            rules.extend(bin_rules)
    return rules


def distinct_rule_itemsets(rules: Iterable[Rule]) -> list[tuple[Item, ...]]:
    """Distinct rule itemsets — cell coverage (Def 3.6) depends only on a
    rule's columns U_R and matching rows T_R, both functions of the
    itemset, so metric code deduplicates LHS/RHS splits here."""
    return sorted({r.items for r in rules})


def prominent_rules(rules: Iterable[Rule], max_itemsets: int) -> list[Rule]:
    """Keep only the rules of the ``max_itemsets`` most *prominent*
    itemsets (highest support, ties broken by size then lexicographic).

    The paper measures coverage against "prominent association rules"
    (footnote 3: prominence via support/confidence); on tables with
    near-constant columns the raw mined set explodes combinatorially,
    so experiments cap the rule family this way and report the cap.
    """
    by_itemset: dict[tuple[Item, ...], float] = {}
    for r in rules:
        by_itemset[r.items] = max(by_itemset.get(r.items, 0.0), r.support)
    keep = set(
        sorted(by_itemset, key=lambda it: (-by_itemset[it], -len(it), it))[
            :max_itemsets
        ]
    )
    return [r for r in rules if r.items in keep]
