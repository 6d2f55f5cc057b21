"""Fig 8 reproduction: intrinsic quality of the interactive baselines.

For each of FL, SP, CY, compute a k×l sub-table with SubTab, RAN and NC
and report cell coverage, diversity and the combined score (α = 0.5).
The paper's shape: SubTab's coverage and combined score dominate both
baselines on every dataset; RAN can edge out on diversity (it did on SP)
but with far lower coverage. Reference numbers (read off Fig 8 / §6.2.3):
SP combined — SubTab 0.68, RAN 0.47, NC 0.51.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.naive_cluster import naive_cluster_select
from repro.baselines.random_search import random_best
from repro.experiments.common import Prepared, prepare, ran_draws


def quality_rows(
    p: Prepared,
    *,
    k: int = 10,
    l: int = 10,
    ran_budget: float = 10.0,
    seed: int = 0,
) -> list[dict]:
    """Score SubTab/RAN/NC sub-tables of one prepared dataset."""
    targets = p.ds.targets
    rows: list[dict] = []

    sub = p.st.select(k, l, targets=targets, seed=seed)
    entries = {"SubTab": (sub.rids, sub.cols)}

    rids, cols, _ = random_best(
        p.fe, k, l, targets=targets, time_budget=ran_budget,
        max_iters=ran_draws(p.ds.name), seed=seed,
    )
    entries["RAN"] = (rids, cols)

    rids, cols = naive_cluster_select(
        p.ds.df, k, l, targets=targets, seed=seed
    )
    entries["NC"] = (rids, cols)

    for algo, (rids, cols) in entries.items():
        s = p.fe.score_rids(rids, cols)
        rows.append(
            {
                "dataset": p.ds.name,
                "algorithm": algo,
                "cell_coverage": round(s.cell_coverage, 3),
                "diversity": round(s.diversity, 3),
                "combined": round(s.combined, 3),
            }
        )
    return rows


def run(
    spark: SparkSession,
    *,
    names: tuple[str, ...] = ("FL", "SP", "CY"),
    n_rows: dict[str, int] | None = None,
    k: int = 10,
    l: int = 10,
    ran_budget: float = 10.0,
    seed: int = 0,
) -> pd.DataFrame:
    """Full Fig 8 table over the three quality-analysis datasets."""
    n_rows = n_rows or {}
    out: list[dict] = []
    for name in names:
        p = prepare(spark, name, n_rows=n_rows.get(name), seed=seed)
        out.extend(
            quality_rows(p, k=k, l=l, ran_budget=ran_budget, seed=seed)
        )
    return pd.DataFrame(out)
