"""Fig 7 reproduction: quality vs. total runtime of the slow baselines.

On the FL dataset, compare SubTab against the non-interactive
comparators: EmbDI-style graph-walk embedding, MAB (UCB) search, and
semi-greedy Alg 1 — each reporting its combined score and its total
wall-clock time (pre-processing + selection, or search budget).

Paper's shape (FL, their testbed): Greedy best quality but 48 h; EmbDI
≈ SubTab quality but ~26× slower pre-processing (40 min vs 1.5 min);
MAB worst quality despite long runtime. Budgets here are scaled to
seconds/minutes (DESIGN.md §5) — the ordering is the reproduction
target, not the absolute times.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines.greedy import semi_greedy
from repro.baselines.mab import mab_select
from repro.core.subtab import SubTab
from repro.embedding.embdi import train_embdi_vectors
from repro.experiments.common import prepare
from repro.util import timer


def run(
    spark: SparkSession,
    *,
    n_rows: int = 20_000,
    k: int = 10,
    l: int = 10,
    greedy_budget: float = 60.0,
    mab_budget: float = 30.0,
    embdi_walks: int = 20,
    seed: int = 0,
) -> pd.DataFrame:
    """Combined score + total seconds for SubTab / EmbDI / MAB / Greedy."""
    p = prepare(spark, "FL", n_rows=n_rows, seed=seed)
    targets = p.ds.targets
    rows: list[dict] = []

    def add(algo: str, rids, cols, seconds: float) -> None:
        s = p.fe.score_rids(rids, cols)
        rows.append(
            {
                "algorithm": algo,
                "cell_coverage": round(s.cell_coverage, 3),
                "diversity": round(s.diversity, 3),
                "combined": round(s.combined, 3),
                "total_seconds": round(seconds, 2),
            }
        )

    # SubTab: pre-processing already timed by prepare(); add selection.
    sub = p.st.select(k, l, targets=targets, seed=seed)
    add(
        "SubTab",
        sub.rids,
        sub.cols,
        p.st.timings["preprocess"] + p.st.timings["select"],
    )

    # EmbDI-like: swap the embedding, reuse the selection phase.
    with timer() as t_emb:
        vecs = train_embdi_vectors(
            p.bt, walks_per_token=embdi_walks, seed=seed
        )
        st2 = SubTab(seed=seed).with_vectors(p.bt, vecs)
        sub2 = st2.select(k, l, targets=targets, seed=seed)
    add("EmbDI", sub2.rids, sub2.cols, t_emb())

    with timer() as t_mab:
        rids, cols, _ = mab_select(
            p.fe, k, l, targets=targets, time_budget=mab_budget,
            max_iters=200, seed=seed,
        )
    add("MAB", rids, cols, t_mab())

    with timer() as t_greedy:
        rids, cols, _ = semi_greedy(
            p.fe, k, l, targets=targets, time_budget=greedy_budget, seed=seed
        )
    add("Greedy", rids, cols, t_greedy())

    return pd.DataFrame(rows)
