"""Fig 6 reproduction: simulated EDA-session replay on CY.

122 sessions of select/group-by steps are generated over the CY
surrogate (next steps follow prominent patterns, §6.2.2 substitution —
see :mod:`repro.sessions.generator`), each query is replayed, a
sub-table of its result is computed by SubTab / RAN / NC at widths
3–7, and we measure the % of next-query fragments present in it.

Paper's shape: SubTab 14% (width 3) rising to 38% (width 7), strictly
above RAN and NC at every width; ranking by avg combined score matches
the ranking by captured fragments (§6.2.3).
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro.core.interactive import InteractiveSubTab
from repro.experiments.common import itemset_supports, prepare
from repro.sessions.generator import generate_sessions, replay_sessions


def run(
    spark: SparkSession,
    *,
    n_rows: int = 30_000,
    n_sessions: int = 122,
    widths: tuple[int, ...] = (3, 4, 5, 6, 7),
    k: int = 10,
    ran_budget: float = 0.05,
    p_pattern: float = 0.75,
    seed: int = 0,
) -> pd.DataFrame:
    """% captured next-query fragments per algorithm × width (CY)."""
    p = prepare(spark, "CY", n_rows=n_rows, seed=seed)
    ist = InteractiveSubTab.from_subtab(p.st, seed=seed)
    sessions = generate_sessions(
        ist.binned_pdf,
        p.itemsets,
        itemset_supports(p),
        fe=p.fe,
        n_sessions=n_sessions,
        p_pattern=p_pattern,
        seed=seed,
    )
    return replay_sessions(
        ist,
        p.fe,
        p.raw_pandas(),
        sessions,
        widths=widths,
        k=k,
        ran_budget=ran_budget,
        seed=seed,
    )
