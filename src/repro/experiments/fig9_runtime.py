"""Fig 9 reproduction: SubTab running time per dataset.

Per paper §6.3, time the two phases separately on all six datasets:
Pre-processing (binning + embedding, once per table) and Selection
(per display). The shape to reproduce: pre-processing dominates, the
all-numeric CC is disproportionately expensive for its row count
(every column must be KDE-binned), and selection stays within a few
seconds everywhere — including on the 298-column USF.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import SparkSession

from repro import datasets
from repro.core.subtab import SubTab

# Scaled-down default sizes (paper sizes in DESIGN.md §3).
DEFAULT_SIZES: dict[str, int] = {
    "FL": 60_000,
    "CY": 30_000,
    "SP": 42_000,
    "CC": 50_000,
    "USF": 5_000,
    "BL": 30_000,
}


def run(
    spark: SparkSession,
    *,
    sizes: dict[str, int] | None = None,
    k: int = 10,
    l: int = 10,
    seed: int = 0,
) -> pd.DataFrame:
    """Per-dataset timing rows (pre-processing split into bin/embed)."""
    sizes = {**DEFAULT_SIZES, **(sizes or {})}
    rows: list[dict] = []
    for name, n in sizes.items():
        ds = datasets.make(spark, name, n_rows=n)
        st = SubTab(seed=seed).preprocess(ds.df)
        st.select(k, l, targets=ds.targets, seed=seed)
        rows.append(
            {
                "dataset": name,
                "n_rows": n,
                "n_cols": len(st.bt.columns),
                "bin_seconds": round(st.timings["bin"], 2),
                "embed_seconds": round(st.timings["embed"], 2),
                "preprocess_seconds": round(st.timings["preprocess"], 2),
                "select_seconds": round(st.timings["select"], 2),
            }
        )
    return pd.DataFrame(rows)
