"""Unit tests for the binning substrate (Def 3.2 / §5.1 step 1)."""
import numpy as np
import pandas as pd
import pytest

from repro.binning import binner
from repro.binning.binner import (
    NAN_LABEL,
    OTHER_LABEL,
    ColumnBins,
    apply_bins,
    bin_table,
    fit_bins,
)
from repro.util import RID, rng


# ---------------------------------------------------------------- KDE unit
def test_kde_finds_valley_between_two_modes():
    g = rng(0)
    x = np.concatenate([g.normal(0, 0.5, 2000), g.normal(10, 0.5, 2000)])
    edges = binner._gaussian_kde_valleys(x, n_bins=5)
    assert edges is not None and len(edges) >= 1
    assert 2 < edges[0] < 8  # valley between the modes


def test_kde_three_modes_two_valleys():
    g = rng(1)
    x = np.concatenate(
        [g.normal(0, 0.4, 1500), g.normal(5, 0.4, 1500), g.normal(10, 0.4, 1500)]
    )
    edges = binner._gaussian_kde_valleys(x, n_bins=5)
    assert edges is not None and len(edges) == 2


def test_kde_rejects_degenerate_inputs():
    assert binner._gaussian_kde_valleys(np.array([1.0] * 100), 5) is None
    assert binner._gaussian_kde_valleys(np.array([1.0, 2.0]), 5) is None


@pytest.mark.parametrize("n_bins", [3, 5, 7])
def test_quantile_edges_monotone(n_bins):
    g = rng(2)
    x = g.random(5000) * 100
    edges = binner._quantile_edges(x, n_bins)
    assert edges == sorted(edges)
    assert len(edges) <= n_bins - 1


def test_quantile_edges_dedupe_on_constant_mass():
    x = np.array([1.0] * 990 + [2.0] * 10)
    edges = binner._quantile_edges(x, 5)
    assert len(edges) == len(set(edges))


def test_bin_labels_spread():
    assert binner._bin_labels(1) == ["very_low"]
    assert binner._bin_labels(3) == ["very_low", "medium", "very_high"]
    assert binner._bin_labels(5) == binner._ORDINAL
    assert len(binner._bin_labels(8)) == 8


# ------------------------------------------------------------- fit + apply
@pytest.fixture(scope="module")
def mixed_df(spark):
    g = rng(3)
    n = 1200
    pdf = pd.DataFrame(
        {
            RID: np.arange(n),
            "cont": np.concatenate(
                [g.normal(0, 1, n // 2), g.normal(20, 1, n - n // 2)]
            ),
            "cont_nan": np.where(g.random(n) < 0.3, np.nan, g.random(n) * 10),
            "cat_small": g.choice(["a", "b", "c"], n),
            "cat_big": g.choice([f"v{i}" for i in range(30)], n),
            "binary": g.integers(0, 2, n),
            "constant": np.ones(n),
        }
    )
    pdf.loc[:10, "cat_small"] = None
    return spark.createDataFrame(pdf)


@pytest.fixture(scope="module")
def mixed_bins(mixed_df):
    return fit_bins(mixed_df, n_bins=5, seed=0)


def test_fit_kinds(mixed_bins):
    assert mixed_bins["cont"].kind == "continuous"
    assert mixed_bins["cont_nan"].kind == "continuous"
    assert mixed_bins["cat_small"].kind == "categorical"
    assert mixed_bins["cat_big"].kind == "categorical"
    assert mixed_bins["binary"].kind == "categorical"
    assert mixed_bins["constant"].kind == "categorical"


def test_fit_bin_counts(mixed_bins):
    for c, cb in mixed_bins.items():
        assert 1 <= cb.n_bins <= 5, c


def test_categorical_other_bucket(mixed_bins):
    assert OTHER_LABEL in mixed_bins["cat_big"].labels
    assert len(mixed_bins["cat_big"].categories) == 4
    assert OTHER_LABEL not in mixed_bins["cat_small"].labels


def test_continuous_edges_monotone(mixed_bins):
    for cb in mixed_bins.values():
        if cb.kind == "continuous":
            assert cb.edges == sorted(cb.edges)


def test_kde_bimodal_column_gets_mode_bins(mixed_bins):
    # cont is strongly bimodal at 0 and 20 — KDE must split near 10.
    edges = mixed_bins["cont"].edges
    assert any(3 < e < 17 for e in edges)


def test_apply_bins_labels(mixed_df, mixed_bins):
    binned = apply_bins(mixed_df, mixed_bins).toPandas().set_index(RID)
    raw = mixed_df.toPandas().set_index(RID)
    for c, cb in mixed_bins.items():
        allowed = set(cb.labels) | {NAN_LABEL}
        assert set(binned[c].unique()) <= allowed, c
    # NaN cells must land in the NaN bin.
    nan_rows = raw["cont_nan"].isna()
    assert (binned.loc[nan_rows.values, "cont_nan"] == NAN_LABEL).all()


def test_apply_bins_continuous_assignment(mixed_df, mixed_bins):
    binned = apply_bins(mixed_df, mixed_bins).toPandas().set_index(RID)
    raw = mixed_df.toPandas().set_index(RID)
    cb = mixed_bins["cont"]
    edges = [-np.inf] + cb.edges + [np.inf]
    expect = pd.cut(raw["cont"], bins=edges, labels=cb.labels, right=False)
    assert (binned["cont"].values == expect.astype(str).values).all()


def test_apply_bins_categorical_assignment(mixed_df, mixed_bins):
    binned = apply_bins(mixed_df, mixed_bins).toPandas().set_index(RID)
    raw = mixed_df.toPandas().set_index(RID)
    cb = mixed_bins["cat_big"]
    exp = raw["cat_big"].astype(str).where(
        raw["cat_big"].astype(str).isin(cb.categories), OTHER_LABEL
    )
    assert (binned["cat_big"].values == exp.values).all()


def test_null_categorical_is_nan_label(mixed_df, mixed_bins):
    binned = apply_bins(mixed_df, mixed_bins).toPandas().set_index(RID)
    assert (binned.loc[:10, "cat_small"] == NAN_LABEL).all()


@pytest.mark.parametrize("n_bins", [3, 5, 8])
def test_bin_table_end_to_end(spark, mixed_df, n_bins):
    bt = bin_table(mixed_df, n_bins=n_bins, seed=0)
    assert bt.n_rows == mixed_df.count()
    assert set(bt.columns) == set(mixed_df.columns) - {RID}
    pdf = bt.binned_pandas()
    assert pdf.shape == (bt.n_rows, len(bt.columns))
    assert pdf.notna().all().all()  # everything is a label string


def test_bin_table_deterministic(spark, mixed_df):
    a = bin_table(mixed_df, seed=0).binned_pandas()
    b = bin_table(mixed_df, seed=0).binned_pandas()
    assert a.equals(b)


def test_restrict_rids(spark, mixed_df):
    bt = bin_table(mixed_df, seed=0)
    sub = bt.restrict_rids([0, 5, 9])
    assert sub.n_rows == 3
    assert sorted(sub.binned_pandas().index) == [0, 5, 9]
    assert sub.bins is bt.bins


def test_token_format():
    from repro.binning.binner import BinnedTable

    assert BinnedTable.token("DIST", "high") == "DIST=high"


def test_binning_oracle_counts(spark, mixed_df, mixed_bins):
    """Bin frequencies computed by Spark match a DuckDB CASE expression."""
    from repro.oracle import assert_equivalent

    binned = apply_bins(mixed_df, mixed_bins)
    got = binned.groupBy("cat_small").count().withColumnRenamed("count", "n")
    cb = mixed_bins["cat_small"]
    whens = " ".join(
        f"WHEN CAST(cat_small AS VARCHAR) = '{c}' THEN '{c}'"
        for c in cb.categories
    )
    other = OTHER_LABEL if OTHER_LABEL in cb.labels else NAN_LABEL
    sql = f"""
        SELECT CASE WHEN cat_small IS NULL THEN '{NAN_LABEL}' {whens}
                    ELSE '{other}' END AS cat_small, COUNT(*) AS n
        FROM t GROUP BY 1
    """
    assert_equivalent(got, sql, t=mixed_df)
