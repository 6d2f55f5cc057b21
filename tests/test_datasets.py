"""Tests for the paper-dataset surrogates and the planted-regime generator."""
import re
import numpy as np
import pandas as pd
import pytest

from repro import datasets
from repro.datasets import NAN, CatCol, ContCol, Regime, planted_table
from repro.util import RID

SHAPES = {  # paper column counts (DESIGN.md §3)
    "FL": 31,
    "CY": 15,
    "SP": 15,
    "CC": 31,
    "USF": 298,
    "BL": 19,
}
TEST_ROWS = {name: 800 for name in SHAPES}


@pytest.fixture(scope="module")
def generated(spark):
    return {
        name: datasets.make(spark, name, n_rows=TEST_ROWS[name])
        for name in SHAPES
    }


@pytest.mark.parametrize("name", list(SHAPES))
def test_column_counts(generated, name):
    ds = generated[name]
    assert len(ds.df.columns) - 1 == SHAPES[name]  # minus __rid
    assert ds.n_rows == TEST_ROWS[name]
    assert ds.df.count() == TEST_ROWS[name]


@pytest.mark.parametrize("name", list(SHAPES))
def test_rid_is_stable_index(generated, name):
    rids = [r[RID] for r in generated[name].df.select(RID).collect()]
    assert sorted(rids) == list(range(TEST_ROWS[name]))


@pytest.mark.parametrize("name", ["FL", "SP", "CC", "BL"])
def test_targets_exist(generated, name):
    ds = generated[name]
    assert ds.targets and all(t in ds.df.columns for t in ds.targets)


@pytest.mark.parametrize("name", list(SHAPES))
def test_deterministic(spark, name):
    a = datasets.make(spark, name, n_rows=300).df.toPandas()
    b = datasets.make(spark, name, n_rows=300).df.toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_flights_cancelled_nan_pattern(generated):
    """Example 1.1's structure: cancelled flights have NaN in-flight cells."""
    pdf = generated["FL"].df.toPandas()
    cancelled = pdf[pdf["CANCELLED"] == "1"]
    assert len(cancelled) > 25
    # Most cancelled flights miss DEPARTURE_TIME/AIR_TIME (5% cell noise
    # + ~1% background-cancelled rows keep this below 1.0).
    assert cancelled["DEPARTURE_TIME"].isna().mean() > 0.8
    assert cancelled["AIR_TIME"].isna().mean() > 0.8
    ok = pdf[pdf["CANCELLED"] == "0"]
    assert ok["DEPARTURE_TIME"].isna().mean() < 0.15


def test_flights_delay_columns_mostly_nan(generated):
    pdf = generated["FL"].df.toPandas()
    for c in ("WEATHER_DELAY", "SECURITY_DELAY"):
        assert pdf[c].isna().mean() > 0.5


def test_flights_long_flight_rule(generated):
    """Example 1.2: long flights are likely not cancelled."""
    pdf = generated["FL"].df.toPandas()
    long = pdf[pdf["DISTANCE"] > 1546]
    assert len(long) > 50
    assert (long["CANCELLED"] == "0").mean() > 0.8


def test_credit_mostly_numeric(generated):
    ds = generated["CC"]
    numeric = [
        f.name
        for f in ds.df.schema.fields
        if f.name != RID and f.dataType.typeName() in ("double", "float")
    ]
    assert len(numeric) == 30  # everything but Class (31 columns total)


def test_spotify_regime_supports(generated):
    pdf = generated["SP"].df.toPandas()
    pop = pdf[pdf["genre"] == "pop"]
    # Dance-pop regime: pop songs skew to high popularity.
    assert (pop["popularity"] > 60).mean() > 0.5


def test_usfunds_width(generated):
    ds = generated["USF"]
    assert sum(bool(re.fullmatch(r"f\d+", c)) for c in ds.df.columns) == 290


def test_bankloans_nan_background(generated):
    pdf = generated["BL"].df.toPandas()
    assert pdf["months_since_delinquent"].isna().mean() > 0.3


# --------------------------------------------------- planted_table engine
def test_planted_regime_assignment(spark):
    cont = [ContCol("x", [(0.0, 1.0), (10.0, 11.0)])]
    cat = [CatCol("y", ["u", "v"])]
    regimes = [Regime(0.5, {"x": 1, "y": "u"})]
    ds = planted_table(
        spark, name="T", n_rows=2000, cont=cont, cat=cat,
        regimes=regimes, noise=0.0, seed=0,
    )
    pdf = ds.df.toPandas()
    hi = pdf["x"] >= 10
    # ~50% of rows in the regime; regime rows have y == "u".
    assert 0.55 < hi.mean() < 0.85  # regime + background half
    assert (pdf.loc[hi & (pdf["y"] == "u")].shape[0] / len(pdf)) > 0.45


def test_planted_nan_level(spark):
    cont = [ContCol("x", [(0.0, 1.0)])]
    cat = [CatCol("y", ["u", "v"])]
    regimes = [Regime(0.4, {"x": NAN, "y": NAN})]
    ds = planted_table(
        spark, name="T", n_rows=1000, cont=cont, cat=cat,
        regimes=regimes, noise=0.0, seed=1,
    )
    pdf = ds.df.toPandas()
    assert 0.3 < pdf["x"].isna().mean() < 0.5
    assert 0.3 < pdf["y"].isna().mean() < 0.5


def test_planted_values_within_ranges(spark):
    cont = [ContCol("x", [(5.0, 6.0), (20.0, 30.0)])]
    ds = planted_table(
        spark, name="T", n_rows=500, cont=cont, cat=[], regimes=[], seed=2
    )
    x = ds.df.toPandas()["x"]
    assert (((x >= 5) & (x <= 6)) | ((x >= 20) & (x <= 30))).all()


def test_planted_values_peak_at_level_centers(spark):
    cont = [ContCol("x", [(0.0, 10.0)])]
    ds = planted_table(
        spark, name="T", n_rows=3000, cont=cont, cat=[], regimes=[], seed=3
    )
    x = ds.df.toPandas()["x"]
    # Truncated normal around 5 with sd 10/6: middle-heavy.
    assert ((x > 2.5) & (x < 7.5)).mean() > 0.8


def test_planted_weight_validation(spark):
    with pytest.raises(AssertionError):
        planted_table(
            spark, name="T", n_rows=10, cont=[], cat=[CatCol("y", ["a"])],
            regimes=[Regime(0.7, {}), Regime(0.7, {})], seed=0,
        )
