"""Surrogates for the paper's six evaluation datasets (§6.1).

The Kaggle/honeynet datasets are not downloadable offline, so each is
replaced by a synthetic table with the same shape (column count, type
mix, NaN structure) and **planted regimes**: latent mixture components
that fix the *level* (≈ bin) of a subset of columns. Rows drawn from a
regime agree on those levels, which is precisely what makes association
rules "prominent" — the property the paper's entire pipeline (rule
mining ground truth + Word2Vec co-occurrence) depends on. Everything is
deterministic in ``seed``. See DESIGN.md §3 for the substitution table.

A level is either an index into a continuous column's value ranges, a
category string, or ``NAN`` (the flights dataset's motivating pattern:
cancelled flights have NaN in all in-flight columns).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.util import RID, rng

NAN = "__nan__"  # level sentinel: the cell is missing under this regime


@dataclass
class ContCol:
    """Continuous column with named value ranges (its latent levels)."""

    name: str
    ranges: list[tuple[float, float]]


@dataclass
class CatCol:
    """Categorical column with its category list.

    ``weights`` sets the *background* (non-regime) category distribution
    — e.g. CANCELLED is ~3% positive outside the cancellation regimes,
    matching the real flights data; uniform when omitted.
    """

    name: str
    cats: list[str]
    weights: list[float] | None = None


@dataclass
class Regime:
    """A latent mixture component: weight + {column: level} assignments."""

    weight: float
    sets: dict[str, object]


@dataclass
class Dataset:
    """A generated surrogate: the Spark table plus its metadata."""

    name: str
    df: DataFrame
    targets: tuple[str, ...]
    regimes: list[Regime]
    n_rows: int


def planted_table(
    spark: SparkSession,
    *,
    name: str,
    n_rows: int,
    cont: list[ContCol],
    cat: list[CatCol],
    regimes: list[Regime],
    targets: tuple[str, ...] = (),
    noise: float = 0.05,
    nan_background: dict[str, float] | None = None,
    derived: dict[str, tuple[str, float]] | None = None,
    seed: int = 0,
) -> Dataset:
    """Generate a table from the regime mixture (vectorized pandas build).

    Background rows (weight 1 − Σ regime weights) take uniform levels;
    regime rows take their assigned levels except with probability
    ``noise`` per constrained cell. ``nan_background`` gives per-column
    background missingness. ``derived`` ties a continuous column to an
    earlier one: ``{col: (source, p)}`` copies the source's level (NaN
    included) with probability ``p`` — real tables are full of such
    redundant families (wheels-off time ≈ departure time, elapsed ≈ air
    time ≈ distance), and they matter: they mean no column is pure
    noise. Priority per cell: regime > derived > background.
    """
    g = rng(seed)
    nan_background = nan_background or {}
    derived = derived or {}
    weights = [r.weight for r in regimes]
    assert sum(weights) <= 1.0 + 1e-9, "regime weights must sum to ≤ 1"
    probs = weights + [max(0.0, 1.0 - sum(weights))]
    assign = g.choice(len(regimes) + 1, size=n_rows, p=np.array(probs) / sum(probs))
    data: dict[str, np.ndarray] = {RID: np.arange(n_rows, dtype=np.int64)}
    lv_by_col: dict[str, np.ndarray] = {}
    for col in cont:
        n_lv = len(col.ranges)
        lv = g.integers(0, n_lv, n_rows)
        p_nan = nan_background.get(col.name, 0.0)
        if p_nan:
            lv = np.where(g.random(n_rows) < p_nan, -1, lv)
        if col.name in derived:
            src, p_copy = derived[col.name]
            src_lv = lv_by_col[src]  # source must be declared earlier
            copy = g.random(n_rows) < p_copy
            # Clamp to this column's level count (families may differ).
            lv = np.where(copy, np.minimum(src_lv, n_lv - 1), lv)
        for ri, reg in enumerate(regimes):
            if col.name not in reg.sets:
                continue
            tgt = reg.sets[col.name]
            rows = (assign == ri) & (g.random(n_rows) >= noise)
            lv = np.where(rows, -1 if tgt == NAN else int(tgt), lv)
        lv_by_col[col.name] = lv
        los = np.array([r[0] for r in col.ranges] + [0.0])
        his = np.array([r[1] for r in col.ranges] + [0.0])
        # Values peak at the level's center (truncated normal): levels
        # become density modes, so KDE binning recovers them as bins —
        # the real-data property the paper's binning step exploits.
        mid = (los[lv] + his[lv]) / 2
        span = his[lv] - los[lv]
        vals = np.clip(
            mid + g.standard_normal(n_rows) * span / 6, los[lv], his[lv]
        )
        vals = np.where(lv == -1, np.nan, vals)
        data[col.name] = vals.round(3)
    cat_frames: dict[str, pd.Series] = {}
    for col in cat:
        n_lv = len(col.cats)
        if col.weights is not None:
            w = np.asarray(col.weights, dtype=float)
            lv = g.choice(n_lv, size=n_rows, p=w / w.sum())
        else:
            lv = g.integers(0, n_lv, n_rows)
        p_nan = nan_background.get(col.name, 0.0)
        if p_nan:
            lv = np.where(g.random(n_rows) < p_nan, -1, lv)
        for ri, reg in enumerate(regimes):
            if col.name not in reg.sets:
                continue
            tgt = reg.sets[col.name]
            rows = (assign == ri) & (g.random(n_rows) >= noise)
            code = -1 if tgt == NAN else col.cats.index(str(tgt))
            lv = np.where(rows, code, lv)
        cats = np.array(col.cats + [None], dtype=object)
        cat_frames[col.name] = pd.Series(cats[lv])
    pdf = pd.DataFrame({**data, **cat_frames})
    # Keep a stable, schema-like column order: rid first, then spec order.
    order = [RID] + [c.name for c in cont] + [c.name for c in cat]
    pdf = pdf[order]
    return Dataset(
        name=name,
        df=spark.createDataFrame(pdf),
        targets=targets,
        regimes=regimes,
        n_rows=n_rows,
    )


# --------------------------------------------------------------------------
# FL — Kaggle flights (paper: 6M×31; CANCELLED is the running target)
# --------------------------------------------------------------------------
_TIME = [(0.0, 600.0), (600.0, 1200.0), (1200.0, 1800.0), (1800.0, 2400.0)]
_DELAY = [(-10.0, 0.0), (0.0, 15.0), (15.0, 60.0), (60.0, 300.0)]
_MINS = [(0.0, 5.0), (5.0, 30.0), (30.0, 180.0)]


def flights(spark: SparkSession, *, n_rows: int = 60_000, seed: int = 10) -> Dataset:
    """FL surrogate: 31 columns; cancelled flights have NaN in-flight
    columns (Example 1.1) and the paper's two Example 1.2 rules are
    planted (long flights → not cancelled; short afternoon → cancelled)."""
    # Declaration order matters: `derived` sources must come first.
    cont = [
        ContCol("SCHEDULED_DEPARTURE", _TIME),
        ContCol("DEPARTURE_TIME", _TIME),
        ContCol("WHEELS_OFF", _TIME),
        ContCol("SCHEDULED_ARRIVAL", _TIME),
        ContCol("ARRIVAL_TIME", _TIME),
        ContCol("WHEELS_ON", _TIME),
        ContCol("AIR_TIME", [(20.0, 90.0), (90.0, 198.0), (198.0, 422.0)]),
        ContCol("ELAPSED_TIME", [(30.0, 90.0), (90.0, 198.0), (198.0, 430.0)]),
        ContCol("SCHEDULED_TIME", [(30.0, 90.0), (90.0, 198.0), (198.0, 430.0)]),
        ContCol("DISTANCE", [(50.0, 500.0), (500.0, 1546.0), (1546.0, 2724.0)]),
        ContCol("DEPARTURE_DELAY", _DELAY),
        ContCol("ARRIVAL_DELAY", _DELAY),
        ContCol("LATE_AIRCRAFT_DELAY", _MINS),
        ContCol("TAXI_OUT", [(1.0, 10.0), (10.0, 25.0), (25.0, 60.0)]),
        ContCol("TAXI_IN", [(1.0, 8.0), (8.0, 20.0), (20.0, 45.0)]),
        ContCol("AIR_SYSTEM_DELAY", _MINS),
        ContCol("SECURITY_DELAY", _MINS),
        ContCol("AIRLINE_DELAY", _MINS),
        ContCol("WEATHER_DELAY", _MINS),
        ContCol("FLIGHT_NUMBER", [(1.0, 7000.0)]),
    ]
    # Real flights columns are redundant families, not independent noise:
    # wheels-off ≈ departure time ≈ schedule; elapsed ≈ air time ≈
    # distance; arrival delay follows departure delay.
    fl_derived = {
        "DEPARTURE_TIME": ("SCHEDULED_DEPARTURE", 0.9),
        "WHEELS_OFF": ("DEPARTURE_TIME", 0.9),
        "ARRIVAL_TIME": ("SCHEDULED_ARRIVAL", 0.85),
        "WHEELS_ON": ("ARRIVAL_TIME", 0.9),
        "ELAPSED_TIME": ("AIR_TIME", 0.9),
        "SCHEDULED_TIME": ("AIR_TIME", 0.85),
        "DISTANCE": ("AIR_TIME", 0.9),
        "ARRIVAL_DELAY": ("DEPARTURE_DELAY", 0.75),
        "LATE_AIRCRAFT_DELAY": ("DEPARTURE_DELAY", 0.5),
        "TAXI_IN": ("TAXI_OUT", 0.6),
    }
    airports = ["ATL", "LAX", "ORD", "DFW", "JFK", "SFO", "SEA", "MCO", "BOS", "SAN"]
    cat = [
        CatCol("YEAR", ["2015"]),
        CatCol("MONTH", [str(i) for i in range(1, 13)]),
        CatCol("DAY", [str(i) for i in range(1, 29)]),
        CatCol("DAY_OF_WEEK", [str(i) for i in range(1, 8)]),
        CatCol("AIRLINE", ["AA", "DL", "UA", "WN", "B6", "AS", "NK", "F9", "HA", "VX"]),
        CatCol("TAIL_NUMBER", [f"N{i:03d}" for i in range(40)]),
        CatCol("ORIGIN_AIRPORT", airports),
        CatCol("DESTINATION_AIRPORT", airports),
        CatCol("DIVERTED", ["0", "1"], weights=[0.97, 0.03]),
        CatCol("CANCELLED", ["0", "1"], weights=[0.995, 0.005]),
        CatCol("CANCELLATION_REASON", ["A", "B", "C"]),
    ]
    nan_inflight = {
        c: NAN
        for c in (
            "DEPARTURE_TIME", "DEPARTURE_DELAY", "TAXI_OUT", "WHEELS_OFF",
            "ELAPSED_TIME", "AIR_TIME", "WHEELS_ON", "TAXI_IN",
            "ARRIVAL_TIME", "ARRIVAL_DELAY",
        )
    }
    # Ten regimes, each constraining 3–5 columns scattered across the
    # schema (real flight patterns touch airports, times, delays and
    # carriers alike). With the rule mass spread over the whole schema,
    # column choice is roughly neutral between algorithms and the
    # row-side difference decides: 10 cluster centroids hit one row per
    # regime, 10 random rows miss several. Cancellations are the rare
    # class (~6% here vs ~2% in the real data, kept mineable).
    regimes = [
        Regime(0.04, {"CANCELLED": "1", "CANCELLATION_REASON": "B", **nan_inflight}),
        Regime(
            0.02,
            {
                "SCHEDULED_DEPARTURE": 2, "SCHEDULED_ARRIVAL": 2,
                "DISTANCE": 0, "CANCELLED": "1", "CANCELLATION_REASON": "A",
                **nan_inflight,
            },
        ),
        # Majority regimes sit comfortably above the 0.1 support
        # threshold (0.13 × (1−noise)² ≈ 0.117) so their pairs survive
        # per-bin mining.
        Regime(0.13, {"AIR_TIME": 2, "DISTANCE": 2, "SCHEDULED_TIME": 2,
                      "CANCELLED": "0"}),
        Regime(0.13, {"DEPARTURE_DELAY": 3, "ARRIVAL_DELAY": 3,
                      "LATE_AIRCRAFT_DELAY": 2, "CANCELLED": "0"}),
        Regime(0.13, {"SCHEDULED_DEPARTURE": 0, "DEPARTURE_TIME": 0,
                      "AIRLINE": "WN", "CANCELLED": "0"}),
        Regime(0.12, {"SCHEDULED_DEPARTURE": 3, "WHEELS_OFF": 3,
                      "ARRIVAL_TIME": 0, "CANCELLED": "0"}),
        Regime(0.12, {"ORIGIN_AIRPORT": "ATL", "AIRLINE": "DL",
                      "TAXI_OUT": 2, "DISTANCE": 1, "CANCELLED": "0"}),
        Regime(0.12, {"WEATHER_DELAY": 2, "ARRIVAL_DELAY": 2,
                      "AIR_SYSTEM_DELAY": 1, "MONTH": "1", "CANCELLED": "0"}),
        Regime(0.12, {"TAXI_OUT": 2, "TAXI_IN": 2, "DEPARTURE_DELAY": 2,
                      "ORIGIN_AIRPORT": "JFK", "CANCELLED": "0"}),
    ]
    # The paper's Example 1.1: delay-cause columns are mostly NaN overall.
    nan_bg = {
        c: 0.7
        for c in (
            "AIR_SYSTEM_DELAY", "SECURITY_DELAY", "AIRLINE_DELAY",
            "LATE_AIRCRAFT_DELAY", "WEATHER_DELAY",
        )
    }
    nan_bg["CANCELLATION_REASON"] = 0.9
    return planted_table(
        spark, name="FL", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=("CANCELLED",), nan_background=nan_bg,
        derived=fl_derived, seed=seed,
    )


# --------------------------------------------------------------------------
# CY — honeynet cyber-security (paper: 30K×15; used for Fig 6 sessions)
# --------------------------------------------------------------------------
def cyber(spark: SparkSession, *, n_rows: int = 30_000, seed: int = 11) -> Dataset:
    cont = [
        ContCol("src_port", [(1024.0, 20000.0), (20000.0, 45000.0), (45000.0, 65535.0)]),
        ContCol("dst_port", [(1.0, 1024.0), (1024.0, 10000.0), (10000.0, 65535.0)]),
        ContCol("bytes_in", [(0.0, 500.0), (500.0, 5000.0), (5000.0, 1e6)]),
        ContCol("bytes_out", [(0.0, 500.0), (500.0, 5000.0), (5000.0, 1e6)]),
        ContCol("duration", [(0.0, 1.0), (1.0, 30.0), (30.0, 3600.0)]),
        ContCol("packets", [(1.0, 10.0), (10.0, 100.0), (100.0, 50000.0)]),
        ContCol("alerts", [(0.0, 1.0), (1.0, 5.0), (5.0, 50.0)]),
        ContCol("hour", [(0.0, 8.0), (8.0, 16.0), (16.0, 24.0)]),
    ]
    countries = ["US", "CN", "RU", "DE", "BR", "IN", "FR", "KR"]
    cat = [
        CatCol("protocol", ["TCP", "UDP", "ICMP"]),
        CatCol("service", ["http", "dns", "ssh", "smtp", "ftp"]),
        CatCol("flag", ["SF", "REJ", "S0"]),
        CatCol("attack_type", ["benign", "scan", "dos", "bruteforce"], weights=[0.85, 0.05, 0.05, 0.05]),
        CatCol("severity", ["low", "med", "high"]),
        CatCol("src_country", countries),
        CatCol("dst_country", countries),
    ]
    # Seven traffic regimes scattered over the schema (see the FL
    # comment for the design rationale).
    regimes = [
        Regime(0.13, {"attack_type": "scan", "flag": "REJ", "packets": 0,
                      "bytes_in": 0, "severity": "low"}),
        Regime(0.13, {"attack_type": "dos", "packets": 2, "bytes_in": 2,
                      "dst_port": 0, "severity": "high", "protocol": "UDP"}),
        Regime(0.12, {"attack_type": "bruteforce", "service": "ssh",
                      "flag": "S0", "duration": 2, "alerts": 2}),
        Regime(0.13, {"attack_type": "benign", "service": "http",
                      "protocol": "TCP", "flag": "SF", "bytes_in": 1}),
        Regime(0.13, {"service": "dns", "protocol": "UDP", "bytes_out": 0,
                      "duration": 0, "packets": 0}),
        Regime(0.13, {"src_country": "US", "dst_country": "US", "hour": 1,
                      "service": "smtp", "alerts": 0}),
    ]
    return planted_table(
        spark, name="CY", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=(), seed=seed,
    )


# --------------------------------------------------------------------------
# SP — Spotify (paper: 42K×15; task "what makes songs popular")
# --------------------------------------------------------------------------
def spotify(spark: SparkSession, *, n_rows: int = 42_000, seed: int = 12) -> Dataset:
    unit = [(0.0, 0.33), (0.33, 0.66), (0.66, 1.0)]
    cont = [
        ContCol("danceability", unit),
        ContCol("energy", unit),
        ContCol("loudness", [(-40.0, -20.0), (-20.0, -8.0), (-8.0, 0.0)]),
        ContCol("speechiness", unit),
        ContCol("acousticness", unit),
        ContCol("instrumentalness", unit),
        ContCol("liveness", unit),
        ContCol("valence", unit),
        ContCol("tempo", [(50.0, 95.0), (95.0, 130.0), (130.0, 220.0)]),
        ContCol("duration_ms", [(60e3, 180e3), (180e3, 260e3), (260e3, 600e3)]),
        ContCol("popularity", [(0.0, 30.0), (30.0, 60.0), (60.0, 100.0)]),
    ]
    cat = [
        CatCol("key", [str(i) for i in range(12)]),
        CatCol("mode", ["major", "minor"]),
        CatCol("genre", ["pop", "rock", "hiphop", "folk", "jazz", "electro", "latin", "metal"]),
        CatCol("decade", ["1980s", "1990s", "2000s", "2010s", "2020s"]),
    ]
    # Six genre regimes over a core of 8 audio/meta columns (the
    # popularity patterns of real Spotify data live in a handful of
    # features); instrumentalness/liveness/tempo/duration/key/mode/decade
    # stay (mostly) noise. Rows from different regimes carry disjoint
    # rule groups — the structure behind the paper's SubTab-vs-RAN gap.
    regimes = [
        Regime(0.16, {"danceability": 2, "energy": 2, "valence": 2,
                      "loudness": 2, "genre": "pop", "popularity": 2}),
        Regime(0.13, {"acousticness": 2, "energy": 0, "loudness": 0,
                      "genre": "folk", "popularity": 0, "valence": 1}),
        Regime(0.13, {"speechiness": 2, "danceability": 2, "loudness": 1,
                      "genre": "hiphop", "popularity": 1}),
        Regime(0.12, {"valence": 0, "energy": 0, "acousticness": 1,
                      "speechiness": 0, "genre": "jazz", "popularity": 0}),
        Regime(0.12, {"energy": 2, "danceability": 2, "valence": 2,
                      "genre": "electro", "popularity": 1}),
        Regime(0.12, {"energy": 2, "loudness": 2, "valence": 0,
                      "genre": "metal", "popularity": 0}),
    ]
    return planted_table(
        spark, name="SP", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=("popularity",), seed=seed,
    )


# --------------------------------------------------------------------------
# CC — credit-card fraud (paper: 250K×31, all numeric but Class —
# binning dominates pre-processing time, Fig 9's observation)
# --------------------------------------------------------------------------
def credit(spark: SparkSession, *, n_rows: int = 50_000, seed: int = 13) -> Dataset:
    v_ranges = [(-5.0, -1.0), (-1.0, 1.0), (1.0, 5.0)]
    cont = [ContCol("Time", [(0.0, 5e4), (5e4, 1.2e5), (1.2e5, 1.8e5)])]
    cont += [ContCol(f"V{i}", v_ranges) for i in range(1, 29)]
    cont += [ContCol("Amount", [(0.0, 10.0), (10.0, 100.0), (100.0, 5000.0)])]
    cat = [CatCol("Class", ["0", "1"], weights=[0.995, 0.005])]
    regimes = [
        Regime(
            0.06,
            {
                "Class": "1", "V1": 0, "V2": 2, "V3": 0, "V4": 2,
                "V5": 0, "V6": 0, "Amount": 0,
            },
        ),
        Regime(
            0.30,
            {"Class": "0", "V1": 1, "V2": 1, "V3": 1, "V4": 1, "Amount": 1},
        ),
        Regime(
            0.15,
            {"Class": "0", "V7": 2, "V8": 2, "V9": 2, "Amount": 2, "Time": 1},
        ),
    ]
    return planted_table(
        spark, name="CC", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=("Class",), seed=seed,
    )


# --------------------------------------------------------------------------
# USF — US mutual funds (paper: 23.5K×298 — the very-wide table)
# --------------------------------------------------------------------------
def usfunds(spark: SparkSession, *, n_rows: int = 5_000, seed: int = 14) -> Dataset:
    n_numeric = 290
    block = 29  # 10 blocks of 29 numeric columns
    cont = [
        ContCol(f"f{i:03d}", [(0.0, 1.0), (1.0, 2.0), (2.0, 3.0)])
        for i in range(n_numeric)
    ]
    cat = [
        CatCol("category", [f"cat{i}" for i in range(8)]),
        CatCol("family", [f"fam{i}" for i in range(12)]),
        CatCol("region", ["US", "EU", "ASIA", "GLOBAL"]),
        CatCol("rating", ["1", "2", "3", "4", "5"]),
        CatCol("risk", ["low", "med", "high"]),
        CatCol("currency", ["USD", "EUR", "GBP"]),
        CatCol("style", ["value", "growth", "blend"]),
        CatCol("size", ["small", "mid", "large"]),
    ]
    regimes = []
    for b in range(6):
        sets: dict[str, object] = {
            f"f{i:03d}": (2 if b % 2 == 0 else 0)
            for i in range(b * block, (b + 1) * block)
        }
        sets["rating"] = str(1 + (b % 5))
        sets["risk"] = ["low", "med", "high"][b % 3]
        regimes.append(Regime(0.12, sets))
    return planted_table(
        spark, name="USF", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=(), seed=seed,
    )


# --------------------------------------------------------------------------
# BL — bank loans (paper: 110K×19; user-study dataset without coloring)
# --------------------------------------------------------------------------
def bankloans(spark: SparkSession, *, n_rows: int = 30_000, seed: int = 15) -> Dataset:
    cont = [
        ContCol("current_loan_amount", [(1e3, 1e4), (1e4, 3e4), (3e4, 1e5)]),
        ContCol("credit_score", [(550.0, 650.0), (650.0, 720.0), (720.0, 850.0)]),
        ContCol("annual_income", [(2e4, 5e4), (5e4, 1e5), (1e5, 5e5)]),
        ContCol("monthly_debt", [(0.0, 500.0), (500.0, 1500.0), (1500.0, 8000.0)]),
        ContCol("years_credit_history", [(1.0, 8.0), (8.0, 18.0), (18.0, 50.0)]),
        ContCol("months_since_delinquent", [(0.0, 12.0), (12.0, 36.0), (36.0, 120.0)]),
        ContCol("open_accounts", [(1.0, 6.0), (6.0, 12.0), (12.0, 40.0)]),
        ContCol("credit_problems", [(0.0, 0.5), (0.5, 2.0), (2.0, 10.0)]),
        ContCol("credit_balance", [(0.0, 1e4), (1e4, 5e4), (5e4, 5e5)]),
        ContCol("max_open_credit", [(0.0, 2e4), (2e4, 1e5), (1e5, 1e6)]),
        ContCol("bankruptcies", [(0.0, 0.5), (0.5, 1.5), (1.5, 5.0)]),
        ContCol("tax_liens", [(0.0, 0.5), (0.5, 1.5), (1.5, 5.0)]),
        ContCol("age", [(18.0, 30.0), (30.0, 50.0), (50.0, 80.0)]),
    ]
    cat = [
        CatCol("loan_status", ["Fully Paid", "Charged Off"], weights=[0.95, 0.05]),
        CatCol("term", ["Short Term", "Long Term"]),
        CatCol("home_ownership", ["Rent", "Own", "Mortgage", "Other"]),
        CatCol("purpose", ["debt", "home", "car", "business", "medical",
                           "education", "vacation", "other"]),
        CatCol("years_in_job", ["<1", "1-3", "4-6", "7-9", "10+"]),
        CatCol("state", [f"S{i}" for i in range(10)]),
    ]
    regimes = [
        # Defaults are the rare class (~9% including background).
        Regime(
            0.06,
            {
                "loan_status": "Charged Off", "credit_score": 0,
                "credit_problems": 2, "bankruptcies": 1,
                "months_since_delinquent": 0, "annual_income": 0,
            },
        ),
        Regime(
            0.25,
            {
                "loan_status": "Fully Paid", "credit_score": 2,
                "annual_income": 2, "credit_problems": 0, "bankruptcies": 0,
                "months_since_delinquent": NAN,
            },
        ),
        Regime(
            0.10,
            {
                "home_ownership": "Rent", "current_loan_amount": 0,
                "term": "Short Term", "loan_status": "Fully Paid", "age": 0,
            },
        ),
    ]
    return planted_table(
        spark, name="BL", n_rows=n_rows, cont=cont, cat=cat,
        regimes=regimes, targets=("loan_status",),
        nan_background={"months_since_delinquent": 0.5}, seed=seed,
    )


ALL_DATASETS = {
    "FL": flights,
    "CY": cyber,
    "SP": spotify,
    "CC": credit,
    "USF": usfunds,
    "BL": bankloans,
}


def make(spark: SparkSession, name: str, *, n_rows: int | None = None, seed: int | None = None) -> Dataset:
    """Factory over the six surrogates; ``n_rows``/``seed`` override defaults."""
    fn = ALL_DATASETS[name]
    kwargs = {}
    if n_rows is not None:
        kwargs["n_rows"] = n_rows
    if seed is not None:
        kwargs["seed"] = seed
    return fn(spark, **kwargs)
