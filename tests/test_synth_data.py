"""Tests for the provided TPC-H-lite generators + DuckDB oracle plumbing."""
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent

SF = 0.002


@pytest.mark.parametrize(
    "gen,key",
    [
        (synth_data.lineitem, "l_orderkey"),
        (synth_data.orders, "o_orderkey"),
        (synth_data.customer, "c_custkey"),
        (synth_data.part, "p_partkey"),
    ],
)
def test_generator_nonempty_and_keyed(spark, gen, key):
    df = gen(spark, sf=SF)
    assert df.count() > 0
    assert key in df.columns


@pytest.mark.parametrize(
    "gen",
    [synth_data.lineitem, synth_data.orders, synth_data.customer, synth_data.part],
)
def test_generator_deterministic(spark, gen):
    a = gen(spark, sf=SF).toPandas()
    b = gen(spark, sf=SF).toPandas()
    assert a.equals(b)


def test_lineitem_value_ranges(spark):
    li = synth_data.lineitem(spark, sf=SF).toPandas()
    assert li["l_quantity"].between(1, 50).all()
    assert li["l_discount"].between(0, 0.1).all()
    assert set(li["l_returnflag"]) <= set("NRA")


def test_zipf_keys_are_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
    counts = df["k"].value_counts()
    # Rank-1 key should dominate the median key by a wide margin.
    assert counts.iloc[0] > 5 * counts.median()


def test_uniform_keys_cover_domain(spark):
    df = synth_data.uniform_keys(spark, n=5000, n_keys=10).toPandas()
    assert set(df["k"]) == set(range(1, 11))


def test_oracle_agg_query(spark):
    li = synth_data.lineitem(spark, sf=SF)
    got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
    assert_equivalent(
        got,
        "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_join_query(spark):
    li = synth_data.lineitem(spark, sf=SF)
    o = synth_data.orders(spark, sf=SF)
    got = (
        li.join(o, li.l_orderkey == o.o_orderkey)
        .groupBy("o_orderpriority")
        .count()
        .withColumnRenamed("count", "n")
    )
    assert_equivalent(
        got,
        """SELECT o_orderpriority, COUNT(*) AS n
           FROM li JOIN o ON l_orderkey = o_orderkey
           GROUP BY o_orderpriority""",
        li=li,
        o=o,
    )


def test_oracle_detects_mismatch(spark):
    li = synth_data.lineitem(spark, sf=SF)
    wrong = li.filter("l_quantity > 10").groupBy("l_returnflag").count()
    wrong = wrong.withColumnRenamed("count", "n")
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
            li=li,
        )
