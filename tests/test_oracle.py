"""Provided DuckDB oracle + synth_data sanity tests."""
import pandas as pd
import pytest

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_accepts_equal(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    got = li.groupBy("l_returnflag").count().withColumnRenamed("count", "n")
    assert_equivalent(
        got,
        "SELECT l_returnflag, COUNT(*) AS n FROM li GROUP BY l_returnflag",
        li=li,
    )


def test_oracle_rejects_wrong(spark):
    li = synth_data.lineitem(spark, sf=0.001, seed=0)
    wrong = li.limit(5).select("l_orderkey")
    with pytest.raises(AssertionError):
        assert_equivalent(wrong, "SELECT l_orderkey FROM li", li=li)


def test_synth_data_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001, seed=3).toPandas()
    b = synth_data.orders(spark, sf=0.001, seed=3).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.2, seed=0).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > counts.iloc[-1] * 5
