"""Self-checks for the provided substrate: DuckDB oracle + TPC-H-lite
generators (they back the oracle-based tests elsewhere)."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro import synth_data
from repro.oracle import assert_equivalent


def test_oracle_passes_on_equivalent_query(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(
        F.count("*").cast("long").alias("n"),
        F.sum("l_quantity").alias("qty"),
    )
    assert_equivalent(
        got,
        """
        SELECT l_returnflag, count(*)::BIGINT AS n, sum(l_quantity) AS qty
        FROM lineitem GROUP BY l_returnflag
        """,
        lineitem=li,
    )


def test_oracle_catches_wrong_result(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    wrong = li.groupBy("l_returnflag").agg(
        (F.count("*") + 1).cast("long").alias("n")
    )
    with pytest.raises(AssertionError):
        assert_equivalent(
            wrong,
            "SELECT l_returnflag, count(*)::BIGINT AS n FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_oracle_catches_column_mismatch(spark):
    li = synth_data.lineitem(spark, sf=0.001)
    got = li.groupBy("l_returnflag").agg(F.count("*").alias("wrong_name"))
    with pytest.raises(AssertionError):
        assert_equivalent(
            got,
            "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
            lineitem=li,
        )


def test_synth_generators_deterministic(spark):
    a = synth_data.orders(spark, sf=0.001).toPandas()
    b = synth_data.orders(spark, sf=0.001).toPandas()
    pd.testing.assert_frame_equal(a, b)


def test_zipf_keys_skewed(spark):
    df = synth_data.zipf_keys(spark, n=5000, n_keys=100, alpha=1.5).toPandas()
    counts = df["k"].value_counts()
    assert counts.iloc[0] > 5 * counts.median()


def test_uniform_keys_cover_range(spark):
    df = synth_data.uniform_keys(spark, n=2000, n_keys=50).toPandas()
    assert df["k"].min() >= 1 and df["k"].max() <= 50
    assert df["k"].nunique() > 40
