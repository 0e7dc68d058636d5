"""Tests for the inverted index I_s — dict and Spark/DuckDB versions."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.oracle import assert_equivalent
from repro.semsim.inverted import build_inverted, build_inverted_spark, posting_df

from tests.helpers import random_instance


@pytest.mark.parametrize("seed", range(5))
def test_build_inverted_complete(seed):
    _, sets, _, _ = random_instance(seed, n_sets=40)
    inv = build_inverted(sets)
    for sid, toks in enumerate(sets):
        for t in toks.tolist():
            assert sid in inv[t].tolist()


def test_build_inverted_no_spurious_entries():
    _, sets, _, _ = random_instance(1, n_sets=30)
    inv = build_inverted(sets)
    for t, sids in inv.items():
        for sid in sids.tolist():
            assert t in sets[sid].tolist()


def test_posting_sizes_sum_to_input_size():
    _, sets, _, _ = random_instance(2, n_sets=30)
    inv = build_inverted(sets)
    assert sum(len(v) for v in inv.values()) == sum(len(s) for s in sets)


def _sets_pdf(sets):
    return pd.DataFrame(
        {
            "set_id": np.arange(len(sets), dtype=np.int64),
            "tokens": [[f"t{t}" for t in s.tolist()] for s in sets],
        }
    )


def test_posting_df_oracle(spark):
    """Spark explode-distinct posting pairs == DuckDB unnest."""
    _, sets, _, _ = random_instance(3, n_sets=25)
    pdf = _sets_pdf(sets)
    sets_df = spark.createDataFrame(pdf)
    assert_equivalent(
        posting_df(sets_df),
        "SELECT DISTINCT set_id, unnest(tokens) AS token FROM sets",
        sets=pdf,
    )


def test_inverted_spark_matches_dict(spark):
    _, sets, _, _ = random_instance(4, n_sets=25)
    pdf = _sets_pdf(sets)
    inv_df = build_inverted_spark(spark.createDataFrame(pdf)).toPandas()
    inv = build_inverted(sets)
    got = {r["token"]: list(r["set_ids"]) for _, r in inv_df.iterrows()}
    expect = {f"t{t}": sorted(v.tolist()) for t, v in inv.items()}
    assert got == expect


def test_inverted_spark_posting_lengths_oracle(spark):
    """Posting-list lengths via Spark == DuckDB group-by."""
    _, sets, _, _ = random_instance(5, n_sets=25)
    pdf = _sets_pdf(sets)
    sets_df = spark.createDataFrame(pdf)
    lengths = (
        build_inverted_spark(sets_df)
        .select("token", F.size("set_ids").cast("long").alias("n_sets"))
    )
    assert_equivalent(
        lengths,
        """
        SELECT token, count(DISTINCT set_id) AS n_sets
        FROM (SELECT set_id, unnest(tokens) AS token FROM sets)
        GROUP BY token
        """,
        sets=pdf,
    )
