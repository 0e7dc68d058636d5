"""Smoke/shape tests for the table harness (small parameters)."""
import numpy as np
import pytest

from repro import harness
from repro.datasets import generator as G


def test_table1_shape_and_paper_columns(spark):
    df = harness.table1(spark, ["dblp", "twitter"])
    assert list(df["dataset"]) == ["dblp", "twitter"]
    assert {"n_sets", "max_size", "avg_size", "n_uniq", "paper_n_sets"} <= set(
        df.columns
    )
    ch = G.load("dblp").characteristics()
    row = df[df["dataset"] == "dblp"].iloc[0]
    assert row["n_sets"] == ch["n_sets"]
    assert row["max_size"] == ch["max_size"]
    assert row["n_uniq"] == ch["n_uniq_elems"]


def test_table2_small(spark):
    df = harness.table2(
        spark, datasets=["dblp"], n_uniform=2, n_partitions=4
    )
    row = df.iloc[0]
    assert 0 <= row["iub_pct"] <= 100
    assert 0 <= row["emet_pct"] <= 100
    assert 0 <= row["noem_pct"] <= 100
    assert row["n_queries"] == 2


def test_pruning_by_interval_small(spark):
    df = harness.pruning_by_interval(
        spark, "opendata", per_interval=1, n_partitions=4
    )
    assert len(df) >= 3
    # Tables IV/V row arithmetic.
    for _, r in df.iterrows():
        assert r["candidates"] >= r["iub"]
        assert r["candidates"] > 0


def test_run_queries_roundtrip(spark):
    coll = G.load("dblp")
    qs = harness.bench_queries(coll, n_uniform=2)["all"]
    runs = harness.run_queries(spark, coll, qs, n_partitions=4)
    assert len(runs) == 2
    for r in runs:
        assert r.response_seconds > 0
        assert r.result.topk  # the query itself is in the collection
        assert r.result.topk[0][1] >= r.query_card - 1e-6


def test_format_table_renders():
    import pandas as pd

    s = harness.format_table(
        pd.DataFrame({"a": [1, 22], "b": [0.5, 1.25]}), "T"
    )
    assert "### T" in s and "| a " in s and "| 22" in s
