"""Tests for the DataFrame (Catalyst) pipeline, with DuckDB oracle checks
on every relational stage."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.koios import brute_force_topk
from repro.core.pipeline import (
    candidate_edges,
    pipeline_topk,
    posting_pairs,
    similar_token_edges,
)
from repro.oracle import assert_equivalent

from tests.helpers import assert_same_topk, random_instance

ALPHA = 0.7


@pytest.fixture(scope="module")
def instance():
    return random_instance(33, n_sets=120)


def _edges_pdf(sims, alpha):
    qi, tj = np.nonzero(sims >= alpha)
    return pd.DataFrame(
        {
            "q_idx": qi.astype(np.int64),
            "token_id": tj.astype(np.int64),
            "sim": sims[qi, tj].astype(np.float64),
        }
    )


def _token_ids_df(spark, sims):
    return spark.createDataFrame(
        pd.DataFrame({"token_id": np.arange(sims.shape[1], dtype=np.int64)})
    )


def test_stage1_edges_oracle(spark, instance):
    """Distributed sim scan+filter == DuckDB filter over the sim matrix."""
    _, _, q, sims = instance
    bc = spark.sparkContext.broadcast(sims)
    edges = similar_token_edges(spark, _token_ids_df(spark, sims), bc, alpha=ALPHA)
    melted = pd.DataFrame(
        {
            "q_idx": np.repeat(np.arange(sims.shape[0], dtype=np.int64), sims.shape[1]),
            "token_id": np.tile(np.arange(sims.shape[1], dtype=np.int64), sims.shape[0]),
            "sim": sims.ravel().astype(np.float64),
        }
    )
    assert_equivalent(
        edges,
        f"SELECT q_idx, token_id, sim FROM sims WHERE sim >= {ALPHA}",
        sims=melted,
    )
    bc.unpersist()


def test_stage2_candidate_join_oracle(spark, instance):
    _, sets, q, sims = instance
    bc = spark.sparkContext.broadcast(sims)
    edges = similar_token_edges(spark, _token_ids_df(spark, sims), bc, alpha=ALPHA)
    posting = posting_pairs(spark, sets)
    cand = candidate_edges(edges, posting).select("set_id", "q_idx", "token_id", "sim")
    posting_pdf = posting.toPandas()
    assert_equivalent(
        cand,
        f"""
        SELECT p.set_id, e.q_idx, e.token_id, e.sim
        FROM edges e JOIN posting p ON e.token_id = p.token_id
        """,
        edges=_edges_pdf(sims, ALPHA),
        posting=posting_pdf,
    )
    bc.unpersist()


def test_candidate_sets_match_kernel(spark, instance):
    """Stage-2 distinct set ids == the kernel's candidate collection."""
    from repro.core.koios import koios_search

    _, sets, q, sims = instance
    bc = spark.sparkContext.broadcast(sims)
    edges = similar_token_edges(spark, _token_ids_df(spark, sims), bc, alpha=ALPHA)
    cand_ids = {
        r["set_id"]
        for r in candidate_edges(edges, posting_pairs(spark, sets))
        .select("set_id").distinct().collect()
    }
    res = koios_search(q, sets, sims, k=5, alpha=ALPHA)
    assert len(cand_ids) == res.stats.candidates
    bc.unpersist()


def test_pipeline_topk_exact(spark, instance):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=ALPHA)
    got = pipeline_topk(
        spark, q, posting_pairs(spark, sets), sims, k=10, alpha=ALPHA
    ).toPandas()
    assert_same_topk(
        [(int(r.set_id), float(r.so)) for r in got.itertuples()], truth
    )


@pytest.mark.parametrize("k", [1, 3, 25])
def test_pipeline_topk_various_k(spark, instance, k):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=k, alpha=ALPHA)
    got = pipeline_topk(
        spark, q, posting_pairs(spark, sets), sims, k=k, alpha=ALPHA
    ).toPandas()
    assert_same_topk(
        [(int(r.set_id), float(r.so)) for r in got.itertuples()], truth
    )


def test_pipeline_topk_sorted_output(spark, instance):
    _, sets, q, sims = instance
    got = pipeline_topk(
        spark, q, posting_pairs(spark, sets), sims, k=10, alpha=ALPHA
    ).toPandas()
    assert list(got["so"]) == sorted(got["so"], reverse=True)


def test_posting_pairs_oracle(spark, instance):
    _, sets, _, _ = instance
    sets_pdf = pd.DataFrame(
        {
            "set_id": np.arange(len(sets), dtype=np.int64),
            "tokens": [s.tolist() for s in sets],
        }
    )
    assert_equivalent(
        posting_pairs(spark, sets),
        "SELECT set_id, unnest(tokens) AS token_id FROM sets",
        sets=sets_pdf,
    )
