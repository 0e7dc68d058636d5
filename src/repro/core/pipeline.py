"""Top-k semantic overlap search as a pure DataFrame (Catalyst) pipeline.

The calibration hint for this reproduction asks for the search expressed
as a *distributed dataflow*: scan + filter for candidate generation, a
join against the inverted index, per-candidate bound aggregation, and a
final top-k after per-pair bipartite-matching verification. This module
is that pipeline; ``core.spark_search`` is the paper-faithful partitioned
kernel. Both are exact and tested equal to the brute-force oracle.

Stages (each a DataFrame -> DataFrame transformation):

1. **similar-token scan** — mapInPandas over the vocabulary: cosine of
   broadcast query vectors vs. each token batch, filter ``sim >= alpha``
   -> edges (q_idx, token_id, sim). This is the token stream ``I_e`` as a
   relation (order-free: the dataflow needs no streaming order).
2. **candidate join** — edges ⋈ posting list (token_id, set_id): every
   output set has non-zero SO (paper §VII-A).
3. **bound aggregation** — per set: UB0 = min(|Q|, |C|) * max(sim)
   (Lemma 2) and LB = greedy matching score (Lemma 3) via applyInPandas.
4. **theta prune** — theta_lb = k-th largest LB (Lemma 4); keep
   UB0 >= theta_lb.
5. **verification** — applyInPandas per candidate: Hungarian matching on
   the edge submatrix with Lemma-8 early termination at theta_lb.
6. **top-k** — orderBy(SO desc).limit(k).
"""
from __future__ import annotations

from collections.abc import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F
from pyspark.sql.types import (
    DoubleType,
    LongType,
    StructField,
    StructType,
)

_EDGE_SCHEMA = StructType(
    [
        StructField("q_idx", LongType()),
        StructField("token_id", LongType()),
        StructField("sim", DoubleType()),
    ]
)
_BOUND_SCHEMA = StructType(
    [
        StructField("set_id", LongType()),
        StructField("lb", DoubleType()),
        StructField("n_edges", LongType()),
    ]
)
_VERIFY_SCHEMA = StructType(
    [StructField("set_id", LongType()), StructField("so", DoubleType())]
)


def similar_token_edges(
    spark: SparkSession,
    token_ids_df: DataFrame,
    sims_bc,
    *,
    alpha: float,
) -> DataFrame:
    """Stage 1: (q_idx, token_id, sim >= alpha) edges via a distributed
    scan over the vocabulary. ``sims_bc`` broadcasts the exact (|Q|, |D|)
    similarity matrix (from ``Vocabulary.sim_matrix``); each task slices
    its token batch, which keeps the UDF a pure scan+filter."""

    def scan(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        sims = sims_bc.value
        for pdf in batches:
            toks = pdf["token_id"].to_numpy()
            sub = sims[:, toks]  # (|Q|, batch)
            qi, tj = np.nonzero(sub >= alpha)
            yield pd.DataFrame(
                {
                    "q_idx": qi.astype(np.int64),
                    "token_id": toks[tj].astype(np.int64),
                    "sim": sub[qi, tj].astype(np.float64),
                }
            )

    return token_ids_df.mapInPandas(scan, schema=_EDGE_SCHEMA)


def candidate_edges(edges_df: DataFrame, posting_df: DataFrame) -> DataFrame:
    """Stage 2: edges ⋈ posting -> (set_id, q_idx, token_id, sim)."""
    return edges_df.join(posting_df, "token_id")


def _greedy_from_edges(pdf: pd.DataFrame) -> float:
    order = np.argsort(-pdf["sim"].to_numpy(), kind="stable")
    used_q: set[int] = set()
    used_t: set[int] = set()
    score = 0.0
    qs = pdf["q_idx"].to_numpy()
    ts = pdf["token_id"].to_numpy()
    ss = pdf["sim"].to_numpy()
    for i in order:
        if qs[i] not in used_q and ts[i] not in used_t:
            used_q.add(int(qs[i]))
            used_t.add(int(ts[i]))
            score += float(ss[i])
    return score


def bounds(cand_df: DataFrame) -> DataFrame:
    """Stage 3: per-set lower bound (greedy score) and edge count."""

    def agg(pdf: pd.DataFrame) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "set_id": [int(pdf["set_id"].iloc[0])],
                "lb": [_greedy_from_edges(pdf)],
                "n_edges": [len(pdf)],
            }
        )

    return cand_df.groupBy("set_id").applyInPandas(agg, schema=_BOUND_SCHEMA)


def _so_from_edges(pdf: pd.DataFrame, abort_below: float | None):
    from repro.matching.hungarian import max_weight_matching

    qs = pdf["q_idx"].to_numpy()
    ts = pdf["token_id"].to_numpy()
    ss = pdf["sim"].to_numpy()
    uq, qinv = np.unique(qs, return_inverse=True)
    ut, tinv = np.unique(ts, return_inverse=True)
    w = np.zeros((len(uq), len(ut)))
    w[qinv, tinv] = ss
    return max_weight_matching(w, abort_below=abort_below)


def pipeline_topk(
    spark: SparkSession,
    query_ids: np.ndarray,
    sets_df: DataFrame,
    sims: np.ndarray,
    *,
    k: int,
    alpha: float,
) -> DataFrame:
    """The full pipeline; returns a (set_id, so) DataFrame of the top-k.

    ``sets_df`` is (set_id, token_id) posting pairs or (set_id, tokens)
    — pass posting pairs via ``posting_pairs`` for clarity.
    """
    sc = spark.sparkContext
    sims_bc = sc.broadcast(sims)
    n_q = len(query_ids)
    assert sims.shape[0] == n_q, "sims rows must correspond to query tokens"

    token_ids_df = spark.createDataFrame(
        pd.DataFrame({"token_id": np.arange(sims.shape[1], dtype=np.int64)})
    )
    edges = similar_token_edges(spark, token_ids_df, sims_bc, alpha=alpha)
    posting = sets_df  # (set_id, token_id)
    cand = candidate_edges(edges, posting)

    sizes = posting.groupBy("set_id").agg(F.count("*").alias("set_size"))
    ub0 = (
        cand.groupBy("set_id")
        .agg(F.max("sim").alias("max_sim"))
        .join(sizes, "set_id")
        .withColumn(
            "ub0", F.least(F.lit(n_q), F.col("set_size")) * F.col("max_sim")
        )
    )
    lbs = bounds(cand)
    # Stage 4: theta_lb = k-th largest greedy LB (Lemma 4). Tiny collect.
    top_lbs = [r["lb"] for r in lbs.orderBy(F.desc("lb")).limit(k).collect()]
    theta_lb = float(top_lbs[-1]) if len(top_lbs) >= k else 0.0

    survivors = ub0.filter(F.col("ub0") >= theta_lb).select("set_id")

    def verify(pdf: pd.DataFrame) -> pd.DataFrame:
        res = _so_from_edges(pdf, abort_below=theta_lb)
        so = float("nan") if res.aborted else float(res.score)
        return pd.DataFrame({"set_id": [int(pdf["set_id"].iloc[0])], "so": [so]})

    verified = (
        cand.join(survivors, "set_id")
        .groupBy("set_id")
        .applyInPandas(verify, schema=_VERIFY_SCHEMA)
    )
    out = (
        verified.filter(~F.isnan("so") & (F.col("so") > 0))
        .orderBy(F.desc("so"), F.asc("set_id"))
        .limit(k)
    )
    return out


def posting_pairs(spark: SparkSession, sets: list[np.ndarray]) -> DataFrame:
    """(set_id, token_id) posting-pair DataFrame from a token-id repository."""
    sid = np.concatenate(
        [np.full(len(s), i, dtype=np.int64) for i, s in enumerate(sets)]
    )
    tok = np.concatenate(sets).astype(np.int64)
    return spark.createDataFrame(
        pd.DataFrame({"set_id": sid, "token_id": tok})
    )
