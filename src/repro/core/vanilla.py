"""Vanilla overlap top-k search (the measure Koios generalizes).

``|Q ∩ C|`` is a special case of semantic overlap with equality similarity
(paper §II) and a lower bound on SO (Lemma 1). Used for the quality
comparison of §VIII-E (semantic vs. syntactic result lists) and as an
oracle-checkable relational baseline: the Spark implementation is a pure
explode–join–aggregate pipeline, verified against DuckDB SQL.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F


def vanilla_topk(
    query_ids: np.ndarray, sets: list[np.ndarray], *, k: int
) -> list[tuple[int, float]]:
    """Driver-side exact top-k by vanilla overlap (ties broken by set id)."""
    qset = set(int(t) for t in query_ids)
    scored = [
        (sid, float(sum(1 for t in toks.tolist() if t in qset)))
        for sid, toks in enumerate(sets)
    ]
    scored = [(sid, s) for sid, s in scored if s > 0]
    scored.sort(key=lambda x: (-x[1], x[0]))
    return scored[:k]


def vanilla_topk_spark(
    spark: SparkSession, sets_df: DataFrame, query_tokens: list[str], *, k: int
) -> DataFrame:
    """Top-k by vanilla overlap as a DataFrame pipeline.

    ``sets_df`` is (set_id, tokens array<string>). Returns
    (set_id, overlap) with the k largest overlaps (ties by set_id).
    """
    qdf = spark.createDataFrame(pd.DataFrame({"token": sorted(set(query_tokens))}))
    posting = sets_df.select("set_id", F.explode("tokens").alias("token")).distinct()
    return (
        posting.join(qdf, "token")
        .groupBy("set_id")
        .agg(F.count("*").cast("long").alias("overlap"))
        .orderBy(F.desc("overlap"), F.asc("set_id"))
        .limit(k)
    )
