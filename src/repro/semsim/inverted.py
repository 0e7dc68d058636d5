"""The inverted index ``I_s`` (paper §IV): token id -> posting list of sets.

The paper builds ``I_s`` on the fly into an in-memory hash map; we do the
same on the driver. ``build_inverted_spark`` builds the identical mapping
through the DataFrame API (explode + groupBy) so the relational definition
can be oracle-checked against DuckDB and reused by the Catalyst pipeline.
"""
from __future__ import annotations

import numpy as np
from pyspark.sql import DataFrame
from pyspark.sql import functions as F


def build_inverted(sets: list[np.ndarray]) -> dict[int, np.ndarray]:
    """token id -> sorted array of set ids containing the token."""
    posting: dict[int, list[int]] = {}
    for sid, toks in enumerate(sets):
        for t in toks.tolist():
            posting.setdefault(t, []).append(sid)
    return {t: np.array(sids, dtype=np.int64) for t, sids in posting.items()}


def posting_df(sets_df: DataFrame) -> DataFrame:
    """(set_id, token) posting pairs from a (set_id, tokens[]) DataFrame."""
    return sets_df.select(
        "set_id", F.explode("tokens").alias("token")
    ).distinct()


def build_inverted_spark(sets_df: DataFrame) -> DataFrame:
    """(token, set_ids[]) inverted index as a DataFrame."""
    return (
        posting_df(sets_df)
        .groupBy("token")
        .agg(F.sort_array(F.collect_list("set_id")).alias("set_ids"))
    )
