"""Tests for vanilla-overlap search, including the DuckDB oracle check."""
import numpy as np
import pandas as pd
import pytest

from repro.core.vanilla import vanilla_topk, vanilla_topk_spark
from repro.matching.hungarian import max_weight_matching
from repro.oracle import assert_equivalent
from repro.semsim.simfn import sim_alpha

from tests.helpers import random_instance


@pytest.mark.parametrize("seed", range(5))
def test_vanilla_topk_counts(seed):
    _, sets, q, _ = random_instance(seed, n_sets=40)
    res = vanilla_topk(q, sets, k=10)
    qset = set(q.tolist())
    for sid, score in res:
        assert score == len(qset & set(sets[sid].tolist()))
    scores = [s for _, s in res]
    assert scores == sorted(scores, reverse=True)


def test_vanilla_is_semantic_special_case():
    """Vanilla overlap == SO under the equality similarity (§II)."""
    _, sets, q, _ = random_instance(6, n_sets=20)
    d = max(int(max(s.max() for s in sets)), int(q.max())) + 1
    eq_sims = np.zeros((len(q), d))
    eq_sims[np.arange(len(q)), q] = 1.0
    w = sim_alpha(eq_sims, 0.5)
    for sid, toks in enumerate(sets[:15]):
        so = max_weight_matching(w[:, toks]).score
        vanilla = len(set(q.tolist()) & set(toks.tolist()))
        assert np.isclose(so, vanilla)


def test_vanilla_spark_oracle(spark):
    """Spark vanilla top-k == DuckDB SQL over the same inputs."""
    _, sets, q, _ = random_instance(7, n_sets=40)
    pdf = pd.DataFrame(
        {
            "set_id": np.arange(len(sets), dtype=np.int64),
            "tokens": [[f"t{t}" for t in s.tolist()] for s in sets],
        }
    )
    qtokens = [f"t{t}" for t in q.tolist()]
    qpdf = pd.DataFrame({"token": sorted(set(qtokens))})
    k = 10
    got = vanilla_topk_spark(spark, spark.createDataFrame(pdf), qtokens, k=k)
    assert_equivalent(
        got,
        f"""
        SELECT set_id, count(*)::BIGINT AS overlap
        FROM (SELECT DISTINCT set_id, unnest(tokens) AS token FROM sets)
        JOIN q USING (token)
        GROUP BY set_id
        ORDER BY overlap DESC, set_id ASC
        LIMIT {k}
        """,
        sets=pdf,
        q=qpdf,
    )


def test_vanilla_spark_matches_driver(spark):
    _, sets, q, _ = random_instance(8, n_sets=40)
    pdf = pd.DataFrame(
        {
            "set_id": np.arange(len(sets), dtype=np.int64),
            "tokens": [[f"t{t}" for t in s.tolist()] for s in sets],
        }
    )
    qtokens = [f"t{t}" for t in q.tolist()]
    got = (
        vanilla_topk_spark(spark, spark.createDataFrame(pdf), qtokens, k=10)
        .toPandas()
    )
    expect = vanilla_topk(q, sets, k=10)
    assert [(int(r.set_id), float(r.overlap)) for r in got.itertuples()] == expect
