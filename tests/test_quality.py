"""Quality of semantic vs. vanilla results (§VIII-E / Fig. 8 shape)."""
import numpy as np
import pytest

from repro import harness
from repro.core.koios import koios_search
from repro.core.vanilla import vanilla_topk
from repro.datasets import benchmarks as B
from repro.datasets import generator as G


@pytest.fixture(scope="module")
def opendata():
    return G.load("opendata")


@pytest.fixture(scope="module")
def queries(opendata):
    return B.uniform_queries(opendata, n=6, seed=13)


def test_semantic_kth_score_dominates_vanilla(opendata, queries):
    """The k-th semantic SO is >= the k-th vanilla overlap (Lemma 1:
    every set's SO >= its vanilla overlap, so the k-th order statistic
    dominates too)."""
    for q in queries:
        sims = opendata.vocab.sim_matrix(q)
        sem = koios_search(q, opendata.sets, sims, k=10, alpha=0.8)
        van = vanilla_topk(q, opendata.sets, k=10)
        if len(sem.topk) == 10 and len(van) == 10:
            assert sem.topk[-1][1] >= van[-1][1] - 1e-9


def test_semantic_finds_sets_vanilla_misses(opendata, queries):
    """Fig. 8's point: the two top-k lists differ — semantic overlap
    surfaces sets with low syntactic overlap."""
    differing = 0
    for q in queries:
        sims = opendata.vocab.sim_matrix(q)
        sem = {sid for sid, _ in koios_search(q, opendata.sets, sims, k=10, alpha=0.8).topk}
        van = {sid for sid, _ in vanilla_topk(q, opendata.sets, k=10)}
        if sem != van:
            differing += 1
    assert differing > 0


def test_quality_compare_harness(opendata, queries):
    df = harness.quality_compare(opendata, queries[:3], k=5)
    assert len(df) == 3
    assert set(
        ["query_card", "sem_kth_so", "van_kth_overlap", "van_kth_so", "intersection", "k"]
    ) <= set(df.columns)
    assert (df["intersection"] <= 5).all()
    # Lemma 1 at the aggregate level.
    assert (df["sem_kth_so"] >= df["van_kth_overlap"] - 1e-9).all()
