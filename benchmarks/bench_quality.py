"""Benchmark for the §VIII-E quality comparison (Fig. 8 shape check):
semantic vs vanilla top-k on OpenData."""
from repro import harness
from repro.datasets import benchmarks as B
from repro.datasets import generator as G

from benchmarks.common import record, run_once


def _run():
    coll = G.load("opendata")
    queries = B.uniform_queries(coll, n=8, seed=13)
    return harness.quality_compare(coll, queries, k=10)


def test_quality_semantic_vs_vanilla(benchmark):
    df = run_once(benchmark, _run)
    record(df, "quality", "Semantic vs vanilla top-k (OpenData, k=10)")
    # Shape (Fig. 8): the k-th semantic SO dominates the k-th vanilla
    # overlap, and the result lists differ for a meaningful share of
    # queries (the paper reports up to 50% missed by vanilla).
    assert (df["sem_kth_so"] >= df["van_kth_overlap"] - 1e-9).all()
    assert (df["intersection"] < df["k"]).any()
