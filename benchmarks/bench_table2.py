"""Benchmark for Table II — average % of sets pruned per filter.

Runs the distributed Koios (10 partitions, k = 10, alpha = 0.8, paper
ub-mode to mirror the paper's Lemma-6 filter) over each dataset's query
benchmark and aggregates filter statistics across partitions.
"""
from repro import harness

from benchmarks.common import record, run_once


def test_table2_pruning_power(spark, benchmark):
    df = run_once(
        benchmark,
        lambda: harness.table2(
            spark, n_uniform=6, per_interval=2, ub_mode="paper"
        ),
    )
    record(df, "table2", "Table II: avg % of sets pruned by filters")
    by = df.set_index("dataset")
    # Shape: iUB prunes the bulk of candidates on the three clustered
    # datasets; Twitter (tiny sets) is the weakest, as in the paper.
    for name in ["dblp", "opendata", "wdc"]:
        assert by.loc[name, "iub_pct"] > 50
    assert by["iub_pct"].idxmin() == "twitter"
