"""Benchmark for Table IV — OpenData pruning counts per query-cardinality
interval (avg per query, summed over the 10 partitions)."""
from repro import harness

from benchmarks.common import record, run_once


def test_table4_opendata_intervals(spark, benchmark):
    df = run_once(
        benchmark,
        lambda: harness.table4(spark, per_interval=3, ub_mode="paper"),
    )
    record(df, "table4", "Table IV: OpenData #sets pruned by filters")
    # Shape (paper's observations for OpenData): the iUB-filtered
    # fraction grows with query cardinality, and the EM count falls.
    # (Paper candidates also grow with cardinality; ours saturate at the
    # collection size because the dense frequent-token head makes every
    # set a candidate — a documented divergence, see EXPERIMENTS.md.)
    frac = df["iub"] / df["candidates"]
    assert frac.iloc[-1] > frac.iloc[0]
    assert df["em"].iloc[-1] < df["em"].iloc[0]
