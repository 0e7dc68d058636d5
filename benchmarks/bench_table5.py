"""Benchmark for Table V — WDC pruning counts per query-cardinality
interval (avg per query, summed over the 10 partitions)."""
from repro import harness

from benchmarks.common import record, run_once


def test_table5_wdc_intervals(spark, benchmark):
    df = run_once(
        benchmark,
        lambda: harness.table5(spark, per_interval=3, ub_mode="paper"),
    )
    record(df, "table5", "Table V: WDC #sets pruned by filters")
    frac = df["iub"] / df["candidates"]
    assert frac.iloc[-1] > frac.iloc[0]
    # Shape: for the largest queries only a tiny fraction of candidates
    # reaches post-processing (paper: < 5%).
    tail = df.iloc[-1]
    post = tail["candidates"] - tail["iub"]
    assert post / tail["candidates"] < 0.25
