"""Benchmark for Table III — response time and memory, Koios vs baseline.

As in the paper, the baseline verifies every candidate (Baseline+ with
the iUB assist on WDC, where the plain baseline is infeasible) and both
systems run through the same 10-partition distributed harness.
"""
from repro import harness

from benchmarks.common import record, run_once


def test_table3_response_time(spark, benchmark):
    df = run_once(
        benchmark,
        lambda: harness.table3(
            spark, n_uniform=4, per_interval=1, ub_mode="paper",
            time_budget=60.0,
        ),
    )
    record(df, "table3", "Table III: response time and memory vs baseline")
    by = df.set_index("dataset")
    # Shape: Koios does less search work than the baseline wherever the
    # baseline's matchings are non-trivial (the paper reports 5.5x..740x
    # response-time speedups; at our 1/40 scale the per-query Spark
    # dispatch overhead ~1s dominates wall time, so the assertion is on
    # kernel time — refinement + post-processing, max over partitions).
    # Twitter is exempt from the time assertion: its sets are ~6 tokens,
    # an exact matching costs microseconds here, and both kernels sit at
    # noise level (tens of ms) — the paper's 740x needs its 27k-set
    # corpus. The mechanism (far fewer exact matchings) is asserted for
    # every dataset instead (see EXPERIMENTS.md).
    for name in by.index:
        ke, be = by.loc[name, "koios_em"], by.loc[name, "baseline_em"]
        if be == be and ke == ke:
            assert ke < be, f"{name}: koios EMs {ke} not fewer than {be}"
        if name == "twitter":
            continue
        k = by.loc[name, "koios_refine_s"] + by.loc[name, "koios_post_s"]
        b = by.loc[name, "baseline_refine_s"] + by.loc[name, "baseline_post_s"]
        if b == b and k == k:  # both non-NaN
            assert k < b * 1.05, f"{name}: koios kernel {k}s vs baseline {b}s"
