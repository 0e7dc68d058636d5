"""Benchmark/harness for Table I — dataset characteristics."""
from repro import harness

from benchmarks.common import record, run_once


def test_table1_dataset_characteristics(spark, benchmark):
    df = run_once(benchmark, lambda: harness.table1(spark))
    record(df, "table1", "Table I: dataset characteristics (ours vs paper)")
    # Shape assertions: the orderings visible in the paper's Table I.
    by = df.set_index("dataset")
    assert by["n_sets"].idxmax() == "wdc"
    assert by["avg_size"].idxmax() == "dblp"
    assert by["max_size"].idxmax() == "opendata"
