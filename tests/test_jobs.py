"""Smoke tests for the spark-submit job entrypoints.

Heavy jobs are exercised through ``repro.harness`` elsewhere; here we
check the entry modules are importable and the light ones run end-to-end
(sharing the session-scoped SparkSession via getOrCreate).
"""
import importlib
import sys

import pytest

JOB_MODULES = [
    "jobs.table1_datasets",
    "jobs.table2_pruning",
    "jobs.table3_response",
    "jobs.table4_opendata",
    "jobs.table5_wdc",
    "jobs.silkmoth_compare",
    "jobs.quality_compare",
]


@pytest.mark.parametrize("mod", JOB_MODULES)
def test_job_importable(mod):
    assert importlib.import_module(mod).main


def test_table1_job_runs(spark, capsys, monkeypatch):
    from jobs import table1_datasets

    monkeypatch.setattr(sys, "argv", ["table1_datasets.py", "dblp"])
    monkeypatch.setattr(spark.__class__, "stop", lambda self: None)
    table1_datasets.main()
    out = capsys.readouterr().out
    assert "Table I" in out and "dblp" in out
