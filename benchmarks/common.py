"""Shared helpers for the per-table benchmarks.

Each benchmark runs its harness once (``benchmark.pedantic`` with a
single round — one run is minutes of Spark work, statistical rounds are
pointless here), prints the paper-style table, and saves it under
``benchmarks/results/`` so EXPERIMENTS.md can be assembled from the
artifacts.
"""
from __future__ import annotations

import pathlib

import pandas as pd

from repro import harness

RESULTS_DIR = pathlib.Path(__file__).parent / "results"


def record(df: pd.DataFrame, name: str, title: str) -> str:
    RESULTS_DIR.mkdir(exist_ok=True)
    text = harness.format_table(df, title)
    (RESULTS_DIR / f"{name}.md").write_text(text)
    print("\n" + text)
    return text


def run_once(benchmark, fn):
    """Run ``fn`` exactly once under pytest-benchmark timing."""
    return benchmark.pedantic(fn, rounds=1, iterations=1, warmup_rounds=0)
