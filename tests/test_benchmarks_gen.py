"""Tests for query-benchmark sampling (§VIII-A2)."""
import numpy as np
import pytest

from repro.datasets import benchmarks as B
from repro.datasets import generator as G


@pytest.fixture(scope="module")
def opendata():
    return G.load("opendata")


def test_uniform_queries_count_and_membership(opendata):
    qs = B.uniform_queries(opendata, n=20, seed=1)
    assert len(qs) == 20
    ids = {id(s) for s in opendata.sets}
    for q in qs:
        assert id(q) in ids  # queries are drawn from the collection


def test_uniform_queries_deterministic(opendata):
    a = B.uniform_queries(opendata, n=5, seed=3)
    b = B.uniform_queries(opendata, n=5, seed=3)
    assert all(np.array_equal(x, y) for x, y in zip(a, b))


def test_uniform_queries_distinct(opendata):
    qs = B.uniform_queries(opendata, n=30, seed=2)
    assert len({id(q) for q in qs}) == 30


def test_interval_queries_respect_bounds(opendata):
    out = B.interval_queries(opendata, per_interval=5, seed=1)
    assert out  # at least one interval populated
    for (lo, hi), qs in out.items():
        for q in qs:
            assert lo <= len(q) < hi


def test_interval_queries_cover_configured_intervals(opendata):
    out = B.interval_queries(opendata, per_interval=3, seed=1)
    for iv in out:
        assert iv in B.INTERVALS["opendata"]


def test_interval_queries_custom_intervals(opendata):
    out = B.interval_queries(
        opendata, per_interval=2, intervals=[(1, 10_000)], seed=1
    )
    assert list(out) == [(1, 10_000)]
    assert len(out[(1, 10_000)]) == 2


def test_wdc_intervals_populated():
    wdc = G.load("wdc")
    out = B.interval_queries(wdc, per_interval=2, seed=1)
    assert len(out) >= 4  # at least the small/medium bins exist
