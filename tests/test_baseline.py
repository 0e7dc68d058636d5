"""Tests for the baseline and Baseline+ searchers (§VIII-A4)."""
import numpy as np
import pytest

from repro.core.baseline import baseline_plus_search, baseline_search
from repro.core.koios import brute_force_topk, koios_search

from tests.helpers import assert_same_topk, random_instance


@pytest.mark.parametrize("seed", range(10))
def test_baseline_exact(seed):
    _, sets, q, sims = random_instance(seed)
    truth = brute_force_topk(q, sets, sims, k=7, alpha=0.7)
    res = baseline_search(q, sets, sims, k=7, alpha=0.7)
    assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("seed", range(10))
def test_baseline_plus_exact(seed):
    _, sets, q, sims = random_instance(seed)
    truth = brute_force_topk(q, sets, sims, k=7, alpha=0.7)
    res = baseline_plus_search(q, sets, sims, k=7, alpha=0.7)
    assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("seed", range(5))
def test_baseline_verifies_every_candidate(seed):
    """The defining property: no filters, one EM per candidate."""
    _, sets, q, sims = random_instance(seed)
    res = baseline_search(q, sets, sims, k=5, alpha=0.7)
    # every candidate has at least one alpha-edge => SO > 0 => scored
    assert res.em_full == res.candidates


@pytest.mark.parametrize("seed", range(5))
def test_baseline_plus_prunes(seed):
    """Baseline+ must do no more EMs than the baseline."""
    _, sets, q, sims = random_instance(seed)
    b = baseline_search(q, sets, sims, k=5, alpha=0.7)
    bp = baseline_plus_search(q, sets, sims, k=5, alpha=0.7)
    assert bp.stats.em_full <= b.em_full
    assert bp.stats.candidates == b.candidates


@pytest.mark.parametrize("seed", range(5))
def test_koios_does_fewer_ems_than_baseline(seed):
    """The headline claim: filters cut exact-match work."""
    _, sets, q, sims = random_instance(seed, n_sets=200)
    b = baseline_search(q, sets, sims, k=5, alpha=0.7)
    kres = koios_search(q, sets, sims, k=5, alpha=0.7)
    assert kres.stats.em_full <= b.em_full


def test_baseline_time_budget():
    _, sets, q, sims = random_instance(1, n_sets=300)
    res = baseline_search(q, sets, sims, k=5, alpha=0.6, time_budget=0.0)
    assert res.timed_out


def test_baseline_same_candidates_as_koios():
    _, sets, q, sims = random_instance(4)
    b = baseline_search(q, sets, sims, k=5, alpha=0.7)
    kres = koios_search(q, sets, sims, k=5, alpha=0.7)
    assert b.candidates == kres.stats.candidates
