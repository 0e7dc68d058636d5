"""Tests for the Hungarian algorithm and the Lemma-8 label-sum bound."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra import numpy as hnp

from repro.matching.hungarian import max_weight_matching, semantic_overlap


def brute_optimal(w: np.ndarray) -> float:
    nr, nc = w.shape
    n = max(nr, nc)
    sq = np.zeros((n, n))
    sq[:nr, :nc] = w
    return max(
        sum(sq[i, p[i]] for i in range(n))
        for p in itertools.permutations(range(n))
    )


def test_empty():
    res = max_weight_matching(np.zeros((0, 0)))
    assert res.score == 0.0 and not res.aborted


def test_all_zero():
    res = max_weight_matching(np.zeros((4, 3)))
    assert res.score == 0.0


def test_identity_diagonal():
    res = max_weight_matching(np.eye(5))
    assert np.isclose(res.score, 5.0)


def test_rectangular_wide_and_tall():
    w = np.array([[0.5, 0.9, 0.2]])
    assert np.isclose(max_weight_matching(w).score, 0.9)
    assert np.isclose(max_weight_matching(w.T).score, 0.9)


def test_optional_matching_ignores_low_rows():
    """Optional 1:1 matching: zero rows/cols never force bad pairings."""
    w = np.array([[1.0, 0.0], [0.0, 0.0]])
    assert np.isclose(max_weight_matching(w).score, 1.0)


def test_negative_weights_rejected():
    with pytest.raises(ValueError):
        max_weight_matching(np.array([[-0.1]]))


def test_non2d_rejected():
    with pytest.raises(ValueError):
        max_weight_matching(np.zeros(3))


@pytest.mark.parametrize("seed", range(40))
def test_matches_brute_force(seed):
    g = np.random.default_rng(seed)
    w = g.random((g.integers(1, 7), g.integers(1, 7)))
    w[w < 0.4] = 0
    res = max_weight_matching(w)
    assert np.isclose(res.score, brute_optimal(w), atol=1e-9)


@pytest.mark.parametrize("seed", range(40))
def test_label_sum_upper_bounds_score(seed):
    """Kuhn–Munkres: the feasible label sum bounds any matching weight —
    the invariant the EM-Early-Terminated filter (Lemma 8) relies on."""
    g = np.random.default_rng(seed + 100)
    w = g.random((g.integers(1, 8), g.integers(1, 8)))
    w[w < 0.3] = 0
    res = max_weight_matching(w)
    assert res.label_sum >= res.score - 1e-9


@given(
    hnp.arrays(
        np.float64,
        st.tuples(st.integers(1, 5), st.integers(1, 5)),
        elements=st.floats(0, 1, allow_nan=False),
    )
)
@settings(max_examples=60, deadline=None)
def test_matches_brute_force_hypothesis(w):
    res = max_weight_matching(w)
    assert np.isclose(res.score, brute_optimal(w), atol=1e-8)


@pytest.mark.parametrize("seed", range(20))
def test_early_termination_above_opt_aborts(seed):
    g = np.random.default_rng(seed)
    w = g.random((4, 5))
    opt = brute_optimal(w)
    res = max_weight_matching(w, abort_below=opt + 1.0)
    assert res.aborted and res.score is None
    # On abort, the reported bound is below the threshold (that is why
    # it aborted) yet still a valid upper bound on the true score.
    assert res.label_sum < opt + 1.0
    assert res.label_sum >= opt - 1e-9


@pytest.mark.parametrize("seed", range(20))
def test_early_termination_below_opt_completes(seed):
    g = np.random.default_rng(seed + 7)
    w = g.random((4, 5))
    w[w < 0.3] = 0
    opt = brute_optimal(w)
    if opt == 0:
        return
    res = max_weight_matching(w, abort_below=opt * 0.5)
    assert not res.aborted
    assert np.isclose(res.score, opt, atol=1e-9)


def test_abort_zero_matrix_with_positive_threshold():
    res = max_weight_matching(np.zeros((3, 3)), abort_below=0.5)
    assert res.aborted


def test_semantic_overlap_wrapper():
    w = np.array([[0.9, 0.0], [0.0, 0.8]])
    assert np.isclose(semantic_overlap(w), 1.7)


def test_large_instance_sane():
    g = np.random.default_rng(0)
    w = g.random((120, 150))
    w[w < 0.8] = 0
    res = max_weight_matching(w)
    # sanity: score within [greedy/1, sum of row maxes]
    assert 0 < res.score <= w.max(axis=1).sum() + 1e-9
    assert res.label_sum >= res.score - 1e-6


def test_ties_handled():
    w = np.full((3, 3), 0.5)
    assert np.isclose(max_weight_matching(w).score, 1.5)
