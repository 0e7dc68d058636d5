"""Tests for greedy matching (LB-Filter substrate, Lemmas 3/5)."""
import itertools

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st
from hypothesis.extra import numpy as hnp

from repro.matching.greedy import greedy_matching_score


def brute_optimal(w: np.ndarray) -> float:
    nr, nc = w.shape
    n = max(nr, nc)
    sq = np.zeros((n, n))
    sq[:nr, :nc] = w
    return max(
        sum(sq[i, p[i]] for i in range(n))
        for p in itertools.permutations(range(n))
    )


def test_empty_matrix():
    assert greedy_matching_score(np.zeros((3, 4))) == 0.0


def test_single_edge():
    w = np.zeros((2, 2))
    w[1, 0] = 0.7
    assert greedy_matching_score(w) == 0.7


def test_takes_heaviest_first():
    w = np.array([[0.9, 0.8], [0.7, 0.0]])
    # greedy: 0.9 (blocks row0/col0), then 0.0... only 0.9 remains valid
    assert np.isclose(greedy_matching_score(w), 0.9)


def test_known_suboptimal_case():
    """The classic 1/2-approximation case: greedy picks the heavy middle
    edge and blocks two slightly lighter disjoint edges."""
    w = np.array([[1.0, 0.9], [0.9, 0.0]])
    assert np.isclose(greedy_matching_score(w), 1.0)
    assert np.isclose(brute_optimal(w), 1.8)


@pytest.mark.parametrize("seed", range(20))
def test_greedy_between_half_and_optimal(seed):
    g = np.random.default_rng(seed)
    w = g.random((g.integers(1, 6), g.integers(1, 6)))
    w[w < 0.35] = 0
    opt = brute_optimal(w)
    got = greedy_matching_score(w)
    assert got <= opt + 1e-9
    assert got >= opt / 2 - 1e-9


@given(
    hnp.arrays(
        np.float64,
        st.tuples(st.integers(1, 5), st.integers(1, 5)),
        elements=st.floats(0, 1, allow_nan=False),
    )
)
@settings(max_examples=60, deadline=None)
def test_greedy_bounds_hypothesis(w):
    opt = brute_optimal(w)
    got = greedy_matching_score(w)
    assert got <= opt + 1e-9
    assert got >= opt / 2 - 1e-9


def test_prefix_sums_are_lower_bounds():
    """Lemma 5: any prefix of the greedy matching lower-bounds SO."""
    g = np.random.default_rng(3)
    w = g.random((6, 6))
    w[w < 0.5] = 0
    opt = brute_optimal(w)
    rows, cols = np.nonzero(w)
    order = np.argsort(-w[rows, cols], kind="stable")
    used_r, used_c = set(), set()
    prefix = 0.0
    for e in order:
        r, c = int(rows[e]), int(cols[e])
        if r not in used_r and c not in used_c:
            used_r.add(r)
            used_c.add(c)
            prefix += w[r, c]
            assert prefix <= opt + 1e-9
