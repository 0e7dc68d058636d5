"""Tests for similarity functions and alpha-thresholding."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.semsim.embeddings import make_vocabulary
from repro.semsim.simfn import CosineSim, QGramJaccardSim, qgrams, sim_alpha


@pytest.fixture(scope="module")
def vocab():
    return make_vocabulary(n_concepts=40, mean_cluster=2.5, oov_frac=0.1, seed=9)


def test_sim_alpha_zeroes_below_threshold():
    s = np.array([[0.79, 0.8, 0.81], [0.0, 1.0, 0.5]])
    out = sim_alpha(s, 0.8)
    assert out.tolist() == [[0.0, 0.8, 0.81], [0.0, 1.0, 0.0]]


def test_sim_alpha_keeps_original_values():
    s = np.random.default_rng(0).random((5, 7))
    out = sim_alpha(s, 0.5)
    mask = s >= 0.5
    assert np.array_equal(out[mask], s[mask])
    assert np.all(out[~mask] == 0)


@given(st.floats(0.0, 1.0))
@settings(max_examples=25, deadline=None)
def test_sim_alpha_idempotent(alpha):
    s = np.linspace(0, 1, 11).reshape(1, -1)
    once = sim_alpha(s, alpha)
    twice = sim_alpha(once, alpha)
    assert np.array_equal(once, twice)


def test_cosine_matches_vocab_matrix(vocab):
    q = np.array([1, 2, 3])
    assert np.array_equal(CosineSim(vocab).matrix(q), vocab.sim_matrix(q))


def test_qgrams_short_strings():
    assert qgrams("a", 3)  # padded, non-empty
    assert qgrams("ab", 3)


def test_qgrams_distinct_strings_distinct_sets():
    assert qgrams("abc") != qgrams("abd")


@given(st.text(alphabet="abcdef", min_size=1, max_size=8))
@settings(max_examples=50, deadline=None)
def test_qgrams_deterministic(s):
    assert qgrams(s) == qgrams(s)


def test_jaccard_identity_is_one(vocab):
    sim = QGramJaccardSim(vocab)
    q = np.array([0, 7, 19])
    m = sim.matrix(q)
    assert np.all(m[np.arange(3), q] == 1.0)


def test_jaccard_range(vocab):
    m = QGramJaccardSim(vocab).matrix(np.array([0, 1, 2, 3]))
    assert m.min() >= 0.0 and m.max() <= 1.0 + 1e-9


def test_jaccard_symmetric(vocab):
    sim = QGramJaccardSim(vocab)
    a = sim.matrix(np.array([4]))[0, 9]
    b = sim.matrix(np.array([9]))[0, 4]
    assert np.isclose(a, b)


def test_jaccard_matches_set_formula(vocab):
    sim = QGramJaccardSim(vocab)
    m = sim.matrix(np.array([2]))
    for t in [0, 5, 11, 40]:
        ga, gb = qgrams(vocab.tokens[2]), qgrams(vocab.tokens[t])
        expect = len(ga & gb) / len(ga | gb)
        if t == 2:
            expect = 1.0
        assert np.isclose(m[0, t], expect, atol=1e-6)


def test_jaccard_similar_surface_tokens(vocab):
    """Tokens of the same concept share the 'cNs' prefix -> nonzero
    3-gram overlap, giving the fuzzy comparator something to match."""
    sim = QGramJaccardSim(vocab)
    c0 = np.nonzero(vocab.concept_of == 0)[0]
    if len(c0) >= 2:
        m = sim.matrix(np.array([c0[0]]))
        assert m[0, c0[1]] > 0
