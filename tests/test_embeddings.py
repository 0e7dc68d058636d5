"""Tests for the synthetic embedding substrate (FastText substitute)."""
import numpy as np
import pytest

from repro.semsim.embeddings import make_vocabulary


@pytest.fixture(scope="module")
def vocab():
    return make_vocabulary(n_concepts=100, mean_cluster=3.0, oov_frac=0.2, seed=42)


def test_deterministic():
    a = make_vocabulary(n_concepts=30, seed=5)
    b = make_vocabulary(n_concepts=30, seed=5)
    assert a.tokens == b.tokens
    assert np.array_equal(a.vectors, b.vectors)


def test_different_seeds_differ():
    a = make_vocabulary(n_concepts=30, seed=5)
    b = make_vocabulary(n_concepts=30, seed=6)
    assert not np.array_equal(a.vectors, b.vectors)


def test_vectors_normalized(vocab):
    norms = np.linalg.norm(vocab.vectors[vocab.has_vector], axis=1)
    assert np.allclose(norms, 1.0, atol=1e-5)


def test_oov_rows_zero(vocab):
    assert np.all(vocab.vectors[~vocab.has_vector] == 0)


def test_oov_fraction(vocab):
    frac = (~vocab.has_vector).mean()
    assert 0.1 < frac < 0.3


def test_id_of_roundtrip(vocab):
    for i in [0, 1, len(vocab) // 2, len(vocab) - 1]:
        assert vocab.id_of(vocab.tokens[i]) == i


def test_id_of_unknown_raises(vocab):
    with pytest.raises(KeyError):
        vocab.id_of("definitely-not-a-token")


def test_intra_concept_similarity_high(vocab):
    """Tokens of the same concept should mostly clear alpha-ish sims."""
    sims_intra = []
    for c in range(50):
        ids = np.nonzero(vocab.concept_of == c)[0]
        if len(ids) < 2:
            continue
        v = vocab.vectors[ids]
        s = v @ v.T
        sims_intra.extend(s[np.triu_indices(len(ids), 1)].tolist())
    assert np.mean(sims_intra) > 0.7


def test_inter_concept_similarity_low(vocab):
    g = np.random.default_rng(0)
    a = g.integers(0, len(vocab), 300)
    b = g.integers(0, len(vocab), 300)
    mask = (vocab.concept_of[a] != vocab.concept_of[b]) & vocab.has_vector[a] & vocab.has_vector[b]
    s = np.einsum("ij,ij->i", vocab.vectors[a[mask]], vocab.vectors[b[mask]])
    assert np.mean(s) < 0.3
    # Very few inter-concept pairs cross a 0.8 threshold.
    assert (s >= 0.8).mean() < 0.05


def test_sim_matrix_shape_and_range(vocab):
    q = np.array([0, 5, 10])
    m = vocab.sim_matrix(q)
    assert m.shape == (3, len(vocab))
    assert m.min() >= 0.0 and m.max() <= 1.0


def test_sim_matrix_identity_exact_one(vocab):
    q = np.arange(0, len(vocab), 97)
    m = vocab.sim_matrix(q)
    assert np.all(m[np.arange(len(q)), q] == 1.0)


def test_sim_matrix_oov_only_self(vocab):
    oov = np.nonzero(~vocab.has_vector)[0][:5]
    m = vocab.sim_matrix(oov)
    for i, t in enumerate(oov):
        row = m[i].copy()
        assert row[t] == 1.0
        row[t] = 0
        assert np.all(row == 0)


def test_sim_matrix_symmetric(vocab):
    """sim(a, b) == sim(b, a) (Def. 1 requires symmetry)."""
    q = np.array([3, 17, 101])
    m = vocab.sim_matrix(q)
    m2 = vocab.sim_matrix(np.array([17]))
    assert np.isclose(m[0, 17], m2[0, 3])


@pytest.mark.parametrize("n_concepts", [1, 5, 50])
def test_small_vocab_sizes(n_concepts):
    v = make_vocabulary(n_concepts=n_concepts, seed=1)
    assert len(v) >= n_concepts
    assert v.vectors.shape[0] == len(v.tokens) == len(v.concept_of)
