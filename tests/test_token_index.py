"""Tests for the exact token index (Faiss substitute) and its contract."""
import numpy as np
import pytest

from repro.semsim.embeddings import make_vocabulary
from repro.semsim.token_index import ExactTokenIndex

from tests.helpers import random_instance


def _drain(index: ExactTokenIndex, qi: int):
    out = []
    while (nxt := index.probe(qi)) is not None:
        out.append(nxt)
    return out


@pytest.mark.parametrize("seed", range(5))
def test_probe_descending(seed):
    _, _, q, sims = random_instance(seed)
    idx = ExactTokenIndex(sims, q, alpha=0.5)
    for qi in range(len(q)):
        seq = _drain(idx, qi)
        vals = [s for _, s in seq]
        assert vals == sorted(vals, reverse=True)


@pytest.mark.parametrize("seed", range(5))
def test_probe_threshold_stop(seed):
    _, _, q, sims = random_instance(seed)
    alpha = 0.7
    idx = ExactTokenIndex(sims, q, alpha=alpha)
    for qi in range(len(q)):
        seq = _drain(idx, qi)
        assert all(s >= alpha for _, s in seq)
        # Exactly the tokens above threshold are returned.
        expect = int((sims[qi] >= alpha).sum())
        assert len(seq) == expect


@pytest.mark.parametrize("seed", range(5))
def test_first_probe_is_query_token(seed):
    """§V rule: the first probe for q returns q itself (sim 1), which
    seeds candidate bounds with the vanilla overlap and covers OOV."""
    _, _, q, sims = random_instance(seed)
    idx = ExactTokenIndex(sims, q, alpha=0.8)
    for qi, qid in enumerate(q):
        tok, sim = idx.probe(qi)
        assert tok == qid
        assert sim == 1.0


def test_no_duplicates_per_query():
    _, _, q, sims = random_instance(11)
    idx = ExactTokenIndex(sims, q, alpha=0.3)
    for qi in range(len(q)):
        seq = [t for t, _ in _drain(idx, qi)]
        assert len(seq) == len(set(seq))


def test_exhausted_returns_none():
    vocab = make_vocabulary(n_concepts=5, seed=0)
    q = np.array([0])
    sims = vocab.sim_matrix(q)
    idx = ExactTokenIndex(sims, q, alpha=1.1)  # nothing reaches 1.1
    assert idx.probe(0) is None
