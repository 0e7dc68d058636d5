"""Shared test fixtures/builders for the Koios reproduction tests."""
from __future__ import annotations

import numpy as np

from repro.semsim.embeddings import Vocabulary, make_vocabulary


def random_instance(
    seed: int,
    *,
    n_concepts: int = 60,
    n_sets: int = 100,
    max_set: int = 20,
    max_query: int = 25,
    oov_frac: float = 0.15,
) -> tuple[Vocabulary, list[np.ndarray], np.ndarray, np.ndarray]:
    """A random (vocab, sets, query_ids, sims) search instance.

    Concept-clustered vocabulary so high-similarity pairs actually occur
    (pure random embeddings rarely cross alpha = 0.8).
    """
    g = np.random.default_rng(seed)
    vocab = make_vocabulary(
        n_concepts=n_concepts, mean_cluster=3.0, oov_frac=oov_frac, seed=seed
    )
    d = len(vocab)
    sets = [
        np.unique(g.integers(0, d, g.integers(2, max_set)))
        for _ in range(n_sets)
    ]
    query = np.unique(g.integers(0, d, g.integers(3, max_query)))
    sims = vocab.sim_matrix(query)
    return vocab, sets, query, sims


def topk_scores(topk: list[tuple[int, float]]) -> np.ndarray:
    return np.sort(np.array([s for _, s in topk]))


def assert_same_topk(got, want, atol: float = 1e-8) -> None:
    """Tie-tolerant top-k equality: the score multisets must match."""
    gs, ws = topk_scores(got), topk_scores(want)
    assert len(gs) == len(ws), f"result sizes differ: {len(gs)} vs {len(ws)}"
    assert np.allclose(gs, ws, atol=atol), f"scores differ: {gs} vs {ws}"
