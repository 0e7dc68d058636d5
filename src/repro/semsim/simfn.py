"""Element similarity functions.

Koios only requires ``sim`` to be symmetric, to return 1 for identical
elements and values in [0, 1] otherwise (Def. 1) — it is *not* required to
be a metric. Two implementations are provided, matching the paper's
experiments:

* :class:`CosineSim` — cosine of (synthetic) embedding vectors, the main
  similarity used throughout the evaluation;
* :class:`QGramJaccardSim` — Jaccard of the 3-gram sets of the token
  strings, used for the SilkMoth comparison (§VIII-B), demonstrating that
  Koios is similarity-function agnostic.

Both expose the same contract: ``matrix(query_ids) -> (|Q|, |D|)`` exact
similarity of query tokens against the entire vocabulary. ``sim_alpha``
applies the paper's thresholding: values below alpha drop to 0.
"""
from __future__ import annotations

import numpy as np

from repro.semsim.embeddings import Vocabulary


def sim_alpha(sims: np.ndarray, alpha: float) -> np.ndarray:
    """``sim_alpha(x, y) = sim(x, y) if sim(x, y) >= alpha else 0`` (Def. 1)."""
    out = np.where(sims >= alpha, sims, 0.0)
    return out


class CosineSim:
    """Cosine similarity of embedding vectors over a :class:`Vocabulary`.

    Identical tokens get similarity exactly 1 (OOV included); OOV tokens
    are similar only to themselves.
    """

    def __init__(self, vocab: Vocabulary):
        self.vocab = vocab

    def matrix(self, query_ids: np.ndarray) -> np.ndarray:
        return self.vocab.sim_matrix(np.asarray(query_ids, dtype=np.int64))


def qgrams(token: str, q: int = 3) -> frozenset[str]:
    """The q-gram set of ``token`` padded with ``#``/``$`` sentinels.

    Padding follows the usual q-gram convention so short strings still
    produce at least one gram.
    """
    padded = "#" * (q - 1) + token + "$" * (q - 1)
    return frozenset(padded[i : i + q] for i in range(len(padded) - q + 1))


class QGramJaccardSim:
    """Jaccard similarity on 3-gram sets of token strings.

    This is the syntactic similarity used for the SilkMoth comparison in
    §VIII-B. The full query-vs-vocabulary matrix is computed exactly
    (vectorized over a binary gram-incidence matrix).
    """

    def __init__(self, vocab: Vocabulary, q: int = 3):
        self.vocab = vocab
        self.q = q
        grams = [qgrams(t, q) for t in vocab.tokens]
        gram_ids: dict[str, int] = {}
        for gs in grams:
            for gm in gs:
                gram_ids.setdefault(gm, len(gram_ids))
        self._incidence = np.zeros((len(vocab), len(gram_ids)), dtype=np.float32)
        for i, gs in enumerate(grams):
            for gm in gs:
                self._incidence[i, gram_ids[gm]] = 1.0
        self._sizes = self._incidence.sum(axis=1)

    def matrix(self, query_ids: np.ndarray) -> np.ndarray:
        q = np.asarray(query_ids, dtype=np.int64)
        inter = (self._incidence[q] @ self._incidence.T).astype(np.float64)
        union = (
            self._sizes[q][:, None] + self._sizes[None, :]
        ).astype(np.float64) - inter
        sims = np.divide(inter, union, out=np.zeros_like(inter), where=union > 0)
        sims[np.arange(len(q)), q] = 1.0
        return sims
