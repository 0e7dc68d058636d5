"""Synthetic token-embedding substrate (FastText substitute).

The paper computes element similarity as the cosine of pre-trained FastText
vectors. Those are unavailable offline, so we synthesize a vocabulary with
the structure the Koios filters exploit:

* tokens cluster around latent *concepts* — tokens of the same concept
  (synonyms, typos, related entities) have high pairwise cosine similarity
  (roughly 0.7..0.99 for the noise range used), tokens of different
  concepts have low similarity (~N(0, 1/sqrt(dim)));
* identical tokens always have similarity exactly 1;
* a configurable fraction of tokens is out-of-vocabulary (OOV, no vector):
  an OOV token is similar only to itself (sim 1), matching Koios's
  vanilla-overlap initialization rule for OOV elements (paper §V).

Everything is deterministic in ``seed``.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np


@dataclass
class Vocabulary:
    """A token vocabulary with (optional) unit embedding vectors.

    Attributes:
        tokens: token strings; position is the global token id.
        vectors: (len(tokens), dim) float32 matrix of L2-normalized
            embeddings. Rows of OOV tokens are zero.
        has_vector: boolean mask, False for OOV tokens.
        concept_of: latent concept id per token (-1 for OOV) — test-only
            ground truth, never read by the search algorithms.
    """

    tokens: list[str]
    vectors: np.ndarray
    has_vector: np.ndarray
    concept_of: np.ndarray
    _id_of: dict[str, int] = field(default_factory=dict, repr=False)

    def __post_init__(self) -> None:
        if not self._id_of:
            self._id_of = {t: i for i, t in enumerate(self.tokens)}

    def __len__(self) -> int:
        return len(self.tokens)

    @property
    def dim(self) -> int:
        return self.vectors.shape[1]

    def id_of(self, token: str) -> int:
        """Global id of ``token`` (KeyError if unknown)."""
        return self._id_of[token]

    def sim_matrix(self, query_ids: np.ndarray) -> np.ndarray:
        """Exact pairwise similarity of ``query_ids`` against the whole
        vocabulary: cosine for in-vocabulary pairs, 1.0 for identical
        tokens (including OOV), 0 otherwise. Shape (len(query_ids), |D|).
        """
        q = np.asarray(query_ids, dtype=np.int64)
        # float64 result: downstream bound arithmetic (greedy sums,
        # label sums, head sums) must agree bit-for-bit on edge weights.
        sims = (self.vectors[q] @ self.vectors.T).astype(np.float64)
        np.clip(sims, 0.0, 1.0, out=sims)
        # Identity overrides: sim(t, t) = 1 exactly, OOV included.
        sims[np.arange(len(q)), q] = 1.0
        return sims


def make_vocabulary(
    *,
    n_concepts: int,
    dim: int = 24,
    mean_cluster: float = 2.0,
    oov_frac: float = 0.1,
    noise_lo: float = 0.1,
    noise_hi: float = 0.6,
    cone_concepts: int = 0,
    cone_gamma: tuple[float, float] = (0.6, 0.85),
    seed: int = 0,
) -> Vocabulary:
    """Build a synthetic vocabulary of concept-clustered tokens.

    ``mean_cluster`` controls the average number of surface tokens per
    concept (1 + Poisson(mean_cluster - 1)); ``oov_frac`` adds that
    fraction of extra vector-less tokens.

    ``cone_concepts`` puts the first that many concepts inside a shared
    *cone*: their tokens get a common direction with weight
    ``sqrt(gamma)``, gamma ~ U(cone_gamma). Tokens of two different cone
    concepts then have cosine ~ sqrt(gamma_i * gamma_j), i.e. frequently
    above a 0.8 threshold — modeling the anisotropy/hubness of real
    pre-trained embeddings, where frequent words are mutually similar.
    Without this, synthetic embeddings make the similarity graph far
    sparser than FastText's, and the paper's filter behavior (matching
    capacity saturating, theta_lb near |Q|) cannot be reproduced.
    """
    g = np.random.default_rng(seed)
    concept_vecs = g.standard_normal((n_concepts, dim))
    concept_vecs /= np.linalg.norm(concept_vecs, axis=1, keepdims=True)
    cone_dir = g.standard_normal(dim)
    cone_dir /= np.linalg.norm(cone_dir)
    # Project cone concepts' residual direction off the cone axis so the
    # gamma weight controls their shared-component exactly.
    concept_gamma = np.zeros(n_concepts)
    if cone_concepts > 0:
        concept_gamma[:cone_concepts] = g.uniform(
            cone_gamma[0], cone_gamma[1], min(cone_concepts, n_concepts)
        )

    cluster_sizes = 1 + g.poisson(max(mean_cluster - 1.0, 0.0), n_concepts)
    tokens: list[str] = []
    concept_of: list[int] = []
    rows: list[np.ndarray] = []
    for c, size in enumerate(cluster_sizes):
        base = concept_vecs[c]
        gamma = concept_gamma[c]
        if gamma > 0:
            resid = base - (base @ cone_dir) * cone_dir
            resid /= np.linalg.norm(resid)
            base = np.sqrt(gamma) * cone_dir + np.sqrt(1 - gamma) * resid
        for s in range(size):
            # Unit-norm noise scaled to sigma, so the expected cosine of
            # two same-concept tokens is ~1/sqrt((1+s1^2)(1+s2^2)) — i.e.
            # ~0.75..0.99 for the default noise range, independent of dim.
            sigma = g.uniform(noise_lo, noise_hi)
            noise = g.standard_normal(dim)
            v = base + sigma * noise / np.linalg.norm(noise)
            v /= np.linalg.norm(v)
            tokens.append(f"c{c}s{s}")
            concept_of.append(c)
            rows.append(v.astype(np.float32))

    n_oov = int(round(oov_frac * len(tokens)))
    for i in range(n_oov):
        tokens.append(f"oov{i}")
        concept_of.append(-1)
        rows.append(np.zeros(dim, dtype=np.float32))

    vectors = np.vstack(rows).astype(np.float32)
    has_vector = np.array([c >= 0 for c in concept_of])
    return Vocabulary(
        tokens=tokens,
        vectors=vectors,
        has_vector=has_vector,
        concept_of=np.array(concept_of, dtype=np.int64),
    )
