"""Synthetic collections shaped like the paper's datasets (Table I).

The paper evaluates on DBLP (title+abstract word sets), OpenData and WDC
(column-value sets, heavy cardinality and token-frequency skew) and
Twitter (small tweet word sets). None are downloadable offline, so each
is replaced by a generator that preserves the distributional features the
Koios filters are sensitive to (DESIGN.md §4):

* number of sets and the set-cardinality distribution (lognormal for
  DBLP/Twitter, power-law-ish for OpenData/WDC);
* vocabulary size and token-frequency skew — WDC gets a strong Zipf
  exponent, producing the "very frequent elements / excessively large
  posting lists" the paper calls out;
* semantic structure via concept-clustered embeddings and ~10% OOV
  tokens (the paper filters to >= 70% embedding coverage).

Everything is deterministic in ``seed``. Scale is ~1/40 of the paper on
set count and ~1/15 on cardinality so O(n^3) verifications stay fast.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.semsim.embeddings import Vocabulary, make_vocabulary


@dataclass
class Collection:
    """A repository of sets over a shared vocabulary."""

    name: str
    vocab: Vocabulary
    sets: list[np.ndarray]  # token-id arrays, unique within a set

    @property
    def n_sets(self) -> int:
        return len(self.sets)

    def characteristics(self) -> dict[str, float]:
        """The Table I metrics: #Sets, MaxSize, AvgSize, #UniqElems."""
        sizes = np.array([len(s) for s in self.sets])
        uniq = len(np.unique(np.concatenate(self.sets))) if self.sets else 0
        return {
            "n_sets": int(self.n_sets),
            "max_size": int(sizes.max()),
            "avg_size": float(sizes.mean()),
            "n_uniq_elems": int(uniq),
        }

    def to_spark(self, spark: SparkSession) -> DataFrame:
        """(set_id, tokens array<string>) DataFrame of the repository."""
        pdf = pd.DataFrame(
            {
                "set_id": np.arange(self.n_sets, dtype=np.int64),
                "tokens": [
                    [self.vocab.tokens[t] for t in toks] for toks in self.sets
                ],
            }
        )
        return spark.createDataFrame(pdf)


@dataclass(frozen=True)
class DatasetSpec:
    """Shape parameters of one synthetic dataset.

    ``pool_concepts``/``common_frac`` model the stopword-like *and
    semantically dense* head of real text and value columns: each set
    draws ``common_frac`` of its tokens from the tokens of the first
    ``pool_concepts`` concepts. Because the pool is cluster-complete,
    pool tokens of two different sets match each other semantically even
    when not identical — the FastText hub effect. This drives pairwise
    matching scores (hence theta_lb) and edge coverage (hence the
    remaining-capacity term m of Lemma 6) to paper-like levels; without
    it every set pair is nearly disjoint, m never shrinks, and the
    iUB-Filter has nothing to work with.
    """

    name: str
    n_sets: int
    n_concepts: int
    mean_cluster: float
    size_dist: str  # "lognormal" | "powerlaw"
    size_mean: float  # lognormal: mean size; powerlaw: median-ish scale
    size_max: int
    size_min: int
    token_zipf: float  # Zipf exponent of token frequency (0 = uniform)
    seed: int
    pool_concepts: int = 0  # concepts forming the frequent head (0 = none)
    common_frac: float = 0.0  # fraction of each set drawn from the head


# Paper Table I (paper -> ours, see DESIGN.md §4):
#   DBLP     4,246 sets / max 514 / avg 178.7 / 25,159 uniq
#   OpenData 15,636 / 31,901 / 86.4 / 179,830
#   Twitter  27,204 / 151 / 22.6 / 72,910
#   WDC      1,014,369 / 10,240 / 30.6 / 328,357
#
# Pool/cone parameters are calibrated so the *filter behavior* matches
# the paper's Tables II/IV/V shape: DBLP gets a dominant dense head
# (FastText makes most abstract-word pairs alpha-similar, saturating the
# matching capacity m); OpenData/WDC get heavy cardinality skew (their
# pruning comes from small sets vs. large queries); Twitter stays sparse
# and homogeneous (the paper's weakest-pruning dataset).
SPECS: dict[str, DatasetSpec] = {
    "dblp": DatasetSpec(
        name="dblp", n_sets=1200, n_concepts=400, mean_cluster=3.0,
        size_dist="lognormal", size_mean=45.0, size_max=160, size_min=10,
        token_zipf=0.6, seed=101, pool_concepts=100, common_frac=0.9,
    ),
    "opendata": DatasetSpec(
        name="opendata", n_sets=2000, n_concepts=3000, mean_cluster=2.5,
        size_dist="powerlaw", size_mean=12.0, size_max=800, size_min=4,
        token_zipf=0.8, seed=202, pool_concepts=80, common_frac=0.5,
    ),
    "twitter": DatasetSpec(
        name="twitter", n_sets=5000, n_concepts=3500, mean_cluster=2.5,
        size_dist="lognormal", size_mean=6.0, size_max=40, size_min=3,
        token_zipf=0.7, seed=303, pool_concepts=40, common_frac=0.35,
    ),
    "wdc": DatasetSpec(
        name="wdc", n_sets=8000, n_concepts=2800, mean_cluster=2.5,
        size_dist="powerlaw", size_mean=6.0, size_max=300, size_min=3,
        token_zipf=1.05, seed=404, pool_concepts=60, common_frac=0.5,
    ),
}


def _sizes(spec: DatasetSpec, g: np.random.Generator) -> np.ndarray:
    if spec.size_dist == "lognormal":
        raw = g.lognormal(mean=np.log(spec.size_mean), sigma=0.5, size=spec.n_sets)
    elif spec.size_dist == "powerlaw":
        # Pareto tail on top of the minimum — strong cardinality skew.
        raw = spec.size_mean * (1.0 + g.pareto(1.3, size=spec.n_sets))
    else:
        raise ValueError(spec.size_dist)
    return np.clip(raw, spec.size_min, spec.size_max).astype(np.int64)


def make_collection(spec: DatasetSpec) -> Collection:
    """Materialize one synthetic dataset from its spec."""
    g = np.random.default_rng(spec.seed)
    vocab = make_vocabulary(
        n_concepts=spec.n_concepts,
        mean_cluster=spec.mean_cluster,
        oov_frac=0.1,
        cone_concepts=spec.pool_concepts,
        cone_gamma=(0.82, 0.98),
        seed=spec.seed + 1,
    )
    n_tokens = len(vocab)
    # Zipf token popularity over a random permutation of the vocabulary.
    ranks = np.arange(1, n_tokens + 1, dtype=np.float64)
    weights = ranks ** -spec.token_zipf if spec.token_zipf > 0 else np.ones(n_tokens)
    weights /= weights.sum()
    perm = g.permutation(n_tokens)
    sizes = _sizes(spec, g)
    pool_ids = np.nonzero(
        (vocab.concept_of >= 0) & (vocab.concept_of < spec.pool_concepts)
    )[0]
    sets: list[np.ndarray] = []
    for size in sizes:
        size = int(size)
        n_common = min(int(round(size * spec.common_frac)), len(pool_ids))
        n_body = size - n_common
        common = (
            g.choice(pool_ids, size=n_common, replace=False)
            if n_common > 0
            else np.empty(0, dtype=np.int64)
        )
        # Oversample then dedupe: cheap approximation of sampling without
        # replacement under a skewed distribution; keep exactly n_body so
        # the pool fraction of the set stays at common_frac.
        body = np.unique(perm[g.choice(n_tokens, size=max(2 * n_body, 4), p=weights)])
        body = np.setdiff1d(body, common, assume_unique=False)
        if len(body) > n_body:
            body = g.choice(body, size=n_body, replace=False)
        toks = np.unique(np.concatenate([common, body]))
        if len(toks) == 0:
            toks = perm[g.integers(0, n_tokens, 1)]
        sets.append(np.sort(toks).astype(np.int64))
    return Collection(name=spec.name, vocab=vocab, sets=sets)


def load(name: str) -> Collection:
    """Build the named synthetic dataset ("dblp", "opendata", "twitter",
    "wdc")."""
    return make_collection(SPECS[name])
