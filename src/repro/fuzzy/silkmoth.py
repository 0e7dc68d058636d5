"""Simplified SilkMoth-style fuzzy set search (the §VIII-B comparator).

SilkMoth [Deng et al., PVLDB'17] is a *threshold*-based related-set
search: given a score threshold theta, return all sets whose maximum
bipartite matching score with the query reaches theta. The paper adapts
it to top-k search by handing it the true theta_k* and keeping a top-k
priority queue over its output — an advantage for SilkMoth, reproduced
here verbatim.

We implement the generic "SilkMoth-semantic" framework the paper
compares against (signature scheme + verification, no similarity-
function-specific filters):

* **Signature**: if ``SO(Q, C) >= theta`` then, since every matched
  element contributes at most 1, any subset ``K ⊆ Q`` with
  ``|Q| - |K| < theta`` must have at least one element matched, i.e. C
  must contain a token alpha-similar to some element of K. The minimum
  valid signature size is ``floor(|Q| - theta) + 1``; we pick the
  elements with the fewest alpha-similar vocabulary tokens (rarest
  first), the standard cheapest-posting heuristic.
* **Candidates**: sets sharing an alpha-similar token with the
  signature (via the inverted index).
* **Check filter**: prune candidates whose relaxed upper bound (sum of
  the ``min(|Q|, |C|)`` heaviest incident edges) is below theta.
* **Verification**: Hungarian matching; keep sets with score >= theta.

Works with any symmetric ``sim`` matrix, e.g. Jaccard on 3-grams
(``semsim.simfn.QGramJaccardSim``) as in the paper's comparison.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.matching.hungarian import max_weight_matching
from repro.semsim.inverted import build_inverted
from repro.semsim.simfn import sim_alpha


@dataclass
class SilkmothStats:
    signature_size: int = 0
    candidates: int = 0
    check_filtered: int = 0
    verified: int = 0


def silkmoth_threshold_search(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    theta: float,
    alpha: float,
    inverted: dict[int, np.ndarray] | None = None,
) -> tuple[list[tuple[int, float]], SilkmothStats]:
    """All sets with ``SO(Q, C) >= theta`` (score-descending)."""
    stats = SilkmothStats()
    nq = len(query_ids)
    w = sim_alpha(sims, alpha)
    if inverted is None:
        inverted = build_inverted(sets)

    # Signature selection: rarest-posting query elements first.
    sig_size = min(nq, int(np.floor(nq - theta)) + 1)
    sig_size = max(sig_size, 1)
    stats.signature_size = sig_size
    posting_cost = np.zeros(nq)
    sim_tokens_per_q: list[np.ndarray] = []
    for qi in range(nq):
        toks = np.nonzero(w[qi] > 0)[0]
        sim_tokens_per_q.append(toks)
        posting_cost[qi] = sum(len(inverted.get(int(t), ())) for t in toks)
    signature = np.argsort(posting_cost, kind="stable")[:sig_size]

    # Candidate generation from the signature's similar tokens.
    cand: set[int] = set()
    for qi in signature:
        for t in sim_tokens_per_q[int(qi)]:
            for sid in inverted.get(int(t), ()):
                cand.add(int(sid))
    stats.candidates = len(cand)

    results: list[tuple[int, float]] = []
    tol = 1e-9  # tie tolerance: theta is often an exact SO of some set
    for sid in sorted(cand):
        sub = w[:, sets[sid]]
        # Check filter: relaxed UB = sum of the c heaviest edges.
        c = min(nq, len(sets[sid]))
        flat = sub[sub > 0].astype(np.float64)
        if len(flat) > c:
            flat = np.partition(flat, len(flat) - c)[-c:]
        if float(flat.sum()) < theta - tol:
            stats.check_filtered += 1
            continue
        res = max_weight_matching(sub)
        stats.verified += 1
        assert res.score is not None
        if res.score >= theta - tol:
            results.append((sid, res.score))
    results.sort(key=lambda x: (-x[1], x[0]))
    return results, stats


def silkmoth_topk(
    query_ids: np.ndarray,
    sets: list[np.ndarray],
    sims: np.ndarray,
    *,
    k: int,
    theta_kstar: float,
    alpha: float,
    inverted: dict[int, np.ndarray] | None = None,
) -> tuple[list[tuple[int, float]], SilkmothStats]:
    """The paper's top-k adaptation: threshold search at the true
    theta_k* (given to SilkMoth as an advantage), then top-k selection."""
    results, stats = silkmoth_threshold_search(
        query_ids, sets, sims, theta=theta_kstar, alpha=alpha, inverted=inverted
    )
    return results[:k], stats
