"""Greedy maximum-weight bipartite matching (the LB-Filter substrate).

At each step the heaviest edge between two unmatched nodes is added. The
greedy score is a lower bound on the optimal matching score and is at
least half of it (paper Lemma 3, [Vazirani 2001]). Complexity
O(E log E) for E nonzero edges.
"""
from __future__ import annotations

import numpy as np


def greedy_matching_score(weights: np.ndarray) -> float:
    """Score of the greedy matching of a nonnegative weight matrix.

    Zero-weight edges never contribute (the matching is optional), so only
    nonzero entries are considered.
    """
    rows, cols = np.nonzero(weights)
    if len(rows) == 0:
        return 0.0
    w = weights[rows, cols]
    order = np.argsort(-w, kind="stable")
    used_r = np.zeros(weights.shape[0], dtype=bool)
    used_c = np.zeros(weights.shape[1], dtype=bool)
    score = 0.0
    for e in order:
        r, c = rows[e], cols[e]
        if not used_r[r] and not used_c[c]:
            used_r[r] = True
            used_c[c] = True
            score += float(w[e])
    return score
