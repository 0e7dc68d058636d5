"""Maximum-weight bipartite matching — Hungarian (Kuhn–Munkres) algorithm.

This is the exact-match (EM) kernel of Koios. Implemented from scratch
(no scipy in the environment) in its maximization form with node
potentials ("labels"): a feasible labeling satisfies
``l(q) + l(c) >= w(q, c)`` for every edge, and for any matching M,
``w(M) <= sum(l)`` (Kuhn–Munkres theorem). The algorithm keeps the
labeling feasible throughout, so the running label sum is an upper bound
on the optimal score at all times — this is exactly the quantity the
EM-Early-Terminated filter monitors (paper Lemma 8): as soon as
``sum(l) < theta_lb`` the set cannot reach the top-k and matching aborts.

The matrix may be rectangular; it is padded to square with zeros, which
realizes the paper's *optional* one-to-one matching (zero-weight matched
pairs are equivalent to unmatched nodes since all weights are >= 0).
All-zero rows and columns are dropped first — they can never contribute
to the score — which shrinks the effective problem to the nodes that
actually have alpha-edges.

Complexity O(n^3) with numpy-vectorized inner loops.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np


@dataclass
class MatchResult:
    """Outcome of :func:`max_weight_matching`.

    Attributes:
        score: optimal matching score, or ``None`` when aborted.
        aborted: True if early-terminated via the label-sum bound.
        label_sum: final feasible label sum — an upper bound on the
            optimal score (equals it at optimality for the padded square
            problem); on abort, the bound that crossed the threshold.
        phases: number of augmenting phases run (for the EM-ETM analysis).
    """

    score: float | None
    aborted: bool
    label_sum: float
    phases: int


def _compact(weights: np.ndarray) -> np.ndarray:
    """Drop all-zero rows/cols and pad to a square float64 matrix."""
    w = np.asarray(weights, dtype=np.float64)
    if w.ndim != 2:
        raise ValueError("weights must be 2-D")
    if w.size == 0:
        return np.zeros((0, 0))
    keep_r = w.any(axis=1)
    keep_c = w.any(axis=0)
    w = w[keep_r][:, keep_c]
    nr, nc = w.shape
    n = max(nr, nc)
    if nr != nc:
        sq = np.zeros((n, n))
        sq[:nr, :nc] = w
        w = sq
    return w


def max_weight_matching(
    weights: np.ndarray, *, abort_below: float | None = None
) -> MatchResult:
    """Maximum-weight (optional one-to-one) matching of a nonnegative
    weight matrix.

    Args:
        weights: (nq, nc) matrix with entries in [0, inf); zeros mean
            "no edge".
        abort_below: Lemma-8 threshold (theta_lb). When the feasible label
            sum drops strictly below it, the optimal score provably cannot
            reach the threshold and the computation aborts.
    """
    if np.any(np.asarray(weights) < 0):
        raise ValueError("weights must be nonnegative")
    w = _compact(weights)
    n = w.shape[0]
    if n == 0:
        res = MatchResult(score=0.0, aborted=False, label_sum=0.0, phases=0)
        if abort_below is not None and 0.0 < abort_below:
            res = MatchResult(score=None, aborted=True, label_sum=0.0, phases=0)
        return res

    lx = w.max(axis=1)  # feasible: lx[i] + 0 >= w[i, j]
    ly = np.zeros(n)
    label_sum = float(lx.sum())
    if abort_below is not None and label_sum < abort_below:
        return MatchResult(None, True, label_sum, 0)

    xy = np.full(n, -1, dtype=np.int64)  # row -> matched col
    yx = np.full(n, -1, dtype=np.int64)  # col -> matched row

    phases = 0
    for root in range(n):
        phases += 1
        # Alternating tree from `root`; slack[j] = min over tree rows i of
        # lx[i] + ly[j] - w[i, j]; slack_row[j] attains it.
        slack = lx[root] + ly - w[root]
        slack_row = np.full(n, root, dtype=np.int64)
        in_tree_row = np.zeros(n, dtype=bool)
        in_tree_col = np.zeros(n, dtype=bool)
        in_tree_row[root] = True

        end_col = -1
        while end_col < 0:
            free = ~in_tree_col
            j = int(np.argmin(np.where(free, slack, np.inf)))
            delta = slack[j]
            if delta > 1e-12:
                # Improve the labeling; feasibility is preserved and the
                # label sum decreases by exactly delta (|S| = |T| + 1).
                lx[in_tree_row] -= delta
                ly[in_tree_col] += delta
                slack[free] -= delta
                label_sum -= float(delta)
                if abort_below is not None and label_sum < abort_below:
                    return MatchResult(None, True, label_sum, phases)
            in_tree_col[j] = True
            if yx[j] < 0:
                end_col = j
            else:
                i2 = int(yx[j])
                in_tree_row[i2] = True
                new_slack = lx[i2] + ly - w[i2]
                # Only non-tree columns may update their slack/parent:
                # parents of in-tree columns are frozen for augmentation.
                better = (new_slack < slack) & ~in_tree_col
                slack = np.where(better, new_slack, slack)
                slack_row[better] = i2

        # Augment along the alternating path ending at `end_col`.
        j = end_col
        while j >= 0:
            i = int(slack_row[j])
            j_prev = int(xy[i])
            xy[i] = j
            yx[j] = i
            j = j_prev

    score = float(w[np.arange(n), xy].sum())
    return MatchResult(score=score, aborted=False, label_sum=label_sum, phases=phases)


def semantic_overlap(weights: np.ndarray) -> float:
    """``SO(Q, C)``: the maximum-matching score of the (already
    alpha-thresholded) similarity matrix (paper Def. 1)."""
    res = max_weight_matching(weights)
    assert res.score is not None
    return res.score
