"""Direct tests of the paper's Lemmas 1–5, 7, 8 on random instances.

Lemma 6 is covered in ``test_lemma6_counterexample.py`` — it is *not*
valid as stated in the paper (see core/koios.py docstring); the corrected
sound bound is tested here instead.
"""
import numpy as np
import pytest

from repro.matching.greedy import greedy_matching_score
from repro.matching.hungarian import max_weight_matching
from repro.semsim.simfn import sim_alpha

from tests.helpers import random_instance

ALPHA = 0.7


def _so(w):
    res = max_weight_matching(w)
    return res.score


@pytest.mark.parametrize("seed", range(10))
def test_lemma1_vanilla_lower_bounds_semantic(seed):
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    qset = set(q.tolist())
    for toks in sets[:30]:
        vanilla = len(qset & set(toks.tolist()))
        assert vanilla <= _so(w[:, toks]) + 1e-9


@pytest.mark.parametrize("seed", range(10))
def test_lemma2_ub_filter(seed):
    """SO(C) <= min(|Q|, |C|) * max-sim."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    for toks in sets[:30]:
        sub = w[:, toks]
        ub = min(len(q), len(toks)) * (sub.max() if sub.size else 0.0)
        assert _so(sub) <= ub + 1e-9


@pytest.mark.parametrize("seed", range(10))
def test_lemma3_lb_filter(seed):
    """max-edge and greedy score lower-bound SO."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    for toks in sets[:30]:
        sub = w[:, toks]
        so = _so(sub)
        assert (sub.max() if sub.size else 0.0) <= so + 1e-9
        assert greedy_matching_score(sub) <= so + 1e-9


@pytest.mark.parametrize("seed", range(8))
def test_lemma4_theta_lb_below_theta_k_star(seed):
    """min of top-k greedy LBs <= theta_k* (k-th best exact SO)."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    k = 5
    lbs = sorted(
        (greedy_matching_score(w[:, t]) for t in sets), reverse=True
    )
    sos = sorted((_so(w[:, t]) for t in sets), reverse=True)
    theta_lb = lbs[k - 1]
    theta_k_star = sos[k - 1]
    assert theta_lb <= theta_k_star + 1e-9


@pytest.mark.parametrize("seed", range(8))
def test_lemma5_partial_greedy_prefixes(seed):
    """Every prefix of the greedy matching lower-bounds SO."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    for toks in sets[:15]:
        sub = w[:, toks]
        so = _so(sub)
        rows, cols = np.nonzero(sub)
        order = np.argsort(-sub[rows, cols], kind="stable")
        used_r, used_c, prefix = set(), set(), 0.0
        for e in order:
            r, c = int(rows[e]), int(cols[e])
            if r not in used_r and c not in used_c:
                used_r.add(r)
                used_c.add(c)
                prefix += sub[r, c]
                assert prefix <= so + 1e-9


@pytest.mark.parametrize("seed", range(8))
def test_sound_iub_bound(seed):
    """The corrected incremental UB (DESIGN.md): after seeing the j
    heaviest edges of C (descending stream), SO <= sum of the first
    min(c, j) + max(0, c - j) * (j-th edge weight)."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    for toks in sets[:15]:
        sub = w[:, toks]
        so = _so(sub)
        weights = np.sort(sub[sub > 0])[::-1]
        c = min(len(q), len(toks))
        for j in range(1, len(weights) + 1):
            s = weights[j - 1]
            head = weights[: min(c, j)].sum()
            ub = head + max(0, c - j) * s
            assert so <= ub + 1e-9, (j, so, ub)


@pytest.mark.parametrize("seed", range(8))
def test_lemma7_no_em_guarantee(seed):
    """A set whose LB reaches the k-th largest UB over candidates must
    belong to a valid top-k result (its SO >= theta_k*)."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, ALPHA)
    k = 5
    cands = [t for t in sets if (w[:, t] > 0).any()]
    if len(cands) < k:
        pytest.skip("too few candidates")
    ubs, lbs, sos = [], [], []
    for t in cands:
        sub = w[:, t]
        ubs.append(min(len(q), len(t)) * sub.max())
        lbs.append(greedy_matching_score(sub))
        sos.append(_so(sub))
    theta_ub = sorted(ubs, reverse=True)[k - 1]
    theta_k_star = sorted(sos, reverse=True)[k - 1]
    for lb, so in zip(lbs, sos):
        if lb >= theta_ub:
            assert so >= theta_k_star - 1e-9


@pytest.mark.parametrize("seed", range(10))
def test_lemma8_label_sum_abort_safe(seed):
    """Aborting when the label sum falls below a threshold never kills a
    set whose SO reaches the threshold."""
    g = np.random.default_rng(seed)
    w = g.random((6, 7))
    w[w < 0.4] = 0
    so = _so(w)
    for frac in [0.3, 0.7, 0.99]:
        thr = so * frac
        res = max_weight_matching(w, abort_below=thr)
        # SO >= thr, so the matching must complete.
        assert not res.aborted
        assert np.isclose(res.score, so, atol=1e-9)
