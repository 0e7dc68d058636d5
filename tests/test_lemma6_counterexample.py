"""Lemma 6 of the paper is unsound as stated — reproduction finding.

The iUB bound ``SO(C) <= S + min(|Q|-l, |C|-l) * s`` (S = partial greedy
score, s = last streamed similarity) implicitly assumes the optimal
matching extends the greedy one. It does not have to: the optimal may
drop a greedy edge and instead use two already-streamed edges the greedy
rejected, each heavier than ``s``. This file pins the concrete instance:

  Q = {a, b, c};  C1 = {x, y, z};  C2 = {u, v, w};  alpha = 0.9, k = 1
  sim: a-x=.999  a-y=.99  b-x=.99  c-z=.97   (C1)
       a-u=.98   b-v=.98  c-w=.98            (C2)

  SO(C1) = a-y + b-x + c-z = 2.95 (optimal rearranges around a-x)
  SO(C2) = 2.94.  Greedy on C1 = a-x + c-z = 1.969, m = 1, s_end = .97
  -> paper iUB(C1) = 1.969 + 0.97 = 2.939 < SO(C1) = 2.95  (bound broken)
  -> theta_lb reaches 2.94 via C2, C1 is wrongly pruned, top-1 = C2.

The corrected "sound" bound keeps C1 alive and returns the right answer.
EXPERIMENTS.md discusses the impact on the paper's exactness claim.
"""
import numpy as np
import pytest

from repro.core.koios import brute_force_topk, koios_search


@pytest.fixture()
def instance():
    q = np.array([0, 1, 2])
    sims = np.zeros((3, 9))
    sims[[0, 1, 2], [0, 1, 2]] = 1.0  # identity similarities
    sims[0, 3], sims[0, 4] = 0.999, 0.99  # a-x, a-y
    sims[1, 3] = 0.99  # b-x
    sims[2, 5] = 0.97  # c-z
    sims[0, 6], sims[1, 7], sims[2, 8] = 0.98, 0.98, 0.98  # C2
    sets = [np.array([3, 4, 5]), np.array([6, 7, 8])]
    return q, sets, sims


def test_lemma6_bound_is_violated(instance):
    """The quantity S + m*s at stream end underestimates SO(C1)."""
    q, sets, sims = instance
    truth = brute_force_topk(q, sets, sims, k=2, alpha=0.9)
    so_c1 = dict(truth)[0]
    assert np.isclose(so_c1, 2.95)
    paper_iub_c1 = 1.969 + 1 * 0.97  # S + m * s_last, per Lemma 6
    assert paper_iub_c1 < so_c1  # the "upper bound" is below the score


def test_paper_mode_returns_wrong_top1(instance):
    q, sets, sims = instance
    res = koios_search(q, sets, sims, k=1, alpha=0.9, ub_mode="paper")
    assert res.topk == [(1, 2.94)]  # C2 — wrong


def test_sound_mode_returns_correct_top1(instance):
    q, sets, sims = instance
    res = koios_search(q, sets, sims, k=1, alpha=0.9, ub_mode="sound")
    truth = brute_force_topk(q, sets, sims, k=1, alpha=0.9)
    assert res.topk == truth == [(0, 2.95)]


def test_both_modes_agree_without_rearrangement_pressure(instance):
    """With k = 2 nothing is pruned and both modes are exact."""
    q, sets, sims = instance
    truth = brute_force_topk(q, sets, sims, k=2, alpha=0.9)
    for mode in ["paper", "sound"]:
        res = koios_search(q, sets, sims, k=2, alpha=0.9, ub_mode=mode)
        assert sorted(res.topk) == sorted(truth)
