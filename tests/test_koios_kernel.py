"""Exactness and invariant tests for the Koios kernel."""
import numpy as np
import pytest

from repro.core.koios import brute_force_topk, koios_search
from repro.matching.greedy import greedy_matching_score
from repro.semsim.simfn import sim_alpha

from tests.helpers import assert_same_topk, random_instance


@pytest.mark.parametrize("seed", range(25))
@pytest.mark.parametrize("k", [1, 5, 10])
def test_sound_mode_exact(seed, k):
    _, sets, q, sims = random_instance(seed)
    alpha = [0.6, 0.7, 0.8][seed % 3]
    truth = brute_force_topk(q, sets, sims, k=k, alpha=alpha)
    res = koios_search(q, sets, sims, k=k, alpha=alpha, ub_mode="sound")
    assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("seed", range(10))
def test_paper_mode_exact_on_random_data(seed):
    """Lemma 6 is unsound in theory (see test_lemma6_counterexample) but
    on non-adversarial data the paper's filter behaves exactly — this
    guards the claim that our Tables II/IV/V runs are valid searches."""
    _, sets, q, sims = random_instance(seed + 1000)
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.8)
    res = koios_search(q, sets, sims, k=10, alpha=0.8, ub_mode="paper")
    assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("seed", range(8))
def test_stats_partition_identity(seed):
    """candidates == iub + no_em + em_et + em — the row arithmetic of
    the paper's Tables IV/V."""
    _, sets, q, sims = random_instance(seed)
    for mode in ["sound", "paper"]:
        res = koios_search(q, sets, sims, k=5, alpha=0.7, ub_mode=mode)
        s = res.stats
        assert s.candidates == (
            s.iub_filtered + s.no_em + s.em_early_terminated + s.em_full
        )
        assert s.survivors == s.candidates - s.iub_filtered
        assert s.refine_seconds >= 0 and s.post_seconds >= 0
        assert s.peak_bytes > 0


@pytest.mark.parametrize("seed", range(6))
def test_results_sorted_and_distinct(seed):
    _, sets, q, sims = random_instance(seed)
    res = koios_search(q, sets, sims, k=8, alpha=0.7)
    scores = [s for _, s in res.topk]
    assert scores == sorted(scores, reverse=True)
    ids = [sid for sid, _ in res.topk]
    assert len(ids) == len(set(ids))
    assert all(s > 0 for s in scores)


@pytest.mark.parametrize("seed", range(6))
def test_theta_seed_preserves_exactness(seed):
    """Any seed <= theta_k* keeps the search exact (Lemma 4) — this is
    what makes the driver-side shared theta_lb substitution valid."""
    _, sets, q, sims = random_instance(seed)
    k = 5
    truth = brute_force_topk(q, sets, sims, k=k, alpha=0.7)
    theta_k_star = truth[-1][1] if len(truth) >= k else 0.0
    for frac in [0.25, 0.75, 1.0]:
        res = koios_search(
            q, sets, sims, k=k, alpha=0.7, theta_seed=theta_k_star * frac
        )
        assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("seed", range(4))
def test_finalize_scores_flag(seed):
    _, sets, q, sims = random_instance(seed)
    res = koios_search(q, sets, sims, k=5, alpha=0.7, finalize_scores=True)
    assert all(res.exact)
    res2 = koios_search(q, sets, sims, k=5, alpha=0.7, finalize_scores=False)
    # Non-finalized scores are lower bounds of the finalized ones.
    for (sid, s), ex in zip(res2.topk, res2.exact):
        if not ex:
            truth = dict(res.topk)
            assert sid in truth and s <= truth[sid] + 1e-9


@pytest.mark.parametrize("seed", range(6))
def test_post_filters_off_is_baseline_plus(seed):
    """post_filters=False must EM every survivor and stay exact."""
    _, sets, q, sims = random_instance(seed)
    truth = brute_force_topk(q, sets, sims, k=5, alpha=0.7)
    res = koios_search(q, sets, sims, k=5, alpha=0.7, post_filters=False)
    assert_same_topk(res.topk, truth)
    assert res.stats.no_em == 0 and res.stats.em_early_terminated == 0
    assert res.stats.em_full == res.stats.survivors


def test_k_larger_than_matches():
    """k exceeding the number of non-zero-SO sets returns all of them."""
    _, sets, q, sims = random_instance(3, n_sets=10)
    truth = brute_force_topk(q, sets, sims, k=50, alpha=0.7)
    res = koios_search(q, sets, sims, k=50, alpha=0.7)
    assert_same_topk(res.topk, truth)


def test_empty_collection():
    _, _, q, sims = random_instance(0, n_sets=1)
    res = koios_search(q, [], sims, k=5, alpha=0.8)
    assert res.topk == []
    assert res.stats.candidates == 0


def test_no_candidates_above_alpha():
    """A query of OOV tokens absent from every set yields no candidates."""
    vocab, sets, _, _ = random_instance(5)
    oov = np.nonzero(~vocab.has_vector)[0]
    present = set(np.concatenate(sets).tolist())
    lonely = np.array([t for t in oov if int(t) not in present][:3])
    if len(lonely) == 0:
        pytest.skip("all OOV tokens occur in sets")
    sims = vocab.sim_matrix(lonely)
    res = koios_search(lonely, sets, sims, k=5, alpha=0.8)
    assert res.topk == [] and res.stats.candidates == 0


def test_query_in_collection_is_top1():
    """A query identical to a stored set must come back with SO = |Q|."""
    _, sets, q, sims = random_instance(7)
    sets = sets + [q.copy()]
    res = koios_search(q, sets, sims, k=3, alpha=0.8)
    assert res.topk[0][1] >= len(q) - 1e-9


@pytest.mark.parametrize("alpha", [0.5, 0.7, 0.9, 0.99])
def test_alpha_sweep_exact(alpha):
    _, sets, q, sims = random_instance(9)
    truth = brute_force_topk(q, sets, sims, k=5, alpha=alpha)
    res = koios_search(q, sets, sims, k=5, alpha=alpha)
    assert_same_topk(res.topk, truth)


def test_time_budget_flags_timeout():
    _, sets, q, sims = random_instance(2, n_sets=300)
    res = koios_search(q, sets, sims, k=5, alpha=0.6, time_budget=0.0)
    assert res.stats.timed_out


@pytest.mark.parametrize("seed", range(5))
def test_theta_lb_is_valid_lower_bound(seed):
    """The kernel's final theta_lb never exceeds theta_k*."""
    _, sets, q, sims = random_instance(seed)
    k = 5
    truth = brute_force_topk(q, sets, sims, k=k, alpha=0.7)
    if len(truth) < k:
        pytest.skip("fewer than k results")
    res = koios_search(q, sets, sims, k=k, alpha=0.7)
    assert res.theta_lb <= truth[-1][1] + 1e-9


@pytest.mark.parametrize("seed", range(5))
def test_greedy_lb_reaches_vanilla_overlap(seed):
    """§V: exact matches stream first at sim 1, so every candidate's LB
    starts at its vanilla overlap — check via the greedy score."""
    _, sets, q, sims = random_instance(seed)
    w = sim_alpha(sims, 0.8)
    qset = set(q.tolist())
    for toks in sets[:20]:
        vanilla = len(qset & set(toks.tolist()))
        assert greedy_matching_score(w[:, toks]) >= vanilla - 1e-9
