"""Tests for the SilkMoth-style fuzzy comparator (§VIII-B)."""
import numpy as np
import pytest

from repro.core.koios import brute_force_topk, koios_search
from repro.fuzzy.silkmoth import silkmoth_threshold_search, silkmoth_topk
from repro.semsim.embeddings import make_vocabulary
from repro.semsim.simfn import QGramJaccardSim, sim_alpha
from repro.matching.hungarian import max_weight_matching

from tests.helpers import assert_same_topk, random_instance


@pytest.mark.parametrize("seed", range(6))
def test_threshold_search_complete_and_correct(seed):
    """Every returned set reaches theta; every theta-reaching set is
    returned (signature completeness)."""
    _, sets, q, sims = random_instance(seed, n_sets=60)
    alpha = 0.7
    w = sim_alpha(sims, alpha)
    sos = [max_weight_matching(w[:, t]).score for t in sets]
    theta = float(np.partition(sos, -3)[-3]) if max(sos) > 0 else 0.5
    theta = max(theta, 1e-6)
    results, _ = silkmoth_threshold_search(q, sets, sims, theta=theta, alpha=alpha)
    got = {sid for sid, _ in results}
    expect = {sid for sid, so in enumerate(sos) if so >= theta}
    assert got == expect
    for sid, score in results:
        assert np.isclose(score, sos[sid])


@pytest.mark.parametrize("seed", range(6))
def test_topk_matches_koios_given_theta_kstar(seed):
    _, sets, q, sims = random_instance(seed + 50, n_sets=80)
    k, alpha = 5, 0.7
    truth = brute_force_topk(q, sets, sims, k=k, alpha=alpha)
    if len(truth) < k:
        pytest.skip("fewer than k non-zero sets")
    theta_kstar = truth[-1][1]
    got, _ = silkmoth_topk(
        q, sets, sims, k=k, theta_kstar=theta_kstar, alpha=alpha
    )
    assert_same_topk(got, truth)


def test_check_filter_counts(seed=3):
    _, sets, q, sims = random_instance(seed, n_sets=60)
    _, stats = silkmoth_threshold_search(q, sets, sims, theta=2.0, alpha=0.7)
    assert stats.candidates == stats.check_filtered + stats.verified + (
        stats.candidates - stats.check_filtered - stats.verified
    )
    assert stats.check_filtered + stats.verified <= stats.candidates


def test_signature_size_formula():
    _, sets, q, sims = random_instance(4, n_sets=30)
    theta = 2.5
    _, stats = silkmoth_threshold_search(q, sets, sims, theta=theta, alpha=0.7)
    assert stats.signature_size == min(len(q), int(np.floor(len(q) - theta)) + 1)


def test_works_with_jaccard_sim():
    """Koios is sim-agnostic: both systems run on Jaccard 3-grams and
    agree (the setting of the paper's §VIII-B comparison)."""
    vocab = make_vocabulary(n_concepts=30, mean_cluster=3.0, seed=17)
    g = np.random.default_rng(17)
    sets = [np.unique(g.integers(0, len(vocab), 8)) for _ in range(50)]
    q = np.unique(g.integers(0, len(vocab), 10))
    sims = QGramJaccardSim(vocab).matrix(q)
    k, alpha = 3, 0.5
    truth = brute_force_topk(q, sets, sims, k=k, alpha=alpha)
    kres = koios_search(q, sets, sims, k=k, alpha=alpha)
    assert_same_topk(kres.topk, truth)
    if len(truth) >= k:
        sres, _ = silkmoth_topk(
            q, sets, sims, k=k, theta_kstar=truth[-1][1], alpha=alpha
        )
        assert_same_topk(sres, truth)
