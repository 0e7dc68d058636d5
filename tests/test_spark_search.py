"""Tests for the distributed (partitioned) Koios search on Spark."""
import numpy as np
import pytest

from repro.core.koios import brute_force_topk
from repro.core.spark_search import (
    koios_spark,
    merge_topk,
    partitioned_sets_df,
    seed_theta,
)

from tests.helpers import assert_same_topk, random_instance


@pytest.fixture(scope="module")
def instance():
    return random_instance(21, n_sets=150)


@pytest.mark.parametrize("n_partitions", [1, 3, 8])
def test_distributed_exact(spark, instance, n_partitions):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.7)
    res = koios_spark(
        spark, q, sets, sims, k=10, alpha=0.7, n_partitions=n_partitions
    )
    assert_same_topk(res.topk, truth)


def test_partition_stats_cover_all_candidates(spark, instance):
    _, sets, q, sims = instance
    res = koios_spark(spark, q, sets, sims, k=5, alpha=0.7, n_partitions=4)
    assert len(res.partition_stats) == 4
    tot = res.total_stats()
    assert tot.candidates == (
        tot.iub_filtered + tot.no_em + tot.em_early_terminated + tot.em_full
    )


def test_theta_seed_is_valid(spark, instance):
    """The driver-side seed never exceeds theta_k* (exactness condition)."""
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.7)
    theta = seed_theta(q, sets, sims, k=10, alpha=0.7)
    assert theta <= truth[-1][1] + 1e-9


def test_share_theta_off_still_exact(spark, instance):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.7)
    res = koios_spark(
        spark, q, sets, sims, k=10, alpha=0.7, n_partitions=4,
        share_theta=False,
    )
    assert_same_topk(res.topk, truth)


@pytest.mark.parametrize("algo", ["baseline", "baseline_plus"])
def test_distributed_baselines_exact(spark, instance, algo):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.7)
    res = koios_spark(
        spark, q, sets, sims, k=10, alpha=0.7, n_partitions=4, algo=algo
    )
    assert_same_topk(res.topk, truth)


def test_prebuilt_sets_df_reuse(spark, instance):
    _, sets, q, sims = instance
    sdf = partitioned_sets_df(spark, sets, n_partitions=3)
    truth = brute_force_topk(q, sets, sims, k=5, alpha=0.7)
    for _ in range(2):  # reuse across queries
        res = koios_spark(
            spark, q, sets, sims, k=5, alpha=0.7, n_partitions=3, sets_df=sdf
        )
        assert_same_topk(res.topk, truth)
    sdf.unpersist()


def test_paper_ub_mode_distributed(spark, instance):
    _, sets, q, sims = instance
    truth = brute_force_topk(q, sets, sims, k=10, alpha=0.7)
    res = koios_spark(
        spark, q, sets, sims, k=10, alpha=0.7, n_partitions=4, ub_mode="paper"
    )
    assert_same_topk(res.topk, truth)


def test_merge_topk():
    lists = [[(1, 5.0), (2, 3.0)], [(3, 4.0)], []]
    assert merge_topk(lists, 2) == [(1, 5.0), (3, 4.0)]
    assert merge_topk(lists, 10) == [(1, 5.0), (3, 4.0), (2, 3.0)]
    assert merge_topk([], 3) == []


def test_more_partitions_than_sets(spark):
    _, sets, q, sims = random_instance(30, n_sets=5)
    truth = brute_force_topk(q, sets, sims, k=3, alpha=0.7)
    res = koios_spark(spark, q, sets, sims, k=3, alpha=0.7, n_partitions=10)
    assert_same_topk(res.topk, truth)
