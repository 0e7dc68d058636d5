"""Tests for the running top-k LB list and the iUB bucket structure."""
import numpy as np
import pytest

from repro.core.bounds import UBBuckets
from repro.core.topk import TopKLowerBounds


class TestTopKLowerBounds:
    def test_theta_zero_until_k_entries(self):
        llb = TopKLowerBounds(3)
        llb.update(1, 5.0)
        llb.update(2, 4.0)
        assert llb.theta_lb == 0.0
        llb.update(3, 3.0)
        assert llb.theta_lb == 3.0

    def test_seed_floors_theta(self):
        llb = TopKLowerBounds(2, seed_threshold=1.5)
        assert llb.theta_lb == 1.5
        llb.update(1, 1.0)
        llb.update(2, 1.2)
        assert llb.theta_lb == 1.5  # seed still dominates
        llb.update(3, 2.0)
        llb.update(4, 3.0)
        assert llb.theta_lb == 2.0

    def test_increase_only(self):
        llb = TopKLowerBounds(2)
        llb.update(1, 5.0)
        llb.update(1, 3.0)  # decrease ignored
        llb.update(2, 4.0)
        assert llb.theta_lb == 4.0

    def test_matches_naive_kth_largest(self):
        g = np.random.default_rng(0)
        k = 4
        llb = TopKLowerBounds(k)
        best: dict[int, float] = {}
        for _ in range(500):
            sid = int(g.integers(0, 40))
            v = float(g.random())
            v = max(v, best.get(sid, 0.0))  # increase-only
            best[sid] = v
            llb.update(sid, v)
            naive = sorted(best.values(), reverse=True)
            expect = naive[k - 1] if len(naive) >= k else 0.0
            assert np.isclose(llb.theta_lb, expect)

    def test_k_one(self):
        llb = TopKLowerBounds(1)
        llb.update(9, 0.4)
        assert llb.theta_lb == 0.4
        llb.update(8, 0.9)
        assert llb.theta_lb == 0.9

    def test_invalid_k(self):
        with pytest.raises(ValueError):
            TopKLowerBounds(0)


class TestUBBuckets:
    def test_add_and_len(self):
        b = UBBuckets()
        b.add(1, 0.0, 5)
        b.add(2, 0.5, 5)
        b.add(3, 0.1, 2)
        assert len(b) == 3

    def test_prune_is_strict(self):
        b = UBBuckets()
        b.add(1, 1.0, 2)  # UB = 1.0 + 2*0.5 = 2.0
        assert b.prune(2.0, 0.5) == []  # UB == theta -> kept
        assert b.prune(2.01, 0.5) == [1]

    def test_prune_prefix_only(self):
        b = UBBuckets()
        for sid, s in enumerate([0.1, 0.2, 0.9, 1.5]):
            b.add(sid, s, 1)
        pruned = b.prune(1.0, 0.3)  # cut = 0.7: prune S in {0.1, 0.2}
        assert sorted(pruned) == [0, 1]
        assert len(b) == 2

    def test_prune_multiple_buckets(self):
        b = UBBuckets()
        b.add(1, 0.0, 10)  # UB = 10s
        b.add(2, 0.0, 1)  # UB = s
        pruned = b.prune(0.5, 0.3)  # 10*0.3=3 >= .5 keep; 1*0.3 < .5 prune
        assert pruned == [2]

    def test_move_between_buckets(self):
        b = UBBuckets()
        b.add(7, 0.0, 3)
        b.move(7, 0.0, 3, 0.9, 2)
        assert len(b) == 1
        # Now prunable only via bucket 2 semantics.
        assert b.prune(10.0, 0.1) == [7]

    def test_upper_bound_formula(self):
        b = UBBuckets()
        assert b.upper_bound(1.5, 4, 0.8) == 1.5 + 4 * 0.8

    def test_empty_bucket_removed(self):
        b = UBBuckets()
        b.add(1, 0.0, 2)
        b.prune(10.0, 1.0)
        assert len(b) == 0
        assert b.approx_bytes() == 0

    def test_mixed_workload_against_naive(self):
        """Randomized buckets vs. a naive dict model."""
        g = np.random.default_rng(1)
        b = UBBuckets()
        model: dict[int, tuple[float, int]] = {}
        next_sid = 0
        s = 1.0
        for step in range(300):
            op = g.random()
            if op < 0.5 or not model:
                sid = next_sid
                next_sid += 1
                m = int(g.integers(1, 6))
                b.add(sid, 0.0, m)
                model[sid] = (0.0, m)
            elif op < 0.8:
                sid = int(g.choice(list(model)))
                score, m = model[sid]
                new = (score + s, max(0, m - 1))
                b.move(sid, score, m, new[0], new[1])
                model[sid] = new
            else:
                s = max(0.05, s - float(g.random()) * 0.05)
                theta = float(g.random()) * 2
                pruned = set(b.prune(theta, s))
                expect = {
                    sid for sid, (sc, m) in model.items() if sc + m * s < theta
                }
                assert pruned == expect
                for sid in pruned:
                    del model[sid]
