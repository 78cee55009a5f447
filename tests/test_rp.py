"""Unit tests for the Random Pairing baseline (repro.baselines.rp)."""
import numpy as np
import pytest

from repro.baselines import rp
from repro.core import estimator

K, SEED = 32, 5


class TestCounters:
    def test_insert_only_n_tracks(self):
        kern = rp.RPKernel(K, SEED, user=1)
        for i in range(10):
            kern.update(i, 1)
        assert kern.n == 10
        assert (kern.c_bad == 0).all() and (kern.c_good == 0).all()

    def test_sample_always_from_set_insert_only(self):
        kern = rp.RPKernel(K, SEED, user=2)
        items = set()
        for i in range(50):
            items.add(i)
            kern.update(i, 1)
        snap = kern.snapshot()
        assert set(snap.tolist()) <= items  # size 1 ≤ n → never EMPTY
        assert (snap != rp.EMPTY).all()

    def test_bad_deletion_voids_sample(self):
        kern = rp.RPKernel(K, SEED, user=3)
        kern.update(7, 1)  # every sampler holds 7
        assert (kern.snapshot() == 7).all()
        kern.update(7, -1)
        assert (kern.snapshot() == rp.EMPTY).all()
        assert (kern.c_bad == 1).all()
        assert kern.n == 0

    def test_good_deletion_keeps_sample(self):
        kern = rp.RPKernel(K, SEED, user=4)
        kern.update(1, 1)
        # force samplers that keep item 1 by inserting a second item;
        # for samplers still holding 1, deleting 2 is a good deletion
        kern.update(2, 1)
        snap = kern.snapshot()
        holders = snap == 1
        if holders.any():
            kern.update(2, -1)
            after = kern.snapshot()
            assert (after[holders] == 1).all()
            assert (kern.c_good[holders] == 1).all()

    def test_pairing_compensates_bad_deletion(self):
        """After delete-all + one insert, c_bad returns to 0 and the new
        item is sampled (c_b/(c_b+c_g) = 1 pairing branch)."""
        kern = rp.RPKernel(K, SEED, user=5)
        kern.update(9, 1)
        kern.update(9, -1)
        assert (kern.c_bad == 1).all()
        kern.update(10, 1)
        assert (kern.c_bad == 0).all() and (kern.c_good == 0).all()
        assert (kern.snapshot() == 10).all()

    def test_feasible_stream_invariant(self):
        """c_b + c_g equals the number of uncompensated deletions."""
        kern = rp.RPKernel(K, SEED, user=6)
        for i in range(20):
            kern.update(i, 1)
        for i in range(5):
            kern.update(i, -1)
        assert ((kern.c_bad + kern.c_good) == 5).all()
        kern.update(100, 1)
        assert ((kern.c_bad + kern.c_good) == 4).all()


class TestUniformity:
    def test_insert_only_reservoir_uniform(self):
        """Size-1 reservoir: every item ends up sampled ~uniformly."""
        n_items, k = 10, 512
        kern = rp.RPKernel(k, SEED, user=7)
        for i in range(n_items):
            kern.update(i, 1)
        counts = np.bincount(kern.snapshot(), minlength=n_items)
        expect = k / n_items
        assert (np.abs(counts - expect) < 5 * np.sqrt(expect) + 5).all()

    def test_uniform_after_deletions(self):
        """The RP guarantee the paper leans on: after deletions the
        sample is still uniform over the *current* set — unlike the
        MinHash/OPH extensions."""
        n0, k = 20, 2048
        kern = rp.RPKernel(k, 1, user=8)
        for i in range(n0):
            kern.update(i, 1)
        for i in range(0, 8):  # delete items 0..7
            kern.update(i, -1)
        for i in range(100, 104):  # insert a few more
            kern.update(i, 1)
        survivors = list(range(8, 20)) + list(range(100, 104))
        snap = kern.snapshot()
        filled = snap[snap != rp.EMPTY]
        assert set(filled.tolist()) <= set(survivors)
        counts = np.array([(filled == s).sum() for s in survivors])
        expect = filled.size / len(survivors)
        assert (np.abs(counts - expect) < 5 * np.sqrt(expect) + 5).all()

    def test_deterministic_per_user_seed(self):
        a = rp.RPKernel(K, SEED, user=9)
        b = rp.RPKernel(K, SEED, user=9)
        for i in range(30):
            a.update(i, 1)
            b.update(i, 1)
        assert (a.snapshot() == b.snapshot()).all()

    def test_users_decorrelated(self):
        a = rp.RPKernel(K, SEED, user=10)
        b = rp.RPKernel(K, SEED, user=11)
        for i in range(30):
            a.update(i, 1)
            b.update(i, 1)
        assert (a.snapshot() != b.snapshot()).any()


class TestEstimator:
    def test_no_matches_zero(self):
        a = np.full((1, K), 3)
        b = np.full((1, K), 4)
        s, j = rp.estimate_pairs(a, b, np.array([10.0]), np.array([10.0]))
        assert s[0] == 0.0 and j[0] == 0.0

    def test_empty_not_a_match(self):
        a = np.full((1, K), rp.EMPTY)
        s, j = rp.estimate_pairs(a, a.copy(), np.array([5.0]), np.array([5.0]))
        assert s[0] == 0.0

    def test_match_scales_with_cardinalities(self):
        regs = np.full((1, K), 7)
        s, _ = rp.estimate_pairs(regs, regs.copy(), np.array([3.0]), np.array([4.0]))
        # all k match → raw = nu*nv, clamped to min(nu,nv)
        assert s[0] == 3.0

    def test_unbiased_insert_only(self):
        """E[ŝ] ≈ s for independent uniform samples (many seeds)."""
        n, s_true, k = 20, 10, 256
        su = list(range(n))
        sv = list(range(n - s_true, 2 * n - s_true))
        ests = []
        for u in range(60):
            ka = rp.RPKernel(k, SEED, user=1000 + u)
            kb = rp.RPKernel(k, SEED, user=2000 + u)
            for i in su:
                ka.update(i, 1)
            for i in sv:
                kb.update(i, 1)
            s_hat, _ = rp.estimate_pairs(
                ka.snapshot()[None, :],
                kb.snapshot()[None, :],
                np.array([float(n)]),
                np.array([float(n)]),
            )
            ests.append(s_hat[0])
        # raw estimator is unbiased; clamping truncates at min(n_u,n_v)=20,
        # so the mean sits near s_true with generous tolerance
        assert abs(np.mean(ests) - s_true) < 5.0
