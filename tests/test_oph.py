"""Unit tests for the dynamic OPH baseline (repro.baselines.oph)."""
import numpy as np
import pytest

from repro.baselines import oph
from repro.common import hashing

K, SEED = 64, 11


def replay(edges, k=K, seed=SEED):
    kern = oph.OPHKernel(k, seed)
    for item, action in edges:
        kern.update(item, action)
    return kern


class TestInsertOnly:
    @pytest.mark.parametrize("items", [[5], [1, 2, 3], list(range(200))])
    def test_matches_static_sketch(self, items):
        kern = replay([(i, 1) for i in items])
        assert (kern.snapshot() == oph.static_sketch(items, K, SEED)).all()

    def test_item_lands_in_its_bin(self):
        kern = replay([(42, 1)])
        h = hashing.oph_values([42], SEED)
        b = int(hashing.oph_bins(h, K)[0])
        snap = kern.snapshot()
        assert snap[b] == 42
        assert (np.delete(snap, b) == oph.EMPTY).all()

    def test_empty_bins_remain(self):
        """With few items most of the k bins stay empty (no
        densification — the paper compares plain OPH)."""
        kern = replay([(i, 1) for i in range(5)])
        assert (kern.snapshot() == oph.EMPTY).sum() >= K - 5


class TestDeletion:
    def test_delete_bin_min_empties_bin(self):
        items = list(range(200))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot()
        filled = np.flatnonzero(snap != oph.EMPTY)
        victim = int(snap[filled[0]])
        kern.update(victim, -1)
        after = kern.snapshot()
        assert after[filled[0]] == oph.EMPTY
        others = np.delete(np.arange(K), filled[0])
        assert (after[others] == snap[others]).all()

    def test_delete_nonmin_is_noop(self):
        items = list(range(200))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot()
        non_min = next(i for i in items if i not in set(snap.tolist()))
        kern.update(non_min, -1)
        assert (kern.snapshot() == snap).all()

    def test_bias_exists_after_deletion(self):
        """The emptied bin does not recover the runner-up item."""
        items = list(range(200))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot()
        filled = np.flatnonzero(snap != oph.EMPTY)
        victim = int(snap[filled[0]])
        kern.update(victim, -1)
        true_after = oph.static_sketch([i for i in items if i != victim], K, SEED)
        assert kern.snapshot()[filled[0]] == oph.EMPTY
        assert true_after[filled[0]] != oph.EMPTY


class TestEstimator:
    def test_identical(self):
        regs = oph.static_sketch(list(range(100)), K, SEED)[None, :]
        s, j = oph.estimate_pairs(regs, regs, np.array([100.0]), np.array([100.0]))
        assert j[0] == pytest.approx(1.0)
        assert s[0] == pytest.approx(100.0)

    def test_all_empty_gives_zero(self):
        empty = np.full((1, K), oph.EMPTY)
        s, j = oph.estimate_pairs(empty, empty, np.array([0.0]), np.array([0.0]))
        assert s[0] == 0.0 and j[0] == 0.0

    def test_denominator_excludes_double_empty(self):
        """One shared item + empty bins everywhere else → Ĵ = 1."""
        regs = oph.static_sketch([7], K, SEED)[None, :]
        s, j = oph.estimate_pairs(regs, regs.copy(), np.array([1.0]), np.array([1.0]))
        assert j[0] == pytest.approx(1.0)

    @pytest.mark.parametrize("jac", [0.25, 0.5, 0.75])
    def test_static_accuracy(self, jac):
        n = 120
        common = int(round(2 * n * jac / (1 + jac)))
        su = list(range(n))
        sv = list(range(n - common, 2 * n - common))
        true_j = common / (2 * n - common)
        js = []
        for seed in range(40):
            a = oph.static_sketch(su, 128, seed)[None, :]
            b = oph.static_sketch(sv, 128, seed)[None, :]
            _, j = oph.estimate_pairs(a, b, np.array([float(n)]), np.array([float(n)]))
            js.append(j[0])
        assert np.mean(js) == pytest.approx(true_j, abs=0.05)


class TestO1Property:
    def test_update_touches_single_bin(self):
        """Every update changes at most one register — O(1)/edge."""
        kern = oph.OPHKernel(K, SEED)
        prev = kern.snapshot()
        rng = np.random.default_rng(0)
        present = []
        for _ in range(300):
            if present and rng.random() < 0.3:
                it = present.pop(rng.integers(len(present)))
                kern.update(int(it), -1)
            else:
                it = int(rng.integers(10_000))
                if it not in present:
                    present.append(it)
                    kern.update(it, 1)
            cur = kern.snapshot()
            assert (cur != prev).sum() <= 1
            prev = cur
