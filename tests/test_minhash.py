"""Unit tests for the dynamic MinHash baseline (repro.baselines.minhash)."""
import numpy as np
import pytest

from repro.baselines import minhash
from repro.core import estimator

K, SEED = 64, 11


def replay(edges, k=K, seed=SEED):
    kern = minhash.MinHashKernel(k, seed)
    for item, action in edges:
        kern.update(item, action)
    return kern


class TestInsertOnly:
    @pytest.mark.parametrize("items", [[5], [1, 2, 3], list(range(100))])
    def test_matches_static_sketch(self, items):
        """Case 1 only: the kernel equals the set-at-once MinHash."""
        kern = replay([(i, 1) for i in items])
        assert (kern.snapshot() == minhash.static_sketch(items, K, SEED)).all()

    def test_insert_order_irrelevant(self):
        a = replay([(i, 1) for i in [1, 2, 3, 4]])
        b = replay([(i, 1) for i in [4, 3, 2, 1]])
        assert (a.snapshot() == b.snapshot()).all()

    def test_empty_registers_before_any_insert(self):
        kern = minhash.MinHashKernel(K, SEED)
        assert (kern.snapshot() == minhash.EMPTY).all()


class TestDeletionCases:
    def test_case2_deleting_min_empties_register(self):
        """Delete the current φ_j → register ∅ even though other items
        remain (the paper's biased extension, reproduced on purpose)."""
        items = list(range(20))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot()
        victim = int(snap[0])
        kern.update(victim, -1)
        after = kern.snapshot()
        was_victim = snap == victim
        assert (after[was_victim] == minhash.EMPTY).all()
        assert (after[~was_victim] == snap[~was_victim]).all()

    def test_case3_deleting_nonmin_is_noop(self):
        # more items than registers so a non-min item must exist
        items = list(range(300))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot()
        non_min = next(i for i in items if i not in set(snap.tolist()))
        kern.update(non_min, -1)
        assert (kern.snapshot() == snap).all()

    def test_biased_vs_true_sketch_after_deletion(self):
        """After delete, the register does NOT fall back to the true
        runner-up — deviating from the static sketch of the remaining
        set. This asserts the bias exists (it is the paper's premise)."""
        items = list(range(50))
        kern = replay([(i, 1) for i in items])
        victim = int(kern.snapshot()[0])
        kern.update(victim, -1)
        remaining = [i for i in items if i != victim]
        true_sketch = minhash.static_sketch(remaining, K, SEED)
        # register 0 disagrees: kernel says EMPTY, truth has the runner-up
        assert kern.snapshot()[0] == minhash.EMPTY
        assert true_sketch[0] != minhash.EMPTY

    def test_reinsert_restores(self):
        items = list(range(10))
        kern = replay([(i, 1) for i in items])
        snap = kern.snapshot().copy()
        victim = int(snap[3])
        kern.update(victim, -1)
        kern.update(victim, 1)
        assert (kern.snapshot() == snap).all()


class TestEstimator:
    def test_identical_sketches(self):
        regs = minhash.static_sketch(list(range(30)), K, SEED)[None, :]
        s, j = minhash.estimate_pairs(regs, regs, np.array([30.0]), np.array([30.0]))
        assert j[0] == pytest.approx(1.0)
        assert s[0] == pytest.approx(30.0)

    def test_disjoint_sets(self):
        a = minhash.static_sketch(list(range(100)), K, SEED)[None, :]
        b = minhash.static_sketch(list(range(1000, 1100)), K, SEED)[None, :]
        s, j = minhash.estimate_pairs(a, b, np.array([100.0]), np.array([100.0]))
        assert j[0] == 0.0 and s[0] == 0.0

    def test_empty_registers_do_not_match(self):
        empty = np.full((1, K), minhash.EMPTY)
        s, j = minhash.estimate_pairs(empty, empty, np.array([0.0]), np.array([0.0]))
        assert j[0] == 0.0 and s[0] == 0.0

    @pytest.mark.parametrize("jac", [0.25, 0.5, 0.75])
    def test_static_accuracy(self, jac):
        """Insert-only MinHash is unbiased: mean Ĵ over seeds ≈ J."""
        n = 120
        common = int(round(2 * n * jac / (1 + jac)))
        su = list(range(n))
        sv = list(range(n - common, 2 * n - common))
        true_j = common / (2 * n - common)
        js = []
        for seed in range(40):
            a = minhash.static_sketch(su, 128, seed)[None, :]
            b = minhash.static_sketch(sv, 128, seed)[None, :]
            _, j = minhash.estimate_pairs(a, b, np.array([float(n)]), np.array([float(n)]))
            js.append(j[0])
        assert np.mean(js) == pytest.approx(true_j, abs=0.04)

    def test_matrix_shapes(self):
        a = np.full((5, K), 3)
        b = np.full((5, K), 3)
        s, j = minhash.estimate_pairs(a, b, np.full(5, 10.0), np.full(5, 10.0))
        assert s.shape == (5,) and j.shape == (5,)
