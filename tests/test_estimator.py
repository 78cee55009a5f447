"""Unit tests for the VOS estimator formulas (repro.core.estimator)."""
import numpy as np
import pytest

from repro.core import estimator


class TestEstimateNDelta:
    def test_clean_sketch_beta_zero(self):
        """With β = 0 the formula reduces to the plain odd-sketch
        inversion −k·ln(1−2α)/2."""
        k = 1000
        alpha = 0.1
        expect = -k * np.log(1 - 2 * alpha) / 2
        assert estimator.estimate_n_delta(alpha, 0.0, k) == pytest.approx(expect)

    def test_contamination_correction_direction(self):
        """At fixed α, a larger β means more of the xor density is noise,
        so the estimated |Δ| must shrink."""
        k = 1000
        est0 = estimator.estimate_n_delta(0.2, 0.0, k)
        est1 = estimator.estimate_n_delta(0.2, 0.05, k)
        assert est1 < est0

    def test_alpha_equals_noise_floor_gives_zero(self):
        """When α equals the pure-noise density 2β(1−β), |Δ| ≈ 0."""
        k, beta = 1000, 0.03
        alpha_noise = 2 * beta * (1 - beta)
        est = estimator.estimate_n_delta(alpha_noise, beta, k)
        assert abs(est) < 1e-6

    def test_vectorised(self):
        out = estimator.estimate_n_delta(np.array([0.1, 0.2]), np.array([0.0, 0.0]), 100)
        assert out.shape == (2,)

    def test_saturation_finite(self):
        assert np.isfinite(estimator.estimate_n_delta(0.5, 0.0, 100))
        assert np.isfinite(estimator.estimate_n_delta(0.1, 0.5, 100))


class TestEstimateCommon:
    def test_identical_sets(self):
        """α = 0 (identical sketches), β = 0 → ŝ = n."""
        s = estimator.estimate_common(50, 50, 0.0, 0.0, 1000)
        assert s == pytest.approx(50.0)

    def test_disjoint_sets(self):
        """α matching |Δ| = n_u + n_v → ŝ = 0."""
        k, n = 10_000, 40
        alpha = (1 - np.exp(-2 * (2 * n) / k)) / 2
        s = estimator.estimate_common(n, n, alpha, 0.0, k)
        assert s == pytest.approx(0.0, abs=0.2)

    def test_clamped_to_feasible_range(self):
        assert estimator.estimate_common(10, 20, 0.49, 0.0, 100) >= 0.0
        assert estimator.estimate_common(10, 20, 0.0, 0.0, 100) <= 10.0

    def test_unclamped_can_exceed(self):
        raw = estimator.estimate_common(10, 20, 0.0, 0.0, 100, clamp=False)
        assert raw == pytest.approx(15.0)  # (10+20)/2 with nΔ̂=0

    def test_paper_formula_shape(self):
        """ŝ = (n_u+n_v)/2 + k(ln|1−2α| − 2ln|1−2β|)/4 verbatim."""
        nu, nv, alpha, beta, k = 120.0, 80.0, 0.17, 0.012, 6400
        expect = (nu + nv) / 2 + k * (
            np.log(abs(1 - 2 * alpha)) - 2 * np.log(abs(1 - 2 * beta))
        ) / 4
        got = estimator.estimate_common(nu, nv, alpha, beta, k, clamp=False)
        assert got == pytest.approx(expect)


class TestJaccard:
    @pytest.mark.parametrize(
        "s,nu,nv,expect",
        [(0, 10, 10, 0.0), (10, 10, 10, 1.0), (5, 10, 10, 1 / 3), (0, 0, 0, 0.0)],
    )
    def test_values(self, s, nu, nv, expect):
        assert estimator.jaccard_from_common(s, nu, nv) == pytest.approx(expect)

    def test_inverse_roundtrip(self):
        """common_from_jaccard inverts jaccard_from_common."""
        for s, nu, nv in [(3, 10, 8), (20, 40, 30), (1, 100, 2)]:
            j = estimator.jaccard_from_common(s, nu, nv)
            assert estimator.common_from_jaccard(j, nu, nv) == pytest.approx(s)

    def test_range(self):
        out = estimator.jaccard_from_common(
            np.array([0.0, 5.0, 10.0]), np.array([10.0] * 3), np.array([10.0] * 3)
        )
        assert (out >= 0).all() and (out <= 1).all()


class TestClampCommon:
    def test_nan_and_inf_handled(self):
        out = estimator.clamp_common(
            np.array([np.nan, -np.inf, np.inf, 5.0]), np.full(4, 10.0), np.full(4, 8.0)
        )
        assert (out == np.array([0.0, 0.0, 0.0, 5.0])).all()

    def test_bounds(self):
        out = estimator.clamp_common(np.array([-3.0, 100.0]), np.array([10.0, 10.0]), np.array([7.0, 7.0]))
        assert (out == np.array([0.0, 7.0])).all()


class TestPairAlpha:
    def test_identical(self):
        sk = np.ones((3, 16), dtype=np.uint8)
        assert (estimator.pair_alpha(sk, sk) == 0).all()

    def test_complement(self):
        a = np.zeros((2, 8), dtype=np.uint8)
        b = np.ones((2, 8), dtype=np.uint8)
        assert (estimator.pair_alpha(a, b) == 1).all()

    def test_half(self):
        a = np.array([[0, 0, 1, 1]], dtype=np.uint8)
        b = np.array([[0, 1, 1, 0]], dtype=np.uint8)
        assert estimator.pair_alpha(a, b)[0] == pytest.approx(0.5)


class TestEndToEndMonteCarlo:
    @pytest.mark.parametrize("overlap", [0.2, 0.5, 0.8])
    def test_estimate_tracks_truth(self, overlap):
        """Full chain on synthetic virtual sketches: contaminated bits
        with flip prob β, averaged over trials, recover s within 15%."""
        rng = np.random.default_rng(0)
        k, beta, n = 4096, 0.02, 200
        s_true = int(overlap * n)
        from repro.core import odd_sketch

        ests = []
        for trial in range(40):
            su = list(range(n))
            sv = list(range(n - s_true, 2 * n - s_true))
            ou = odd_sketch.odd_sketch(su, k, trial)
            ov = odd_sketch.odd_sketch(sv, k, trial)
            flip_u = rng.random(k) < beta
            flip_v = rng.random(k) < beta
            alpha = ((ou ^ flip_u) != (ov ^ flip_v)).mean()
            ests.append(estimator.estimate_common(n, n, alpha, beta, k))
        assert abs(np.mean(ests) - s_true) / max(s_true, 1) < 0.15
