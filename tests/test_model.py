"""Theorem 3 model — distributional identities and derivative checks."""
import math

import numpy as np
import pytest

from repro.core.model import BranchModel, comb, digamma, harmonic, hyper


class TestSpecialFunctions:
    def test_comb_outside_triangle(self):
        assert comb(5, -1) == 0
        assert comb(3, 5) == 0
        assert comb(-2, 1) == 0
        assert comb(6, 2) == 15

    def test_comb_bigint(self):
        # C(2e6, 10) exact — would overflow naive float64 factorials.
        assert comb(2_000_000, 10) > 10**55

    def test_digamma_known_values(self):
        # ψ(1) = -γ; ψ(2) = 1 - γ; ψ(1/2) = -γ - 2 ln 2
        gamma = 0.5772156649015329
        assert digamma(1.0) == pytest.approx(-gamma, abs=1e-10)
        assert digamma(2.0) == pytest.approx(1 - gamma, abs=1e-10)
        assert digamma(0.5) == pytest.approx(
            -gamma - 2 * math.log(2), abs=1e-10
        )

    def test_digamma_recurrence(self):
        for x in [0.3, 1.7, 4.2, 9.9]:
            assert digamma(x + 1) == pytest.approx(
                digamma(x) + 1.0 / x, abs=1e-10
            )

    def test_harmonic(self):
        assert harmonic(1) == pytest.approx(1.0, abs=1e-10)
        assert harmonic(4) == pytest.approx(1 + 0.5 + 1 / 3 + 0.25, abs=1e-10)

    def test_hyper_sums_to_one(self):
        M, K, N = 20, 7, 5
        assert sum(hyper(x, M, K, N) for x in range(N + 1)) == pytest.approx(1)

    def test_hyper_degenerate(self):
        assert hyper(0, 5, 2, 0) == 1.0
        assert hyper(1, 5, 2, 0) == 0.0
        assert hyper(0, 0, 0, 1) == 0.0  # C(0,1)=0 denominator


@pytest.fixture(scope="module", params=[4, 7, 12])
def bm(request):
    return BranchModel(request.param, n_vlabels=3, n_elabels=2)


class TestOmegaIdentities:
    def test_omega1_sums_to_one(self, bm):
        for tau in range(1, 5):
            s = sum(bm.omega1(x, tau) for x in range(tau + 1))
            assert s == pytest.approx(1.0, abs=1e-12), tau

    def test_omega2_sums_to_one(self, bm):
        for tau in range(1, 5):
            for x in range(tau + 1):
                s = sum(
                    bm.omega2(m, x, tau) for m in range(min(2 * tau, bm.v) + 1)
                )
                assert s == pytest.approx(1.0, abs=1e-12), (tau, x)

    def test_omega2_nonnegative(self, bm):
        for tau in range(1, 5):
            for x in range(tau + 1):
                for m in range(2 * tau + 1):
                    assert bm.omega2(m, x, tau) >= -1e-15

    def test_omega2_zero_edges_zero_cover(self, bm):
        # y = 0 relabelled edges cover exactly 0 vertices.
        assert bm.omega2(0, 2, 2) == pytest.approx(1.0)
        assert bm.omega2(1, 2, 2) == pytest.approx(0.0)

    def test_omega2_one_edge_covers_two(self, bm):
        assert bm.omega2(2, 0, 1) == pytest.approx(1.0)
        assert bm.omega2(1, 0, 1) == pytest.approx(0.0)

    def test_omega3_sums_to_one_over_phi(self, bm):
        for r in range(0, 8):
            s = sum(bm.omega3(r, phi) for phi in range(r + 1))
            assert s == pytest.approx(1.0, rel=1e-9), r

    def test_omega3_zero_when_phi_exceeds_r(self, bm):
        assert bm.omega3(2, 3) == 0.0

    def test_omega4_sums_to_one(self, bm):
        for x in range(0, 4):
            for m in range(0, min(6, bm.v) + 1):
                s = sum(bm.omega4(x, r, m) for r in range(x + m + 1))
                assert s == pytest.approx(1.0, abs=1e-12), (x, m)

    def test_omega4_support(self, bm):
        # r < max(x, m) or r > x + m is impossible.
        assert bm.omega4(2, 1, 3) == 0.0
        assert bm.omega4(2, 6, 3) == 0.0


class TestLam1:
    def test_rows_sum_to_one(self, bm):
        """Σ_φ Λ1(τ, φ) = 1: Λ1 is a distribution over GBD values."""
        for tau in range(0, 5):
            s = sum(bm.lam1(tau, phi) for phi in range(3 * tau + 1))
            assert s == pytest.approx(1.0, rel=1e-9), tau

    def test_tau_zero_degenerate(self, bm):
        assert bm.lam1(0, 0) == 1.0
        assert bm.lam1(0, 1) == 0.0

    def test_zero_beyond_3tau(self, bm):
        for tau in range(1, 4):
            assert bm.lam1(tau, 3 * tau + 1) == 0.0

    def test_nonnegative(self, bm):
        for tau in range(0, 4):
            for phi in range(0, 3 * tau + 2):
                assert bm.lam1(tau, phi) >= -1e-15

    def test_impossible_tau(self):
        bm = BranchModel(2, 3, 2)  # v + E = 3 units
        assert bm.lam1(10, 0) == 0.0

    def test_large_v_concentrates_near_2tau(self):
        """For large graphs a random edit seq touches ~2τ branches."""
        bm = BranchModel(500, 8, 4)
        tau = 3
        dist = [bm.lam1(tau, phi) for phi in range(3 * tau + 1)]
        assert int(np.argmax(dist)) == 2 * tau

    def test_lam1_table_matches_scalar(self, bm):
        t = bm.lam1_table(3, 9)
        for tau in range(4):
            for phi in range(10):
                assert t[tau, phi] == bm.lam1(tau, phi)


def _gcomb_smooth(n: int, k: float) -> float:
    """Gamma continuation of C(n, k), no support clamping (test-only)."""
    return math.exp(
        math.lgamma(n + 1) - math.lgamma(k + 1) - math.lgamma(n - k + 1)
    )


def _lam1_cont(bm: BranchModel, tau_int: int, tau_real: float, phi: int) -> float:
    """Term-wise gamma continuation of Λ1 around integer ``tau_int``.

    The analytic derivative in BranchModel (like the paper's Eqs.
    18–23) differentiates each *term* of Theorem 3 through its gamma
    continuation; terms that are zero at the integer point stay
    excluded. This reference mirrors that convention so central finite
    differences are well-defined.
    """
    out = 0.0
    for x in range(min(tau_int, bm.v) + 1):
        y_int = tau_int - x
        y = tau_real - x
        if comb(bm.E, y_int) == 0:
            continue
        o1 = (
            comb(bm.v, x)
            * _gcomb_smooth(bm.E, y)
            / _gcomb_smooth(bm.v + bm.E, tau_real)
        )
        inner = 0.0
        for m in range(min(2 * tau_int, bm.v) + 1):
            num = 0.0
            for t in range(m + 1):
                t2 = comb(t, 2)
                if comb(t2, y_int) == 0:
                    continue
                sign = 1 if (m - t) % 2 == 0 else -1
                num += sign * comb(bm.v, m) * comb(m, t) * _gcomb_smooth(t2, y)
            o2 = num / _gcomb_smooth(bm.E, y)
            s = sum(
                bm.omega3(r, phi) * bm.omega4(x, r, m)
                for r in range(max(x, m), x + m + 1)
            )
            inner += o2 * s
        out += o1 * inner
    return out


class TestDerivative:
    def test_matches_finite_difference(self, bm):
        """dΛ1/dτ matches a central finite difference of the term-wise
        gamma continuation."""
        h = 1e-5
        for tau in range(1, 4):
            for phi in range(0, 3 * tau + 1):
                analytic = bm.dlam1_dtau(tau, phi)
                fd = (
                    _lam1_cont(bm, tau, tau + h, phi)
                    - _lam1_cont(bm, tau, tau - h, phi)
                ) / (2 * h)
                assert analytic == pytest.approx(fd, rel=2e-4, abs=2e-6), (
                    tau,
                    phi,
                )

    def test_value_consistency_with_continuation(self, bm):
        """The continuation agrees with exact Λ1 at integer τ."""
        for tau in range(1, 4):
            for phi in range(0, 3 * tau + 1):
                assert _lam1_cont(bm, tau, tau, phi) == pytest.approx(
                    bm.lam1(tau, phi), rel=1e-9, abs=1e-12
                )

    def test_cached(self, bm):
        a = bm.dlam1_dtau(2, 3)
        assert bm.dlam1_dtau(2, 3) == a


class TestJeffreysPrior:
    def test_normalized(self, bm):
        for tau_hat in (2, 4):
            p = bm.jeffreys_prior(tau_hat)
            assert p.shape == (tau_hat + 1,)
            assert p.sum() == pytest.approx(1.0)
            assert (p >= 0).all()

    def test_large_v_runs(self):
        bm = BranchModel(1000, 8, 4)
        p = bm.jeffreys_prior(3)
        assert p.sum() == pytest.approx(1.0)

    def test_deterministic(self, bm):
        p1 = bm.jeffreys_prior(3)
        p2 = BranchModel(bm.v, 3, 2).jeffreys_prior(3)
        assert np.allclose(p1, p2)
