"""The paper's probabilistic model (Section 5, Theorem 3, Appendix A–E).

Computes ``Λ1(τ, φ) = Pr[GBD = φ | GED = τ]`` for extended graphs with
``v = |V1'|`` vertices and label alphabets of sizes ``|L_V|``/``|L_E|``:

    Λ1 = Σ_x Ω1(x,τ) Σ_m Ω2(m,x,τ) Σ_r Ω3(r,φ)·Ω4(x,r,m)

- Ω1 — hypergeometric split of τ edit ops into x vertex relabels and
  τ−x edge relabels over the extended (complete) graph's v vertices and
  E = C(v,2) edges (Lemma 1);
- Ω2 — inclusion–exclusion probability that τ−x random edges cover
  exactly m vertices (Lemma 2);
- Ω3 — ball-pair recolouring probability that exactly r−φ of the r
  touched branches re-match (Lemma 3), with the branch-type count D of
  Eq. (13);
- Ω4 — hypergeometric overlap between relabelled vertices and covered
  vertices (Lemma 4).

All binomials are exact Python big-ints (`math.comb`), so the
alternating sum in Ω2 is computed without float cancellation; only the
final ratios become floats. ``d/dτ log Λ1`` (needed by the Jeffreys
prior, Eq. 16–17) is obtained by differentiating the gamma-function
continuation of the same formulas analytically via digamma factors —
equivalent to the paper's Eqs. (18)–(23), see DESIGN.md §4.
"""
from __future__ import annotations

import math
from fractions import Fraction

import numpy as np


def comb(n: int, k: int) -> int:
    """Binomial coefficient, 0 outside the Pascal triangle."""
    if k < 0 or n < 0 or k > n:
        return 0
    return math.comb(n, k)


def digamma(x: float) -> float:
    """Digamma ψ(x) for real x > 0 (recurrence + asymptotic series).

    No scipy in the container; accuracy ~1e-12 for x ≥ 6 after shifting.
    """
    if x <= 0:
        raise ValueError("digamma defined here for x > 0 only")
    r = 0.0
    while x < 12.0:
        r -= 1.0 / x
        x += 1.0
    x2 = 1.0 / (x * x)
    return r + math.log(x) - 0.5 / x - x2 * (
        1.0 / 12 - x2 * (1.0 / 120 - x2 * (1.0 / 252 - x2 / 240))
    )


def harmonic(n: int) -> float:
    """n-th harmonic number H(n) = ψ(n+1) + γ."""
    return digamma(n + 1) + 0.5772156649015328606


def hyper(x: int, M: int, K: int, N: int) -> float:
    """Hypergeometric pmf H(x; M, K, N) of Eq. (12), exact-then-float."""
    den = comb(M, N)
    if den == 0:
        return 0.0
    return float(Fraction(comb(K, x) * comb(M - K, N - x), den))


class BranchModel:
    """Λ1 and its τ-derivative for fixed ``v = |V1'|`` and alphabets.

    Caches inner sums; one instance per distinct extended-graph size.
    """

    def __init__(self, v: int, n_vlabels: int, n_elabels: int):
        if v < 1:
            raise ValueError("v must be >= 1")
        self.v = v
        self.E = comb(v, 2)
        # D = |L_V| * C(v + |L_E| - 1, |L_E|)  (Eq. 13), exact int.
        self.D = max(2, n_vlabels * comb(v + n_elabels - 1, n_elabels))
        self.logD = math.log(self.D)
        # log(D-1) via log1p for precision at huge D.
        self.logD1 = self.logD + math.log1p(-1.0 / self.D)
        self._lam1_cache: dict[tuple[int, int], float] = {}
        self._dlam1_cache: dict[tuple[int, int], float] = {}

    # -- Ω factors --------------------------------------------------------
    def omega1(self, x: int, tau: int) -> float:
        """Ω1(x, τ) = H(x; v + E, v, τ)  (Eq. 8 / Lemma 1)."""
        return hyper(x, self.v + self.E, self.v, tau)

    def _omega2_numden(self, m: int, y: int) -> tuple[int, int]:
        """Exact (numerator, denominator) of Ω2 with y = τ − x."""
        den = comb(self.E, y)
        if den == 0:
            return 0, 0
        cv_m = comb(self.v, m)
        num = 0
        for t in range(m + 1):
            term = cv_m * comb(m, t) * comb(comb(t, 2), y)
            num += term if (m - t) % 2 == 0 else -term
        return num, den

    def omega2(self, m: int, x: int, tau: int) -> float:
        """Ω2(m, x, τ) = Pr[Z = m | Y = τ − x]  (Eq. 9 / Lemma 2)."""
        num, den = self._omega2_numden(m, tau - x)
        if den == 0:
            return 0.0
        return float(Fraction(num, den))

    def omega3(self, r: int, phi: int) -> float:
        """Ω3(r, φ) = C(r, r−φ)·(D−1)^φ / D^r  (Eq. 10 / Lemma 3)."""
        c = comb(r, r - phi)
        if c == 0:
            return 0.0
        return c * math.exp(phi * self.logD1 - r * self.logD)

    def omega4(self, x: int, r: int, m: int) -> float:
        """Ω4(x, r, m) = H(x + m − r; v, m, x)  (Eq. 11 / Lemma 4)."""
        return hyper(x + m - r, self.v, m, x)

    # -- Λ1 ---------------------------------------------------------------
    def lam1(self, tau: int, phi: int) -> float:
        """Λ1(τ, φ) = Pr[GBD = φ | GED = τ]  (Theorem 3)."""
        key = (tau, phi)
        if key in self._lam1_cache:
            return self._lam1_cache[key]
        if tau < 0 or phi < 0 or tau > self.v + self.E:
            out = 0.0
        elif tau == 0:
            out = 1.0 if phi == 0 else 0.0
        else:
            out = 0.0
            for x in range(min(tau, self.v) + 1):
                o1 = self.omega1(x, tau)
                if o1 == 0.0:
                    continue
                inner = 0.0
                for m in range(min(2 * tau, self.v) + 1):
                    o2 = self.omega2(m, x, tau)
                    if o2 == 0.0:
                        continue
                    s = 0.0
                    # Ω4 ≠ 0 only for r ∈ [max(x, m), x + m].
                    for r in range(max(x, m), x + m + 1):
                        s += self.omega3(r, phi) * self.omega4(x, r, m)
                    inner += o2 * s
                out += o1 * inner
        self._lam1_cache[key] = out
        return out

    # -- derivative d/dτ Λ1 (gamma continuation) --------------------------
    def _domega1(self, x: int, tau: int) -> float:
        """dΩ1/dτ at integer τ via digamma factors."""
        o1 = self.omega1(x, tau)
        if o1 == 0.0:
            return 0.0
        y = tau - x
        return o1 * (
            -digamma(y + 1)
            + digamma(self.E - y + 1)
            + digamma(tau + 1)
            - digamma(self.v + self.E - tau + 1)
        )

    def _domega2(self, m: int, x: int, tau: int) -> float:
        """dΩ2/dτ at integer τ via per-term digamma factors."""
        y = tau - x
        den = comb(self.E, y)
        if den == 0:
            return 0.0
        cv_m = comb(self.v, m)
        out = 0.0
        for t in range(m + 1):
            t2 = comb(t, 2)
            c = comb(t2, y)
            if c == 0:
                continue
            sign = 1 if (m - t) % 2 == 0 else -1
            ratio = float(Fraction(cv_m * comb(m, t) * c, den))
            out += sign * ratio * (
                digamma(t2 - y + 1) - digamma(self.E - y + 1)
            )
        return out

    def dlam1_dtau(self, tau: int, phi: int) -> float:
        """dΛ1/dτ (continuous-τ continuation) at integer τ."""
        key = (tau, phi)
        if key in self._dlam1_cache:
            return self._dlam1_cache[key]
        out = 0.0
        for x in range(min(tau, self.v) + 1):
            o1 = self.omega1(x, tau)
            do1 = self._domega1(x, tau)
            if o1 == 0.0 and do1 == 0.0:
                continue
            inner = dinner = 0.0
            for m in range(min(2 * tau, self.v) + 1):
                o2 = self.omega2(m, x, tau)
                do2 = self._domega2(m, x, tau)
                if o2 == 0.0 and do2 == 0.0:
                    continue
                s = 0.0
                for r in range(max(x, m), x + m + 1):
                    s += self.omega3(r, phi) * self.omega4(x, r, m)
                inner += o2 * s
                dinner += do2 * s
            out += do1 * inner + o1 * dinner
        self._dlam1_cache[key] = out
        return out

    # -- tables and priors ------------------------------------------------
    def lam1_table(self, tau_max: int, phi_max: int) -> np.ndarray:
        """Array ``T[τ, φ] = Λ1(τ, φ)`` for τ ≤ tau_max, φ ≤ phi_max."""
        return np.array(
            [
                [self.lam1(t, p) for p in range(phi_max + 1)]
                for t in range(tau_max + 1)
            ]
        )

    def jeffreys_prior(self, tau_hat: int) -> np.ndarray:
        """Jeffreys prior Pr[GED = τ], τ ∈ {0..τ̂}  (Eq. 16).

        φ ranges over {0..2τ̂} (one edit changes ≤ 2 branches, §6.3.2);
        the Fisher information is Σ_φ (dΛ1/dτ)²/Λ1; result normalized.
        τ=0 is a boundary atom (Λ1 degenerate there): we evaluate the
        information at τ=1 for it, then normalize — the paper's Figure 5
        likewise shows smooth mass at small τ.
        """
        vals = np.zeros(tau_hat + 1)
        for tau in range(tau_hat + 1):
            t_eval = max(tau, 1)
            info = 0.0
            for phi in range(2 * tau_hat + 1):
                l1 = self.lam1(t_eval, phi)
                if l1 <= 0.0:
                    continue
                d = self.dlam1_dtau(t_eval, phi)
                info += d * d / l1
            vals[tau] = math.sqrt(max(info, 0.0))
        s = vals.sum()
        if s <= 0:
            return np.full(tau_hat + 1, 1.0 / (tau_hat + 1))
        return vals / s
