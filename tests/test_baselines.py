"""LSAP / Greedy-Sort / Seriation GED approximations."""
import numpy as np
import pytest
from hypothesis import given, settings, strategies as st

from repro.baselines.lsap import cost_matrix, greedy_sort_ged, lsap_ged
from repro.baselines.membudget import bytes_needed, feasible
from repro.baselines.seriation import (
    _levenshtein,
    adjacency,
    leading_eigenvector,
    seriate,
    seriation_ged,
)
from repro.ged.exact import ged_exact
from repro.graphs import Graph
from tests.fixtures import fig1_g1, fig1_g2, random_graph


class TestCostMatrix:
    def test_shape_and_blocks(self):
        g1, g2 = fig1_g1(), fig1_g2()
        cm = cost_matrix(g1, g2)
        assert cm.shape == (7, 7)
        # ε→ε block is zero.
        assert (cm[3:, 4:] == 0).all()
        # deletion diagonal = 1 + degree.
        assert cm[0, 4] == 1 + 2
        # off-diagonal ε cells forbidden.
        assert cm[0, 5] >= 1e8

    def test_substitution_zero_for_identical_branch(self):
        g = fig1_g1()
        cm = cost_matrix(g, g.copy())
        assert np.diag(cm[:3, :3]).sum() == 0


class TestLsapGed:
    def test_identical_zero(self):
        g = fig1_g1()
        assert lsap_ged(g, g.copy()) == 0

    def test_fig1_upper_bound(self):
        assert lsap_ged(fig1_g1(), fig1_g2()) >= 3

    @given(st.integers(0, 2000))
    @settings(max_examples=20, deadline=None)
    def test_upper_bounds_exact(self, seed):
        g1 = random_graph(5, 0.4, 2, 2, seed)
        g2 = random_graph(6, 0.4, 2, 2, seed + 13)
        assert lsap_ged(g1, g2) >= ged_exact(g1, g2)

    def test_often_tight_on_near_graphs(self):
        hits = 0
        for seed in range(20):
            g1 = random_graph(6, 0.4, 3, 2, seed)
            g2 = g1.copy()
            g2.vlabels[0] = "ZZ"
            if lsap_ged(g1, g2) == 1:
                hits += 1
        assert hits >= 15  # LSAP is near-exact for single relabels


class TestGreedySortGed:
    def test_identical_zero(self):
        g = fig1_g2()
        assert greedy_sort_ged(g, g.copy()) == 0

    @given(st.integers(0, 2000))
    @settings(max_examples=20, deadline=None)
    def test_upper_bounds_exact(self, seed):
        g1 = random_graph(5, 0.4, 2, 2, seed)
        g2 = random_graph(5, 0.4, 2, 2, seed + 29)
        assert greedy_sort_ged(g1, g2) >= ged_exact(g1, g2)


class TestSeriation:
    def test_adjacency(self):
        a = adjacency(fig1_g1())
        assert a.sum() == 6  # 3 undirected edges
        assert (a == a.T).all()

    def test_leading_eigenvector_fixed_point(self):
        a = adjacency(random_graph(10, 0.5, 2, 2, 5))
        x = leading_eigenvector(a)
        lam = x @ a @ x
        resid = np.linalg.norm(a @ x - lam * x)
        assert resid < 1e-4

    def test_levenshtein_reference(self):
        def ref(a, b):
            la, lb = len(a), len(b)
            d = [[0] * (lb + 1) for _ in range(la + 1)]
            for i in range(la + 1):
                d[i][0] = i
            for j in range(lb + 1):
                d[0][j] = j
            for i in range(1, la + 1):
                for j in range(1, lb + 1):
                    d[i][j] = min(
                        d[i - 1][j] + 1,
                        d[i][j - 1] + 1,
                        d[i - 1][j - 1] + (a[i - 1] != b[j - 1]),
                    )
            return d[la][lb]

        rng = np.random.default_rng(0)
        for _ in range(30):
            a = [str(x) for x in rng.integers(0, 4, rng.integers(0, 9))]
            b = [str(x) for x in rng.integers(0, 4, rng.integers(0, 9))]
            assert _levenshtein(a, b) == ref(a, b), (a, b)

    def test_identical_zero(self):
        g = random_graph(8, 0.4, 3, 2, 7)
        assert seriation_ged(g, g.copy()) == 0

    def test_nonnegative_and_bounded(self):
        g1 = random_graph(6, 0.4, 2, 2, 1)
        g2 = random_graph(9, 0.4, 2, 2, 2)
        d = seriation_ged(g1, g2)
        assert 0 <= d <= 9

    def test_seriate_deterministic(self):
        g = random_graph(12, 0.3, 3, 2, 11)
        assert seriate(g) == seriate(g)


class TestMemBudget:
    def test_quadratic_methods(self):
        assert bytes_needed("lsap", 1000, 1000) == 8 * 2000**2
        assert bytes_needed("greedy", 10, 20) == 16 * 30**2

    def test_seriation_adjacency(self):
        assert bytes_needed("seriation", 100, 200) >= 8 * (100**2 + 200**2)

    def test_gbda_linear(self):
        assert bytes_needed("gbda", 10**5, 10**5) < 10**9

    def test_feasibility_ordering(self):
        """Reproduces the paper's scalability walls at our scale: every
        baseline dies at n=2000, LSAP survives one step (n=1500) beyond
        Greedy/Seriation (n=1000), GBDA survives everything."""
        for n in (100, 500, 1000, 1500, 2000, 10**5):
            assert feasible("gbda", n, n)
        for m in ("lsap", "greedy", "seriation"):
            assert feasible(m, 1000, 1000), m
            assert not feasible(m, 2000, 2000), m
        assert feasible("lsap", 1500, 1500)
        assert not feasible("greedy", 1500, 1500)
        assert not feasible("seriation", 1500, 1500)

    def test_unknown_method(self):
        with pytest.raises(ValueError):
            bytes_needed("magic", 1, 1)
