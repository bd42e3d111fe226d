"""Theorems 1 & 2: GED and GBD are invariant under graph extension.

The paper's model reasons over *extended graphs* (Definition 5: pad the
smaller graph with virtual ε-vertices, then complete both graphs with
virtual ε-edges) but never materializes them (Section 4). These tests
materialize them anyway and verify the two invariance theorems the
derivation rests on, using the exact A* GED and the local GBD.
"""
import pytest

from repro.core.gbd import gbd_local
from repro.ged.exact import ged_exact
from repro.graphs import Graph
from tests.fixtures import fig1_g1, fig1_g2, random_graph

EPS = "&eps;"  # virtual label — never used by the generators


def extend(g: Graph, k: int) -> Graph:
    """Extended graph G^{k} (Definition 5): add k virtual vertices,
    then a virtual edge between every non-adjacent pair."""
    out = Graph(list(g.vlabels) + [EPS] * k, dict(g.edges))
    n = out.n
    for u in range(n):
        for v in range(u + 1, n):
            if out.edge_label(u, v) is None:
                out.add_edge(u, v, EPS)
    return out


def extended_pair(g1: Graph, g2: Graph) -> tuple[Graph, Graph]:
    """(G1', G2') with extension factors (|V2|−|V1|, 0), |V1| ≤ |V2|."""
    if g1.n > g2.n:
        g1, g2 = g2, g1
    return extend(g1, g2.n - g1.n), extend(g2, 0)


class TestDefinition5:
    def test_extension_is_complete(self):
        g1e, g2e = extended_pair(fig1_g1(), fig1_g2())
        for ge in (g1e, g2e):
            assert ge.m == ge.n * (ge.n - 1) // 2

    def test_sizes_equalized(self):
        g1e, g2e = extended_pair(fig1_g1(), fig1_g2())
        assert g1e.n == g2e.n == 4

    def test_real_edges_preserved(self):
        g1e, _ = extended_pair(fig1_g1(), fig1_g2())
        assert g1e.edge_label(0, 1) == "y"
        assert g1e.edge_label(0, 3) == EPS  # virtual vertex edge


class TestTheorem2_GBD:
    def test_fig1(self):
        g1, g2 = fig1_g1(), fig1_g2()
        g1e, g2e = extended_pair(g1, g2)
        assert gbd_local(g1e, g2e) == gbd_local(g1, g2) == 3

    @pytest.mark.parametrize("seed", range(12))
    def test_random_pairs(self, seed):
        g1 = random_graph(4 + seed % 3, 0.4, 3, 2, seed)
        g2 = random_graph(5 + seed % 4, 0.4, 3, 2, seed + 100)
        g1e, g2e = extended_pair(g1, g2)
        assert gbd_local(g1e, g2e) == gbd_local(g1, g2)

    def test_identical_graphs(self):
        g = random_graph(6, 0.5, 2, 2, 3)
        g1e, g2e = extended_pair(g, g.copy())
        assert gbd_local(g1e, g2e) == 0


class TestTheorem1_GED:
    def test_fig1(self):
        g1, g2 = fig1_g1(), fig1_g2()
        g1e, g2e = extended_pair(g1, g2)
        assert ged_exact(g1e, g2e) == ged_exact(g1, g2) == 3

    @pytest.mark.parametrize("seed", range(8))
    def test_random_pairs_small(self, seed):
        g1 = random_graph(3, 0.5, 2, 2, seed)
        g2 = random_graph(4, 0.5, 2, 2, seed + 50)
        g1e, g2e = extended_pair(g1, g2)
        assert ged_exact(g1e, g2e) == ged_exact(g1, g2)

    def test_relabel_only_on_extended(self):
        """On extended graphs every minimal edit path is relabel-only
        (Section 4) — sanity-check one concrete case: the edit distance
        equals the count of label mismatches under the best mapping."""
        g1 = Graph(["A", "B"])
        g1.add_edge(0, 1, "x")
        g2 = Graph(["A", "B"])
        g2.add_edge(0, 1, "y")
        g1e, g2e = extended_pair(g1, g2)
        assert ged_exact(g1e, g2e) == 1  # RE x→y
