"""Exact GED (A*) vs brute force and hand-verified cases."""
from hypothesis import given, settings, strategies as st

from repro.core.gbd import gbd_local
from repro.ged.exact import ged_brute, ged_exact, induced_edit_cost
from repro.graphs import Graph
from tests.fixtures import fig1_g1, fig1_g2, random_graph


def test_example1_ged_is_3():
    """Example 1: GED(G1, G2) = 3 (DE + AV + AE)."""
    assert ged_exact(fig1_g1(), fig1_g2()) == 3


def test_ged_identical_zero():
    g = fig1_g1()
    assert ged_exact(g, g.copy()) == 0


def test_ged_one_relabel():
    g = fig1_g1()
    h = g.copy()
    h.vlabels[2] = "Z"
    assert ged_exact(g, h) == 1


def test_ged_one_edge_delete():
    g = fig1_g1()
    h = g.copy()
    del h.edges[(0, 1)]
    assert ged_exact(g, h) == 1


def test_ged_isolated_vertex_insert():
    g = fig1_g1()
    h = g.copy()
    h.vlabels.append("A")
    assert ged_exact(g, h) == 1


def test_ged_nonisolated_vertex_costs_edges_too():
    g = Graph(["A"])
    h = Graph(["A", "B"])
    h.add_edge(0, 1, "x")
    # AV(B) + AE(x) = 2
    assert ged_exact(g, h) == 2


def test_ged_symmetric_small():
    g1 = random_graph(5, 0.4, 2, 2, 11)
    g2 = random_graph(6, 0.4, 2, 2, 12)
    assert ged_exact(g1, g2) == ged_exact(g2, g1)


def test_induced_cost_identity_mapping():
    g = fig1_g1()
    assert induced_edit_cost(g, g, {0: 0, 1: 1, 2: 2}) == 0


def test_induced_cost_all_deleted():
    g1 = fig1_g1()
    g2 = Graph([])
    # 3 DV + 3 DE
    assert induced_edit_cost(g1, g2, {0: None, 1: None, 2: None}) == 6


def test_induced_cost_upper_bounds_ged():
    g1 = random_graph(5, 0.5, 2, 2, 3)
    g2 = random_graph(5, 0.5, 2, 2, 4)
    exact = ged_exact(g1, g2)
    ident = induced_edit_cost(g1, g2, {i: i for i in range(5)})
    assert ident >= exact


@given(st.integers(0, 5000), st.integers(0, 5000))
@settings(max_examples=20, deadline=None)
def test_astar_matches_brute(seed1, seed2):
    g1 = random_graph(4, 0.5, 2, 2, seed1)
    g2 = random_graph(4, 0.5, 2, 2, seed2)
    assert ged_exact(g1, g2) == ged_brute(g1, g2)


@given(st.integers(0, 5000))
@settings(max_examples=15, deadline=None)
def test_astar_matches_brute_unequal_sizes(seed):
    g1 = random_graph(3, 0.5, 2, 2, seed)
    g2 = random_graph(5, 0.5, 2, 2, seed + 1)
    assert ged_exact(g1, g2) == ged_brute(g1, g2)


def test_limit_prunes():
    g1 = Graph(["A"] * 4)
    g2 = Graph(["B"] * 4)
    assert ged_exact(g1, g2) == 4
    assert ged_exact(g1, g2, limit=2) is None
    assert ged_exact(g1, g2, limit=4) == 4


@given(st.integers(0, 3000))
@settings(max_examples=15, deadline=None)
def test_gbd_le_twice_ged(seed):
    """GBD ≤ 2·GED: each edit op changes at most two branches."""
    g1 = random_graph(5, 0.4, 2, 2, seed)
    g2 = random_graph(5, 0.4, 2, 2, seed + 7)
    assert gbd_local(g1, g2) <= 2 * ged_exact(g1, g2)
