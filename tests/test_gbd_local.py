"""GBD (Definition 4) — local reference implementation."""
from hypothesis import given, settings, strategies as st

from repro.core.gbd import gbd_local
from repro.datasets.generators import _random_edit  # noqa: F401 (doc ref)
from repro.graphs import Graph
from tests.fixtures import fig1_g1, fig1_g2, random_graph


def test_example3_gbd_is_3():
    """Example 3: GBD(G1, G2) = max(3, 4) − 1 = 3."""
    assert gbd_local(fig1_g1(), fig1_g2()) == 3


def test_gbd_identical_graphs_zero():
    g = fig1_g1()
    assert gbd_local(g, g.copy()) == 0


def test_gbd_relabelled_vertex():
    g = fig1_g1()
    h = g.copy()
    h.vlabels[0] = "Z"
    # one RV changes exactly 1 branch here (the root's own branch).
    assert gbd_local(g, h) == 1


def test_gbd_relabelled_edge_changes_two_branches():
    g = fig1_g1()
    h = g.copy()
    h.edges[(0, 1)] = "q"
    assert gbd_local(g, h) == 2


def test_gbd_size_difference_lower_bound():
    g1 = Graph(["A"] * 3)
    g2 = Graph(["A"] * 7)
    # identical isolated-vertex branches: intersection = 3.
    assert gbd_local(g1, g2) == 7 - 3


def test_gbd_disjoint_labels():
    g1 = Graph(["A", "A"])
    g2 = Graph(["B", "B"])
    assert gbd_local(g1, g2) == 2


@given(st.integers(0, 10_000), st.integers(0, 10_000))
@settings(max_examples=25, deadline=None)
def test_gbd_symmetric(seed1, seed2):
    g1 = random_graph(6, 0.4, 3, 2, seed1)
    g2 = random_graph(7, 0.4, 3, 2, seed2)
    assert gbd_local(g1, g2) == gbd_local(g2, g1)


@given(st.integers(0, 10_000))
@settings(max_examples=25, deadline=None)
def test_gbd_self_zero(seed):
    g = random_graph(8, 0.3, 3, 2, seed)
    assert gbd_local(g, g) == 0


@given(st.integers(0, 10_000), st.integers(1, 3))
@settings(max_examples=25, deadline=None)
def test_gbd_at_most_two_per_edit(seed, k):
    """One edit op changes ≤ 2 branches, so GBD ≤ 2·#edits (§6.3.2)."""
    import numpy as np

    g = random_graph(8, 0.4, 3, 2, seed)
    h = g.copy()
    rng = np.random.default_rng(seed + 1)
    from repro.datasets.generators import _random_edit as edit

    for _ in range(k):
        edit(h, rng, ["V0", "V1", "V2"], ["e0", "e1"])
    assert gbd_local(g, h) <= 2 * k


def test_gbd_bounded_by_max_n():
    g1 = random_graph(5, 0.5, 2, 2, 1)
    g2 = random_graph(9, 0.5, 2, 2, 2)
    assert 0 <= gbd_local(g1, g2) <= 9
