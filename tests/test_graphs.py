"""Unit tests for the Graph model and Spark interchange."""
import pytest

from repro.graphs import (
    Graph,
    dataframes_to_graphs,
    graph_store,
    graphs_to_dataframes,
)
from tests.fixtures import fig1_g1, fig1_g2, random_graph


class TestGraphBasics:
    def test_counts(self):
        g = fig1_g1()
        assert g.n == 3
        assert g.m == 3

    def test_degrees(self):
        g = fig1_g1()
        assert [g.degree(v) for v in range(3)] == [2, 2, 2]
        g2 = fig1_g2()
        assert [g2.degree(v) for v in range(4)] == [2, 1, 1, 2]

    def test_edge_label_symmetric(self):
        g = fig1_g1()
        assert g.edge_label(0, 1) == "y"
        assert g.edge_label(1, 0) == "y"
        assert g.edge_label(1, 2) == "z"
        assert g.edge_label(0, 3 - 3) is None  # self pair absent

    def test_no_self_loops(self):
        g = Graph(["A"])
        with pytest.raises(ValueError):
            g.add_edge(0, 0, "x")

    def test_out_of_range_edge(self):
        g = Graph(["A", "B"])
        with pytest.raises(ValueError):
            g.add_edge(0, 5, "x")

    def test_neighbors(self):
        g = fig1_g2()
        assert sorted(g.neighbors(0)) == [2, 3]
        assert g.neighbors(1) == [3]

    def test_avg_degree(self):
        assert fig1_g1().avg_degree() == 2.0
        assert Graph([]).avg_degree() == 0.0

    def test_copy_is_deep(self):
        g = fig1_g1()
        h = g.copy()
        h.vlabels[0] = "Z"
        h.edges[(0, 1)] = "q"
        assert g.vlabels[0] == "A"
        assert g.edges[(0, 1)] == "y"


class TestBranches:
    def test_example2_branches(self):
        """Example 2: branches of G1."""
        g = fig1_g1()
        assert g.branch(0) == ("A", ("y", "y"))
        assert g.branch(1) == ("C", ("y", "z"))
        assert g.branch(2) == ("B", ("y", "z"))

    def test_example3_branches_g2(self):
        g = fig1_g2()
        assert g.branch(0) == ("B", ("x", "z"))
        assert g.branch(1) == ("A", ("y",))
        assert g.branch(2) == ("A", ("x",))
        assert g.branch(3) == ("C", ("y", "z"))

    def test_branches_sorted(self):
        g = fig1_g2()
        bs = g.branches()
        assert bs == sorted(bs)
        assert len(bs) == 4

    def test_signature_format(self):
        g = fig1_g1()
        assert sorted(g.branch_signatures()) == ["A|y,y", "B|y,z", "C|y,z"]

    def test_isolated_vertex_signature(self):
        g = Graph(["A"])
        assert g.branch_signatures() == ["A|"]


class TestSerialization:
    def test_payload_roundtrip(self):
        for seed in range(5):
            g = random_graph(8, 0.4, 3, 2, seed)
            h = Graph.from_payload(g.to_payload())
            assert h.vlabels == g.vlabels
            assert h.edges == g.edges

    def test_payload_empty_graph(self):
        g = Graph(["A", "B"])
        h = Graph.from_payload(g.to_payload())
        assert h.n == 2 and h.m == 0


class TestSparkInterchange:
    def test_roundtrip(self, spark):
        graphs = {i: random_graph(6, 0.5, 3, 2, i) for i in range(4)}
        vdf, edf = graphs_to_dataframes(spark, graphs)
        back = dataframes_to_graphs(vdf, edf)
        assert set(back) == set(graphs)
        for gid, g in graphs.items():
            assert back[gid].vlabels == g.vlabels
            assert back[gid].edges == g.edges

    def test_edgeless_graphs(self, spark):
        graphs = {0: Graph(["A", "B"])}
        vdf, edf = graphs_to_dataframes(spark, graphs)
        assert vdf.count() == 2
        assert edf.count() == 0
        back = dataframes_to_graphs(vdf, edf)
        assert back[0].m == 0

    def test_graph_store(self, spark):
        graphs = {i: random_graph(5, 0.5, 2, 2, i) for i in range(3)}
        store = graph_store(spark, graphs)
        rows = {r["gid"]: r["payload"] for r in store.collect()}
        for gid, g in graphs.items():
            assert Graph.from_payload(rows[gid]).edges == g.edges
