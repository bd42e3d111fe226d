"""Branch extraction on Spark — oracle-checked against DuckDB SQL."""
import pandas as pd
from pyspark.sql import functions as F

from repro.core.branches import branch_counts, branch_table, graph_sizes
from repro.graphs import Graph, graphs_to_dataframes
from repro.oracle import assert_equivalent
from tests.fixtures import fig1_g1, fig1_g2, random_graph

# DuckDB equivalent of branch_table: explode both endpoints, aggregate
# sorted edge labels, left-join vertices for isolated ones.
_BRANCH_SQL = """
WITH endpoints AS (
  SELECT gid, src AS vid, elabel FROM edges
  UNION ALL
  SELECT gid, dst AS vid, elabel FROM edges
),
nlab AS (
  SELECT gid, vid,
         string_agg(elabel, ',' ORDER BY elabel) AS nlabels
  FROM endpoints GROUP BY gid, vid
)
SELECT v.gid AS gid, v.vid AS vid,
       v.vlabel || '|' || coalesce(n.nlabels, '') AS sig
FROM vertices v LEFT JOIN nlab n ON v.gid = n.gid AND v.vid = n.vid
"""


def _dataset(spark, graphs):
    vdf, edf = graphs_to_dataframes(spark, graphs)
    return vdf, edf


class TestBranchTable:
    def test_fig1_signatures(self, spark):
        vdf, edf = _dataset(spark, {1: fig1_g1(), 2: fig1_g2()})
        rows = branch_table(vdf, edf).collect()
        sigs = sorted((r["gid"], r["sig"]) for r in rows)
        assert sigs == [
            (1, "A|y,y"),
            (1, "B|y,z"),
            (1, "C|y,z"),
            (2, "A|x"),
            (2, "A|y"),
            (2, "B|x,z"),
            (2, "C|y,z"),
        ]

    def test_matches_local_signatures(self, spark):
        graphs = {i: random_graph(7, 0.4, 3, 2, i) for i in range(5)}
        vdf, edf = _dataset(spark, graphs)
        rows = branch_table(vdf, edf).collect()
        by_gid: dict[int, list[str]] = {}
        for r in rows:
            by_gid.setdefault(r["gid"], []).append(r["sig"])
        for gid, g in graphs.items():
            assert sorted(by_gid[gid]) == g.branch_signatures()

    def test_oracle_branch_table(self, spark):
        graphs = {i: random_graph(8, 0.35, 3, 3, 100 + i) for i in range(6)}
        graphs[99] = Graph(["A", "B"])  # isolated vertices covered
        vdf, edf = _dataset(spark, graphs)
        assert_equivalent(
            branch_table(vdf, edf),
            _BRANCH_SQL,
            vertices=vdf,
            edges=edf,
        )

    def test_isolated_vertex_kept(self, spark):
        vdf, edf = _dataset(spark, {0: Graph(["A", "B"])})
        rows = branch_table(vdf, edf).collect()
        assert sorted(r["sig"] for r in rows) == ["A|", "B|"]


class TestBranchCounts:
    def test_multiset_counts(self, spark):
        g = Graph(["A", "A", "A"])  # three identical isolated branches
        vdf, edf = _dataset(spark, {0: g})
        rows = branch_counts(vdf, edf).collect()
        assert len(rows) == 1
        assert rows[0]["cnt"] == 3

    def test_oracle_branch_counts(self, spark):
        graphs = {i: random_graph(6, 0.5, 2, 2, 300 + i) for i in range(5)}
        vdf, edf = _dataset(spark, graphs)
        sql = f"""
        SELECT gid, sig, count(*) AS cnt
        FROM ({_BRANCH_SQL}) GROUP BY gid, sig
        """
        assert_equivalent(
            branch_counts(vdf, edf), sql, vertices=vdf, edges=edf
        )

    def test_counts_sum_to_n(self, spark):
        graphs = {i: random_graph(9, 0.3, 2, 2, i) for i in range(4)}
        vdf, edf = _dataset(spark, graphs)
        tot = (
            branch_counts(vdf, edf)
            .groupBy("gid")
            .agg(F.sum("cnt").alias("s"))
            .collect()
        )
        for r in tot:
            assert r["s"] == graphs[r["gid"]].n


class TestGraphSizes:
    def test_sizes(self, spark):
        graphs = {0: fig1_g1(), 1: fig1_g2(), 2: Graph(["A"])}
        vdf, _ = _dataset(spark, graphs)
        got = {r["gid"]: r["n_vertices"] for r in graph_sizes(vdf).collect()}
        assert got == {0: 3, 1: 4, 2: 1}

    def test_oracle_sizes(self, spark):
        graphs = {i: random_graph(5, 0.4, 2, 2, i) for i in range(3)}
        vdf, _ = _dataset(spark, graphs)
        assert_equivalent(
            graph_sizes(vdf),
            "SELECT gid, count(*) AS n_vertices FROM vertices GROUP BY gid",
            vertices=vdf,
        )
