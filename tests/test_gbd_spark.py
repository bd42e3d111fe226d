"""Spark GBD joins vs the local reference — oracle-checked."""
import pandas as pd

from repro.core.branches import branch_counts, graph_sizes
from repro.core.gbd import gbd_local, gbd_pairs, gbd_query_vs_db
from repro.graphs import Graph, graphs_to_dataframes
from repro.oracle import assert_equivalent
from tests.fixtures import fig1_g1, fig1_g2, random_graph

# DuckDB equivalent of gbd_pairs over precomputed branch-count/size
# tables: signature join with sum(least) intersection.
_GBD_PAIRS_SQL = """
WITH inter AS (
  SELECT p.gid1, p.gid2, sum(least(b1.cnt, b2.cnt)) AS i
  FROM pairs p
  JOIN bc b1 ON b1.gid = p.gid1
  JOIN bc b2 ON b2.gid = p.gid2 AND b2.sig = b1.sig
  GROUP BY p.gid1, p.gid2
)
SELECT p.gid1 AS gid1, p.gid2 AS gid2,
       greatest(s1.n_vertices, s2.n_vertices) - coalesce(inter.i, 0) AS gbd
FROM pairs p
LEFT JOIN inter ON inter.gid1 = p.gid1 AND inter.gid2 = p.gid2
JOIN sizes s1 ON s1.gid = p.gid1
JOIN sizes s2 ON s2.gid = p.gid2
"""


def _index(spark, graphs):
    vdf, edf = graphs_to_dataframes(spark, graphs)
    return branch_counts(vdf, edf), graph_sizes(vdf)


class TestGbdPairs:
    def test_example3(self, spark):
        graphs = {1: fig1_g1(), 2: fig1_g2()}
        bc, sizes = _index(spark, graphs)
        pairs = spark.createDataFrame(
            pd.DataFrame({"gid1": [1], "gid2": [2]}), "gid1 long, gid2 long"
        )
        rows = gbd_pairs(pairs, bc, sizes).collect()
        assert rows[0]["gbd"] == 3

    def test_matches_local(self, spark):
        graphs = {i: random_graph(8, 0.35, 3, 2, 40 + i) for i in range(8)}
        bc, sizes = _index(spark, graphs)
        plist = [(a, b) for a in range(8) for b in range(8) if a < b]
        pairs = spark.createDataFrame(
            pd.DataFrame(plist, columns=["gid1", "gid2"]),
            "gid1 long, gid2 long",
        )
        got = {
            (r["gid1"], r["gid2"]): r["gbd"]
            for r in gbd_pairs(pairs, bc, sizes).collect()
        }
        for a, b in plist:
            assert got[(a, b)] == gbd_local(graphs[a], graphs[b]), (a, b)

    def test_disjoint_pair_present(self, spark):
        graphs = {0: Graph(["A", "A"]), 1: Graph(["B", "B", "B"])}
        bc, sizes = _index(spark, graphs)
        pairs = spark.createDataFrame(
            pd.DataFrame({"gid1": [0], "gid2": [1]}), "gid1 long, gid2 long"
        )
        rows = gbd_pairs(pairs, bc, sizes).collect()
        assert len(rows) == 1 and rows[0]["gbd"] == 3

    def test_oracle(self, spark):
        graphs = {i: random_graph(7, 0.4, 2, 2, 70 + i) for i in range(6)}
        bc, sizes = _index(spark, graphs)
        plist = [(a, b) for a in range(6) for b in range(6) if a != b]
        pairs = spark.createDataFrame(
            pd.DataFrame(plist, columns=["gid1", "gid2"]),
            "gid1 long, gid2 long",
        )
        assert_equivalent(
            gbd_pairs(pairs, bc, sizes),
            _GBD_PAIRS_SQL,
            pairs=pairs,
            bc=bc,
            sizes=sizes,
        )


class TestGbdQueryVsDb:
    def test_matches_local(self, spark):
        graphs = {i: random_graph(7, 0.4, 3, 2, i) for i in range(10)}
        bc, sizes = _index(spark, graphs)
        q = random_graph(6, 0.4, 3, 2, 999)
        got = {
            r["gid"]: r["gbd"]
            for r in gbd_query_vs_db(spark, q, bc, sizes).collect()
        }
        assert set(got) == set(graphs)
        for gid, g in graphs.items():
            assert got[gid] == gbd_local(q, g), gid

    def test_self_query_zero(self, spark):
        graphs = {i: random_graph(6, 0.5, 2, 2, i) for i in range(5)}
        bc, sizes = _index(spark, graphs)
        got = {
            r["gid"]: r["gbd"]
            for r in gbd_query_vs_db(spark, graphs[3], bc, sizes).collect()
        }
        assert got[3] == 0

    def test_no_common_branches(self, spark):
        graphs = {0: Graph(["A", "A", "A"])}
        bc, sizes = _index(spark, graphs)
        q = Graph(["Z"])
        rows = gbd_query_vs_db(spark, q, bc, sizes).collect()
        assert rows[0]["gbd"] == 3
