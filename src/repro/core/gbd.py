"""Graph Branch Distance (GBD, Definition 4) — local and Spark forms.

``GBD(G1, G2) = max(|V1|, |V2|) − |B_G1 ∩ B_G2|`` with a *multiset*
intersection of branch signatures. On Spark the intersection is a join
on the signature column with ``sum(least(cnt1, cnt2))`` — the bulk
similarity-join shape from the repro hint:

- :func:`gbd_pairs` computes GBD for an explicit pair list (used when
  sampling database pairs for the GBD prior);
- :func:`gbd_query_vs_db` scores one query against every graph in the
  database via a **broadcast join** of the query's (tiny) branch-count
  table against the partitioned database branch table.
"""
from __future__ import annotations

from collections import Counter

from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.graphs import Graph


def gbd_local(g1: Graph, g2: Graph) -> int:
    """Reference driver-side GBD via Counter intersection."""
    c1 = Counter(g1.branch_signatures())
    c2 = Counter(g2.branch_signatures())
    inter = sum((c1 & c2).values())
    return max(g1.n, g2.n) - inter


def gbd_pairs(
    pairs: DataFrame, branch_cnts: DataFrame, sizes: DataFrame
) -> DataFrame:
    """GBD for every pair in ``pairs``: ``(gid1, gid2, gbd)``.

    ``pairs``: ``(gid1, gid2)``; ``branch_cnts``: ``(gid, sig, cnt)``;
    ``sizes``: ``(gid, n_vertices)``. Pairs with disjoint branch
    multisets still appear (intersection coalesced to 0).
    """
    bc1 = branch_cnts.select(
        F.col("gid").alias("gid1"), "sig", F.col("cnt").alias("c1")
    )
    bc2 = branch_cnts.select(
        F.col("gid").alias("gid2"), "sig", F.col("cnt").alias("c2")
    )
    inter = (
        pairs.join(bc1, "gid1")
        .join(bc2, ["gid2", "sig"])
        .groupBy("gid1", "gid2")
        .agg(F.sum(F.least("c1", "c2")).alias("inter"))
    )
    s1 = sizes.select(F.col("gid").alias("gid1"), F.col("n_vertices").alias("n1"))
    s2 = sizes.select(F.col("gid").alias("gid2"), F.col("n_vertices").alias("n2"))
    return (
        pairs.join(inter, ["gid1", "gid2"], "left")
        .join(s1, "gid1")
        .join(s2, "gid2")
        .select(
            "gid1",
            "gid2",
            (
                F.greatest("n1", "n2") - F.coalesce("inter", F.lit(0))
            ).alias("gbd"),
        )
    )


def gbd_query_vs_db(
    spark: SparkSession,
    query: Graph,
    branch_cnts: DataFrame,
    sizes: DataFrame,
) -> DataFrame:
    """GBD of ``query`` vs every database graph: ``(gid, n_vertices, gbd)``.

    The query's branch-count table is broadcast (explicit hint — the
    session disables auto-broadcast) and joined against the database
    branch table partitions; per-graph aggregation yields the multiset
    intersection size. ``n_vertices`` (the database graph's size) rides
    along so downstream scoring needs no second join against ``sizes``.
    """
    qc = Counter(query.branch_signatures())
    qdf = spark.createDataFrame(
        [(sig, int(c)) for sig, c in qc.items()], "sig string, qc long"
    )
    inter = (
        branch_cnts.join(F.broadcast(qdf), "sig")
        .groupBy("gid")
        .agg(F.sum(F.least("cnt", "qc")).alias("inter"))
    )
    qn = query.n
    # `inter` has ≤ |D| tiny rows (one per graph with a shared branch);
    # broadcasting it turns the final sizes join into a map-side join,
    # keeping the per-query latency at one shuffle (the groupBy).
    return (
        sizes.join(F.broadcast(inter), "gid", "left")
        .select(
            "gid",
            "n_vertices",
            (
                F.greatest("n_vertices", F.lit(qn))
                - F.coalesce("inter", F.lit(0))
            ).alias("gbd"),
        )
    )
