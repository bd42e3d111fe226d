"""Branch extraction as Catalyst DataFrame transformations.

A *branch* (Definition 2) rooted at vertex ``v`` is
``B(v) = (L(v), N(v))`` with ``N(v)`` the sorted multiset of labels of
edges adjacent to ``v``. On the Spark side a branch is materialized as a
canonical *signature* string ``vlabel + "|" + ",".join(sorted(N(v)))``
— branch isomorphism (Definition 3) is exactly signature equality.

All transformations are pure DataFrame/Spark SQL (explode → groupBy →
sort_array → join), so they run through Catalyst and are verified
against DuckDB SQL by the oracle tests.
"""
from __future__ import annotations

from pyspark.sql import DataFrame
from pyspark.sql import functions as F

#: Separator between the vertex label and the edge-label list. Must not
#: occur in labels (generators use alphanumeric labels only).
SIG_SEP = "|"
#: Separator between edge labels inside the signature.
LAB_SEP = ","


def branch_table(vertices: DataFrame, edges: DataFrame) -> DataFrame:
    """Per-vertex branches: ``(gid, vid, sig)``.

    ``vertices``: ``(gid, vid, vlabel)``; ``edges``: ``(gid, src, dst,
    elabel)`` stored once per undirected edge. Isolated vertices get the
    empty edge-label list (signature ``vlabel + "|"``).
    """
    endpoints = edges.select(
        "gid", F.col("src").alias("vid"), "elabel"
    ).unionByName(edges.select("gid", F.col("dst").alias("vid"), "elabel"))
    nlab = endpoints.groupBy("gid", "vid").agg(
        F.concat_ws(
            LAB_SEP, F.sort_array(F.collect_list("elabel"))
        ).alias("nlabels")
    )
    return (
        vertices.join(nlab, ["gid", "vid"], "left")
        .withColumn(
            "sig",
            F.concat(
                F.col("vlabel"),
                F.lit(SIG_SEP),
                F.coalesce(F.col("nlabels"), F.lit("")),
            ),
        )
        .select("gid", "vid", "sig")
    )


def branch_counts(vertices: DataFrame, edges: DataFrame) -> DataFrame:
    """Branch multiset per graph as counts: ``(gid, sig, cnt)``.

    This is the pre-computed accessory structure the paper assumes is
    stored with each graph (Section 3) — multiset intersections reduce
    to a join on ``sig`` with ``min(cnt, cnt)``.
    """
    return (
        branch_table(vertices, edges)
        .groupBy("gid", "sig")
        .agg(F.count(F.lit(1)).alias("cnt"))
    )


def graph_sizes(vertices: DataFrame) -> DataFrame:
    """Vertex count per graph: ``(gid, n_vertices)``."""
    return vertices.groupBy("gid").agg(
        F.count(F.lit(1)).alias("n_vertices")
    )
