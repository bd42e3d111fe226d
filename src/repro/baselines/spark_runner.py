"""Distributed per-pair GED estimation for the baselines.

The paper runs every competitor over the whole database per query; we
parallelize that the Spark way: a pair table ``(qid, gid)`` is joined
with a broadcast ``graph_store`` payload table on both sides, and
``mapInPandas`` executes the per-pair estimator on the executors. The
same runner also produces exact-GED ground truth (bounded A*).

Infeasible pairs — memory model (``membudget``) says the method's
dominant allocation exceeds the budget, or the exact search exceeds its
expansion cap — come back with ``est = NULL`` so harnesses can count
them instead of silently dropping work.
"""
from __future__ import annotations

from typing import Callable, Iterator

import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.baselines.lsap import greedy_sort_ged, lsap_ged
from repro.baselines.membudget import DEFAULT_BUDGET_BYTES, feasible
from repro.baselines.seriation import seriation_ged
from repro.ged.exact import SearchBudgetExceeded, ged_exact
from repro.graphs import Graph, graph_store


def _exact_estimator(limit: int | None, max_expansions: int | None):
    def run(g1: Graph, g2: Graph) -> float | None:
        try:
            out = ged_exact(g1, g2, limit=limit, max_expansions=max_expansions)
        except SearchBudgetExceeded:
            return None
        return float(out) if out is not None else float("inf")

    return run


def _method_fn(
    method: str, *, limit: int | None = None,
    max_expansions: int | None = None,
) -> Callable[[Graph, Graph], float | None]:
    if method == "lsap":
        return lambda a, b: float(lsap_ged(a, b))
    if method == "greedy":
        return lambda a, b: float(greedy_sort_ged(a, b))
    if method == "seriation":
        return lambda a, b: float(seriation_ged(a, b))
    if method == "exact":
        return _exact_estimator(limit, max_expansions)
    raise ValueError(f"unknown method {method!r}")


def estimate_pairs(
    spark: SparkSession,
    pairs: list[tuple[int, int]],
    graphs: dict[int, Graph],
    method: str,
    *,
    limit: int | None = None,
    max_expansions: int | None = None,
    budget: int = DEFAULT_BUDGET_BYTES,
) -> DataFrame:
    """Estimate GED for every ``(qid, gid)`` pair: ``(qid, gid, est)``.

    ``est`` is NULL for infeasible pairs (memory model) or capped exact
    searches, and ``+inf`` for exact searches proven ``> limit``.
    """
    fn = _method_fn(method, limit=limit, max_expansions=max_expansions)
    pdf = pd.DataFrame(pairs, columns=["qid", "gid"])
    # Spread heavy per-pair work across cores even for short pair lists.
    pair_df = spark.createDataFrame(pdf, "qid long, gid long").repartition(
        max(1, min(len(pairs), spark.sparkContext.defaultParallelism))
    )
    store = graph_store(spark, graphs)
    s1 = store.select(
        F.col("gid").alias("qid"), F.col("payload").alias("p1")
    )
    s2 = store.select("gid", F.col("payload").alias("p2"))
    joined = (
        pair_df.join(F.broadcast(s1), "qid")
        .join(F.broadcast(s2), "gid")
        .select("qid", "gid", "p1", "p2")
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        cache: dict[str, Graph] = {}

        def parse(payload: str) -> Graph:
            g = cache.get(payload)
            if g is None:
                g = cache[payload] = Graph.from_payload(payload)
            return g

        for b in batches:
            ests = []
            for p1, p2 in zip(b["p1"], b["p2"]):
                g1, g2 = parse(p1), parse(p2)
                if method != "exact" and not feasible(
                    method, g1.n, g2.n, budget
                ):
                    ests.append(None)
                else:
                    ests.append(fn(g1, g2))
            yield pd.DataFrame(
                {"qid": b["qid"], "gid": b["gid"], "est": ests}
            )

    return joined.mapInPandas(run, schema="qid long, gid long, est double")
