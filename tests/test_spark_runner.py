"""Distributed per-pair estimation runner."""
import math

import pandas as pd
import pytest

from repro.baselines.lsap import greedy_sort_ged, lsap_ged
from repro.baselines.seriation import seriation_ged
from repro.baselines.spark_runner import estimate_pairs
from repro.ged.exact import ged_exact
from tests.fixtures import random_graph


@pytest.fixture(scope="module")
def pair_setup():
    graphs = {i: random_graph(6, 0.4, 3, 2, 500 + i) for i in range(8)}
    pairs = [(a, b) for a in range(4) for b in range(4, 8)]
    return graphs, pairs


class TestEstimatePairs:
    @pytest.mark.parametrize(
        "method,local",
        [
            ("lsap", lsap_ged),
            ("greedy", greedy_sort_ged),
            ("seriation", seriation_ged),
        ],
    )
    def test_matches_local(self, spark, pair_setup, method, local):
        graphs, pairs = pair_setup
        out = estimate_pairs(spark, pairs, graphs, method).toPandas()
        got = {
            (int(r["qid"]), int(r["gid"])): r["est"]
            for _, r in out.iterrows()
        }
        assert set(got) == set(pairs)
        for a, b in pairs:
            assert got[(a, b)] == local(graphs[a], graphs[b]), (method, a, b)

    def test_exact_with_limit(self, spark, pair_setup):
        graphs, pairs = pair_setup
        out = estimate_pairs(
            spark, pairs, graphs, "exact", limit=2, max_expansions=100_000
        ).toPandas()
        for _, r in out.iterrows():
            a, b = int(r["qid"]), int(r["gid"])
            exact = ged_exact(graphs[a], graphs[b])
            if exact <= 2:
                assert r["est"] == exact
            else:
                assert math.isinf(r["est"])

    def test_infeasible_returns_null(self, spark):
        graphs = {0: random_graph(5, 0.5, 2, 2, 0), 1: random_graph(5, 0.5, 2, 2, 1)}
        out = estimate_pairs(
            spark, [(0, 1)], graphs, "lsap", budget=10
        ).toPandas()
        assert pd.isna(out["est"]).all()

    def test_unknown_method(self, spark, pair_setup):
        graphs, pairs = pair_setup
        with pytest.raises(ValueError):
            estimate_pairs(spark, pairs, graphs, "nope")

    def test_budget_exceeded_exact_is_null(self, spark):
        graphs = {
            0: random_graph(8, 0.6, 2, 2, 11),
            1: random_graph(8, 0.6, 2, 2, 99),
        }
        out = estimate_pairs(
            spark, [(0, 1)], graphs, "exact", limit=10, max_expansions=1
        ).toPandas()
        assert pd.isna(out["est"]).all()
