"""Benchmark: online query stage (Figs 14–16) — GBDA vs competitors.

GBDA's broadcast-join search against a real-like database, and each
method's per-query cost on a Syn-1 subset (n=500, where all methods are
still feasible — the crossover table itself comes from the jobs).
"""
import pytest

from repro.baselines.spark_runner import estimate_pairs
from repro.core.search import DatabaseIndex, build_offline, search
from repro.experiments.suite import real_dataset, syn_dataset


@pytest.fixture(scope="module")
def grec_setup(spark):
    ds = real_dataset("GREC", 0)
    index = DatabaseIndex.build(spark, ds.db)
    model = build_offline(
        spark, ds.db, tau_hat=3, n_vlabels=ds.spec.n_vlabels,
        n_elabels=ds.spec.n_elabels, n_pairs=500, seed=0,
    )
    query = next(iter(ds.queries.values()))
    yield ds, index, model, query
    index.unpersist()


@pytest.fixture(scope="module")
def syn_setup(spark):
    fam = syn_dataset("Syn-1", 0).families[500]
    db = {i: g for i, g in enumerate(fam.graphs)}
    return db, fam.graphs[0]


def test_bench_gbda_query_grec(spark, grec_setup, benchmark):
    ds, index, model, query = grec_setup
    out = benchmark.pedantic(
        lambda: search(spark, query, index, model, gamma=0.8).collect(),
        rounds=5, iterations=1,
    )
    assert out is not None


@pytest.mark.parametrize("method", ["gbda", "lsap", "greedy", "seriation"])
def test_bench_online_syn_500(spark, syn_setup, benchmark, method):
    db, query = syn_setup
    if method == "gbda":
        index = DatabaseIndex.build(spark, db)
        model = build_offline(
            spark, db, tau_hat=5, n_vlabels=16, n_elabels=8,
            n_pairs=100, seed=0,
        )
        try:
            benchmark.pedantic(
                lambda: search(spark, query, index, model, gamma=0.8).collect(),
                rounds=3, iterations=1,
            )
        finally:
            index.unpersist()
    else:
        pairs = [(0, gid) for gid in db]
        benchmark.pedantic(
            lambda: estimate_pairs(spark, pairs, db, method).collect(),
            rounds=2 if method != "lsap" else 1, iterations=1,
        )
