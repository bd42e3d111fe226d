"""Benchmark: Table 3 (GBD prior — Spark pair sampling + GMM fit).

One representative dataset per regime: GREC (small real-like graphs)
and Syn-1 (large known-GED graphs). ``table3`` timings over all five
datasets are produced by ``jobs/table3_gbd_prior.py``.
"""
import numpy as np

from repro.core.priors import gbd_prior_from_samples, sample_pair_gbds
from repro.experiments.tables import dataset_graphs


def _gbd_prior(spark, name, n_pairs):
    graphs = dataset_graphs(name)
    gbds = sample_pair_gbds(spark, graphs, n_pairs, seed=0)
    return gbd_prior_from_samples(gbds, int(gbds.max()), k=3)


def test_bench_gbd_prior_grec(spark, benchmark):
    prior = benchmark.pedantic(
        _gbd_prior, args=(spark, "GREC", 1000), rounds=3, iterations=1
    )
    assert prior.sum() > 0.5


def test_bench_gbd_prior_syn1(spark, benchmark):
    prior = benchmark.pedantic(
        _gbd_prior, args=(spark, "Syn-1", 500), rounds=2, iterations=1
    )
    assert (prior > 0).all()
