"""Benchmark: Table 4 (GED Jeffreys prior, Spark-parallel over sizes)."""
from repro.core.priors import ged_prior_table
from repro.experiments.tables import dataset_graphs


def _ged_prior(spark, name, tau_hat):
    graphs = dataset_graphs(name)
    sizes = sorted({g.n for g in graphs.values()})
    return ged_prior_table(spark, sizes, tau_hat, 8, 4)


def test_bench_ged_prior_grec(spark, benchmark):
    res = benchmark.pedantic(
        _ged_prior, args=(spark, "GREC", 5), rounds=3, iterations=1
    )
    assert len(res.table) >= 5


def test_bench_ged_prior_syn1(spark, benchmark):
    res = benchmark.pedantic(
        _ged_prior, args=(spark, "Syn-1", 5), rounds=2, iterations=1
    )
    assert max(res.table) == 2000
