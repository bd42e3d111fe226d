"""GMM EM, GBD prior (Spark-sampled), and Jeffreys GED prior."""
import numpy as np
import pytest

from repro.core.gbd import gbd_local
from repro.core.priors import (
    fit_gmm,
    gbd_prior_from_samples,
    ged_prior_table,
    sample_pair_gbds,
)
from tests.fixtures import random_graph


class TestGMM:
    def test_recovers_planted_mixture(self):
        rng = np.random.default_rng(0)
        x = np.concatenate(
            [rng.normal(0, 1, 4000), rng.normal(10, 1.5, 6000)]
        )
        gmm = fit_gmm(x, k=2, seed=0)
        order = np.argsort(gmm.means)
        assert gmm.means[order[0]] == pytest.approx(0.0, abs=0.2)
        assert gmm.means[order[1]] == pytest.approx(10.0, abs=0.2)
        assert gmm.weights[order[1]] == pytest.approx(0.6, abs=0.05)

    def test_weights_sum_to_one(self):
        x = np.random.default_rng(1).normal(5, 2, 500)
        gmm = fit_gmm(x, k=3)
        assert gmm.weights.sum() == pytest.approx(1.0)

    def test_pdf_integrates_to_one(self):
        x = np.random.default_rng(2).normal(0, 1, 300)
        gmm = fit_gmm(x, k=2)
        grid = np.linspace(-10, 10, 4001)
        integral = np.trapz(gmm.pdf(grid), grid)
        assert integral == pytest.approx(1.0, abs=1e-3)

    def test_cdf_monotone_limits(self):
        gmm = fit_gmm(np.array([1.0, 2.0, 3.0, 4.0]), k=2)
        assert gmm.cdf(np.array([-1e6]))[0] == pytest.approx(0.0, abs=1e-9)
        assert gmm.cdf(np.array([1e6]))[0] == pytest.approx(1.0, abs=1e-9)

    def test_degenerate_single_value(self):
        gmm = fit_gmm(np.full(50, 3.0), k=3)
        assert gmm.pdf(np.array([3.0]))[0] > 0

    def test_empty_rejected(self):
        with pytest.raises(ValueError):
            fit_gmm(np.array([]))


class TestGbdPrior:
    def test_mass_concentrated_near_samples(self):
        rng = np.random.default_rng(3)
        gbds = rng.integers(3, 8, 2000)
        pr = gbd_prior_from_samples(gbds, phi_max=20, k=2)
        assert pr.shape == (21,)
        assert pr[3:8].sum() > 0.8
        assert (pr > 0).all()  # floored

    def test_near_normalized(self):
        gbds = np.random.default_rng(4).normal(10, 2, 3000).clip(0)
        pr = gbd_prior_from_samples(gbds, phi_max=30)
        assert pr.sum() == pytest.approx(1.0, abs=0.02)


class TestSamplePairGbds(object):
    def test_matches_local(self, spark):
        graphs = {i: random_graph(6, 0.4, 3, 2, i) for i in range(10)}
        gbds = sample_pair_gbds(spark, graphs, n_pairs=60, seed=0)
        assert gbds.size > 0
        lo = min(
            gbd_local(graphs[a], graphs[b])
            for a in graphs
            for b in graphs
            if a != b
        )
        hi = max(
            gbd_local(graphs[a], graphs[b])
            for a in graphs
            for b in graphs
            if a != b
        )
        assert gbds.min() >= lo
        assert gbds.max() <= hi

    def test_no_self_pairs(self, spark):
        graphs = {i: random_graph(4, 0.5, 1, 1, 0) for i in range(3)}
        # identical graphs: any self pair would produce gbd=0 anyway;
        # with 1 label alphabet all pairs are identical → all zeros.
        gbds = sample_pair_gbds(spark, graphs, n_pairs=20, seed=1)
        assert (gbds == 0).all()


class TestGedPriorTable:
    def test_spark_parallel_matches_driver(self, spark):
        from repro.core.model import BranchModel

        res = ged_prior_table(spark, [5, 8], tau_hat=3, n_vlabels=3, n_elabels=2)
        for v in (5, 8):
            expected = BranchModel(v, 3, 2).jeffreys_prior(3)
            assert np.allclose(res.table[v], expected)
            assert res.task_seconds[v] > 0
            assert res.task_bytes[v] == expected.nbytes

    def test_dedupes_sizes(self, spark):
        res = ged_prior_table(
            spark, [4, 4, 4], tau_hat=2, n_vlabels=2, n_elabels=2
        )
        assert list(res.table) == [4]
