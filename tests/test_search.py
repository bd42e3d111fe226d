"""GBDA search (Algorithm 1) — end-to-end on Spark."""
import numpy as np
import pytest

from repro.core.gbd import gbd_local
from repro.core.search import (
    DatabaseIndex,
    OfflineModel,
    build_offline,
    search,
)
from repro.datasets.generators import GREC_LITE, make_dataset
from tests.fixtures import random_graph


@pytest.fixture(scope="module")
def small_db():
    db = {i: random_graph(6 + (i % 3), 0.4, 4, 3, i) for i in range(20)}
    return db


@pytest.fixture(scope="module")
def offline(spark, small_db):
    return build_offline(
        spark, small_db, tau_hat=3, n_vlabels=4, n_elabels=3,
        n_pairs=150, seed=0,
    )


@pytest.fixture(scope="module")
def index(spark, small_db):
    idx = DatabaseIndex.build(spark, small_db)
    yield idx
    idx.unpersist()


class TestOfflineModel:
    def test_tables_built_for_all_sizes(self, offline, small_db):
        for n in {g.n for g in small_db.values()}:
            assert n in offline.lam1
            assert n in offline.ged_prior

    def test_lam1_rows_are_distributions(self, offline):
        for v, tab in offline.lam1.items():
            for tau in range(offline.tau_hat + 1):
                assert tab[tau].sum() == pytest.approx(1.0, rel=1e-6), (
                    v,
                    tau,
                )

    def test_ged_prior_normalized(self, offline):
        for v, p in offline.ged_prior.items():
            assert p.sum() == pytest.approx(1.0)

    def test_score_in_unit_interval(self, offline):
        for v in offline.lam1:
            for phi in range(0, 3 * offline.tau_hat + 2):
                s = offline.score(v, phi)
                assert 0.0 <= s <= 1.0

    def test_score_zero_far_phi(self, offline):
        v = next(iter(offline.lam1))
        assert offline.score(v, 3 * offline.tau_hat + 5) == 0.0

    def test_score_decreasing_trend(self, offline):
        """Φ at φ=0 (identical branch multisets) ≥ Φ at large φ."""
        v = next(iter(offline.lam1))
        assert offline.score(v, 0) >= offline.score(v, 3 * offline.tau_hat)

    def test_ensure_size_lazy(self, offline):
        big = 30
        assert big not in offline.lam1
        offline.ensure_size(big)
        assert big in offline.lam1 and big in offline.ged_prior


class TestSearch:
    def test_self_query_has_top_score(self, spark, small_db, index, offline):
        q = small_db[5]
        res = search(spark, q, index, offline, gamma=0.0).toPandas()
        assert set(res.columns) == {"gid", "gbd", "phi_score"}
        by_gid = res.set_index("gid")
        assert by_gid.loc[5, "gbd"] == 0
        assert by_gid.loc[5, "phi_score"] == res["phi_score"].max()

    def test_gbd_matches_local(self, spark, small_db, index, offline):
        q = random_graph(7, 0.4, 4, 3, 777)
        res = search(spark, q, index, offline, gamma=0.0).toPandas()
        got = dict(zip(res["gid"], res["gbd"]))
        for gid, g in small_db.items():
            assert got[gid] == gbd_local(q, g)

    def test_gamma_filters(self, spark, small_db, index, offline):
        q = small_db[0]
        all_rows = search(spark, q, index, offline, gamma=0.0).count()
        some_rows = search(spark, q, index, offline, gamma=0.5).count()
        assert some_rows <= all_rows

    def test_monotone_in_gamma(self, spark, small_db, index, offline):
        q = small_db[11]
        counts = [
            search(spark, q, index, offline, gamma=g).count()
            for g in (0.2, 0.5, 0.8)
        ]
        assert counts == sorted(counts, reverse=True)

    def test_query_larger_than_db(self, spark, small_db, index, offline):
        q = random_graph(15, 0.3, 4, 3, 42)
        res = search(spark, q, index, offline, gamma=0.0).toPandas()
        assert len(res) == len(small_db)


class TestOnRealisticDataset:
    def test_grec_lite_end_to_end(self, spark):
        db, queries = make_dataset(GREC_LITE, seed=0)
        sub_db = {k: db[k] for k in list(db)[:30]}
        model = build_offline(
            spark, sub_db, tau_hat=2,
            n_vlabels=GREC_LITE.n_vlabels, n_elabels=GREC_LITE.n_elabels,
            n_pairs=100, seed=0,
        )
        idx = DatabaseIndex.build(spark, sub_db)
        try:
            q = next(iter(queries.values()))
            res = search(spark, q, idx, model, gamma=0.5).toPandas()
            assert (res["phi_score"] >= 0.5).all()
        finally:
            idx.unpersist()
