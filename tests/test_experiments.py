"""Experiment harnesses — scaled-down integration tests."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments.effectiveness import (
    accuracy_vs_n,
    effectiveness_real,
    ground_truth_real,
    pairwise_gbd,
    prf,
)
from repro.experiments.suite import real_dataset, syn_all_graphs, syn_dataset
from repro.experiments.tables import dataset_graphs, table2, table3, table4
from repro.core.gbd import gbd_local
from tests.fixtures import random_graph


class TestSuite:
    def test_real_dataset_cached(self):
        a = real_dataset("GREC", 0)
        b = real_dataset("GREC", 0)
        assert a is b

    def test_syn_datasets_distinct(self):
        s1 = syn_dataset("Syn-1", 0)
        s2 = syn_dataset("Syn-2", 0)
        assert s1.scale_free and not s2.scale_free

    def test_syn_all_graphs_count(self):
        s1 = syn_dataset("Syn-1", 0)
        allg = syn_all_graphs(s1)
        assert len(allg) == sum(len(f.graphs) for f in s1.families.values())

    def test_dataset_graphs_dispatch(self):
        assert len(dataset_graphs("GREC")) == 105
        assert len(dataset_graphs("Syn-1")) == 72


class TestPrf:
    def test_perfect(self):
        assert prf({1, 2}, {1, 2}) == (1.0, 1.0, 1.0)

    def test_empty_both(self):
        assert prf(set(), set()) == (1.0, 1.0, 1.0)

    def test_empty_pred_nonempty_truth(self):
        p, r, f = prf(set(), {1})
        assert (p, r) == (1.0, 0.0) and f == 0.0

    def test_half(self):
        p, r, f = prf({1, 2}, {2, 3})
        assert p == 0.5 and r == 0.5 and f == pytest.approx(0.5)


class TestTable2:
    def test_all_rows_present(self):
        df = table2()
        assert list(df["dataset"]) == ["AIDS", "Finger", "GREC", "Syn-1", "Syn-2"]
        assert (df["|D|"] > 0).all()
        # scale-free datasets have smaller tail exponent than Syn-2.
        syn2 = df.set_index("dataset").loc["Syn-2", "tail_exp"]
        syn1 = df.set_index("dataset").loc["Syn-1", "tail_exp"]
        assert syn1 < syn2


class TestTable3:
    def test_structure(self, spark):
        df = table3(spark, n_pairs=200)
        assert set(df["dataset"]) == {"AIDS", "Finger", "GREC", "Syn-1", "Syn-2"}
        assert (df["time_s"] > 0).all()
        assert (df["space_bytes"] > 0).all()
        # Syn prior tables span φ up to ~2000 → much larger than real.
        d = df.set_index("dataset")
        assert d.loc["Syn-1", "space_bytes"] > d.loc["AIDS", "space_bytes"]


class TestTable4:
    def test_structure(self, spark):
        df = table4(spark, tau_hat=3)
        assert (df["sum_T_s"] >= df["max_T_s"]).all()
        assert (df["sum_S_bytes"] >= df["max_S_bytes"]).all()
        assert (df["n_tasks"] > 1).all()


class TestPerPairMicro:
    def test_gbd_is_fastest_per_pair(self):
        from repro.experiments.efficiency import per_pair_micro

        df = per_pair_micro(names=("GREC",), n_sample_pairs=30)
        row = df.iloc[0]
        assert row["gbd_us_per_pair"] < row["lsap_us_per_pair"]
        assert row["gbd_us_per_pair"] < row["seriation_us_per_pair"]
        assert row["gbd_us_per_pair"] < row["greedy_us_per_pair"]


class TestPairwiseGbd:
    def test_matches_local(self, spark):
        db = {i: random_graph(6, 0.4, 3, 2, i) for i in range(5)}
        qs = {10: random_graph(6, 0.4, 3, 2, 99)}
        got = pairwise_gbd(spark, qs, db)
        for gid, g in db.items():
            assert got[(10, gid)] == gbd_local(qs[10], g)


class TestGroundTruth:
    def test_grec_small(self, spark):
        truth, excluded = ground_truth_real(
            spark, "GREC", tau_max=2, n_queries=2, max_expansions=50_000
        )
        assert len(truth) == 2
        total = sum(len(t) for t in truth.values()) + excluded
        assert total == 2 * len(real_dataset("GREC", 0).db)
        # every resolved value is an int ≤ 2 or +inf.
        for t in truth.values():
            for v in t.values():
                assert v == float("inf") or (0 <= v <= 2)


class TestEffectivenessScaled:
    def test_small_sweep(self, spark):
        df = effectiveness_real(
            spark, "GREC", tau_hats=(1, 2), gammas=(0.8,), n_queries=2,
            n_pairs=150,
        )
        assert set(df["method"]) == {"gbda", "lsap", "greedy", "seriation"}
        for col in ("precision", "recall", "f1"):
            assert df[col].between(0, 1).all()

    def test_accuracy_vs_n_small(self, spark):
        df = accuracy_vs_n(
            spark, "Syn-1", tau_hats=(3,), gammas=(0.8,), seed=0
        )
        assert set(df["n"]) == set(syn_dataset("Syn-1", 0).families)
        assert df["f1"].between(0, 1).all()
