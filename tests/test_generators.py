"""Dataset generators — shape properties per Table 2 specs."""
import numpy as np
import pytest

from repro.datasets.generators import (
    AIDS_LITE,
    FINGER_LITE,
    GREC_LITE,
    dataset_stats,
    degree_tail_exponent,
    make_dataset,
    scale_free_graph,
    uniform_random_graph,
)


class TestGraphGenerators:
    def test_connected_scale_free(self):
        g = scale_free_graph(50, 3.0, ["A", "B"], ["x", "y"], seed=0)
        assert g.n == 50
        # spanning construction guarantees connectivity: BFS reaches all.
        seen = {0}
        frontier = [0]
        while frontier:
            v = frontier.pop()
            for u in g.neighbors(v):
                if u not in seen:
                    seen.add(u)
                    frontier.append(u)
        assert len(seen) == 50

    def test_average_degree_close_to_target(self):
        for gen in (scale_free_graph, uniform_random_graph):
            g = gen(200, 4.0, ["A"], ["x"], seed=1)
            assert g.avg_degree() == pytest.approx(4.0, abs=0.5)

    def test_deterministic(self):
        a = scale_free_graph(30, 3.0, ["A", "B"], ["x"], seed=7)
        b = scale_free_graph(30, 3.0, ["A", "B"], ["x"], seed=7)
        assert a.vlabels == b.vlabels and a.edges == b.edges

    def test_scale_free_has_hubs(self):
        sf = scale_free_graph(400, 4.0, ["A"], ["x"], seed=3)
        ur = uniform_random_graph(400, 4.0, ["A"], ["x"], seed=3)
        max_sf = max(sf.degree(v) for v in range(sf.n))
        max_ur = max(ur.degree(v) for v in range(ur.n))
        assert max_sf > max_ur  # preferential attachment grows hubs

    def test_labels_from_alphabet(self):
        g = scale_free_graph(20, 2.0, ["A", "B"], ["x", "y"], seed=5)
        assert set(g.vlabels) <= {"A", "B"}
        assert set(g.edges.values()) <= {"x", "y"}


class TestDatasets:
    @pytest.mark.parametrize("spec", [AIDS_LITE, FINGER_LITE, GREC_LITE])
    def test_counts_match_spec(self, spec):
        db, queries = make_dataset(spec, seed=0)
        assert len(db) == spec.n_db
        assert len(queries) == spec.n_query

    def test_stats_in_range(self):
        db, _ = make_dataset(AIDS_LITE, seed=0)
        st = dataset_stats(db)
        assert st["V_m"] <= AIDS_LITE.size_hi
        assert st["avg_degree"] == pytest.approx(
            AIDS_LITE.avg_degree, abs=0.6
        )

    def test_queries_use_db_population(self):
        db, queries = make_dataset(GREC_LITE, seed=1)
        sizes_db = {g.n for g in db.values()}
        assert all(q.n in sizes_db for q in queries.values())

    def test_gid_spaces_disjoint(self):
        db, queries = make_dataset(FINGER_LITE, seed=2)
        assert set(db).isdisjoint(set(queries))

    def test_empty_stats(self):
        assert dataset_stats({})["count"] == 0


class TestScaleFreeness:
    def test_tail_exponent_discriminates(self):
        sf = {
            i: scale_free_graph(300, 5.0, ["A"], ["x"], seed=i)
            for i in range(5)
        }
        ur = {
            i: uniform_random_graph(300, 5.0, ["A"], ["x"], seed=i)
            for i in range(5)
        }
        assert degree_tail_exponent(sf) < degree_tail_exponent(ur)

    def test_nan_on_tiny_input(self):
        assert np.isnan(degree_tail_exponent({}))
