"""Appendix-F known-GED generator — validated against exact A* GED."""
import pytest

from repro.core.gbd import gbd_local
from repro.datasets.known_ged import make_family, make_syn
from repro.ged.exact import ged_exact


class TestFamilyConstruction:
    def test_levels_cycle(self):
        fam = make_family(30, n_graphs=8, center_degree=5, seed=0)
        d = fam.graphs[0].degree(fam.center)
        assert d >= 5
        assert fam.levels == [i % (d + 1) for i in range(8)]

    def test_known_ged_values(self):
        fam = make_family(20, n_graphs=6, center_degree=5, seed=1)
        assert fam.ged(0, 0) == 0
        assert fam.ged(0, 3) == 3
        assert fam.ged(2, 5) == 3

    def test_center_degree_enforced(self):
        fam = make_family(40, center_degree=8, seed=2)
        assert fam.graphs[0].degree(fam.center) >= 8

    def test_graphs_share_size(self):
        fam = make_family(25, n_graphs=5, seed=3)
        assert len({g.n for g in fam.graphs}) == 1

    @pytest.mark.parametrize("seed", [0, 1, 2, 3])
    def test_exact_ged_matches_construction(self, seed):
        """On small instances the A* GED equals the designed GED."""
        fam = make_family(
            8, avg_degree=2.5, n_graphs=5, center_degree=4,
            n_vlabels=4, n_elabels=3, seed=seed,
        )
        for i in range(len(fam.graphs)):
            for j in range(i, len(fam.graphs)):
                got = ged_exact(fam.graphs[i], fam.graphs[j])
                assert got == fam.ged(i, j), (seed, i, j)

    def test_gbd_tracks_ged(self):
        """Each center-edge relabel flips 2 branches (center+neighbor),
        but center-branch changes collapse into one multiset slot, so
        GBD ∈ [GED, GED+1] for this construction."""
        fam = make_family(50, n_graphs=8, center_degree=6, seed=4)
        for i in range(8):
            for j in range(i + 1, 8):
                ged = fam.ged(i, j)
                gbd = gbd_local(fam.graphs[i], fam.graphs[j])
                if ged == 0:
                    assert gbd == 0
                else:
                    assert ged <= gbd <= ged + 1, (i, j, ged, gbd)


class TestSynDatasets:
    def test_sizes_and_families(self):
        syn = make_syn("Syn-1", sizes=(50, 100), n_graphs=6, seed=0)
        assert set(syn.families) == {50, 100}
        for n, fam in syn.families.items():
            assert all(g.n == n for g in fam.graphs)
            assert len(fam.graphs) == 6

    def test_scale_free_flag(self):
        s1 = make_syn("Syn-1", sizes=(80,), scale_free=True, seed=1)
        s2 = make_syn("Syn-2", sizes=(80,), scale_free=False, seed=1)
        hub1 = max(
            s1.families[80].graphs[0].degree(v) for v in range(80)
        )
        hub2 = max(
            s2.families[80].graphs[0].degree(v) for v in range(80)
        )
        assert s1.scale_free and not s2.scale_free
        assert hub1 >= hub2

    def test_deterministic(self):
        a = make_syn("Syn-1", sizes=(60,), seed=5)
        b = make_syn("Syn-1", sizes=(60,), seed=5)
        assert a.families[60].graphs[2].edges == b.families[60].graphs[2].edges
