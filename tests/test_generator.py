"""Tests for the synthetic molecule-database generators (Table 2 substrate)."""
import pytest

from repro.graphdb.generator import ATOMS, PROFILES, molecule_db, motif_library


@pytest.mark.parametrize("name", sorted(PROFILES))
class TestProfiles:
    def test_deterministic(self, name):
        a = molecule_db(name, 10, seed=3)
        b = molecule_db(name, 10, seed=3)
        assert [(g.vlabels, g.edges) for g in a] == [(g.vlabels, g.edges) for g in b]

    def test_seed_changes_output(self, name):
        a = molecule_db(name, 10, seed=3)
        b = molecule_db(name, 10, seed=4)
        assert [(g.vlabels, g.edges) for g in a] != [(g.vlabels, g.edges) for g in b]

    def test_gids_sequential(self, name):
        db = molecule_db(name, 12, seed=0)
        assert [g.gid for g in db] == list(range(12))

    def test_all_connected(self, name):
        assert all(g.is_connected() for g in molecule_db(name, 30, seed=1))

    def test_valence_cap(self, name):
        for g in molecule_db(name, 30, seed=2):
            deg = [0] * g.n_vertices
            for u, v, _ in g.edges:
                deg[u] += 1
                deg[v] += 1
            assert max(deg) <= 6  # motif anchors can exceed 4 slightly, never 6

    def test_labels_from_atom_alphabet(self, name):
        for g in molecule_db(name, 20, seed=5):
            assert set(g.vlabels) <= set(ATOMS)

    def test_v_max_respected(self, name):
        p = PROFILES[name]
        assert all(g.n_vertices <= p.v_max + 6 for g in molecule_db(name, 50, seed=6))

    def test_avg_size_near_profile_target(self, name):
        p = PROFILES[name]
        db = molecule_db(name, 400, seed=0)
        avg = sum(g.n_vertices for g in db) / len(db)
        assert 0.7 * p.v_avg <= avg <= 1.3 * p.v_avg

    def test_carbon_dominant(self, name):
        db = molecule_db(name, 100, seed=7)
        counts = {}
        for g in db:
            for l in g.vlabels:
                counts[l] = counts.get(l, 0) + 1
        assert counts["C"] == max(counts.values())


class TestEdgeLabels:
    def test_unlabeled_profiles_use_sentinel(self):
        for g in molecule_db("aids_lite", 10, seed=0):
            assert {el for _, _, el in g.edges} == {"-"}

    def test_labeled_profile_has_bond_labels(self):
        els = {el for g in molecule_db("aidsl_lite", 30, seed=0) for _, _, el in g.edges}
        assert els <= {"1", "2"} and "1" in els


class TestMotifLibrary:
    def test_motifs_valid_and_connected(self):
        for m in motif_library():
            assert m.is_connected() and m.n_edges >= 1

    def test_labeled_variant_differs(self):
        plain = motif_library(False)
        labeled = motif_library(True)
        assert len(plain) == len(labeled)
        assert any(a.edges != b.edges for a, b in zip(plain, labeled))

    def test_benzene_ring_present(self):
        assert any(
            m.n_vertices == 6 and m.n_edges == 6 and set(m.vlabels) == {"C"}
            for m in motif_library()
        )
