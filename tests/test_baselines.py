"""Baseline (ALL_g / ALL_t / FSG_g / FSG_t / OPT) behaviour tests."""
import pytest

from repro.core.baselines import (
    all_g,
    all_t,
    enumerate_cover_sets,
    fsg_g,
    fsg_t,
    opt_exact,
)
from repro.graphdb.model import edge_key
from repro.isomorphism.bruteforce import distinct_patterns_bruteforce
from repro.maxcover.greedy import greedy_max_cover

K, E_MAX = 3, 3


class TestEnumerateCoverSets:
    def test_matches_bruteforce_sets(self, spark, tiny_mol_db, tiny_edges):
        sets, timed_out = enumerate_cover_sets(spark, tiny_edges, e_max=2)
        assert not timed_out
        bf = distinct_patterns_bruteforce(tiny_mol_db, 2)
        assert len(sets) == len(bf)
        bf_covers = set()
        for occ in bf.values():
            cov = set()
            for gid, esets in occ.items():
                for es in esets:
                    cov |= {edge_key(gid, e) for e in es}
            bf_covers.add(frozenset(cov))
        assert set(sets.values()) == bf_covers

    def test_frequent_sets_subset(self, spark, tiny_edges):
        all_sets, _ = enumerate_cover_sets(spark, tiny_edges, e_max=2)
        freq_sets, _ = enumerate_cover_sets(spark, tiny_edges, e_max=2, min_support_frac=0.5)
        assert set(freq_sets) < set(all_sets)


class TestAlgorithms:
    def test_all_g_equals_greedy_over_sets(self, spark, tiny_edges):
        sets, _ = enumerate_cover_sets(spark, tiny_edges, e_max=E_MAX)
        _, cov = greedy_max_cover(sets, K)
        r = all_g(spark, tiny_edges, k=K, e_max=E_MAX)
        assert r.coverage == len(cov)

    def test_all_g_tracks_candidate_memory(self, spark, tiny_edges):
        r = all_g(spark, tiny_edges, k=K, e_max=E_MAX)
        assert r.stored_candidate_bytes > 0 and r.n_enumerated > 0

    def test_fsg_g_enumerates_fewer(self, spark, tiny_edges):
        ra = all_g(spark, tiny_edges, k=K, e_max=E_MAX)
        rf = fsg_g(spark, tiny_edges, k=K, e_max=E_MAX, sup_min=0.5)
        assert rf.n_enumerated < ra.n_enumerated
        assert rf.coverage <= ra.coverage

    def test_all_t_uses_swaps(self, spark, tiny_edges):
        r = all_t(spark, tiny_edges, k=K, e_max=E_MAX)
        assert r.index_size_bytes > 0
        assert len(r.patterns) <= K

    def test_fsg_t_runs(self, spark, tiny_edges):
        r = fsg_t(spark, tiny_edges, k=K, e_max=E_MAX, sup_min=0.3)
        assert 0 < r.coverage <= r.total_edges

    def test_opt_dominates_all(self, spark, tiny_edges):
        opt = opt_exact(spark, tiny_edges, k=K, e_max=E_MAX)
        for r in (
            all_g(spark, tiny_edges, k=K, e_max=E_MAX),
            all_t(spark, tiny_edges, k=K, e_max=E_MAX),
            fsg_g(spark, tiny_edges, k=K, e_max=E_MAX, sup_min=0.3),
            fsg_t(spark, tiny_edges, k=K, e_max=E_MAX, sup_min=0.3),
        ):
            assert r.coverage <= opt.coverage

    def test_greedy_all_g_within_bound_of_opt(self, spark, tiny_edges):
        opt = opt_exact(spark, tiny_edges, k=K, e_max=E_MAX)
        r = all_g(spark, tiny_edges, k=K, e_max=E_MAX)
        assert r.coverage >= (1 - 1 / 2.718281828) * opt.coverage

    def test_time_limit_reports_inf(self, spark, tiny_edges):
        r = all_g(spark, tiny_edges, k=K, e_max=4, time_limit_s=0.0)
        assert r.timed_out and r.row()["time_s"] == "INF"

    def test_result_row_shape(self, spark, tiny_edges):
        row = all_g(spark, tiny_edges, k=K, e_max=2).row()
        assert {"algo", "coverage_rate", "time_s"} <= set(row)
