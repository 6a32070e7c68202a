"""Tests for the embedding matcher — cover sets, counts, extensions —
cross-checked against brute-force subgraph enumeration."""
import pytest

from repro.graphdb.model import make_graph
from repro.isomorphism.bruteforce import (
    canonical_form_bruteforce,
    connected_edge_subsets,
    induced_subgraph,
)
from repro.isomorphism.dfscode import code_to_graph, is_min, min_code_of_graph
from repro.isomorphism.matcher import (
    MatchResult,
    contains,
    cover_set,
    iter_embeddings,
    match_stats,
)
from tests.helpers import random_connected_graph


class TestBasics:
    def test_single_edge_in_triangle(self):
        tri = make_graph(0, ["C", "C", "C"], [(0, 1), (1, 2), (0, 2)])
        p = min_code_of_graph(make_graph(-1, ["C", "C"], [(0, 1)]))
        ms = match_stats(p, tri)
        assert ms.n_embeddings == 6  # 3 edges x 2 orientations
        assert ms.covered_eids == {0, 1, 2}

    def test_no_match_wrong_label(self):
        g = make_graph(0, ["C", "C"], [(0, 1)])
        p = min_code_of_graph(make_graph(-1, ["C", "N"], [(0, 1)]))
        assert match_stats(p, g).n_embeddings == 0
        assert not contains(g, p)

    def test_edge_label_respected(self):
        g = make_graph(0, ["C", "C"], [(0, 1, "1")])
        p = min_code_of_graph(make_graph(-1, ["C", "C"], [(0, 1, "2")]))
        assert not contains(g, p)

    def test_injectivity(self):
        # pattern C-C-C needs 3 distinct vertices; a single C-C edge has 2
        g = make_graph(0, ["C", "C"], [(0, 1)])
        p = min_code_of_graph(make_graph(-1, ["C"] * 3, [(0, 1), (1, 2)]))
        assert match_stats(p, g).n_embeddings == 0

    def test_backward_edge_matching(self):
        tri = make_graph(0, ["C", "C", "C"], [(0, 1), (1, 2), (0, 2)])
        code = min_code_of_graph(tri)
        ms = match_stats(code, tri)
        assert ms.n_embeddings == 6  # automorphisms of labeled triangle
        assert ms.covered_eids == {0, 1, 2}

    def test_truncation_flag(self):
        # near-clique of identical labels: tiny cap must trigger
        g = make_graph(0, ["C"] * 5, [(u, v) for u in range(5) for v in range(u + 1, 5)])
        p = min_code_of_graph(make_graph(-1, ["C", "C"], [(0, 1)]))
        ms = match_stats(p, g, max_emb=3)
        assert ms.truncated and ms.n_embeddings == 3

    def test_iter_embeddings_yields_consistent_edges(self):
        tri = make_graph(0, ["C", "C", "N"], [(0, 1), (1, 2), (0, 2)])
        p = min_code_of_graph(make_graph(-1, ["C", "N"], [(0, 1)]))
        for vmap, eids in iter_embeddings(p, tri):
            assert len(vmap) == 2 and len(eids) == 1
            u, v, _ = tri.edges[eids[0]]
            assert {u, v} == set(vmap)


def _bruteforce_match(pattern_code, g):
    """Reference: occurrences of a pattern as connected edge subsets."""
    pcanon = canonical_form_bruteforce(code_to_graph(pattern_code))
    m = len(pattern_code)
    occ = [
        es
        for es in connected_edge_subsets(g, m)
        if len(es) == m and canonical_form_bruteforce(induced_subgraph(g, es)) == pcanon
    ]
    cover = set().union(*occ) if occ else set()
    return occ, cover


class TestVsBruteForce:
    @pytest.mark.parametrize("seed", range(30))
    def test_cover_sets_match(self, seed):
        g = random_connected_graph(seed, n_min=4, n_max=7)
        # patterns: every distinct <=3-edge subgraph of a *different* graph
        pg = random_connected_graph(seed + 123, n_min=3, n_max=6)
        codes = {
            min_code_of_graph(induced_subgraph(pg, es))
            for es in connected_edge_subsets(pg, 3)
        }
        for code in sorted(codes, key=len)[:12]:
            _, bf_cover = _bruteforce_match(code, g)
            assert cover_set(code, g) == bf_cover

    @pytest.mark.parametrize("seed", range(15))
    def test_embedding_existence_matches(self, seed):
        g = random_connected_graph(seed, n_min=4, n_max=7)
        pg = random_connected_graph(seed + 77, n_min=3, n_max=5)
        for es in connected_edge_subsets(pg, 2):
            code = min_code_of_graph(induced_subgraph(pg, es))
            occ, _ = _bruteforce_match(code, g)
            assert contains(g, code) == bool(occ)


class TestExtensions:
    @pytest.mark.parametrize("seed", range(20))
    def test_extensions_are_real_children(self, seed):
        """Every minimal extension corresponds to an actual occurrence of the
        child pattern in the graph."""
        g = random_connected_graph(seed, n_min=4, n_max=7)
        p = min_code_of_graph(make_graph(-1, ["C", "C"], [(0, 1)]))
        ms = match_stats(p, g)
        for ext in ms.extensions:
            child = p + (ext,)
            if is_min(child):
                assert contains(g, child)

    @pytest.mark.parametrize("seed", range(20))
    def test_every_child_occurrence_has_an_extension(self, seed):
        """Completeness: if a 2-edge pattern occurs in g, some 1-edge parent
        must report an extension leading to it."""
        g = random_connected_graph(seed, n_min=4, n_max=7)
        two_edge_codes = {
            min_code_of_graph(induced_subgraph(g, es))
            for es in connected_edge_subsets(g, 2)
            if len(es) == 2
        }
        produced = set()
        one_edge_codes = {
            min_code_of_graph(induced_subgraph(g, es))
            for es in connected_edge_subsets(g, 1)
        }
        for p in one_edge_codes:
            for ext in match_stats(p, g).extensions:
                child = p + (ext,)
                if is_min(child):
                    produced.add(child)
        assert two_edge_codes <= produced

    def test_prefilter_short_circuits(self):
        g = make_graph(0, ["C", "C"], [(0, 1)])
        p = min_code_of_graph(make_graph(-1, ["S", "S"], [(0, 1)]))
        assert match_stats(p, g) == MatchResult(0, set(), set(), False)
