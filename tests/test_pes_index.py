"""PES-Index invariant tests: the incremental structure must always agree
with from-scratch recomputation, under arbitrary insert/delete sequences."""
import numpy as np
import pytest

from repro.core.pes_index import PESIndex
from repro.graphdb.model import edge_key


def _check_invariants(idx: PESIndex):
    """Recompute every component from the stored cover sets."""
    all_cov = set().union(*idx.cover_sets.values()) if idx.cover_sets else set()
    assert idx.cov_total == len(all_cov), "cov_total mismatch"
    # rcov: exact reverse mapping
    rcov_expect = {}
    for p, c in idx.cover_sets.items():
        for e in c:
            rcov_expect.setdefault(e, set()).add(p)
    assert idx.rcov == rcov_expect, "rcov mismatch"
    # pcov: naive private coverage
    for p in idx.cover_sets:
        assert idx.pcov[p] == idx.loss_score_naive(p), f"pcov mismatch for {p}"
    # rcnt buckets partition patterns by pcov value
    seen = set()
    for i, bucket in idx.rcnt.items():
        assert bucket, "empty rcnt bucket kept"
        for p in bucket:
            assert idx.pcov[p] == i
            seen.add(p)
    assert seen == set(idx.cover_sets)
    # per-graph covered counts
    per_graph = {}
    for e in all_cov:
        gid = e >> 20
        per_graph[gid] = per_graph.get(gid, 0) + 1
    assert idx.covered_per_graph == per_graph


def _random_cover(rng, n_graphs=4, max_edges=12):
    return frozenset(
        edge_key(int(rng.integers(0, n_graphs)), int(rng.integers(0, max_edges)))
        for _ in range(rng.integers(1, 10))
    )


class TestOperations:
    def test_insert_single(self):
        idx = PESIndex()
        idx.insert("p1", frozenset({edge_key(0, 0), edge_key(0, 1)}))
        assert idx.cov_total == 2 and idx.pcov["p1"] == 2
        _check_invariants(idx)

    def test_overlapping_insert_updates_privacy(self):
        idx = PESIndex()
        idx.insert("p1", frozenset({1, 2, 3}))
        idx.insert("p2", frozenset({3, 4}))
        assert idx.cov_total == 4
        assert idx.pcov["p1"] == 2 and idx.pcov["p2"] == 1
        _check_invariants(idx)

    def test_delete_restores_privacy(self):
        idx = PESIndex()
        idx.insert("p1", frozenset({1, 2, 3}))
        idx.insert("p2", frozenset({3, 4}))
        idx.delete("p2")
        assert idx.cov_total == 3 and idx.pcov["p1"] == 3
        _check_invariants(idx)

    def test_update_is_delete_then_insert(self):
        idx = PESIndex()
        idx.insert("p1", frozenset({1, 2}))
        idx.insert("p2", frozenset({2, 3}))
        idx.update("p1", "p3", frozenset({5, 6}))
        assert set(idx.cover_sets) == {"p2", "p3"}
        assert idx.cov_total == 4
        _check_invariants(idx)

    def test_select_returns_min_private(self):
        idx = PESIndex()
        idx.insert("a", frozenset({1, 2, 3}))
        idx.insert("b", frozenset({4}))
        idx.insert("c", frozenset({5, 6}))
        score, p = idx.select()
        assert score == 1 and p == "b"

    def test_benefit_counts_uncovered_only(self):
        idx = PESIndex()
        idx.insert("a", frozenset({1, 2}))
        assert idx.benefit(frozenset({2, 3, 4})) == 2
        assert idx.benefit(frozenset({1, 2})) == 0

    def test_insert_duplicate_pattern_asserts(self):
        idx = PESIndex()
        idx.insert("a", frozenset({1}))
        with pytest.raises(AssertionError):
            idx.insert("a", frozenset({2}))

    def test_size_estimate_grows_with_content(self):
        idx = PESIndex()
        s0 = idx.estimated_size_bytes()
        idx.insert("a", frozenset(range(50)))
        assert idx.estimated_size_bytes() > s0

    def test_maintenance_time_accumulates(self):
        idx = PESIndex()
        idx.insert("a", frozenset(range(100)))
        idx.delete("a")
        assert idx.maintenance_time_s > 0


class TestPaperExample4Shape:
    """Mirror of Example 4's arithmetic on synthetic cover sets."""

    def test_swap_example(self):
        # |pCov| = 2, 10, 8; coverage 33; benefit of newcomer 7
        idx = PESIndex()
        # build disjoint private parts + shared edges to reach the paper's values
        g1_private = frozenset(range(0, 2))
        p1_private = frozenset(range(10, 20))
        p3_private = frozenset(range(30, 38))
        shared = frozenset(range(100, 113))  # 13 shared edges, covered by all
        idx.insert("g1", g1_private | shared)
        idx.insert("p1", p1_private | shared)
        idx.insert("p3", p3_private | shared)
        assert idx.cov_total == 33
        score_l, p_t = idx.select()
        assert score_l == 2 and p_t == "g1"
        # 7 new edges + 5 edges already covered by the remaining patterns
        newcomer = frozenset(range(200, 207)) | frozenset(range(100, 105))
        assert idx.benefit(newcomer) == 7
        # Swap criterion with alpha=1: 7 > 2*2; coverage 33 -> 31 -> 38
        idx.update(p_t, "p2", newcomer)
        assert idx.cov_total == 38
        _check_invariants(idx)


@pytest.mark.parametrize("seed", range(30))
def test_random_op_sequences_keep_invariants(seed):
    rng = np.random.default_rng(seed)
    idx = PESIndex()
    live = []
    for step in range(40):
        if live and rng.random() < 0.35:
            p = live.pop(int(rng.integers(0, len(live))))
            idx.delete(p)
        else:
            p = f"p{seed}_{step}"
            idx.insert(p, _random_cover(rng))
            live.append(p)
        _check_invariants(idx)
