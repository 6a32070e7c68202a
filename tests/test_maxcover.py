"""Tests for the greedy and exact max-k-cover solvers."""
from itertools import combinations

import numpy as np
import pytest

from repro.maxcover.exact import exact_max_cover
from repro.maxcover.greedy import greedy_max_cover


def _random_instance(seed, n_sets=10, universe=30, max_size=8):
    rng = np.random.default_rng(seed)
    return {
        f"s{i}": frozenset(
            int(x) for x in rng.choice(universe, size=rng.integers(1, max_size + 1), replace=False)
        )
        for i in range(n_sets)
    }


def _exhaustive(sets, k):
    best = 0
    for combo in combinations(sets.values(), min(k, len(sets))):
        best = max(best, len(frozenset().union(*combo)))
    return best


class TestGreedy:
    def test_simple_pick(self):
        sets = {"a": frozenset({1, 2, 3}), "b": frozenset({3, 4}), "c": frozenset({5})}
        chosen, cov = greedy_max_cover(sets, 2)
        # 'a' first; then 'b' and 'c' tie with gain 1 — insertion order wins
        assert chosen == ["a", "b"] and cov == {1, 2, 3, 4}

    def test_stops_when_no_gain(self):
        sets = {"a": frozenset({1}), "b": frozenset({1})}
        chosen, cov = greedy_max_cover(sets, 2)
        assert chosen == ["a"] and cov == {1}

    def test_k_zero(self):
        assert greedy_max_cover({"a": frozenset({1})}, 0) == ([], set())

    def test_deterministic_tiebreak_by_insertion_order(self):
        sets = {"b": frozenset({1, 2}), "a": frozenset({3, 4})}
        chosen, _ = greedy_max_cover(sets, 1)
        assert chosen == ["b"]

    @pytest.mark.parametrize("seed", range(25))
    def test_greedy_within_1_minus_1_over_e_of_opt(self, seed):
        sets = _random_instance(seed)
        for k in (1, 3):
            _, cov = greedy_max_cover(sets, k)
            opt = _exhaustive(sets, k)
            assert len(cov) >= (1 - 1 / np.e) * opt - 1e-9


class TestExact:
    @pytest.mark.parametrize("seed", range(25))
    def test_exact_equals_exhaustive(self, seed):
        sets = _random_instance(seed, n_sets=9)
        for k in (1, 2, 4):
            _, cov = exact_max_cover(sets, k)
            assert len(cov) == _exhaustive(sets, k)

    def test_exact_at_least_greedy(self):
        for seed in range(10):
            sets = _random_instance(seed)
            _, g = greedy_max_cover(sets, 3)
            _, e = exact_max_cover(sets, 3)
            assert len(e) >= len(g)

    def test_handles_duplicates_and_subsets(self):
        sets = {
            "a": frozenset({1, 2}),
            "b": frozenset({1, 2}),
            "c": frozenset({1}),
            "d": frozenset({3}),
        }
        keys, cov = exact_max_cover(sets, 2)
        assert cov == {1, 2, 3} and len(keys) == 2

    def test_empty_sets_ignored(self):
        keys, cov = exact_max_cover({"a": frozenset(), "b": frozenset({1})}, 2)
        assert keys == ["b"] and cov == {1}
