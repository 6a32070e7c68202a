"""Tests for PatternMaintain (Algorithm 3 lines 8-16) and the swap
criteria Swap_1 / Swap_2 / Swap_alpha."""
import pytest

from repro.core.maintain import PatternMaintainer


def f(*xs):
    return frozenset(xs)


class TestFillPhase:
    def test_first_k_always_accepted(self):
        m = PatternMaintainer(k=3)
        assert m.offer("a", f(1)) and m.offer("b", f(2)) and m.offer("c", f(3))
        assert len(m) == 3 and m.stats.n_inserted == 3

    def test_patterns_property_order(self):
        m = PatternMaintainer(k=2)
        m.offer("a", f(1))
        m.offer("b", f(2))
        assert m.patterns == ["a", "b"]


class TestSwapCriterion:
    def test_swap1_accepts_when_benefit_exceeds_twice_loss(self):
        m = PatternMaintainer(k=2, alpha=1.0)  # Swap_1: b > 2*loss
        m.offer("a", f(1))
        m.offer("b", f(2, 3, 4))
        # loss(a)=1 -> threshold 2; candidate with 3 new edges passes
        assert m.offer("c", f(5, 6, 7))
        assert "a" not in m and "c" in m
        assert m.stats.n_swaps == 1

    def test_swap1_rejects_at_threshold(self):
        m = PatternMaintainer(k=2, alpha=1.0)
        m.offer("a", f(1))
        m.offer("b", f(2, 3, 4))
        # benefit 2 == 2*loss 2 -> strict inequality fails
        assert not m.offer("c", f(5, 6))
        assert m.stats.n_rejected == 1

    def test_swap2_uses_average_coverage(self):
        m = PatternMaintainer(k=2, alpha=0.0)  # Swap_2: b > loss + cov/k
        m.offer("a", f(1))
        m.offer("b", f(2, 3, 4))
        # cov=4, k=2 -> avg 2; loss(a)=1 -> threshold 3
        assert not m.offer("c", f(5, 6, 7))        # benefit 3: rejected
        assert m.offer("d", f(5, 6, 7, 8))         # benefit 4: accepted
        assert "a" not in m

    def test_swap_alpha_between(self):
        m = PatternMaintainer(k=2, alpha=0.5)
        m.offer("a", f(1))
        m.offer("b", f(2, 3, 4))
        # threshold = 1.5*1 + 0.5*4/2 = 2.5
        assert not m.offer("c", f(5, 6))
        assert m.offer("d", f(5, 6, 7))

    def test_coverage_monotone_under_swaps(self):
        m = PatternMaintainer(k=2, alpha=1.0)
        m.offer("a", f(1))
        m.offer("b", f(2))
        before = m.coverage
        m.offer("c", f(3, 4, 5))
        assert m.coverage >= before

    def test_swap_threshold_exposed(self):
        m = PatternMaintainer(k=2, alpha=1.0)
        m.offer("a", f(1))
        m.offer("b", f(2, 3))
        assert m.swap_threshold() == pytest.approx(2.0)  # 2 * loss(a)=1

    def test_contains(self):
        m = PatternMaintainer(k=1)
        m.offer("a", f(1))
        assert "a" in m and "zzz" not in m
