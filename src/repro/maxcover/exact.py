"""Exact max-k-cover by branch and bound — the OPT reference.

Used only on small databases (the paper's Figure 13 compares against the
optimal solution on PubChem100 / AIDS100). Sets are deduplicated and
dominated sets (subsets of another set) removed first; the bound adds the
``k - depth`` largest remaining set sizes.
"""
from __future__ import annotations

from typing import Hashable


def exact_max_cover(
    sets: dict[Hashable, frozenset[int]], k: int
) -> tuple[list[Hashable], set[int]]:
    """Optimal coverage over all <=k-subsets of ``sets``. Exponential —
    keep the (deduplicated) candidate count small."""
    # Dedup identical sets; drop dominated ones (strict subsets of another).
    uniq: dict[frozenset[int], Hashable] = {}
    for key, s in sets.items():
        if s and s not in uniq:
            uniq[s] = key
    items = sorted(uniq.items(), key=lambda kv: -len(kv[0]))
    pruned: list[tuple[frozenset[int], Hashable]] = []
    for s, key in items:
        if not any(s < t for t, _ in pruned):
            pruned.append((s, key))
    sizes = [len(s) for s, _ in pruned]

    # Seed the incumbent with the greedy solution — tightens the bound from
    # the start and keeps branch-and-bound tractable on hundreds of sets.
    from repro.maxcover.greedy import greedy_max_cover

    best_keys, best_cov = greedy_max_cover({k: s for s, k in pruned}, k)

    def rec(idx: int, picked: list[Hashable], covered: set[int], slots: int) -> None:
        nonlocal best_cov, best_keys
        if len(covered) > len(best_cov):
            best_cov, best_keys = set(covered), list(picked)
        if slots == 0 or idx >= len(pruned):
            return
        # Upper bound: current coverage + sizes of the `slots` largest
        # remaining sets (sizes is sorted desc, so a slice suffices).
        if len(covered) + sum(sizes[idx : idx + slots]) <= len(best_cov):
            return
        s, key = pruned[idx]
        gain = s - covered
        if gain:  # branch 1: take it
            rec(idx + 1, picked + [key], covered | s, slots - 1)
        rec(idx + 1, picked, covered, slots)  # branch 2: skip it

    rec(0, [], set(), k)
    return best_keys, best_cov
