"""PES-Index (Private-Edge-Set Index) — Section 4.2.

Maintains, for the current pattern set P over database D:

- ``cov_total``      — |Cov(P, D)|;
- ``pcov[p]``        — |pCov(p)| = edges covered only by ``p``;
- ``rcov[e]``        — reverse cover set: patterns covering edge ``e``;
- ``rcnt[i]``        — patterns whose private coverage is ``i``;
- ``p_min``          — a pattern with minimum private coverage (via SELECT).

Operations INSERT / DELETE / UPDATE / SELECT follow the paper; SELECT yields
the minimum loss score ``Score_L = |pCov(p_min)|`` in O(#distinct buckets),
and the benefit score of a candidate is a membership scan of its cover set.
Edges are global ``edge_key(gid, eid)`` ints; per-graph covered counts are
maintained incrementally for the PRM bounds (Definition 7).

Wall-clock spent inside the index and its estimated footprint feed the
paper's Tables 3–4.
"""
from __future__ import annotations

import time
from typing import Hashable, Iterable

from repro.graphdb.model import split_edge_key

PatternKey = Hashable


class PESIndex:
    """Incremental private-edge-set index over the current pattern set."""

    def __init__(self) -> None:
        self.cover_sets: dict[PatternKey, frozenset[int]] = {}
        self.rcov: dict[int, set[PatternKey]] = {}
        self.pcov: dict[PatternKey, int] = {}
        self.rcnt: dict[int, set[PatternKey]] = {}
        self.cov_total: int = 0
        self.covered_per_graph: dict[int, int] = {}
        self.maintenance_time_s: float = 0.0

    # -- internal helpers --------------------------------------------------
    def _move_rcnt(self, p: PatternKey, old: int, new: int) -> None:
        bucket = self.rcnt.get(old)
        if bucket is not None:
            bucket.discard(p)
            if not bucket:
                del self.rcnt[old]
        self.rcnt.setdefault(new, set()).add(p)

    def _bump_graph(self, e: int, delta: int) -> None:
        gid = split_edge_key(e)[0]
        n = self.covered_per_graph.get(gid, 0) + delta
        if n:
            self.covered_per_graph[gid] = n
        else:
            self.covered_per_graph.pop(gid, None)

    # -- operations --------------------------------------------------------
    def insert(self, p: PatternKey, cover: Iterable[int]) -> None:
        """INSERT: add pattern ``p`` with cover set ``cover`` to P."""
        t0 = time.perf_counter()
        cover = frozenset(cover)
        assert p not in self.cover_sets, "pattern already indexed"
        self.cover_sets[p] = cover
        private = 0
        for e in cover:
            s = self.rcov.setdefault(e, set())
            s.add(p)
            if len(s) == 1:  # e newly covered — private to p
                private += 1
                self.cov_total += 1
                self._bump_graph(e, +1)
            elif len(s) == 2:  # the one other owner loses privacy
                (other,) = s - {p}
                old = self.pcov[other]
                self.pcov[other] = old - 1
                self._move_rcnt(other, old, old - 1)
        self.pcov[p] = private
        self.rcnt.setdefault(private, set()).add(p)
        self.maintenance_time_s += time.perf_counter() - t0

    def delete(self, p: PatternKey) -> None:
        """DELETE: remove pattern ``p`` from P."""
        t0 = time.perf_counter()
        cover = self.cover_sets.pop(p)
        old = self.pcov.pop(p)
        bucket = self.rcnt[old]
        bucket.discard(p)
        if not bucket:
            del self.rcnt[old]
        for e in cover:
            s = self.rcov[e]
            s.remove(p)
            if not s:  # e now uncovered
                del self.rcov[e]
                self.cov_total -= 1
                self._bump_graph(e, -1)
            elif len(s) == 1:  # sole remaining owner gains privacy
                (other,) = s
                old = self.pcov[other]
                self.pcov[other] = old + 1
                self._move_rcnt(other, old, old + 1)
        self.maintenance_time_s += time.perf_counter() - t0

    def update(self, p_out: PatternKey, p_in: PatternKey, cover_in: Iterable[int]) -> None:
        """UPDATE = DELETE(p_out) then INSERT(p_in) — the swap."""
        self.delete(p_out)
        self.insert(p_in, cover_in)

    def select(self) -> tuple[int, PatternKey]:
        """SELECT: ``(Score_L, p_t)`` — the minimum private coverage and a
        pattern attaining it (deterministic tie-break for reproducibility)."""
        t0 = time.perf_counter()
        assert self.pcov, "SELECT on an empty pattern set"
        i = min(self.rcnt)  # few distinct buckets (<= |P|)
        p_min = min(self.rcnt[i], key=repr)
        self.maintenance_time_s += time.perf_counter() - t0
        return i, p_min

    def benefit(self, cover: Iterable[int]) -> int:
        """``Score_B`` of a candidate: its cover edges not covered by P."""
        t0 = time.perf_counter()
        rc = self.rcov
        b = sum(1 for e in cover if e not in rc)
        self.maintenance_time_s += time.perf_counter() - t0
        return b

    # -- instrumentation ---------------------------------------------------
    def estimated_size_bytes(self) -> int:
        """Footprint of the five index components (Table 3).

        8 bytes per stored integer / reference: rcov dominates with one key
        per covered edge plus one reference per (edge, pattern) incidence —
        matching the paper's O(max(E(G))·|D|) space bound. ``cover_sets`` is
        an access-path duplicate of rcov's incidences and is not counted
        twice.
        """
        rcov_bytes = sum(8 + 8 * len(s) for s in self.rcov.values())
        pcov_bytes = 16 * len(self.pcov)
        rcnt_bytes = sum(8 + 8 * len(s) for s in self.rcnt.values())
        return 8 + rcov_bytes + pcov_bytes + rcnt_bytes + 8  # cov_total + p_min

    def loss_score_naive(self, p: PatternKey) -> int:
        """Definition-4 loss score recomputed from scratch — test oracle."""
        others = set().union(*(c for q, c in self.cover_sets.items() if q != p)) if len(self.cover_sets) > 1 else set()
        return len(self.cover_sets[p] - others)
