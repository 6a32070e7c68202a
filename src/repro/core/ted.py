"""The TED framework — Algorithm 3 plus the two optimizations of Section 5.

Variants (paper Section 7 naming):

- ``base``: TED_BASE — level-synchronous enumeration with integrated
  swap-based PatternMaintain; only k patterns (plus one frontier) in memory.
- ``prm``:  BASE + Promising Right-Most Extension (Definition 7) — subtrees
  whose best-possible descendant benefit cannot beat the swap threshold are
  never extended.
- ``ips``:  BASE + Initial Pattern Selection — initial P comes from a
  BFS-style greedy walk over the level-1 roots instead of the first k
  enumerated subgraphs.
- ``ted``:  PRM + IPS (the complete algorithm).

Approximation (Theorem 4): coverage >= OPT/4 under the swap strategy; the
guarantee is independent of stream order, so the level-synchronous stream
(DESIGN.md §3.2) preserves it.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession

from repro.core.maintain import PatternMaintainer
from repro.core.result import AlgoResult
from repro.enumeration.distributed import PatternLevelStats, match_level
from repro.enumeration.gspan import CODE_KEY, enumerate_gspan, level1_codes
from repro.graphdb.spark_io import per_graph_edge_counts
from repro.isomorphism.dfscode import DFSCode, is_min
from repro.isomorphism.matcher import DEFAULT_MAX_EMB

VARIANTS = ("base", "prm", "ips", "ted")


def ips_initial_patterns(
    spark: SparkSession,
    edges: DataFrame,
    *,
    k: int,
    e_max: int,
    e_min: int = 1,
    max_emb: int = DEFAULT_MAX_EMB,
) -> list[tuple[DFSCode, frozenset[int]]]:
    """Initial Pattern Selection (Section 5.2).

    One greedy chain per level-1 root: repeatedly extend to the child with
    the highest coverage while coverage strictly improves (and |E| < E_max).
    All chains advance together, so each BFS depth is a single Spark job.
    Returns the top-k chain results by coverage as (code, cover) pairs.
    """
    roots = level1_codes(edges)
    root_stats = match_level(spark, edges, roots, want_extensions=True, max_emb=max_emb)
    # chain state: (current stats, done?)
    chains: list[PatternLevelStats] = [ps for ps in root_stats if ps.support > 0]
    active = [ps for ps in chains if len(ps.code) < e_max and ps.extensions]
    settled = [ps for ps in chains if ps not in active]
    while active:
        # one job for every chain's candidate children
        cand_codes: list[DFSCode] = []
        owners: list[int] = []
        for ci, ps in enumerate(active):
            for ext in sorted(ps.extensions):
                child = ps.code + (ext,)
                if is_min(child):
                    cand_codes.append(child)
                    owners.append(ci)
        if not cand_codes:
            settled.extend(active)
            break
        child_stats = match_level(
            spark, edges, cand_codes, want_extensions=True, max_emb=max_emb
        )
        best: dict[int, PatternLevelStats] = {}
        for ci, cs in zip(owners, child_stats):
            cur = best.get(ci)
            if cur is None or cs.coverage > cur.coverage or (
                cs.coverage == cur.coverage and CODE_KEY(cs.code) < CODE_KEY(cur.code)
            ):
                best[ci] = cs
        next_active = []
        for ci, ps in enumerate(active):
            ch = best.get(ci)
            if ch is not None and ch.coverage > ps.coverage:
                if len(ch.code) < e_max and ch.extensions:
                    next_active.append(ch)
                else:
                    settled.append(ch)
            else:
                settled.append(ps)  # no improving child — chain done
        active = next_active
    settled.sort(key=lambda ps: (-ps.coverage, CODE_KEY(ps.code)))
    picked: list[tuple[DFSCode, frozenset[int]]] = []
    seen: set[DFSCode] = set()
    for ps in settled:
        if len(ps.code) < e_min:
            continue
        if ps.code not in seen:
            seen.add(ps.code)
            picked.append((ps.code, ps.cover))
        if len(picked) == k:
            break
    return picked


def ted(
    spark: SparkSession,
    edges: DataFrame,
    *,
    k: int,
    e_max: int,
    e_min: int = 1,
    alpha: float = 1.0,
    variant: str = "ted",
    max_emb: int = DEFAULT_MAX_EMB,
    time_limit_s: float | None = None,
) -> AlgoResult:
    """Run a TED variant and return its result + instrumentation.

    ``e_min`` is the VINCENT pattern budget's minimum pattern size
    (Section 6.2 MinE): patterns with fewer edges are traversed but not
    eligible for P. The discovery problem itself (Definition 3) has no
    minimum, so ``e_min=1`` is the default everywhere except the VQF
    studies."""
    if variant not in VARIANTS:
        raise ValueError(f"variant must be one of {VARIANTS}")
    use_prm = variant in ("prm", "ted")
    use_ips = variant in ("ips", "ted")
    t0 = time.perf_counter()

    edge_counts = per_graph_edge_counts(edges)
    total_edges = sum(edge_counts.values())
    maintainer = PatternMaintainer(k=k, alpha=alpha)

    if use_ips:
        for code, cover in ips_initial_patterns(
            spark, edges, k=k, e_max=e_max, e_min=e_min, max_emb=max_emb
        ):
            maintainer.offer(code, cover)

    def visitor(ps: PatternLevelStats) -> None:
        if len(ps.code) < e_min:  # below the pattern budget's MinE
            return
        if ps.code in maintainer:  # already in P (seeded by IPS)
            return
        maintainer.offer(ps.code, ps.cover)

    def prm_filter(ps: PatternLevelStats) -> bool:
        # Definition 7: extend only if even covering every currently
        # uncovered edge of the graphs containing g could beat the swap
        # threshold. Before P is full there is no threshold — always extend.
        if len(maintainer) < k:
            return True
        covered = maintainer.index.covered_per_graph
        bound = sum(edge_counts[g] - covered.get(g, 0) for g in ps.support_gids)
        return bound >= maintainer.swap_threshold()

    enum_stats = enumerate_gspan(
        spark,
        edges,
        e_max=e_max,
        min_support_frac=0.0,
        visitor=visitor,
        extend_filter=prm_filter if use_prm else None,
        max_emb=max_emb,
        time_limit_s=time_limit_s,
    )
    elapsed = time.perf_counter() - t0
    idx = maintainer.index
    return AlgoResult(
        name={"base": "BASE", "prm": "PRM", "ips": "IPS", "ted": "TED"}[variant],
        patterns=maintainer.patterns,
        coverage=idx.cov_total,
        total_edges=total_edges,
        elapsed_s=elapsed,
        timed_out=enum_stats.timed_out,
        index_time_s=idx.maintenance_time_s,
        index_size_bytes=idx.estimated_size_bytes(),
        n_enumerated=enum_stats.n_visited,
        n_pruned=enum_stats.n_pruned_filter,
        n_swaps=maintainer.stats.n_swaps,
        extra={
            "alpha": alpha,
            "k": k,
            "e_max": e_max,
            "levels": enum_stats.levels,
            "peak_frontier": enum_stats.peak_frontier,
            "truncated": enum_stats.truncated,
        },
    )


def coverage_of_patterns(
    spark: SparkSession,
    edges: DataFrame,
    codes: list[DFSCode],
    *,
    max_emb: int = DEFAULT_MAX_EMB,
) -> tuple[int, frozenset[int]]:
    """Recompute ``|Cov(P, D)|`` for a fixed pattern set with one Spark job —
    the independent check that the incrementally-maintained PES total is
    right (used by tests and the jobs' verification output)."""
    stats = match_level(spark, edges, codes, want_extensions=False, max_emb=max_emb)
    cover: set[int] = set()
    for ps in stats:
        cover |= ps.cover
    return len(cover), frozenset(cover)
