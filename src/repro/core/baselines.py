"""Baselines of Section 3 / Section 7: ALL_g, ALL_t, FSG_g, FSG_t, OPT.

All four materialize the candidate set S (all subgraphs, or the frequent
ones) before selecting patterns — exactly the memory behaviour the paper
criticizes; ``stored_candidate_bytes`` surfaces it. The ``_g`` variants run
greedy MaxCover (Algorithm 1), the ``_t`` variants stream the materialized
candidates through the same swap-based maintenance TED uses. ``opt_exact``
solves max-k-cover optimally (Figure 13's OPT) — small databases only.
"""
from __future__ import annotations

import time

from pyspark.sql import DataFrame, SparkSession

from repro.core.maintain import PatternMaintainer
from repro.core.result import AlgoResult
from repro.enumeration.gspan import enumerate_gspan
from repro.graphdb.spark_io import per_graph_edge_counts
from repro.isomorphism.dfscode import DFSCode
from repro.isomorphism.matcher import DEFAULT_MAX_EMB
from repro.maxcover.exact import exact_max_cover
from repro.maxcover.greedy import greedy_max_cover


def enumerate_cover_sets(
    spark: SparkSession,
    edges: DataFrame,
    *,
    e_max: int,
    min_support_frac: float = 0.0,
    max_emb: int = DEFAULT_MAX_EMB,
    time_limit_s: float | None = None,
) -> tuple[dict[DFSCode, frozenset[int]], bool]:
    """Materialize S (Algorithm 1 line 1 / Algorithm 2 line 1): every
    enumerated pattern's cover set, in DFS-code stream order. Returns
    ``(sets, timed_out)``."""
    sets: dict[DFSCode, frozenset[int]] = {}

    stats = enumerate_gspan(
        spark,
        edges,
        e_max=e_max,
        min_support_frac=min_support_frac,
        visitor=lambda ps: sets.__setitem__(ps.code, ps.cover),
        max_emb=max_emb,
        time_limit_s=time_limit_s,
    )
    return sets, stats.timed_out


def _candidate_bytes(sets: dict[DFSCode, frozenset[int]]) -> int:
    """Footprint of the materialized S: 8 bytes per stored cover-set edge
    plus the pattern codes themselves (~40 bytes per code entry)."""
    return sum(8 * len(c) + 40 * len(code) for code, c in sets.items())


def _run_materialized(
    spark: SparkSession,
    edges: DataFrame,
    *,
    name: str,
    k: int,
    e_max: int,
    min_support_frac: float,
    strategy: str,  # "greedy" | "swap" | "exact"
    alpha: float = 1.0,
    max_emb: int = DEFAULT_MAX_EMB,
    time_limit_s: float | None = None,
) -> AlgoResult:
    t0 = time.perf_counter()
    total_edges = sum(per_graph_edge_counts(edges).values())
    sets, timed_out = enumerate_cover_sets(
        spark,
        edges,
        e_max=e_max,
        min_support_frac=min_support_frac,
        max_emb=max_emb,
        time_limit_s=time_limit_s,
    )
    index_time = 0.0
    index_bytes = 0
    n_swaps = 0
    if strategy == "greedy":
        chosen, covered = greedy_max_cover(sets, k)
    elif strategy == "exact":
        chosen, covered = exact_max_cover(sets, k)
    elif strategy == "swap":
        maintainer = PatternMaintainer(k=k, alpha=alpha)
        for code, cover in sets.items():  # insertion order == stream order
            maintainer.offer(code, cover)
        chosen = maintainer.patterns
        covered = set()
        for c in chosen:
            covered |= sets[c]
        index_time = maintainer.index.maintenance_time_s
        index_bytes = maintainer.index.estimated_size_bytes()
        n_swaps = maintainer.stats.n_swaps
    else:
        raise ValueError(f"unknown strategy {strategy!r}")
    return AlgoResult(
        name=name,
        patterns=list(chosen),
        coverage=len(covered),
        total_edges=total_edges,
        elapsed_s=time.perf_counter() - t0,
        timed_out=timed_out,
        index_time_s=index_time,
        index_size_bytes=index_bytes,
        n_enumerated=len(sets),
        n_swaps=n_swaps,
        stored_candidate_bytes=_candidate_bytes(sets),
        extra={"k": k, "e_max": e_max, "sup_min": min_support_frac},
    )


def all_g(spark, edges, *, k, e_max, max_emb=DEFAULT_MAX_EMB, time_limit_s=None) -> AlgoResult:
    """Algorithm 1: enumerate all subgraphs, then greedy MaxCover."""
    return _run_materialized(
        spark, edges, name="ALL_g", k=k, e_max=e_max, min_support_frac=0.0,
        strategy="greedy", max_emb=max_emb, time_limit_s=time_limit_s,
    )


def all_t(spark, edges, *, k, e_max, alpha=1.0, max_emb=DEFAULT_MAX_EMB, time_limit_s=None) -> AlgoResult:
    """ALL_g variant: materialized all-subgraph stream + swap-based search."""
    return _run_materialized(
        spark, edges, name="ALL_t", k=k, e_max=e_max, min_support_frac=0.0,
        strategy="swap", alpha=alpha, max_emb=max_emb, time_limit_s=time_limit_s,
    )


def fsg_g(spark, edges, *, k, e_max, sup_min=0.1, max_emb=DEFAULT_MAX_EMB, time_limit_s=None) -> AlgoResult:
    """Algorithm 2: frequent subgraphs (sup >= sup_min), then greedy MaxCover."""
    return _run_materialized(
        spark, edges, name=f"FSG_g({sup_min})", k=k, e_max=e_max,
        min_support_frac=sup_min, strategy="greedy", max_emb=max_emb,
        time_limit_s=time_limit_s,
    )


def fsg_t(spark, edges, *, k, e_max, sup_min=0.1, alpha=1.0, max_emb=DEFAULT_MAX_EMB, time_limit_s=None) -> AlgoResult:
    """FSG_g variant: frequent-subgraph stream + swap-based search."""
    return _run_materialized(
        spark, edges, name=f"FSG_t({sup_min})", k=k, e_max=e_max,
        min_support_frac=sup_min, strategy="swap", alpha=alpha, max_emb=max_emb,
        time_limit_s=time_limit_s,
    )


def opt_exact(spark, edges, *, k, e_max, max_emb=DEFAULT_MAX_EMB, time_limit_s=None) -> AlgoResult:
    """Exact optimum over all enumerated subgraphs (Figure 13's OPT)."""
    return _run_materialized(
        spark, edges, name="OPT", k=k, e_max=e_max, min_support_frac=0.0,
        strategy="exact", max_emb=max_emb, time_limit_s=time_limit_s,
    )
