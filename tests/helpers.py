"""Shared test helpers: random labeled graphs and tiny databases."""
from __future__ import annotations

import numpy as np

from repro.graphdb.model import Graph, make_graph

LABELS = ["C", "N", "O"]


def random_connected_graph(
    seed: int, *, n_min: int = 3, n_max: int = 7, extra_edge_p: float = 0.3,
    labels: list[str] | None = None, edge_labels: list[str] | None = None,
) -> Graph:
    """Small random connected labeled graph (tree + random extra edges)."""
    rng = np.random.default_rng(seed)
    labels = labels or LABELS
    n = int(rng.integers(n_min, n_max + 1))
    vlabels = [labels[int(rng.integers(0, len(labels)))] for _ in range(n)]
    els = edge_labels or ["-"]
    edges: list[tuple[int, int, str]] = []
    present = set()
    for v in range(1, n):
        u = int(rng.integers(0, v))
        edges.append((u, v, els[int(rng.integers(0, len(els)))]))
        present.add((u, v))
    for u in range(n):
        for v in range(u + 1, n):
            if (u, v) not in present and rng.random() < extra_edge_p:
                edges.append((u, v, els[int(rng.integers(0, len(els)))]))
                present.add((u, v))
    return make_graph(seed, vlabels, edges)


def tiny_db(seed: int, n_graphs: int = 8, **kw) -> list[Graph]:
    """A deterministic database of small random graphs with gids 0..n-1."""
    return [
        random_connected_graph(seed * 1000 + i, **kw).relabel(i)
        for i in range(n_graphs)
    ]
