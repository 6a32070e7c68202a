"""Synthetic molecule-like graph databases.

The paper evaluates on AIDS (40K graphs, V_avg 25.4), eMol (10K, V_avg 15.5)
and PubChem (23K–1M, V_avg 42.3) — all external downloads unavailable
offline. This module generates *molecule-shaped* labeled graphs instead:

- degree capped at 4 (valence), connected, simple;
- vertex labels drawn from an atom distribution dominated by carbon;
- a library of chemically-styled motifs (rings, carboxyl, amine, nitro, ...)
  is embedded with per-profile probability — the same library doubles as the
  "PubChem repository" stand-in for Table 7's biological-importance test;
- graph sizes follow a lognormal with a heavy tail clipped to the profile's
  V_max, calibrated to Table 2's V_avg.

Generation is deterministic in ``seed`` and happens on the driver (graphs are
tiny); :mod:`repro.graphdb.spark_io` ships the result to Spark as one edge
DataFrame.
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

from repro.graphdb.model import Graph, make_graph

#: Atom alphabet shared by all profiles (most-frequent first). The real
#: AIDS/PubChem datasets carry 60+ element labels; a rich alphabet is what
#: makes multi-edge patterns competitive with 1-edge patterns for edge
#: coverage (one pattern slot covers many edge-label types at once — the
#: regime the paper's Figure 4 illustrates). With only a few labels the
#: optimum degenerates to k 1-edge patterns.
ATOMS = [
    "C", "N", "O", "S", "Cl", "F", "P", "Br",
    "I", "B", "Si", "Se", "As", "Na", "K", "Zn",
]


@dataclass(frozen=True)
class Profile:
    """Dataset profile calibrated to one row of the paper's Table 2."""

    name: str
    v_avg: float          # target average vertex count (Table 2 V_avg)
    v_max: int            # hard cap on vertices (Table 2 V_max)
    sigma: float          # lognormal shape — controls the heavy tail
    atom_probs: tuple[float, ...]   # over ATOMS
    ring_rate: float      # expected ring closures per 6 vertices
    motif_prob: float     # probability a library motif is grafted on
    labeled_edges: bool   # True -> bond labels '1'/'2' (AIDSL), else '-'


PROFILES: dict[str, Profile] = {
    "aids_lite": Profile(
        "aids_lite", 25.4, 222, 0.45,
        (0.34, 0.17, 0.17, 0.12, 0.10, 0.10, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0), 0.7, 0.75, False,
    ),
    "aidsl_lite": Profile(
        "aidsl_lite", 25.4, 222, 0.45,
        (0.34, 0.17, 0.17, 0.12, 0.10, 0.10, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0), 0.7, 0.75, True,
    ),
    "emol_lite": Profile(
        "emol_lite", 15.5, 100, 0.35,
        (0.34, 0.17, 0.17, 0.12, 0.10, 0.10, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0), 0.6, 0.65, False,
    ),
    "pubchem_lite": Profile(
        "pubchem_lite", 42.3, 801, 0.55,
        (0.34, 0.17, 0.17, 0.12, 0.10, 0.10, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0, 0.0), 0.7, 0.8, False,
    ),
}


def motif_library(labeled_edges: bool = False) -> list[Graph]:
    """Chemically-styled motifs grafted into generated molecules.

    This library is the reproduction's stand-in for "exists in the PubChem
    repository" (Table 7): a mined pattern has *biological importance* iff it
    is isomorphic to one of these motifs (see ``repro.vqf.repository``).

    Design constraint (DESIGN.md §3.1): the multi-edge "scaffold" motifs are
    built from edge-label *pairs* that the random backbone almost never
    produces (P-O, Si-O, Se-C, ...). A pattern matching such a motif covers
    several near-exclusive edge types at once, so it strictly beats each of
    its component 1-edge patterns for coverage — the regime the paper's
    Figure 4 illustrates and without which top-k edge coverage degenerates
    to k single edges.
    """
    s = "1" if labeled_edges else "-"
    d = "2" if labeled_edges else "-"
    ring6 = [(i, (i + 1) % 6, s if i % 2 else d) for i in range(6)]
    return [
        # -- classic small fragments (frequent; several are 1-edge) --------
        # benzene-like ring
        make_graph(-1, ["C"] * 6, ring6),
        # carboxyl C(=O)O
        make_graph(-1, ["C", "O", "O"], [(0, 1, d), (0, 2, s)]),
        # amide N-C=O
        make_graph(-1, ["N", "C", "O"], [(0, 1, s), (1, 2, d)]),
        # nitro N(-O)(-O)
        make_graph(-1, ["N", "O", "O"], [(0, 1, s), (0, 2, d)]),
        # amine C-N
        make_graph(-1, ["C", "N"], [(0, 1, s)]),
        # hydroxyl C-O
        make_graph(-1, ["C", "O"], [(0, 1, s)]),
        # butane-like carbon chain
        make_graph(-1, ["C"] * 4, [(0, 1, s), (1, 2, s), (2, 3, s)]),
        # chloro-carbon
        make_graph(-1, ["C", "Cl"], [(0, 1, s)]),
        # -- multi-edge scaffolds over near-exclusive edge types -----------
        # pyridine-like hetero-ring (C-C x4 + C-N x2)
        make_graph(-1, ["C", "C", "C", "C", "C", "N"],
                   [(i, (i + 1) % 6, s) for i in range(6)]),
        # thiophosphate-like chain O-P-S-C (types O-P, P-S, S-C)
        make_graph(-1, ["O", "P", "S", "C"], [(0, 1, d), (1, 2, s), (2, 3, s)]),
        # boronate-ester chain B-O-Si-C (types B-O, O-Si, Si-C)
        make_graph(-1, ["B", "O", "Si", "C"], [(0, 1, s), (1, 2, s), (2, 3, s)]),
        # halo-selenide chain Br-Se-C-F (types Br-Se, Se-C, C-F)
        make_graph(-1, ["Br", "Se", "C", "F"], [(0, 1, s), (1, 2, s), (2, 3, s)]),
        # organometallic star Zn(-Na)(-K)(-O) (types Zn-Na, Zn-K, Zn-O)
        make_graph(-1, ["Zn", "Na", "K", "O"], [(0, 1, s), (0, 2, s), (0, 3, s)]),
        # arsenate ring As-O-I-N-As'... 5-ring As-O-I-N-S
        make_graph(-1, ["As", "O", "I", "N", "S"],
                   [(i, (i + 1) % 5, s) for i in range(5)]),
        # sulfonyl-like chain C-S=O
        make_graph(-1, ["C", "S", "O"], [(0, 1, s), (1, 2, d)]),
        # silicon hetero-ring Si-O-Si-O... 6-ring alternating with F cap
        make_graph(-1, ["Si", "O", "Si", "O", "Si", "F"],
                   [(i, (i + 1) % 6, s) for i in range(6)]),
    ]


#: Average vertices a grafted motif adds (library mean ≈ 4.2).
_MOTIF_V_AVG = 4.2


def _sample_size(rng: np.random.Generator, p: Profile) -> int:
    # Motif grafting adds an expected geometric p/(1-p) motifs of ~4.2
    # vertices each; shrink the base lognormal target so the *final* graph
    # hits Table 2's V_avg.
    expected_motif_v = p.motif_prob / (1.0 - p.motif_prob) * _MOTIF_V_AVG
    target = max(5.0, p.v_avg - expected_motif_v)
    mu = np.log(target) - p.sigma**2 / 2.0  # lognormal mean == target
    n = int(round(rng.lognormal(mu, p.sigma)))
    return int(min(max(n, 4), p.v_max))


def _molecule(gid: int, rng: np.random.Generator, p: Profile) -> Graph:
    """One connected molecule-like graph under profile ``p``."""
    nv = _sample_size(rng, p)
    labels: list[str] = [ATOMS[rng.choice(len(ATOMS), p=np.asarray(p.atom_probs))]
                         for _ in range(nv)]
    deg = [0] * nv
    edges: list[tuple[int, int, str]] = []
    edge_set: set[tuple[int, int]] = set()

    def bond() -> str:
        if not p.labeled_edges:
            return "-"
        return "2" if rng.random() < 0.12 else "1"

    def add_edge(u: int, v: int) -> bool:
        a, b = min(u, v), max(u, v)
        if a == b or (a, b) in edge_set or deg[a] >= 4 or deg[b] >= 4:
            return False
        edges.append((a, b, bond()))
        edge_set.add((a, b))
        deg[a] += 1
        deg[b] += 1
        return True

    # Random spanning tree with valence cap: attach each vertex to a prior one.
    for v in range(1, nv):
        for _ in range(8):  # retry if the sampled anchor is saturated
            u = int(rng.integers(0, v))
            if add_edge(u, v):
                break
        else:  # all sampled anchors full — scan for any open vertex
            for u in range(v):
                if add_edge(u, v):
                    break

    # Ring closures.
    n_rings = rng.poisson(p.ring_rate * nv / 6.0)
    for _ in range(int(n_rings)):
        u, v = int(rng.integers(0, nv)), int(rng.integers(0, nv))
        add_edge(u, v)

    # Graft motifs: append the motif's vertices/edges and connect one motif
    # vertex to an existing vertex so the graph stays connected.
    lib = motif_library(p.labeled_edges)
    while rng.random() < p.motif_prob and nv + 6 <= p.v_max:
        m = lib[int(rng.integers(0, len(lib)))]
        base = nv
        labels.extend(m.vlabels)
        deg.extend([0] * m.n_vertices)
        nv += m.n_vertices
        for u, v, el in m.edges:
            a, b = base + u, base + v
            edges.append((a, b, el))
            edge_set.add((a, b))
            deg[a] += 1
            deg[b] += 1
        anchor_new = base + int(rng.integers(0, m.n_vertices))
        for _ in range(8):
            u = int(rng.integers(0, base))
            if add_edge(u, anchor_new) or add_edge((u + 1) % base, anchor_new):
                break
        else:
            for u in range(base):
                if add_edge(u, anchor_new):
                    break

    g = make_graph(gid, labels, edges)
    assert g.is_connected(), f"generator produced a disconnected graph gid={gid}"
    return g


def molecule_db(name: str, n_graphs: int, *, seed: int = 0) -> list[Graph]:
    """Generate a database of ``n_graphs`` molecules under profile ``name``.

    Deterministic in ``(name, n_graphs, seed)``; graph ids are ``0..n-1``.
    """
    p = PROFILES[name]
    # hash() is salted per-process for str; use a stable digest instead.
    name_key = sum(ord(c) * 131**i for i, c in enumerate(name)) % (1 << 31)
    root = np.random.SeedSequence([name_key, seed])
    return [
        _molecule(i, np.random.default_rng(s), p)
        for i, s in enumerate(root.spawn(n_graphs))
    ]
