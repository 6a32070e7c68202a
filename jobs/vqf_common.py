"""Shared setup for the VQF studies (Tables 5–7, Exp 7): datasets, the three
compared pattern sets (FS / CATAPULT-lite / TED), and the query workload.

Scale substitution: the paper uses AIDS/PubChem with queries of 30–62 edges
drawn from real PubChem compounds (CIDs). Our synthetic graphs are smaller,
so queries are sampled connected subgraphs with |E| in [12, 24]; the claims
under test (TED's patterns cover more of a query than FS/CATAPULT, and
infrequent patterns help) are size-relative.
"""
from __future__ import annotations

from dataclasses import dataclass

from repro.core.ted import ted
from repro.graphdb.generator import molecule_db
from repro.graphdb.model import Graph
from repro.graphdb.spark_io import to_edges_df
from repro.isomorphism.dfscode import DFSCode
from repro.vqf.catapult import catapult_lite
from repro.vqf.fs import top_k_frequent
from repro.vqf.queries import sample_query

K_PATTERNS = 12
E_MAX = 4
E_MIN = 2              # VINCENT pattern budget MinE (Section 6.2): canned
                       # patterns must beat edge-at-a-time, so >= 2 edges
Q_EDGE_RANGE = (12, 24)
N_QUERIES = 5
SUP_MIN_FS = 0.2       # FS mining threshold
SUP_INFREQUENT = 0.2   # a pattern with sup < 20% counts as infrequent


@dataclass
class VqfSetup:
    dataset: str
    db: list[Graph]
    edges: object  # cached Spark DataFrame
    pattern_sets: dict[str, list[DFSCode]]  # FS / CATAPULT / TED
    queries: list[Graph]


def build_setup(spark, dataset: str, *, n_graphs: int = 300, seed: int = 0) -> VqfSetup:
    db = molecule_db(dataset, n_graphs, seed=seed)
    edges = to_edges_df(spark, db).cache()
    edges.count()
    fs = [
        c
        for c, _ in top_k_frequent(
            spark, edges, k=K_PATTERNS, e_max=E_MAX, e_min=E_MIN, sup_min=SUP_MIN_FS
        )
    ]
    cat = [
        c
        for c, _ in catapult_lite(
            spark, edges, k=K_PATTERNS, e_max=E_MAX, e_min=E_MIN, sup_min=0.1
        )
    ]
    ted_r = ted(spark, edges, k=K_PATTERNS, e_max=E_MAX, e_min=E_MIN)
    queries = [
        sample_query(db, e_min=Q_EDGE_RANGE[0], e_max=Q_EDGE_RANGE[1], seed=seed * 100 + i)
        for i in range(N_QUERIES)
    ]
    return VqfSetup(
        dataset=dataset,
        db=db,
        edges=edges,
        pattern_sets={"FS": fs, "CATAPULT": cat, "TED": ted_r.patterns},
        queries=queries,
    )
