"""Reproduction of "TED: Towards Discovering Top-k Edge-Diversified
Patterns in a Graph Database" (Huang et al., SIGMOD 2023) on PySpark.

Packages:
- ``repro.graphdb``      — graph model, synthetic molecule datasets, Spark I/O
- ``repro.isomorphism``  — DFS codes, embedding matcher, join-based matcher
- ``repro.enumeration``  — distributed level-synchronous gSpan + FSM
- ``repro.maxcover``     — greedy and exact max-k-cover solvers
- ``repro.core``         — TED (PES-Index, PatternMaintain, PRM, IPS) + baselines
- ``repro.vqf``          — VINCENT user-study simulation (Tables 5–7)
"""
__version__ = "0.1.0"
