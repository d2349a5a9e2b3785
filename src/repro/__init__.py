"""Reproduction of "An Efficient and Exact Algorithm for Locally h-Clique
Densest Subgraph Discovery" (SIGMOD 2024) — the IPPV pipeline — in PySpark.

Subpackages:

- ``repro.graphs``    — edge-list utilities, h-clique / pattern enumeration,
  (k, psi_h)-core decomposition, connected components (the graph substrate).
- ``repro.flow``      — exact integer max-flow (Dinic) and the paper's flow
  networks (DeriveCompact, IsDensest, exact dense decomposition).
- ``repro.core``      — the paper's contribution: Frank-Wolfe approximation of
  CP(G, h), tentative graph decomposition, stable h-clique groups, pruning,
  basic/fast verification, and the IPPV driver loop (Algorithms 1-7).
- ``repro.baselines`` — LTDS / LDSflow-style flow-exact baseline and the
  Greedy top-k CDS baseline.
- ``repro.metrics``   — subgraph quality measures used by Tables 4 and 5.
- ``repro.experiments`` — the synthetic dataset suite and per-table harnesses.
"""

__version__ = "0.1.0"
