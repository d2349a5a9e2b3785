"""Subgraph quality measures for Tables 4 and 5.

Edge density ``2|E| / (|V|(|V|-1))``, diameter (longest shortest path
within the induced subgraph), and the average local clustering
coefficient — computed on the driver over the (small) detected
subgraphs, exactly as the paper evaluates its detected LhCDSes.
"""
from __future__ import annotations

import numpy as np

from .graphs.local import LocalGraph


def subgraph_metrics(lg: LocalGraph, S: set[int]) -> dict:
    """Quality measures of one detected subgraph."""
    return {
        "size": len(S),
        "edge_density": lg.edge_density(S),
        "diameter": lg.diameter(S),
        "avg_clustering": lg.avg_clustering(S),
    }


def average_metrics(lg: LocalGraph, subgraphs: list[set[int]]) -> dict:
    """Averages over the top-k detected subgraphs (NaN-free; empty -> None)."""
    if not subgraphs:
        return {"edge_density": None, "diameter": None, "avg_clustering": None, "count": 0}
    ms = [subgraph_metrics(lg, S) for S in subgraphs]
    return {
        "edge_density": float(np.mean([m["edge_density"] for m in ms])),
        "diameter": float(np.mean([m["diameter"] for m in ms])),
        "avg_clustering": float(np.mean([m["avg_clustering"] for m in ms])),
        "count": len(ms),
    }
