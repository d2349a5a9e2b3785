"""Exact max-flow substrate: Dinic + the paper's verification networks."""
