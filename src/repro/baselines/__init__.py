"""Comparison baselines: flow-exact (LTDS/LDSflow stand-in) and Greedy CDS."""
