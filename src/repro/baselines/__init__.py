"""Baselines from the paper: dynamic MinHash, OPH, RP, and exact truth."""
