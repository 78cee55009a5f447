"""Fully dynamic bipartite graph stream generation (the paper's workload)."""
