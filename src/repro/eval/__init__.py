"""Evaluation harnesses reproducing the paper's Figures 2 and 3 as tables."""
