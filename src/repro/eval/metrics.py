"""The paper's two accuracy metrics (§V).

AAPE  — average absolute percentage error of ŝ_uv over tracked pairs;
        defined over pairs whose true s > 0 at that time (the relative
        error is undefined otherwise; the paper's pair selection makes
        s > 0 at selection time, but deletions can zero it mid-stream).
ARMSE — root mean squared error of Ĵ over tracked pairs.
"""
from __future__ import annotations

import numpy as np


def aape(true_s, est_s) -> float:
    """Mean |s − ŝ|/s over pairs with s > 0; NaN if no such pair."""
    t = np.asarray(true_s, dtype=np.float64)
    e = np.asarray(est_s, dtype=np.float64)
    mask = t > 0
    if not mask.any():
        return float("nan")
    return float(np.mean(np.abs(t[mask] - e[mask]) / t[mask]))


def armse(true_j, est_j) -> float:
    """Root mean squared error of the Jaccard estimates."""
    t = np.asarray(true_j, dtype=np.float64)
    e = np.asarray(est_j, dtype=np.float64)
    if t.size == 0:
        return float("nan")
    return float(np.sqrt(np.mean((e - t) ** 2)))
