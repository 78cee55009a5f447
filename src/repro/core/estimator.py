"""VOS similarity estimators (paper §IV), vectorised over user pairs.

Chain: ``α`` (1-bit fraction of the xor of two rebuilt virtual
sketches) and ``β`` (1-bit fraction of the shared array A) →

    n̂Δ = −k·(ln|1−2α| − 2·ln|1−2β|)/2
    ŝ  = (n_u + n_v)/2 − n̂Δ/2
       = (n_u + n_v)/2 + k·(ln|1−2α| − 2·ln|1−2β|)/4
    Ĵ  = ŝ / (n_u + n_v − ŝ)

Guards (uniform across all methods, DESIGN.md §3): log arguments
floored at 1e−12 (α or β at exactly 1/2 means the sketch is saturated);
ŝ clamped into the feasible range [0, min(n_u, n_v)], which also keeps
Ĵ in [0, 1].
"""
from __future__ import annotations

import numpy as np

_EPS = 1e-12


def estimate_n_delta(alpha, beta, k: int) -> np.ndarray:
    """Estimated |S_u Δ S_v| from contaminated-sketch xor density α."""
    a = np.asarray(alpha, dtype=np.float64)
    b = np.asarray(beta, dtype=np.float64)
    la = np.log(np.maximum(np.abs(1.0 - 2.0 * a), _EPS))
    lb = np.log(np.maximum(np.abs(1.0 - 2.0 * b), _EPS))
    return -k * (la - 2.0 * lb) / 2.0


def clamp_common(s_hat, n_u, n_v) -> np.ndarray:
    """Clamp ŝ into the feasible range [0, min(n_u, n_v)]."""
    s = np.asarray(s_hat, dtype=np.float64)
    hi = np.minimum(np.asarray(n_u, np.float64), np.asarray(n_v, np.float64))
    return np.clip(np.nan_to_num(s, nan=0.0, neginf=0.0, posinf=0.0), 0.0, hi)


def estimate_common(n_u, n_v, alpha, beta, k: int, *, clamp: bool = True) -> np.ndarray:
    """ŝ_uv — estimated number of common items (paper's closed form)."""
    nu = np.asarray(n_u, dtype=np.float64)
    nv = np.asarray(n_v, dtype=np.float64)
    s = (nu + nv - estimate_n_delta(alpha, beta, k)) / 2.0
    return clamp_common(s, nu, nv) if clamp else s


def jaccard_from_common(s, n_u, n_v) -> np.ndarray:
    """J = s / (n_u + n_v − s); defined as 0 when both sets are empty."""
    sv = np.asarray(s, dtype=np.float64)
    denom = np.asarray(n_u, np.float64) + np.asarray(n_v, np.float64) - sv
    with np.errstate(divide="ignore", invalid="ignore"):
        j = np.where(denom > 0, sv / np.maximum(denom, _EPS), 0.0)
    return np.clip(j, 0.0, 1.0)


def common_from_jaccard(j, n_u, n_v) -> np.ndarray:
    """Inverse map s = J·(n_u + n_v)/(1 + J) — used by MinHash/OPH."""
    jv = np.asarray(j, dtype=np.float64)
    total = np.asarray(n_u, np.float64) + np.asarray(n_v, np.float64)
    return jv * total / (1.0 + jv)


def pair_alpha(sketch_u: np.ndarray, sketch_v: np.ndarray) -> np.ndarray:
    """α for each pair: mean of the xor of two (n_pairs, k) bit matrices."""
    return np.mean(sketch_u != sketch_v, axis=-1)
