"""Plain odd sketch (Mitzenmacher et al., WWW'14) — numpy reference.

The odd sketch of a set S under hash ψ is the k-bit array
``O[j] = ⊕_{i∈S} 1(ψ(i) = j)`` — the parity of the number of items
hashing to bit j. Two properties the paper builds on, both tested:

* insert/delete of the same item cancel (xor), so O is a function of
  the *net* set only — the key to handling fully dynamic streams;
* ``O(S_u) ⊕ O(S_v) = O(S_u Δ S_v)``, and the expected fraction of
  1-bits in that xor is ``(1 − (1−2/k)^{|S_u Δ S_v|})/2``, inverted to
  estimate the symmetric-difference size.

VOS (``vos.py``) virtualises this sketch into a shared bit array; this
module is the uncontaminated reference the VOS tests compare against.
"""
from __future__ import annotations

import numpy as np

from ..common import hashing


def odd_sketch(items, k: int, seed: int) -> np.ndarray:
    """Odd sketch bits (uint8[k]) of an item collection (net parity)."""
    it = np.asarray(items, dtype=np.int64)
    if it.size == 0:
        return np.zeros(k, dtype=np.uint8)
    j = hashing.psi(it, k, seed)
    return (np.bincount(j, minlength=k) % 2).astype(np.uint8)


def estimate_symmetric_difference(alpha: np.ndarray | float, k: int) -> np.ndarray:
    """Invert E[α] = (1 − (1−2/k)^{nΔ})/2 ≈ (1 − e^{−2nΔ/k})/2.

    ``alpha`` is the fraction of 1-bits in O(S_u) ⊕ O(S_v). Uses the
    exponential approximation exactly as the paper does; |·| and an eps
    floor guard α ≥ 1/2 (sketch saturated — nΔ ≳ k, outside the sketch's
    designed range).
    """
    a = np.asarray(alpha, dtype=np.float64)
    inner = np.maximum(np.abs(1.0 - 2.0 * a), 1e-12)
    return -k * np.log(inner) / 2.0
