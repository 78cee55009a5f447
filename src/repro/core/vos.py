"""VOS — virtual odd sketch over a shared bit array (paper §IV).

Structure: a shared bit array ``A`` of ``m`` bits, ``ψ`` mapping items
to {0..k−1}, and ``f_1..f_k`` mapping users to positions in A. Each
edge (u, i, ±) flips the single bit ``A[f_ψ(i)(u)]`` — identical O(1)
work for insertions and deletions, which is exactly why VOS is unbiased
on fully dynamic streams.

Because xor is commutative and associative, the state of A at time t is
the *parity of the flip count per position* over all edges with
arrival ≤ t. That makes the sequential per-edge definition expressible
as a Catalyst aggregation — ``groupBy(pos).count() % 2`` — which is how
``build_bit_arrays`` builds A (for many checkpoints in a single pass
using conditional sums). ``VOSKernel`` is the paper's sequential O(1)
update loop, used for the runtime experiment (Fig 2) and as the
reference the distributed builds are tested against; the Structured
Streaming operator lives in ``streaming.py``.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql import types as T

from ..common import hashing


@dataclass(frozen=True)
class VOSParams:
    """VOS configuration.

    ``k``: virtual sketch bits per user (the paper sets k = λ·32·k_reg,
    λ = 2 against baselines with k_reg 32-bit registers).
    ``m``: shared bit-array length (paper: m = 32·k_reg·|U| bits, the
    same total memory the baselines use).
    """

    k: int
    m: int
    seed: int = 7

    @staticmethod
    def paper_budget(n_users: int, k_reg: int = 100, lam: int = 2, seed: int = 7) -> "VOSParams":
        """The paper's §V memory accounting: m = 32·k_reg·|U|, k = λ·32·k_reg."""
        return VOSParams(k=lam * 32 * k_reg, m=32 * k_reg * n_users, seed=seed)


def with_positions(edges: DataFrame, params: VOSParams) -> DataFrame:
    """Append the flipped bit position ``pos = f_ψ(item)(user)`` per edge."""
    k, m, seed = params.k, params.m, params.seed

    @F.pandas_udf(T.LongType())
    def pos_udf(user: pd.Series, item: pd.Series) -> pd.Series:
        return pd.Series(
            hashing.vos_positions(
                user.to_numpy(np.int64), item.to_numpy(np.int64), k, m, seed
            )
        )

    return edges.withColumn("pos", pos_udf("user", "item"))


def build_bit_arrays(
    edges: DataFrame, params: VOSParams, checkpoints: Sequence[int]
) -> tuple[np.ndarray, np.ndarray]:
    """Build A at each checkpoint time in one distributed pass.

    Returns ``(A, beta)`` where ``A`` is a (n_checkpoints, m) uint8 bit
    matrix and ``beta[c]`` the fraction of 1-bits at checkpoint c.
    One shuffle: groupBy position with one conditional flip-count per
    checkpoint; parity taken on the (≤ n_edges distinct positions)
    result.
    """
    cps = [int(c) for c in checkpoints]
    aggs = [
        F.sum(F.when(F.col("t") <= c, F.lit(1)).otherwise(F.lit(0))).alias(f"c{i}")
        for i, c in enumerate(cps)
    ]
    rows = with_positions(edges, params).groupBy("pos").agg(*aggs).toPandas()
    A = np.zeros((len(cps), params.m), dtype=np.uint8)
    pos = rows["pos"].to_numpy(np.int64)
    for i in range(len(cps)):
        A[i, pos] = (rows[f"c{i}"].to_numpy(np.int64) % 2).astype(np.uint8)
    return A, A.mean(axis=1)


def rebuild_user_sketches(users, A_row: np.ndarray, params: VOSParams) -> np.ndarray:
    """Ô_u[j] = A[f_j(u)] for each user — (n_users, k) uint8 matrix."""
    us = np.asarray(users, dtype=np.int64)
    j = np.arange(params.k, dtype=np.int64)
    pos = hashing.f_positions(us[:, None], j[None, :], params.m, params.seed)
    return A_row[pos]


def user_counts_at(
    edges: DataFrame, checkpoints: Sequence[int], users: Sequence[int] | None = None
) -> pd.DataFrame:
    """Exact n_u at each checkpoint (the paper's per-user counters).

    Returns long-format pandas: columns ``user``, ``ckpt`` (index into
    ``checkpoints``), ``n``. Restricted to ``users`` when given.
    """
    cps = [int(c) for c in checkpoints]
    df = edges
    if users is not None:
        df = df.where(F.col("user").isin([int(u) for u in users]))
    aggs = [
        F.sum(F.when(F.col("t") <= c, F.col("action")).otherwise(F.lit(0))).alias(
            f"c{i}"
        )
        for i, c in enumerate(cps)
    ]
    wide = df.groupBy("user").agg(*aggs).toPandas()
    out = wide.melt(id_vars=["user"], var_name="ckpt", value_name="n")
    out["ckpt"] = out["ckpt"].str.removeprefix("c").astype(int)
    out["n"] = out["n"].astype(np.int64)
    return out.sort_values(["user", "ckpt"]).reset_index(drop=True)


class VOSKernel:
    """Sequential O(1)-per-edge VOS update — the paper's Algorithm.

    Maintains A, the running 1-bit fraction β (the paper's incremental
    counter), and per-user item counters n_u. Used by the Fig 2 runtime
    harness and as the ground truth for the distributed builds.
    """

    def __init__(self, params: VOSParams):
        self.params = params
        self.A = np.zeros(params.m, dtype=np.uint8)
        self.ones = 0
        self.n: dict[int, int] = {}

    @property
    def beta(self) -> float:
        return self.ones / self.params.m

    def update(self, user: int, item: int, action: int) -> None:
        """Process one edge: one hash, one bit flip, two counter bumps."""
        p = self.params
        pos = int(hashing.vos_positions([user], [item], p.k, p.m, p.seed)[0])
        new = self.A[pos] ^ 1
        self.A[pos] = new
        # β ← β ± 1/m, the paper's running-fraction update, kept exact
        # as an integer 1-bit count.
        self.ones += 1 if new else -1
        self.n[user] = self.n.get(user, 0) + (1 if action > 0 else -1)

    def sketch(self, user: int) -> np.ndarray:
        """Rebuilt virtual sketch Ô_u of one user."""
        return rebuild_user_sketches([user], self.A, self.params)[0]
