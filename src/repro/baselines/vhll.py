"""vHLL — virtual-HLL register sharing (paper §III-B-2, Xiao et al. [47]).

One shared array of M ``w``-bit registers. User s's *virtual* HLL
sketch is ``R[f_1(s)], …, R[f_m(s)]``; pair (s, d) max-updates
``R[f_{h(d)}(s)]`` with ``ρ(d)``. The estimator removes the noise other
users leak into the virtual sketch and rescales::

    n̂_s = M/(M-m) · ( α_m m² / Σ_i 2^{-R[f_i(s)]}  -  m α_M M / Σ_j 2^{-R[j]} )

with the standard linear-counting substitution for the first term when
it falls below ``2.5m`` (paper §III-B-2). Estimates are clamped to
``[0, ∞)``. Here M counts *registers* (the paper's M bits correspond to
``M_bits/w`` registers).

Layers mirror :mod:`repro.baselines.cse`: a sequential tracked-counter
run (O(m) per edge) and a Spark batch end-state estimator (register
array reduced with ``max`` per position, broadcast, ``mapInPandas``).
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F
from pyspark.sql.types import DoubleType, LongType, StructField, StructType

from repro.baselines.estimators import (
    alpha,
    hll_estimate,
    linear_counting,
    pow2_neg_table,
)
from repro.hashing import f_user, h_item, rho_item


def _vhll_formula(
    M: int,
    m: int,
    virtual_hsum: float,
    virtual_zeros: int,
    global_hsum: float,
    global_zeros: int,
) -> float:
    """The vHLL estimator given the two harmonic sums.

    The noise term is ``m/M`` times the HLL estimate of the *total*
    cardinality from the whole array. The paper writes the raw harmonic
    form ``m α_M M / Σ_j 2^{-R[j]}``; like any HLL read-out it needs the
    standard linear-counting small-range correction when the global
    array is lightly loaded (the original vHLL estimator corrects its
    totals the same way) — without it the noise term overshoots by up
    to ~65% at small loads and drags every small user to zero.
    """
    first = alpha(m) * m * m / virtual_hsum
    if first < 2.5 * m and virtual_zeros > 0:
        first = linear_counting(m, virtual_zeros)
    total_est = hll_estimate(M, global_hsum, global_zeros)
    noise = m * total_est / M
    return max(0.0, M / (M - m) * (first - noise))


class VhllSketch:
    """Shared register array + per-user tracked counters (sequential)."""

    def __init__(self, M: int, m: int, w: int = 5, seed: int = 0):
        if not 1 <= m < M:
            raise ValueError("need 1 <= m < M")
        self.M, self.m, self.w, self.seed = int(M), int(m), int(w), seed
        self.cap = (1 << w) - 1
        self._pow2 = pow2_neg_table(self.cap)
        self.R = np.zeros(self.M, dtype=np.uint8)
        self.global_hsum = float(self.M)  # Σ_j 2^{-R[j]}, maintained O(1)
        self.global_zeros = self.M  # #zero registers, maintained O(1)
        self.estimates: dict[int, float] = {}
        self._iota = np.arange(self.m, dtype=np.int64)
        # virtual-sketch index cache: recomputing f_1..f_m(s) costs
        # ~m hash ops per edge; heavy-tail streams revisit the same
        # users constantly, so memoize (int32, capped ~64 MB)
        self._idx_cache: dict[int, np.ndarray] = {}
        self._idx_cache_cap = 16384

    def _user_idx(self, s: int) -> np.ndarray:
        """Memoized virtual-sketch positions ``f_1(s)..f_m(s)``."""
        idx = self._idx_cache.get(s)
        if idx is None:
            idx = f_user(np.int64(s), self._iota, self.M, seed=self.seed).astype(
                np.int32
            )
            if len(self._idx_cache) < self._idx_cache_cap:
                self._idx_cache[s] = idx
        return idx

    def estimate(self, s: int) -> float:
        """End-state vHLL estimate for user s from the current array."""
        idx = self._user_idx(s)
        vals = self.R[idx]
        hsum = float(self._pow2[vals].sum())
        zeros = int((vals == 0).sum())
        return _vhll_formula(
            self.M, self.m, hsum, zeros, self.global_hsum, self.global_zeros
        )

    def update(self, s: int, pos: int, r: int) -> None:
        """Max-update register ``pos`` and refresh s's counter."""
        old = int(self.R[pos])
        if r > old:
            self.global_hsum += self._pow2[r] - self._pow2[old]
            if old == 0:
                self.global_zeros -= 1
            self.R[pos] = r
        self.estimates[s] = self.estimate(s)

    def run(
        self,
        users: np.ndarray,
        items: np.ndarray,
        checkpoints: list[int] | None = None,
    ) -> dict[int, dict[int, float]]:
        """Stream all edges; return estimate snapshots at checkpoints."""
        users = np.asarray(users, dtype=np.int64)
        items = np.asarray(items, dtype=np.int64)
        i_of_item = h_item(items, self.m, seed=self.seed)
        pos = f_user(users, i_of_item, self.M, seed=self.seed)
        rs = rho_item(items, cap=self.cap, seed=self.seed)
        snaps: dict[int, dict[int, float]] = {}
        cps = sorted(checkpoints or [])
        ci = 0
        for t in range(len(users)):
            while ci < len(cps) and cps[ci] <= t:
                snaps[cps[ci]] = dict(self.estimates)
                ci += 1
            self.update(int(users[t]), int(pos[t]), int(rs[t]))
        for cp in cps[ci:]:
            snaps[cp] = dict(self.estimates)
        return snaps

    def final_estimates(self) -> pd.Series:
        """Tracked counters as a Series (index: user)."""
        return pd.Series(self.estimates, dtype=np.float64).rename_axis("user")

    def end_state_estimates(self, users: np.ndarray) -> pd.Series:
        """Re-estimate the given users against the *final* array."""
        return pd.Series(
            {int(s): self.estimate(int(s)) for s in users}, dtype=np.float64
        ).rename_axis("user")


def vhll_spark(
    edges: DataFrame, M: int, m: int, w: int = 5, seed: int = 0
) -> DataFrame:
    """vHLL on Spark: end-of-stream estimates ``(user, estimate)``.

    The final register array is order-independent (elementwise max), so
    it is a ``groupBy(pos).agg(max(rho))`` aggregation; the array is
    then broadcast and users evaluated vectorized in ``mapInPandas``.
    """
    cap = (1 << w) - 1

    @F.pandas_udf(LongType())
    def pos_udf(user: pd.Series, item: pd.Series) -> pd.Series:
        i = h_item(item.to_numpy(), m, seed=seed)
        return pd.Series(f_user(user.to_numpy(), i, M, seed=seed))

    @F.pandas_udf(LongType())
    def rho_udf(item: pd.Series) -> pd.Series:
        return pd.Series(rho_item(item.to_numpy(), cap=cap, seed=seed))

    reg_state = (
        edges.select(
            pos_udf("user", "item").alias("pos"), rho_udf("item").alias("rho")
        )
        .groupBy("pos")
        .agg(F.max("rho").alias("r"))
        .toPandas()
    )
    R = np.zeros(M, dtype=np.uint8)
    R[reg_state["pos"].to_numpy()] = reg_state["r"].to_numpy()
    pow2 = pow2_neg_table(cap)
    global_hsum = float(pow2[R].sum())
    global_zeros = int((R == 0).sum())
    sc = edges.sparkSession.sparkContext
    bR = sc.broadcast(R)

    out_schema = StructType(
        [StructField("user", LongType()), StructField("estimate", DoubleType())]
    )

    def per_user(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        R_local = bR.value
        iota = np.arange(m, dtype=np.int64)
        for pdf in batches:
            users = pdf["user"].to_numpy()
            ests = np.empty(len(users), dtype=np.float64)
            for k, s in enumerate(users):
                idx = f_user(np.int64(s), iota, M, seed=seed)
                vals = R_local[idx]
                hsum = float(pow2[vals].sum())
                zeros = int((vals == 0).sum())
                ests[k] = _vhll_formula(
                    M, m, hsum, zeros, global_hsum, global_zeros
                )
            yield pd.DataFrame({"user": users, "estimate": ests})

    return edges.select("user").distinct().mapInPandas(per_user, out_schema)
