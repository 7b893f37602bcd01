"""FreeRS — parameter-free register sharing (paper §IV-B, Algorithm 2).

One shared register array ``R[0..M-1]`` of ``w``-bit registers. Each
edge hashes to register ``h*(e)`` with Geometric(1/2) rank ``ρ*(e)``;
if the register's value increases, the arriving user's estimate grows
by ``1/q_R`` with ``q_R = Σ_j 2^{-R[j]} / M`` evaluated on the
*pre-update* array (the formal definition and the unbiasedness proof;
Algorithm 2's pseudocode updates q first — see DESIGN.md §1 for why we
follow the theory). O(1) per edge via incremental maintenance of the
sum ``S = Σ_j 2^{-R[j]}``.

Exact distributed reformulation (DESIGN.md §2): register-change events
are running-max records within each register's sub-stream (a window
partitioned by register); each record perturbs ``S`` by
``Δ = 2^-ρ − 2^-prev``; a global cumulative sum of Δ in arrival order
recovers the pre-event ``S`` and hence the contribution ``M/S``.
"""
from __future__ import annotations

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, Window
from pyspark.sql import functions as F
from pyspark.sql.types import LongType

from repro.hashing import h_star, rho_star


def freers_sequential(
    users: np.ndarray,
    items: np.ndarray,
    M: int,
    seed: int = 0,
    w: int = 5,
) -> pd.DataFrame:
    """Algorithm 2 verbatim (pre-update q): trace ``(t, user, contrib)``."""
    cap = (1 << w) - 1
    regs = h_star(users, items, M, seed=seed)
    rhos = rho_star(users, items, cap=cap, seed=seed)
    R = np.zeros(M, dtype=np.int64)
    S = float(M)
    ts, us, cs = [], [], []
    for t in range(len(users)):
        j, r = regs[t], rhos[t]
        if r > R[j]:
            cs.append(M / S)  # 1/q_R with q_R = S_pre / M
            ts.append(t)
            us.append(users[t])
            S += 2.0**-r - 2.0 ** -float(R[j])
            R[j] = r
    return pd.DataFrame(
        {"t": np.array(ts, dtype=np.int64), "user": np.array(us, dtype=np.int64), "contrib": cs}
    )


def freers_trace(
    users: np.ndarray,
    items: np.ndarray,
    M: int,
    seed: int = 0,
    w: int = 5,
) -> pd.DataFrame:
    """Exact vectorized FreeRS trace, identical to the sequential run.

    Per-register running maxima are computed with the segmented-cummax
    trick (offset each register's ranks by ``reg * 64`` — ranks are
    < 64 — take one global ``maximum.accumulate`` over the
    register-sorted order, subtract the offset back).
    """
    cap = (1 << w) - 1
    users = np.asarray(users, dtype=np.int64)
    items = np.asarray(items, dtype=np.int64)
    regs = h_star(users, items, M, seed=seed)
    rhos = rho_star(users, items, cap=cap, seed=seed)

    order = np.argsort(regs, kind="stable")  # by register, arrival order kept
    reg_s, rho_s = regs[order], rhos[order]
    new_seg = np.ones(len(reg_s), dtype=bool)
    new_seg[1:] = reg_s[1:] != reg_s[:-1]
    seg_id = np.cumsum(new_seg) - 1
    offset = seg_id.astype(np.int64) * 64
    cummax = np.maximum.accumulate(offset + rho_s) - offset
    prev = np.zeros(len(reg_s), dtype=np.int64)
    prev[1:] = cummax[:-1]
    prev[new_seg] = 0  # register starts at 0
    is_record = rho_s > prev

    t_rec = order[is_record]
    rho_rec = rho_s[is_record]
    prev_rec = prev[is_record]
    by_t = np.argsort(t_rec, kind="stable")
    t_rec, rho_rec, prev_rec = t_rec[by_t], rho_rec[by_t], prev_rec[by_t]

    delta = 2.0**-rho_rec.astype(np.float64) - 2.0**-prev_rec.astype(np.float64)
    s_pre = float(M) + np.concatenate(([0.0], np.cumsum(delta)[:-1]))
    return pd.DataFrame(
        {"t": t_rec.astype(np.int64), "user": users[t_rec], "contrib": M / s_pre}
    )


def estimates_from_trace(trace: pd.DataFrame) -> pd.Series:
    """Final per-user estimates (index: user) from a trace."""
    return trace.groupby("user")["contrib"].sum()


def freers_spark_trace(
    edges: DataFrame, M: int, seed: int = 0, w: int = 5
) -> DataFrame:
    """FreeRS on Spark: trace DataFrame ``(t, user, contrib)``.

    Same window structure as the vectorized form: per-register previous
    running max (window max over preceding rows), record filter, global
    running sum of Δ for the pre-event S. The global window is single-
    partition — exactness boundary, as for FreeBS.
    """
    cap = (1 << w) - 1

    @F.pandas_udf(LongType())
    def reg_udf(user: pd.Series, item: pd.Series) -> pd.Series:
        return pd.Series(h_star(user.to_numpy(), item.to_numpy(), M, seed=seed))

    @F.pandas_udf(LongType())
    def rho_udf(user: pd.Series, item: pd.Series) -> pd.Series:
        return pd.Series(
            rho_star(user.to_numpy(), item.to_numpy(), cap=cap, seed=seed)
        )

    w_reg = (
        Window.partitionBy("reg")
        .orderBy("t")
        .rowsBetween(Window.unboundedPreceding, -1)
    )
    w_all = Window.orderBy("t").rowsBetween(Window.unboundedPreceding, -1)
    return (
        edges.withColumn("reg", reg_udf("user", "item"))
        .withColumn("rho", rho_udf("user", "item"))
        .withColumn("prev", F.coalesce(F.max("rho").over(w_reg), F.lit(0)))
        .filter(F.col("rho") > F.col("prev"))
        .withColumn(
            "delta",
            F.pow(F.lit(2.0), -F.col("rho")) - F.pow(F.lit(2.0), -F.col("prev")),
        )
        .withColumn(
            "s_pre",
            F.lit(float(M)) + F.coalesce(F.sum("delta").over(w_all), F.lit(0.0)),
        )
        .withColumn("contrib", F.lit(float(M)) / F.col("s_pre"))
        .select("t", "user", "contrib")
    )


def freers_spark(edges: DataFrame, M: int, seed: int = 0, w: int = 5) -> DataFrame:
    """FreeRS on Spark: final per-user estimates ``(user, estimate)``."""
    return (
        freers_spark_trace(edges, M, seed=seed, w=w)
        .groupBy("user")
        .agg(F.sum("contrib").alias("estimate"))
    )
