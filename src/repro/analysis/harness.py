"""Shared evaluation harness for the paper's experiments (§V).

One entry point per experimental protocol, reused by ``jobs/``,
``benchmarks/`` and the integration tests:

* :func:`run_tracked` — the paper's §V-B protocol: every method keeps a
  per-user counter updated on that user's arrivals; returns final
  counters (and optional checkpoint snapshots) for each method.
* :func:`table2_rows` — super-spreader FNR/FPR per method (Table II).
* :func:`fig5_rse` — RSE per cardinality bucket per method (Fig. 5).
* :func:`fig6_over_time` — FNR/FPR at checkpoints (Fig. 6).
* :func:`measure_update_ns` — mean per-edge update+estimate latency of
  a method's sequential loop (Fig. 3).

Memory accounting follows §V-B: under a budget of ``M_bits``, FreeBS
and CSE get ``M_bits`` bits; FreeRS and vHLL get ``M_bits/w`` w-bit
registers (w=5); LPC gets ``M_bits/|S|`` bits per user; HLL++ gets
``M_bits/(6|S|)`` 6-bit registers per user. The per-user counters all
methods need are excluded from the budget (as in the paper).
"""
from __future__ import annotations

import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from repro.analysis.metrics import (
    detection_metrics,
    estimates_at_checkpoints,
    rse_by_bucket,
    truth_at_checkpoints,
)
from repro.baselines import CseSketch, HllPerUser, LpcPerUser, VhllSketch
from repro.core.freebs import freebs_sequential, freebs_trace
from repro.core.freers import freers_sequential, freers_trace

REGISTER_WIDTH = 5  # w: bits per shared register (paper §V-B)
HLLPP_WIDTH = 6  # HLL++ registers are 6-bit (paper §V-B)
DEFAULT_M_VIRTUAL = 1024  # m for CSE/vHLL virtual sketches (paper §V-E)

ALL_METHODS = ("freebs", "freers", "cse", "vhll", "hllpp", "lpc")
TABLE2_METHODS = ("freebs", "freers", "cse", "vhll", "hllpp")  # §V-F set


def per_user_m(M_bits: int, n_users: int, width: int) -> int:
    """Per-user sketch size under the global budget (floor 4)."""
    return max(4, M_bits // (width * n_users))


@dataclass
class TrackedResult:
    """Final tracked counters and optional checkpoint snapshots."""

    estimates: dict[str, pd.Series]
    snapshots: dict[str, dict[int, pd.Series]] = field(default_factory=dict)
    config: dict = field(default_factory=dict)


def run_tracked(
    stream: pd.DataFrame,
    M_bits: int,
    m: int = DEFAULT_M_VIRTUAL,
    methods: tuple[str, ...] = TABLE2_METHODS,
    checkpoints: list[int] | None = None,
    seed: int = 0,
) -> TrackedResult:
    """Run the §V-B tracked-counter protocol for the given methods."""
    users = stream["user"].to_numpy(np.int64)
    items = stream["item"].to_numpy(np.int64)
    n_users = int(stream["user"].nunique())
    M_regs = max(m + 1, M_bits // REGISTER_WIDTH)
    cps = sorted(checkpoints or [])
    est: dict[str, pd.Series] = {}
    snaps: dict[str, dict[int, pd.Series]] = {}

    def _dict_snaps(d: dict[int, dict[int, float]]) -> dict[int, pd.Series]:
        return {
            cp: pd.Series(v, dtype=np.float64).rename_axis("user")
            for cp, v in d.items()
        }

    for method in methods:
        if method == "freebs":
            trace = freebs_trace(users, items, M_bits, seed=seed)
            est[method] = trace.groupby("user")["contrib"].sum()
            if cps:
                snaps[method] = estimates_at_checkpoints(trace, cps)
        elif method == "freers":
            trace = freers_trace(
                users, items, M_regs, seed=seed, w=REGISTER_WIDTH
            )
            est[method] = trace.groupby("user")["contrib"].sum()
            if cps:
                snaps[method] = estimates_at_checkpoints(trace, cps)
        elif method == "cse":
            sk = CseSketch(M=M_bits, m=m, seed=seed)
            s = sk.run(users, items, checkpoints=cps)
            est[method] = sk.final_estimates()
            if cps:
                snaps[method] = _dict_snaps(s)
        elif method == "vhll":
            sk = VhllSketch(M=M_regs, m=m, w=REGISTER_WIDTH, seed=seed)
            s = sk.run(users, items, checkpoints=cps)
            est[method] = sk.final_estimates()
            if cps:
                snaps[method] = _dict_snaps(s)
        elif method == "hllpp":
            mu = per_user_m(M_bits, n_users, HLLPP_WIDTH)
            sk = HllPerUser(m=mu, w=HLLPP_WIDTH, seed=seed)
            s = sk.run(users, items, checkpoints=cps)
            est[method] = sk.final_estimates()
            if cps:
                snaps[method] = _dict_snaps(s)
        elif method == "lpc":
            mu = per_user_m(M_bits, n_users, 1)
            sk = LpcPerUser(m=mu, seed=seed)
            s = sk.run(users, items, checkpoints=cps)
            est[method] = sk.final_estimates()
            if cps:
                snaps[method] = _dict_snaps(s)
        else:
            raise ValueError(f"unknown method {method!r}")
    return TrackedResult(
        estimates=est,
        snapshots=snaps,
        config={"M_bits": M_bits, "m": m, "M_regs": M_regs, "n_users": n_users},
    )


def table2_rows(
    stream: pd.DataFrame,
    M_bits: int,
    delta: float,
    m: int = DEFAULT_M_VIRTUAL,
    methods: tuple[str, ...] = TABLE2_METHODS,
    seed: int = 0,
) -> pd.DataFrame:
    """Super-spreader FNR/FPR per method at end of stream (Table II)."""
    truth = stream.groupby("user")["item"].nunique()
    res = run_tracked(stream, M_bits, m=m, methods=methods, seed=seed)
    rows = []
    for method in methods:
        d = detection_metrics(res.estimates[method], truth, delta)
        rows.append({"method": method, **d})
    return pd.DataFrame(rows)


def fig5_rse(
    stream: pd.DataFrame,
    M_bits: int,
    m: int = DEFAULT_M_VIRTUAL,
    methods: tuple[str, ...] = TABLE2_METHODS,
    seed: int = 0,
) -> pd.DataFrame:
    """RSE per power-of-two cardinality bucket per method (Fig. 5)."""
    truth = stream.groupby("user")["item"].nunique()
    res = run_tracked(stream, M_bits, m=m, methods=methods, seed=seed)
    out = []
    for method in methods:
        b = rse_by_bucket(res.estimates[method], truth)
        b.insert(0, "method", method)
        out.append(b)
    return pd.concat(out, ignore_index=True)


def fig6_over_time(
    stream: pd.DataFrame,
    M_bits: int,
    delta: float,
    n_checkpoints: int = 10,
    m: int = DEFAULT_M_VIRTUAL,
    methods: tuple[str, ...] = TABLE2_METHODS,
    seed: int = 0,
) -> pd.DataFrame:
    """FNR/FPR at evenly spaced checkpoints over the stream (Fig. 6)."""
    n = len(stream)
    cps = [int(n * (i + 1) / n_checkpoints) for i in range(n_checkpoints)]
    res = run_tracked(
        stream, M_bits, m=m, methods=methods, checkpoints=cps, seed=seed
    )
    truths = truth_at_checkpoints(stream, cps)
    rows = []
    for method in methods:
        for cp in cps:
            d = detection_metrics(
                res.snapshots[method].get(cp, pd.Series(dtype=float)),
                truths[cp],
                delta,
            )
            rows.append({"method": method, "t": cp, **d})
    return pd.DataFrame(rows)


def measure_update_ns(
    method: str,
    users: np.ndarray,
    items: np.ndarray,
    m: int,
    M_bits: int = 1 << 23,
    seed: int = 0,
) -> float:
    """Mean per-edge update+estimate time (ns) of the sequential loop.

    The Fig. 3 protocol: same harness for every method; for the O(m)
    methods the estimate step enumerates the m bits/registers of the
    arriving user's (virtual) sketch, as in the paper's implementations.
    FreeBS/FreeRS take no m (their O(1) loop is Algorithm 1/2).
    """
    M_regs = max(m + 1, M_bits // REGISTER_WIDTH)
    start = time.perf_counter()
    if method == "freebs":
        freebs_sequential(users, items, M_bits, seed=seed)
    elif method == "freers":
        freers_sequential(users, items, M_regs, seed=seed, w=REGISTER_WIDTH)
    elif method == "cse":
        CseSketch(M=M_bits, m=m, seed=seed).run(users, items)
    elif method == "vhll":
        VhllSketch(M=M_regs, m=m, w=REGISTER_WIDTH, seed=seed).run(users, items)
    elif method == "hllpp":
        HllPerUser(m=m, w=HLLPP_WIDTH, seed=seed).run(
            users, items, enumerate_state=True
        )
    elif method == "lpc":
        LpcPerUser(m=m, seed=seed).run(users, items, enumerate_state=True)
    else:
        raise ValueError(f"unknown method {method!r}")
    return (time.perf_counter() - start) / len(users) * 1e9
