"""Closed-form error theory from the paper (§III, §IV, Theorems 1–2).

These are the approximations the paper derives; the statistical tests
compare Monte-Carlo moments of the implementations against them, which
guards against implementation drift (a subtly wrong estimator matches
neither its mean nor its variance law).

All formulas take *true* quantities (``n_s``, ``n_total``) and the
configuration (M, m, w) and return moments of the estimators.
"""
from __future__ import annotations

import math

from repro.baselines.estimators import alpha


def e_inv_q_bs(n_total: float, M: int) -> float:
    """``E[1/q_B]`` after n_total distinct pairs (Theorem 1 approx)."""
    x = n_total / M
    return math.exp(x) * (1.0 + (math.exp(x) - x - 1.0) / M)


def freebs_variance(n_s: float, n_total: float, M: int) -> float:
    """Theorem 1 upper bound: ``Var ≤ n_s (E[1/q_B^(t)] - 1)``."""
    return n_s * (e_inv_q_bs(n_total, M) - 1.0)


def e_inv_q_rs(n_total: float, M: int) -> float:
    """``E[1/q_R]`` after n_total distinct pairs (Theorem 2 approx).

    The paper's asymptotic ``n/(α_M M) ≈ 1.386 n/M`` holds for
    ``n > 2.5M``; 1/q is ≥ 1 always, so we floor at 1 for the small-n
    regime (where q ≈ 1).
    """
    return max(1.0, n_total / (alpha(M) * M))


def freers_variance(n_s: float, n_total: float, M: int) -> float:
    """Theorem 2 upper bound: ``Var ≤ n_s (E[1/q_R^(t)] - 1)``."""
    return n_s * (e_inv_q_rs(n_total, M) - 1.0)


def lpc_bias(n_s: float, m: int) -> float:
    """LPC bias ``(e^{n/m} - n/m - 1)/2`` (§III-A-1)."""
    x = n_s / m
    return 0.5 * (math.exp(x) - x - 1.0)


def lpc_variance(n_s: float, m: int) -> float:
    """LPC variance ``m (e^{n/m} - n/m - 1)`` (§III-A-1)."""
    x = n_s / m
    return m * (math.exp(x) - x - 1.0)


def cse_variance(n_s: float, n_total: float, M: int, m: int) -> float:
    """CSE variance ``m (E[1/q] e^{n_s/m} - n_s/m - 1)`` (§IV-C).

    ``E[1/q]`` is the bit-sharing inverse-zero-fraction moment with the
    full array load, as in the FreeBS comparison discussion.
    """
    x = n_s / m
    return m * (e_inv_q_bs(n_total, M) * math.exp(x) - x - 1.0)


def vhll_variance(n_s: float, n_total: float, M: int, m: int) -> float:
    """vHLL variance (§III-B-2); M counts registers here."""
    blow = (M / (M - m)) ** 2
    load = (n_total - n_s) * m / M
    return blow * (
        (1.04**2 / m) * (n_s + load) ** 2
        + load * (1.0 - m / M)
        + (1.04 * n_total * m) ** 2 / M**3
    )


def hll_rse(m: int) -> float:
    """HLL asymptotic RSE ``β_m/sqrt(m)`` with ``β_∞ ≈ 1.04`` (§III-A-2)."""
    return 1.04 / math.sqrt(m)


def freebs_max_range(M: int) -> float:
    """FreeBS estimation range ``Σ_{i=1..M} M/i ≈ M ln M`` (§IV-C)."""
    return M * (math.log(M) + 0.5772156649)


def lpc_max_range(m: int) -> float:
    """LPC/CSE estimation range ``m ln m`` (§III-A-1, §VI)."""
    return m * math.log(m)
