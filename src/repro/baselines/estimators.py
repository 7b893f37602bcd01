"""Shared estimator arithmetic for the LPC/HLL family (paper §III-A)."""
from __future__ import annotations

import math

import numpy as np


def alpha(m: int) -> float:
    """HLL bias-correction constant ``α_m`` (paper §III-A-2).

    The paper gives the standard numeric values: 0.673 (m=16), 0.697
    (m=32), 0.709 (m=64) and ``0.7213/(1+1.079/m)`` for m ≥ 128. For
    m < 16 (never used by the paper's configurations) we fall back to
    the m=16 constant.
    """
    if m >= 128:
        return 0.7213 / (1 + 1.079 / m)
    if m >= 64:
        return 0.709
    if m >= 32:
        return 0.697
    return 0.673


def linear_counting(m: int, zeros: int) -> float:
    """LPC estimate ``-m ln(U/m)``; saturates at ``m ln m`` when U = 0."""
    z = max(int(zeros), 1)
    return -m * math.log(z / m)


def hll_estimate(
    m: int, harmonic_sum: float, zeros: int, *, small_range_correction: bool = True
) -> float:
    """HLL estimate with the standard small-range correction.

    ``harmonic_sum`` is ``Σ_i 2^{-R[i]}``; when the raw estimate is
    below ``2.5m`` the register array is read as an LPC bitmap (paper
    §III-A-2).
    """
    raw = alpha(m) * m * m / harmonic_sum
    if small_range_correction and raw < 2.5 * m and zeros > 0:
        return linear_counting(m, zeros)
    return raw


def pow2_neg_table(cap: int) -> np.ndarray:
    """Lookup table ``[2^0, 2^-1, …, 2^-cap]`` for register sums."""
    return 2.0 ** -np.arange(cap + 1, dtype=np.float64)
