"""Baselines the paper compares against (§III, §V-B) — built from scratch.

* :mod:`repro.baselines.lpc` — per-user Linear-Time Probabilistic
  Counting [Whang et al. 1990].
* :mod:`repro.baselines.hll` — per-user HyperLogLog; the paper's HLL++
  baseline is HLL with 6-bit registers + linear-counting small-range
  correction (substitution documented in DESIGN.md §5).
* :mod:`repro.baselines.cse` — CSE virtual-LPC bit sharing
  [Yoon et al. 2009].
* :mod:`repro.baselines.vhll` — vHLL virtual-HLL register sharing
  [Xiao et al. 2015].

Each shared-array baseline has (a) a sequential *tracked-counter* run —
the paper's evaluation protocol (§V-B: one counter per user, updated on
that user's arrivals, O(m) per edge) — and (b) a Spark batch end-state
estimator (shared array reduced in Spark, per-user estimates via
``mapInPandas`` over a broadcast array).
"""
from repro.baselines.estimators import alpha, linear_counting
from repro.baselines.lpc import LpcPerUser
from repro.baselines.hll import HllPerUser
from repro.baselines.cse import CseSketch, cse_spark
from repro.baselines.vhll import VhllSketch, vhll_spark

__all__ = [
    "alpha",
    "linear_counting",
    "LpcPerUser",
    "HllPerUser",
    "CseSketch",
    "cse_spark",
    "VhllSketch",
    "vhll_spark",
]
