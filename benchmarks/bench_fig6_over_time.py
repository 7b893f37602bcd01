"""Benchmark + reproduction of Fig. 6 (detection quality over time).

Runs the §V-F anytime-detection experiment on sanjose — Δ = 5e-5,
m = 1024, tracked counters, 10 checkpoints — and records FNR/FPR per
method per checkpoint (EXPERIMENTS.md § Fig. 6). Asserts the Free*
methods beat the baselines at (almost) every checkpoint.
"""
import pandas as pd
import pytest

from repro.analysis.harness import TABLE2_METHODS, fig6_over_time
from repro.datasets import CATALOG, generate_stream

from benchmarks._results import save

DELTA = 5e-5
M_VIRTUAL = 1024


def test_fig6_sanjose(benchmark):
    spec = CATALOG["sanjose"]
    stream = generate_stream(spec, seed=0)
    df = benchmark.pedantic(
        fig6_over_time,
        args=(stream, spec.M_bits),
        kwargs={
            "delta": DELTA,
            "n_checkpoints": 10,
            "m": M_VIRTUAL,
            "methods": TABLE2_METHODS,
        },
        rounds=1,
        iterations=1,
    )
    fnr = df.pivot(index="t", columns="method", values="fnr")
    fpr = df.pivot(index="t", columns="method", values="fpr")
    save(
        "fig6_over_time",
        f"Fig. 6 as table — sanjose, Δ={DELTA}, m={M_VIRTUAL}\n\nFNR:\n"
        + fnr.to_string(float_format="{:.2e}".format)
        + "\n\nFPR:\n"
        + fpr.to_string(float_format="{:.2e}".format),
    )
    # the paper's claim over time: Free* below the baselines at every
    # checkpoint for FNR, and at the final checkpoints for FPR
    base = ["cse", "vhll", "hllpp"]
    free = ["freebs", "freers"]
    assert (fnr[free].max(axis=1) <= fnr[base].min(axis=1) + 1e-12).all()
    tail = fpr.iloc[len(fpr) // 2 :]
    assert (tail[free].max(axis=1) <= tail[base].min(axis=1) + 1e-12).all()
