"""Benchmark + reproduction of Fig. 5 (RSE vs cardinality).

Runs the §V-E accuracy experiment on orkut and sanjose — load-factor-
preserving M, m = 1024, tracked counters — and records the RSE per
power-of-two cardinality bucket (EXPERIMENTS.md § Fig. 5). Asserts the
paper's qualitative claims: the Free* methods dominate the baselines
overall, and CSE's error blows up past its ``m ln m`` range.
"""
import math

import numpy as np
import pandas as pd
import pytest

from repro.analysis.harness import TABLE2_METHODS, fig5_rse
from repro.datasets import CATALOG, generate_stream

from benchmarks._results import save

M_VIRTUAL = 1024
DATASETS = ("orkut", "sanjose")

_parts: list[pd.DataFrame] = []


@pytest.mark.parametrize("name", DATASETS)
def test_fig5_dataset(benchmark, name):
    spec = CATALOG[name]
    stream = generate_stream(spec, seed=0)
    df = benchmark.pedantic(
        fig5_rse,
        args=(stream, spec.M_bits),
        kwargs={"m": M_VIRTUAL, "methods": TABLE2_METHODS},
        rounds=1,
        iterations=1,
    )
    df.insert(0, "dataset", name)
    _parts.append(df)

    piv = df.pivot(index="bucket_lo", columns="method", values="rse")
    # Free* dominate: geometric-mean RSE across buckets is lowest
    gmean = np.exp(np.log(piv.clip(lower=1e-6)).mean())
    assert gmean["freebs"] < gmean[["cse", "vhll", "hllpp"]].min()
    assert gmean["freers"] < gmean[["cse", "vhll", "hllpp"]].min()
    if name == "orkut":
        # CSE's V-shape: its RSE first falls with n, then blows back up
        # as n approaches the m·ln m (~7.1e3) range limit, while FreeRS
        # keeps improving (the paper's Fig. 5 signature)
        collapse = piv[piv.index > M_VIRTUAL * math.log(M_VIRTUAL)]
        if len(collapse):
            assert (collapse["cse"] > 4 * piv["cse"].min()).all()
            assert (collapse["freers"] < 0.2).all()

    if len(_parts) == len(DATASETS):
        out = []
        for part in _parts:
            ds = part["dataset"].iloc[0]
            out.append(
                f"Fig. 5 as table — RSE by cardinality bucket ({ds}, "
                f"m={M_VIRTUAL})\n"
                + part.pivot(
                    index="bucket_lo", columns="method", values="rse"
                )
                .round(4)
                .to_string()
            )
        save("fig5_rse", "\n\n".join(out))
