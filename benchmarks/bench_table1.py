"""Benchmark + reproduction of Table I (dataset generation).

Times the synthetic generator per dataset and records the generated
summary next to the paper's numbers (EXPERIMENTS.md § Table I).
"""
import pandas as pd
import pytest

from repro.datasets import CATALOG, generate_stream, stream_summary

from benchmarks._results import save

_summaries: dict[str, dict] = {}


@pytest.mark.parametrize("name", list(CATALOG))
def test_generate_dataset(benchmark, name):
    spec = CATALOG[name]
    stream = benchmark.pedantic(
        generate_stream, args=(spec,), kwargs={"seed": 0}, rounds=1, iterations=1
    )
    s = stream_summary(stream)
    _summaries[name] = {
        "dataset": name,
        "scale": spec.scale,
        "users": s["users"],
        "paper_users": spec.paper_users,
        "max_card": s["max_cardinality"],
        "paper_max_card": spec.paper_max_card,
        "total_card": s["total_cardinality"],
        "paper_total_card": spec.paper_total_card,
        "stream_len": s["stream_length"],
        "M_bits": spec.M_bits,
    }
    # targets hit: totals within 2%, users exact by construction
    assert abs(s["total_cardinality"] / spec.total_card - 1) < 0.02
    assert s["users"] == spec.users
    if len(_summaries) == len(CATALOG):
        save(
            "table1",
            "Table I — paper vs synthetic stand-in\n"
            + pd.DataFrame(_summaries.values()).to_string(index=False),
        )
