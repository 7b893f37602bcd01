"""Helpers for persisting benchmark result tables.

pytest captures stdout, so every benchmark writes its table to
``benchmarks/results/<name>.txt`` (and also prints it, visible with
``-s``). EXPERIMENTS.md quotes these files.
"""
from __future__ import annotations

from pathlib import Path

RESULTS_DIR = Path(__file__).resolve().parent / "results"


def save(name: str, text: str) -> Path:
    RESULTS_DIR.mkdir(exist_ok=True)
    p = RESULTS_DIR / f"{name}.txt"
    p.write_text(text + "\n")
    print(text)
    return p
