"""Deterministic file-backed micro-batch edge stream.

Structured Streaming's file source, with ``maxFilesPerTrigger=1`` and
strictly increasing modification times, delivers one written chunk per
micro-batch in write order — a reproducible stand-in for a live feed
that still exercises real multi-batch state persistence.
"""
from __future__ import annotations

import os
from pathlib import Path

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

EDGE_SCHEMA = "t LONG, user LONG, item LONG"


def write_stream_batches(
    stream: pd.DataFrame, directory: str | Path, n_batches: int
) -> list[Path]:
    """Split an edge stream (ordered by ``t``) into parquet micro-batches.

    Files get strictly increasing mtimes so the file source replays them
    in order. Returns the written paths.
    """
    directory = Path(directory)
    directory.mkdir(parents=True, exist_ok=True)
    stream = stream.sort_values("t").reset_index(drop=True)
    chunks = np.array_split(np.arange(len(stream)), n_batches)
    base = 1_000_000_000  # fixed epoch keeps mtimes deterministic too
    paths = []
    for i, idx in enumerate(chunks):
        p = directory / f"batch-{i:05d}.parquet"
        stream.iloc[idx].to_parquet(p, index=False)
        os.utime(p, (base + i, base + i))
        paths.append(p)
    return paths


def read_edge_stream(spark: SparkSession, directory: str | Path) -> DataFrame:
    """Open the directory as a one-file-per-trigger streaming DataFrame."""
    return (
        spark.readStream.schema(EDGE_SCHEMA)
        .option("maxFilesPerTrigger", 1)
        .parquet(str(directory))
    )
