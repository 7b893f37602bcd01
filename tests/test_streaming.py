"""Structured Streaming stateful implementations vs batch (exactness).

A streaming run over N micro-batches must produce exactly the same
trace/estimates as one batch pass — state (the shared array and its q
bookkeeping) carries across triggers.
"""
import numpy as np
import pandas as pd
import pytest

from repro.baselines import HllPerUser
from repro.core.freebs import freebs_trace
from repro.core.freers import freers_trace
from repro.streaming import (
    freebs_stateful,
    freers_stateful,
    hllpp_stateful,
    read_edge_stream,
    write_stream_batches,
)


def _stream_pdf(n_users, n_items, n_edges, seed):
    rng = np.random.default_rng(seed)
    return pd.DataFrame(
        {
            "t": np.arange(n_edges, dtype=np.int64),
            "user": rng.integers(0, n_users, n_edges),
            "item": rng.integers(0, n_items, n_edges),
        }
    )


def _run_query(result_df, name):
    q = (
        result_df.writeStream.format("memory")
        .queryName(name)
        .outputMode("append" if name.startswith("free") else "update")
        .trigger(availableNow=True)
        .start()
    )
    q.awaitTermination(timeout=300)
    return q


@pytest.fixture(scope="module")
def edges_pdf():
    return _stream_pdf(30, 500, 5000, 7)


class TestSharedSketchStreaming:
    @pytest.mark.parametrize(
        "stateful, local, name",
        [
            (freebs_stateful, freebs_trace, "freebs_stream"),
            (freers_stateful, freers_trace, "freers_stream"),
        ],
    )
    def test_streaming_equals_batch(
        self, spark, tmp_path, edges_pdf, stateful, local, name
    ):
        M = 1024
        write_stream_batches(edges_pdf, tmp_path / name, n_batches=5)
        stream = read_edge_stream(spark, tmp_path / name)
        _run_query(stateful(stream, M), name)
        got = (
            spark.table(name)
            .toPandas()
            .sort_values("t")
            .reset_index(drop=True)
        )
        want = local(
            edges_pdf["user"].to_numpy(), edges_pdf["item"].to_numpy(), M
        )
        assert np.array_equal(got["t"], want["t"])
        assert np.array_equal(got["user"], want["user"])
        np.testing.assert_allclose(got["contrib"], want["contrib"], rtol=1e-9)

    def test_state_persists_across_many_batches(self, spark, tmp_path):
        # 1 batch vs 10 batches must agree: state round-trips exactly
        pdf = _stream_pdf(10, 200, 1200, 1)
        M = 256
        results = {}
        for n_batches in (1, 10):
            name = f"freebs_nb{n_batches}"
            write_stream_batches(pdf, tmp_path / name, n_batches=n_batches)
            _run_query(
                freebs_stateful(read_edge_stream(spark, tmp_path / name), M),
                name,
            )
            results[n_batches] = (
                spark.table(name).toPandas().sort_values("t").reset_index(drop=True)
            )
        pd.testing.assert_frame_equal(results[1], results[10])


class TestPerUserStreaming:
    def test_hllpp_streaming_matches_sequential(self, spark, tmp_path, edges_pdf):
        m = 32
        write_stream_batches(edges_pdf, tmp_path / "hllpp", n_batches=4)
        stream = read_edge_stream(spark, tmp_path / "hllpp")
        _run_query(hllpp_stateful(stream, m=m), "hllpp_stream")
        # memory sink in update mode appends rows per batch; keep the
        # last emitted estimate per user (estimates only grow)
        got = (
            spark.table("hllpp_stream")
            .toPandas()
            .groupby("user")["estimate"]
            .max()
            .sort_index()
        )
        h = HllPerUser(m=m)
        h.run(edges_pdf["user"].to_numpy(), edges_pdf["item"].to_numpy())
        want = h.final_estimates().sort_index()
        np.testing.assert_allclose(got.to_numpy(), want.to_numpy(), rtol=1e-9)
        assert set(got.index) == set(want.index)
