"""Tests for the shared evaluation harness (repro.analysis.harness)."""
import numpy as np
import pandas as pd
import pytest

from repro.analysis import harness as H
from repro.datasets import DatasetSpec, generate_stream

TINY = DatasetSpec("tiny", 200_000, 20_000, 2_000_000, 1 / 200)


@pytest.fixture(scope="module")
def stream():
    return generate_stream(TINY, seed=0)  # ~1000 users, ~10k pairs


class TestPerUserM:
    def test_budget_split(self):
        assert H.per_user_m(6_000_000, 1000, 6) == 1000
        assert H.per_user_m(1_000_000, 1000, 1) == 1000

    def test_floor(self):
        assert H.per_user_m(100, 1000, 6) == 4


class TestRunTracked:
    def test_all_methods_produce_estimates(self, stream):
        res = H.run_tracked(
            stream, M_bits=1 << 18, m=64, methods=H.ALL_METHODS
        )
        truth = stream.groupby("user")["item"].nunique()
        for method in H.ALL_METHODS:
            est = res.estimates[method]
            assert len(est) > 0
            assert (est >= 0).all()
            # every estimated user exists
            assert est.index.isin(truth.index).all()

    def test_free_methods_cover_almost_every_user(self, stream):
        # FreeBS estimates every user with >= 1 accepted pair; at light
        # load only the rare cardinality-1 user whose single pair lands
        # on an already-set bit is missed
        res = H.run_tracked(stream, M_bits=1 << 22, m=64, methods=("freebs",))
        truth = stream.groupby("user")["item"].nunique()
        covered = res.estimates["freebs"].index.isin(truth.index).sum()
        assert covered == len(res.estimates["freebs"])
        assert len(res.estimates["freebs"]) > 0.99 * len(truth)

    def test_unknown_method_raises(self, stream):
        with pytest.raises(ValueError):
            H.run_tracked(stream.head(10), 1 << 12, methods=("nope",))

    def test_checkpoint_snapshots_returned(self, stream):
        cps = [len(stream) // 2, len(stream)]
        res = H.run_tracked(
            stream, M_bits=1 << 16, m=64,
            methods=("freebs", "cse"), checkpoints=cps,
        )
        for method in ("freebs", "cse"):
            assert set(res.snapshots[method]) == set(cps)
            mid = res.snapshots[method][cps[0]].sum()
            end = res.snapshots[method][cps[1]].sum()
            assert mid <= end * 1.01

    def test_config_reported(self, stream):
        res = H.run_tracked(stream, M_bits=1000, m=64, methods=("freebs",))
        assert res.config["M_regs"] == max(65, 1000 // 5)


class TestTable2:
    def test_generous_memory_detects_perfectly(self, stream):
        # with a huge array every method nails the spreaders
        rows = H.table2_rows(
            stream, M_bits=1 << 24, delta=0.005, m=256,
            methods=("freebs", "freers"),
        )
        assert (rows["fnr"] < 0.05).all()
        assert (rows["fpr"] < 0.01).all()

    def test_row_per_method(self, stream):
        rows = H.table2_rows(
            stream, M_bits=1 << 16, delta=0.005, methods=("freebs", "cse")
        )
        assert list(rows["method"]) == ["freebs", "cse"]
        assert {"fnr", "fpr", "threshold", "n_spreaders"} <= set(rows.columns)


class TestFig5:
    def test_bucketed_rse_shape(self, stream):
        out = H.fig5_rse(
            stream, M_bits=1 << 18, m=64, methods=("freebs", "hllpp")
        )
        assert set(out["method"]) == {"freebs", "hllpp"}
        assert (out["rse"] >= 0).all()
        # buckets cover the full cardinality range
        truth = stream.groupby("user")["item"].nunique()
        assert out["bucket_hi"].max() >= truth.max()


class TestFig6:
    def test_over_time_rows(self, stream):
        out = H.fig6_over_time(
            stream, M_bits=1 << 18, delta=0.005, n_checkpoints=4,
            methods=("freebs",),
        )
        assert len(out) == 4
        assert out["t"].is_monotonic_increasing


class TestRuntimeMeasurement:
    def test_all_methods_measurable(self, stream):
        users = stream["user"].to_numpy()[:2000]
        items = stream["item"].to_numpy()[:2000]
        for method in H.ALL_METHODS:
            ns = H.measure_update_ns(method, users, items, m=64)
            assert 0 < ns < 1e7

    def test_cse_scales_with_m(self, stream):
        """The O(m) vs O(1) contrast Fig. 3 demonstrates."""
        users = stream["user"].to_numpy()[:3000]
        items = stream["item"].to_numpy()[:3000]
        slow = H.measure_update_ns("cse", users, items, m=4096)
        fast = H.measure_update_ns("cse", users, items, m=64)
        assert slow > 1.5 * fast
