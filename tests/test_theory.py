"""Tests for the paper's closed-form error theory (repro.analysis.theory)."""
import math

import numpy as np
import pytest

from repro.analysis import theory as T


class TestMomentFormulas:
    def test_e_inv_q_bs_at_zero_load(self):
        assert T.e_inv_q_bs(0, 1000) == pytest.approx(1.0)

    def test_e_inv_q_bs_grows_with_load(self):
        vals = [T.e_inv_q_bs(n, 1000) for n in (0, 500, 1000, 2000)]
        assert all(b > a for a, b in zip(vals, vals[1:]))
        # leading term is e^{n/M}
        assert T.e_inv_q_bs(1000, 1000) == pytest.approx(math.e, rel=0.01)

    def test_e_inv_q_rs_floor_and_asymptote(self):
        assert T.e_inv_q_rs(0, 1000) == 1.0
        # n = 10M: ~ 1.386 * 10
        assert T.e_inv_q_rs(10_000, 1000) == pytest.approx(13.86, rel=0.02)

    def test_variance_bounds_nonnegative(self):
        assert T.freebs_variance(100, 1000, 512) >= 0
        assert T.freers_variance(100, 10_000, 512) >= 0

    def test_freers_beats_freebs_at_high_load(self):
        """§IV-C: register sharing wins once n/M >= 0.772w."""
        M_bits = 10_000
        w = 5
        n_total = 8 * M_bits  # far past the crossover
        v_bs = T.freebs_variance(100, n_total, M_bits)
        v_rs = T.freers_variance(100, n_total, M_bits // w)
        assert v_rs < v_bs

    def test_freers_bound_floors_below_asymptotic_regime(self):
        # below n ~ alpha_M*M the Theorem-2 approximation gives E[1/q]=1,
        # so the bound degenerates to 0 (q ~ 1: every update accepted)
        M = 100_000 // 5
        assert T.freers_variance(100, 2_000, M) == 0.0
        assert T.freers_variance(100, 10 * M, M) > 0.0

    def test_lpc_moments(self):
        assert T.lpc_bias(0, 64) == 0.0
        assert T.lpc_variance(0, 64) == 0.0
        assert T.lpc_variance(64, 64) == pytest.approx(
            64 * (math.e - 2), rel=1e-9
        )

    def test_cse_variance_exceeds_freebs(self):
        """§IV-C discussion: Var(CSE) > Var(FreeBS) (same memory)."""
        M, m = 1 << 20, 1024
        n_s, n_total = 5000, 200_000
        assert T.cse_variance(n_s, n_total, M, m) > T.freebs_variance(
            n_s, n_total, M
        )

    def test_vhll_variance_exceeds_freers(self):
        """§IV-C discussion: Var(vHLL) ≳ 2.16 n n_s/M vs 1.386 n n_s/M."""
        M_regs, m = 1 << 17, 1024
        n_s, n_total = 5000, 2_000_000
        assert T.vhll_variance(n_s, n_total, M_regs, m) > T.freers_variance(
            n_s, n_total, M_regs
        )

    def test_ranges(self):
        assert T.lpc_max_range(1024) == pytest.approx(1024 * math.log(1024))
        # FreeBS range M ln M >> CSE range m ln m for M >> m
        assert T.freebs_max_range(1 << 20) > 500 * T.lpc_max_range(1024)

    def test_hll_rse(self):
        assert T.hll_rse(1024) == pytest.approx(1.04 / 32)


class TestTheoryVsMonteCarlo:
    """The variance formulas describe the actual implementations."""

    def test_freebs_e_inv_q_matches_empirical(self):
        from repro.core.freebs import freebs_trace

        # after n distinct pairs, mean over seeds of 1/q at event n
        # approximates e^{n/M}
        M, n = 256, 512
        users = np.zeros(n, dtype=np.int64)
        items = np.arange(n)
        last = [
            freebs_trace(users, items, M, seed=s)["contrib"].iloc[-1]
            for s in range(40)
        ]
        assert np.mean(last) == pytest.approx(
            T.e_inv_q_bs(n, M), rel=0.25
        )

    def test_freers_e_inv_q_matches_empirical(self):
        from repro.core.freers import freers_trace

        M, n = 64, 1000  # n > 2.5M: the asymptotic regime
        users = np.zeros(n, dtype=np.int64)
        items = np.arange(n)
        last = [
            freers_trace(users, items, M, seed=s)["contrib"].iloc[-1]
            for s in range(40)
        ]
        assert np.mean(last) == pytest.approx(
            T.e_inv_q_rs(n, M), rel=0.30
        )
