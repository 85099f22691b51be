"""Tests for BLB estimation, Theorem 11, and Eq.-12 incremental sizing."""
import numpy as np
import pytest

from repro.core import (
    BLBEstimate,
    BLBParams,
    accuracy_guaranteed,
    blb_estimate,
    incremental_sample_size,
    moe_threshold,
    z_value,
)


class TestZValue:
    def test_95(self):
        assert z_value(0.05) == pytest.approx(1.959964, abs=1e-5)

    def test_99(self):
        assert z_value(0.01) == pytest.approx(2.575829, abs=1e-5)

    def test_90(self):
        assert z_value(0.10) == pytest.approx(1.644854, abs=1e-5)


class TestBLB:
    def test_point_estimate_is_mean(self):
        vals = [0.1, 0.2, 0.3, 0.4]
        est = blb_estimate(vals)
        assert est.delta_star == pytest.approx(0.25)

    def test_empty(self):
        est = blb_estimate([])
        assert est.delta_star == 0.0 and est.moe == 0.0

    def test_single_value_exact(self):
        est = blb_estimate([0.3])
        assert est.moe == 0.0

    def test_zero_spread_exact(self):
        est = blb_estimate([0.3] * 40)
        assert est.moe == 0.0

    def test_deterministic(self):
        rng = np.random.default_rng(0)
        vals = rng.random(60)
        a = blb_estimate(vals, seed=5)
        b = blb_estimate(vals, seed=5)
        assert a == b

    def test_moe_tracks_clt(self):
        """ε should be within a factor ~2 of z·σ/√n for normal data."""
        rng = np.random.default_rng(1)
        vals = rng.normal(0.5, 0.1, 400)
        est = blb_estimate(vals, alpha=0.05, params=BLBParams(m=0.7, r=100, s=3))
        clt = 1.96 * vals.std() / np.sqrt(len(vals))
        assert 0.5 * clt < est.moe < 2.0 * clt

    def test_moe_shrinks_with_n(self):
        rng = np.random.default_rng(2)
        small = blb_estimate(rng.normal(0.5, 0.1, 30), seed=1)
        large = blb_estimate(rng.normal(0.5, 0.1, 3000), seed=1)
        assert large.moe < small.moe

    def test_moe_grows_with_confidence(self):
        rng = np.random.default_rng(3)
        vals = rng.normal(0.5, 0.1, 200)
        loose = blb_estimate(vals, alpha=0.10, seed=1)
        tight = blb_estimate(vals, alpha=0.01, seed=1)
        assert tight.moe > loose.moe

    def test_subsample_accounting(self):
        vals = np.linspace(0, 1, 100)
        est = blb_estimate(vals, params=BLBParams(m=0.5, r=20, s=3))
        # b = ceil(100^0.5) = 10, s = min(3, 100//10) = 3
        assert est.n_blb == 30 and est.n_subsamples == 3


class TestTheorem11:
    def test_threshold(self):
        assert moe_threshold(0.3, 0.01) == pytest.approx(0.3 * 0.01 / 1.01)

    def test_guarantee_accept(self):
        est = BLBEstimate(delta_star=0.3, moe=0.001, n_blb=100, n_subsamples=2)
        assert accuracy_guaranteed(est, e=0.01)

    def test_guarantee_reject(self):
        est = BLBEstimate(delta_star=0.3, moe=0.01, n_blb=100, n_subsamples=2)
        assert not accuracy_guaranteed(est, e=0.01)

    def test_guarantee_semantics(self):
        """If ε ≤ δ*e/(1+e) then any δ inside the CI has rel. error ≤ e."""
        ds, e = 0.42, 0.07
        eps = moe_threshold(ds, e)
        for delta in np.linspace(ds - eps, ds + eps, 50):
            assert abs(ds - delta) / delta <= e + 1e-12


class TestIncrementalSampling:
    def test_paper_example6_large_moe(self):
        """Example 6, second case: ε=8e-3 → |ΔS| ≈ 2284."""
        est = BLBEstimate(delta_star=0.3, moe=8e-3, n_blb=1000, n_subsamples=3)
        ds = incremental_sample_size(est, e=0.01, m=0.6)
        assert abs(ds - 2284) <= 2

    def test_paper_example6_small_moe(self):
        """Example 6, first case (ε=3.5e-3): Eq. 12 evaluates to ≈218.

        (The paper prints ≈253; plugging its own numbers into Eq. 12
        gives 1000·((3.5e-3/(0.3·0.01/1.01))^1.2 − 1) = 217.6 — we pin
        our implementation to the formula.)
        """
        est = BLBEstimate(delta_star=0.3, moe=3.5e-3, n_blb=1000, n_subsamples=3)
        ds = incremental_sample_size(est, e=0.01, m=0.6)
        assert abs(ds - 218) <= 2

    def test_zero_when_guaranteed(self):
        est = BLBEstimate(delta_star=0.3, moe=1e-5, n_blb=1000, n_subsamples=3)
        assert incremental_sample_size(est, e=0.01) == 0

    def test_larger_moe_needs_more(self):
        a = incremental_sample_size(
            BLBEstimate(0.3, 5e-3, 1000, 3), e=0.01, m=0.6
        )
        b = incremental_sample_size(
            BLBEstimate(0.3, 9e-3, 1000, 3), e=0.01, m=0.6
        )
        assert b > a

    def test_at_least_one_on_failure(self):
        est = BLBEstimate(delta_star=0.3, moe=0.0029704, n_blb=10, n_subsamples=1)
        assert incremental_sample_size(est, e=0.01, m=0.6) >= 1
