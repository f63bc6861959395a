"""Unit tests for the Moment sketch baseline (baselines/moment.py)."""
import math

import numpy as np
import pytest

from repro.baselines.moment import MomentPolicy, MomentSketch, inv_norm_cdf
from repro.core.quantile import exact_quantiles
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon


class TestInvNormCdf:
    @pytest.mark.parametrize(
        "p,z",
        [
            (0.5, 0.0),
            (0.8413447460685429, 1.0),
            (0.9772498680518208, 2.0),
            (0.9986501019683699, 3.0),
            (0.158655253931457, -1.0),
            (0.975, 1.959963984540054),
        ],
    )
    def test_known_values(self, p, z):
        assert inv_norm_cdf(p) == pytest.approx(z, abs=1e-6)

    def test_symmetry(self):
        for p in (0.01, 0.1, 0.3):
            assert inv_norm_cdf(p) == pytest.approx(-inv_norm_cdf(1 - p), abs=1e-7)

    @pytest.mark.parametrize("p", [0.0, 1.0, -0.1])
    def test_invalid(self, p):
        with pytest.raises(ValueError):
            inv_norm_cdf(p)


class TestMomentSketch:
    def test_merge_equals_whole(self):
        g = np.random.default_rng(0)
        v = np.exp(g.normal(7, 0.5, 1000))
        parts = np.split(v, 4)
        merged = MomentSketch.merge(
            [MomentSketch.from_values(p, k=8, center=7.0) for p in parts]
        )
        whole = MomentSketch.from_values(v, k=8, center=7.0)
        assert merged.count == whole.count
        assert merged.z_min == whole.z_min
        assert merged.z_max == whole.z_max
        np.testing.assert_allclose(merged.power_sums, whole.power_sums, rtol=1e-9)

    def test_size(self):
        s = MomentSketch.from_values(np.array([1.0, 2.0]), k=12)
        assert s.size == 15

    def test_merge_empty_raises(self):
        with pytest.raises(ValueError):
            MomentSketch.merge([])

    def test_merge_mismatched_centers_raises(self):
        a = MomentSketch.from_values(np.array([1.0, 2.0]), k=4, center=0.0)
        b = MomentSketch.from_values(np.array([1.0, 2.0]), k=4, center=1.0)
        with pytest.raises(ValueError):
            MomentSketch.merge([a, b])

    def test_lognormal_recovery(self):
        # On truly lognormal data the sketch should recover quantiles well.
        g = np.random.default_rng(1)
        v = np.exp(g.normal(7, 0.4, 50_000))
        sk = MomentSketch.from_values(v, k=12)
        phis = [0.5, 0.9, 0.99]
        est, _ = sk.quantiles(phis)
        exact = exact_quantiles(v, phis)
        for e, x in zip(est, exact):
            assert abs(e - x) / x < 0.05

    def test_constant_data(self):
        sk = MomentSketch.from_values(np.full(100, 42.0), k=6)
        est, fb = sk.quantiles([0.5, 0.99])
        np.testing.assert_allclose(est, 42.0, rtol=1e-9)

    def test_netmon_mid_quantiles_reasonable(self):
        v = netmon(50_000, seed=2)
        sk = MomentSketch.from_values(v, k=12)
        est, _ = sk.quantiles([0.5])
        exact = exact_quantiles(v, [0.5])[0]
        assert abs(est[0] - exact) / exact < 0.15

    def test_estimates_monotone_in_phi(self):
        v = netmon(20_000, seed=3)
        sk = MomentSketch.from_values(v, k=12)
        est, _ = sk.quantiles([0.1, 0.5, 0.9, 0.99, 0.999])
        assert (np.diff(est) >= -1e-9).all()


class TestMomentPolicy:
    def test_eval_count_and_space(self):
        stream = netmon(8_000, seed=4)
        spec = WindowSpec(size=2_000, period=500)
        pol = MomentPolicy(spec, (0.5, 0.9), k=12)
        results = pol.observe_chunk(stream)
        assert len(results) == spec.n_evaluations(8_000)
        assert pol.space_observed() == 4 * 15
        assert pol.space_analytical() == 4 * 15

    def test_mid_quantile_accuracy(self):
        stream = netmon(64_000, seed=5)
        spec = WindowSpec(size=16_000, period=4_000)
        pol = MomentPolicy(spec, (0.5,), k=12)
        results = pol.observe_chunk(stream)
        errs = []
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            exact = exact_quantiles(stream[lo:hi], [0.5])[0]
            errs.append(abs(r[0.5] - exact) / exact)
        assert np.mean(errs) < 0.15

    def test_fallback_counter_consistent(self):
        stream = netmon(16_000, seed=6)
        spec = WindowSpec(size=4_000, period=1_000)
        pol = MomentPolicy(spec, (0.5,), k=12)
        pol.observe_chunk(stream)
        assert 0 <= pol.n_fallbacks <= pol.n_queries
