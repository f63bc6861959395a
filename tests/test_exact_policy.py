"""Unit tests for the Exact sliding-window baseline (baselines/exact.py)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactPolicy
from repro.core.quantile import exact_quantiles
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99, 0.999)


class TestExactPolicy:
    def test_matches_numpy_sliding(self):
        g = np.random.default_rng(0)
        stream = np.rint(g.normal(1000, 100, 3000))
        spec = WindowSpec(size=600, period=150)
        pol = ExactPolicy(spec, PHIS)
        results = pol.observe_chunk(stream)
        assert len(results) == spec.n_evaluations(3000)
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            np.testing.assert_array_equal(
                [r[p] for p in PHIS], exact_quantiles(stream[lo:hi], PHIS)
            )

    def test_tumbling(self):
        g = np.random.default_rng(1)
        stream = g.random(1000) * 100
        spec = WindowSpec(size=250, period=250)
        pol = ExactPolicy(spec, PHIS)
        results = pol.observe_chunk(stream)
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            np.testing.assert_array_equal(
                [r[p] for p in PHIS], exact_quantiles(stream[lo:hi], PHIS)
            )

    def test_deaccumulation_removes_unique_values(self):
        spec = WindowSpec(size=4, period=2)
        pol = ExactPolicy(spec, (0.5,))
        pol.observe_chunk(np.array([1.0, 1.0, 2.0, 2.0, 3.0, 3.0]))
        # window now {2,2,3,3}: value 1.0 must be gone from the state
        assert 1.0 not in pol._freq

    def test_misaligned_chunks(self):
        g = np.random.default_rng(2)
        stream = np.rint(g.normal(0, 50, 900))
        spec = WindowSpec(size=300, period=100)
        p1, p2 = ExactPolicy(spec, PHIS), ExactPolicy(spec, PHIS)
        r1 = p1.observe_chunk(stream)
        r2 = []
        for lo in range(0, 900, 41):
            r2.extend(p2.observe_chunk(stream[lo : lo + 41]))
        assert r1 == r2

    def test_quantization(self):
        spec = WindowSpec(size=4, period=4)
        pol = ExactPolicy(spec, (1.0,), sig_digits=2)
        (r,) = pol.observe_chunk(np.array([74_265.0, 1.0, 2.0, 3.0]))
        assert r[1.0] == pytest.approx(74_000.0)

    def test_space_tracks_window_uniques(self):
        spec = WindowSpec(size=100, period=50)
        pol = ExactPolicy(spec, (0.5,))
        pol.observe_chunk(np.arange(100, dtype=np.float64))  # all unique
        assert pol.space_observed() >= 100

    def test_netmon_space_benefits_from_redundancy(self):
        stream = netmon(40_000, seed=3)
        spec = WindowSpec(size=20_000, period=5_000)
        pol = ExactPolicy(spec, PHIS)
        pol.observe_chunk(stream)
        # far fewer unique values than window size
        assert pol.space_observed() < 20_000
