"""Unit tests for the Random sampling baseline (baselines/random_sampling.py)."""
import numpy as np
import pytest

from repro.baselines.random_sampling import RandomPolicy
from repro.core.quantile import rank_error
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99)


class TestRandomPolicy:
    def test_deterministic_in_seed(self):
        stream = netmon(4_000, seed=0)
        spec = WindowSpec(size=1_000, period=250)
        # epsilon large enough that samples are a strict subset per
        # sub-window (otherwise every seed degenerates to exact).
        r1 = RandomPolicy(spec, PHIS, epsilon=0.2, seed=42).observe_chunk(stream)
        r2 = RandomPolicy(spec, PHIS, epsilon=0.2, seed=42).observe_chunk(stream)
        r3 = RandomPolicy(spec, PHIS, epsilon=0.2, seed=43).observe_chunk(stream)
        assert r1 == r2
        assert r1 != r3

    def test_sample_budget(self):
        spec = WindowSpec(size=8_000, period=1_000)
        pol = RandomPolicy(spec, PHIS, epsilon=0.02)
        # ceil(1/eps^2) = 2500 total, /8 sub-windows
        assert pol.sample_per_sub == int(np.ceil(2500 / 8))

    def test_sample_capped_at_period(self):
        spec = WindowSpec(size=400, period=100)
        pol = RandomPolicy(spec, PHIS, epsilon=0.01)
        assert pol.sample_per_sub == 100

    def test_full_sampling_is_exact_median_rank(self):
        # sample == whole sub-window -> exact quantiles
        stream = netmon(2_000, seed=1)
        spec = WindowSpec(size=500, period=100)
        pol = RandomPolicy(spec, PHIS, epsilon=0.001)
        assert pol.sample_per_sub == 100
        results = pol.observe_chunk(stream)
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            win = np.sort(stream[lo:hi])
            for p in PHIS:
                assert rank_error(r[p], win, p) == 0.0

    def test_rank_error_probabilistic_bound(self):
        eps = 0.05
        stream = netmon(60_000, seed=2)
        spec = WindowSpec(size=10_000, period=2_000)
        pol = RandomPolicy(spec, PHIS, epsilon=eps, seed=0)
        results = pol.observe_chunk(stream)
        errs = [
            rank_error(r[p], np.sort(stream[slice(*spec.window_bounds(e))]), p)
            for e, r in enumerate(results)
            for p in PHIS
        ]
        # probabilistic bound: the *mean* rank error stays well inside eps
        assert np.mean(errs) < eps

    def test_space(self):
        spec = WindowSpec(size=800, period=200)
        pol = RandomPolicy(spec, PHIS, epsilon=0.1)
        pol.observe_chunk(netmon(1_600, seed=3))
        assert pol.space_observed() == pol.space_analytical()

    def test_invalid_epsilon(self):
        with pytest.raises(ValueError):
            RandomPolicy(WindowSpec(size=10, period=5), PHIS, epsilon=2.0)
