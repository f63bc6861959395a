"""Unit tests for the CMQS-lite baseline (baselines/cmqs.py)."""
import numpy as np
import pytest

from repro.baselines.cmqs import CmqsPolicy
from repro.core.quantile import rank_error
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99, 0.999)


class TestCmqs:
    def test_capacity_formula(self):
        # rank spacing eps*P/2 -> ceil(2/eps) stored points per sketch
        spec = WindowSpec(size=131_072, period=16_384)
        pol = CmqsPolicy(spec, PHIS, epsilon=0.02)
        assert pol.capacity == 100

    def test_capacity_capped_at_period(self):
        spec = WindowSpec(size=40, period=10)
        pol = CmqsPolicy(spec, PHIS, epsilon=0.01)
        assert pol.capacity == 10

    def test_eval_count(self):
        spec = WindowSpec(size=1_000, period=250)
        pol = CmqsPolicy(spec, PHIS, epsilon=0.1)
        results = pol.observe_chunk(np.random.default_rng(0).random(3_000))
        assert len(results) == spec.n_evaluations(3_000)

    def test_rank_error_within_epsilon(self):
        # The deterministic property CMQS provides: rank error <= eps.
        eps = 0.05
        stream = netmon(60_000, seed=0)
        spec = WindowSpec(size=10_000, period=2_000)
        pol = CmqsPolicy(spec, PHIS, epsilon=eps)
        results = pol.observe_chunk(stream)
        assert results
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            win = np.sort(stream[lo:hi])
            for p in PHIS:
                assert rank_error(r[p], win, p) <= eps

    def test_space_shrinks_with_larger_epsilon(self):
        spec = WindowSpec(size=8_000, period=1_000)
        stream = netmon(16_000, seed=1)
        small = CmqsPolicy(spec, PHIS, epsilon=0.02)
        large = CmqsPolicy(spec, PHIS, epsilon=0.2)
        small.observe_chunk(stream)
        large.observe_chunk(stream)
        assert large.space_observed() < small.space_observed()

    def test_space_analytical(self):
        spec = WindowSpec(size=8_000, period=1_000)
        pol = CmqsPolicy(spec, PHIS, epsilon=0.1)
        assert pol.space_analytical() == 8 * 20 * 2

    def test_invalid_epsilon(self):
        with pytest.raises(ValueError):
            CmqsPolicy(WindowSpec(size=10, period=5), PHIS, epsilon=0.0)

    def test_misaligned_chunks(self):
        stream = netmon(4_000, seed=2)
        spec = WindowSpec(size=1_000, period=500)
        p1 = CmqsPolicy(spec, PHIS, epsilon=0.1)
        p2 = CmqsPolicy(spec, PHIS, epsilon=0.1)
        r1 = p1.observe_chunk(stream)
        r2 = []
        for lo in range(0, 4_000, 333):
            r2.extend(p2.observe_chunk(stream[lo : lo + 333]))
        assert r1 == r2
