"""Unit tests for the AM-lite multi-level baseline (baselines/am.py)."""
import numpy as np
import pytest

from repro.baselines.am import AmPolicy
from repro.baselines.cmqs import CmqsPolicy
from repro.core.quantile import rank_error
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99, 0.999)


class TestAm:
    def test_eval_count(self):
        spec = WindowSpec(size=2_000, period=250)
        pol = AmPolicy(spec, PHIS, epsilon=0.1)
        results = pol.observe_chunk(np.random.default_rng(0).random(6_000))
        assert len(results) == spec.n_evaluations(6_000)

    def test_rank_error_within_epsilon(self):
        eps = 0.05
        stream = netmon(48_000, seed=0)
        spec = WindowSpec(size=8_000, period=1_000)
        pol = AmPolicy(spec, PHIS, epsilon=eps)
        results = pol.observe_chunk(stream)
        assert results
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            win = np.sort(stream[lo:hi])
            for p in PHIS:
                assert rank_error(r[p], win, p) <= eps

    def test_more_space_less_error_than_cmqs(self):
        # Table 1 ordering: AM stores more than CMQS and errs less at the
        # extreme quantile.
        stream = netmon(200_000, seed=1)
        spec = WindowSpec(size=16_000, period=1_000)
        am = AmPolicy(spec, PHIS, epsilon=0.02)
        cm = CmqsPolicy(spec, PHIS, epsilon=0.02)
        r_am = am.observe_chunk(stream)
        r_cm = cm.observe_chunk(stream)
        assert am.space_observed() > cm.space_observed()

        def q999_err(results):
            errs = []
            for e, r in enumerate(results):
                lo, hi = spec.window_bounds(e)
                win = np.sort(stream[lo:hi])
                from repro.core.quantile import rank_of

                exact = win[rank_of(0.999, len(win)) - 1]
                errs.append(abs(r[0.999] - exact) / exact)
            return np.mean(errs)

        assert q999_err(r_am) <= q999_err(r_cm)

    def test_block_expiry(self):
        spec = WindowSpec(size=400, period=100)
        pol = AmPolicy(spec, PHIS, epsilon=0.1)
        pol.observe_chunk(np.random.default_rng(2).random(10_000))
        # level-0 blocks older than the current window must be expired
        level0 = [b for (lvl, b) in pol._blocks if lvl == 0]
        assert min(level0) >= pol._next_sub - spec.n_subwindows

    def test_cover_uses_coarse_blocks(self):
        spec = WindowSpec(size=800, period=100)  # n = 8
        pol = AmPolicy(spec, PHIS, epsilon=0.1)
        pol.observe_chunk(np.random.default_rng(3).random(800))
        # aligned window [0, 7] should be covered by a single level-3 block
        parts = pol._cover(0, 7)
        assert len(parts) == 1

    def test_misaligned_cover(self):
        spec = WindowSpec(size=800, period=100)
        pol = AmPolicy(spec, PHIS, epsilon=0.1)
        pol.observe_chunk(np.random.default_rng(4).random(1_100))
        # window [3, 10]: greedy cover = [3], [4-7], [8-9], [10]
        parts = pol._cover(3, 10)
        assert len(parts) == 4
        assert sum(p.total_weight for p in parts) == pytest.approx(800)

    def test_invalid_epsilon(self):
        with pytest.raises(ValueError):
            AmPolicy(WindowSpec(size=10, period=5), PHIS, epsilon=1.5)
