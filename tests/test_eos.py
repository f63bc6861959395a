"""Unit tests for the weighted EOS summary building block (baselines/eos.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.baselines.eos import WeightedSummary
from repro.core.quantile import exact_quantiles, rank_of


class TestCompress:
    def test_no_compression_below_capacity(self):
        s = WeightedSummary.from_values(np.array([3.0, 1.0, 2.0]), capacity=10)
        np.testing.assert_array_equal(s.values, [1.0, 2.0, 3.0])
        assert s.total_weight == 3

    def test_capacity_respected(self):
        s = WeightedSummary.from_values(np.arange(1000.0), capacity=16)
        assert len(s.values) == 16
        assert s.total_weight == pytest.approx(1000)

    def test_values_sorted(self):
        g = np.random.default_rng(0)
        s = WeightedSummary.from_values(g.random(500), capacity=20)
        assert (np.diff(s.values) >= 0).all()

    def test_invalid_capacity(self):
        with pytest.raises(ValueError):
            WeightedSummary.from_values(np.arange(5.0), capacity=0)

    def test_rank_error_bound(self):
        # Within one summary, any quantile is off by at most W/(2c) ranks
        # (+1 for discretization).
        n, c = 10_000, 50
        v = np.sort(np.random.default_rng(1).random(n))
        s = WeightedSummary.from_values(v, capacity=c)
        for phi in (0.1, 0.5, 0.9, 0.99):
            est = s.query(phi)
            true_rank = rank_of(phi, n)
            est_rank = np.searchsorted(v, est, side="right")
            assert abs(est_rank - true_rank) <= n / (2 * c) + 1


class TestMergeQuery:
    def test_merge_preserves_weight(self):
        parts = [
            WeightedSummary.from_values(np.random.default_rng(i).random(100), 8)
            for i in range(4)
        ]
        merged = WeightedSummary.merge(parts)
        assert merged.total_weight == pytest.approx(400)

    def test_merge_sorted(self):
        parts = [
            WeightedSummary.from_values(np.random.default_rng(i).random(100), 8)
            for i in range(3)
        ]
        merged = WeightedSummary.merge(parts)
        assert (np.diff(merged.values) >= 0).all()

    def test_merge_empty_raises(self):
        with pytest.raises(ValueError):
            WeightedSummary.merge([])

    def test_query_uncompressed_is_exact(self):
        g = np.random.default_rng(2)
        v = g.random(500)
        s = WeightedSummary.from_values(v, capacity=500)
        for phi in (0.01, 0.25, 0.5, 0.75, 0.999, 1.0):
            assert s.query(phi) == exact_quantiles(v, [phi])[0]

    @given(st.integers(min_value=2, max_value=6), st.floats(min_value=0.05, max_value=1.0))
    @settings(max_examples=40)
    def test_merged_query_rank_bounded(self, n_parts, phi):
        g = np.random.default_rng(n_parts)
        per, cap = 400, 20
        window = g.random(n_parts * per)
        parts = [
            WeightedSummary.from_values(p, cap) for p in np.split(window, n_parts)
        ]
        merged = WeightedSummary.merge(parts)
        est = merged.query(phi)
        v = np.sort(window)
        true_rank = rank_of(phi, len(v))
        est_rank = np.searchsorted(v, est, side="right")
        # errors add across parts: n_parts * per/(2*cap), plus slack for
        # discretization at each merge boundary
        assert abs(est_rank - true_rank) <= n_parts * (per / (2 * cap) + 1)

    def test_size_metric(self):
        s = WeightedSummary.from_values(np.arange(100.0), capacity=10)
        assert s.size == 20
