"""Unit tests for the paper's quantile rank convention (core/quantile.py)."""
import math

import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.quantile import (
    exact_quantiles,
    exact_quantiles_freq,
    exact_quantiles_sorted,
    kth_largest_count,
    rank_error,
    rank_of,
    value_error,
)


class TestRankOf:
    def test_paper_example_median(self):
        # Section 1: N=100K, phi=0.5 -> rank 50K.
        assert rank_of(0.5, 100_000) == 50_000

    def test_paper_example_q999_128k(self):
        # Section 5.3: 128K window, Q0.999 needs 132 largest entries.
        n = 131_072
        assert kth_largest_count(0.999, n) == 132

    def test_phi_one_is_max(self):
        assert rank_of(1.0, 17) == 17

    def test_tiny_phi_clamps_to_one(self):
        assert rank_of(1e-9, 10) == 1

    @pytest.mark.parametrize("phi", [0.0, -0.1, 1.1])
    def test_invalid_phi(self, phi):
        with pytest.raises(ValueError):
            rank_of(phi, 10)

    def test_invalid_n(self):
        with pytest.raises(ValueError):
            rank_of(0.5, 0)

    @given(st.floats(min_value=1e-6, max_value=1.0), st.integers(min_value=1, max_value=10**6))
    def test_rank_always_valid(self, phi, n):
        r = rank_of(phi, n)
        assert 1 <= r <= n

    @given(st.floats(min_value=1e-6, max_value=1.0), st.integers(min_value=1, max_value=10**6))
    def test_kth_largest_complements_rank(self, phi, n):
        assert kth_largest_count(phi, n) == n - rank_of(phi, n) + 1


class TestExactQuantiles:
    def test_sorted_small(self):
        v = np.array([1.0, 2.0, 3.0, 4.0])
        assert exact_quantiles_sorted(v, [0.5]).tolist() == [2.0]
        assert exact_quantiles_sorted(v, [0.75]).tolist() == [3.0]
        assert exact_quantiles_sorted(v, [1.0]).tolist() == [4.0]

    def test_unsorted_matches_sorted(self):
        g = np.random.default_rng(0)
        v = g.random(1000)
        phis = [0.1, 0.5, 0.9, 0.99]
        np.testing.assert_array_equal(
            exact_quantiles(v, phis), exact_quantiles_sorted(np.sort(v), phis)
        )

    def test_freq_matches_expanded(self):
        uniq = np.array([1.0, 5.0, 9.0])
        counts = np.array([3, 2, 5])
        expanded = np.repeat(uniq, counts)
        phis = [0.1, 0.3, 0.5, 0.9, 0.999]
        np.testing.assert_array_equal(
            exact_quantiles_freq(uniq, counts, phis), exact_quantiles(expanded, phis)
        )

    def test_freq_shape_mismatch(self):
        with pytest.raises(ValueError):
            exact_quantiles_freq(np.array([1.0]), np.array([1, 2]), [0.5])

    @given(
        st.lists(st.integers(min_value=0, max_value=50), min_size=1, max_size=200),
        st.floats(min_value=0.01, max_value=1.0),
    )
    @settings(max_examples=50)
    def test_freq_equals_expanded_property(self, values, phi):
        v = np.array(values, dtype=np.float64)
        uniq, counts = np.unique(v, return_counts=True)
        got = exact_quantiles_freq(uniq, counts, [phi])[0]
        want = np.sort(v)[rank_of(phi, len(v)) - 1]
        assert got == want

    def test_result_is_an_element(self):
        g = np.random.default_rng(1)
        v = g.random(777)
        for phi in (0.01, 0.5, 0.95, 0.999):
            assert exact_quantiles(v, [phi])[0] in v


class TestErrors:
    def test_rank_error_exact_value_is_zero(self):
        v = np.sort(np.arange(100, dtype=np.float64))
        q = v[rank_of(0.9, 100) - 1]
        assert rank_error(q, v, 0.9) == 0.0

    def test_rank_error_offset(self):
        v = np.arange(1, 101, dtype=np.float64)  # values 1..100
        # phi=0.5 -> rank 50 (value 50). Estimate 60 has rank 60: error 0.1.
        assert rank_error(60.0, v, 0.5) == pytest.approx(0.1)

    def test_rank_error_below_min(self):
        v = np.arange(1, 101, dtype=np.float64)
        assert rank_error(0.0, v, 0.5) == pytest.approx((50 - 1) / 100)

    def test_value_error(self):
        assert value_error(110.0, 100.0) == pytest.approx(0.1)
        assert value_error(100.0, 100.0) == 0.0
        assert value_error(0.0, 0.0) == 0.0
        assert math.isinf(value_error(1.0, 0.0))
