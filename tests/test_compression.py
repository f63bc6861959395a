"""Unit tests for significant-digit value compression (core/compression.py)."""
import numpy as np
import pytest
from hypothesis import given
from hypothesis import strategies as st

from repro.core.compression import max_relative_error, quantize_sig


class TestQuantizeSig:
    @pytest.mark.parametrize(
        "value,expected",
        [
            (74_265.0, 74_200.0),  # the paper's NetMon max
            (1_247.0, 1_240.0),
            (798.0, 798.0),
            (1_874.0, 1_870.0),
            (0.012345, 0.0123),
            (999.0, 999.0),
            (1000.0, 1000.0),
            (1001.0, 1000.0),
            (0.0, 0.0),
        ],
    )
    def test_examples(self, value, expected):
        assert quantize_sig(np.array([value]))[0] == pytest.approx(expected, rel=1e-12)

    def test_negative_values_truncate_toward_zero(self):
        assert quantize_sig(np.array([-74_265.0]))[0] == pytest.approx(-74_200.0)

    def test_two_digits(self):
        assert quantize_sig(np.array([74_265.0]), digits=2)[0] == pytest.approx(74_000.0)

    def test_one_digit(self):
        assert quantize_sig(np.array([74_265.0]), digits=1)[0] == pytest.approx(70_000.0)

    def test_invalid_digits(self):
        with pytest.raises(ValueError):
            quantize_sig(np.array([1.0]), digits=0)

    def test_all_zero(self):
        np.testing.assert_array_equal(quantize_sig(np.zeros(4)), np.zeros(4))

    def test_increases_duplicates(self):
        g = np.random.default_rng(0)
        v = np.rint(g.normal(10_000, 500, 50_000))
        q = quantize_sig(v, 3)
        assert len(np.unique(q)) < len(np.unique(v))

    @given(st.floats(min_value=1e-6, max_value=1e12))
    def test_relative_error_bound(self, x):
        # Section 3.1: 3 significant digits keep values within <1% rel error.
        q = quantize_sig(np.array([x]), 3)[0]
        assert abs(q - x) / x < max_relative_error(3)

    @given(
        st.floats(min_value=1e-6, max_value=1e12),
        st.integers(min_value=1, max_value=8),
    )
    def test_idempotent(self, x, digits):
        q1 = quantize_sig(np.array([x]), digits)
        q2 = quantize_sig(q1, digits)
        np.testing.assert_allclose(q1, q2, rtol=1e-12)

    @given(st.lists(st.floats(min_value=1.0, max_value=1e9), min_size=2, max_size=50))
    def test_monotone(self, values):
        # Quantization preserves order (so quantiles of quantized data are
        # quantized quantiles).
        v = np.sort(np.array(values))
        q = quantize_sig(v, 3)
        assert (np.diff(q) >= 0).all()


def test_max_relative_error_values():
    assert max_relative_error(3) == pytest.approx(0.01)
    assert max_relative_error(1) == pytest.approx(1.0)
