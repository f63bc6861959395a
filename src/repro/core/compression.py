"""Value compression by significant-digit quantization (Section 3.1).

"To increase data duplicates, some insignificant low-order digits of
streamed values may be zeroed out. Often, we consider only the three most
significant digits of the original value, which ensures the quantized value
within less than 1% relative error."

Quantization keeps the ``digits`` most significant decimal digits and zeroes
the rest (truncation toward zero, matching "zeroed out"). For ``digits=3``
the relative error is ``< 10^-(3-1) = 1%``.
"""
from __future__ import annotations

import numpy as np

__all__ = ["quantize_sig", "max_relative_error"]


def quantize_sig(values: np.ndarray, digits: int = 3) -> np.ndarray:
    """Zero out all but the ``digits`` most significant decimal digits.

    Works element-wise on positive/negative/zero float or int arrays and
    returns float64. Examples (digits=3): 74265 -> 74200, 1247 -> 1240,
    798 -> 798, 0.012345 -> 0.0123.
    """
    if digits < 1:
        raise ValueError(f"need digits >= 1, got {digits}")
    v = np.asarray(values, dtype=np.float64)
    out = np.zeros_like(v)
    nz = v != 0
    if not nz.any():
        return out
    mag = np.floor(np.log10(np.abs(v[nz])))
    scale = np.power(10.0, mag - (digits - 1))
    # The tiny relative inflation guards against float division landing an
    # exact decade boundary just below its integer ratio (e.g. 1.0 / 0.1 =
    # 9.999...), which would otherwise truncate away a significant digit.
    ratio = np.abs(v[nz]) / scale * (1.0 + 1e-10)
    out[nz] = np.sign(v[nz]) * np.trunc(ratio) * scale
    return out


def max_relative_error(digits: int = 3) -> float:
    """Worst-case relative error of :func:`quantize_sig`.

    Truncating to ``d`` significant digits drops at most one unit in the
    ``d``-th digit relative to a leading digit of at least 1, i.e. strictly
    less than ``10^-(d-1)``.
    """
    return 10.0 ** -(digits - 1)
