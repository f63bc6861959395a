"""Fast exact sliding reference for the error metrics (Section 5.1).

Average relative value error and average rank error both compare a
policy's estimates against the *exact* quantiles of every evaluated
window. This module computes those references with one presort per
sub-window and one merge-sort per window — independent of any policy under
test, and itself cross-checked against DuckDB and ``numpy`` in
``tests/test_exact_ref.py``.
"""
from __future__ import annotations

from typing import Iterator, Sequence

import numpy as np

from repro.core.quantile import exact_quantiles_sorted
from repro.streams.windows import WindowSpec

__all__ = ["sorted_windows", "exact_sliding_quantiles"]


def sorted_windows(stream: np.ndarray, spec: WindowSpec) -> Iterator[np.ndarray]:
    """Yield the ascending-sorted contents of each evaluated window.

    Sub-windows are presorted once; each window is the sort of its ``n``
    presorted member chunks (numpy's mergesort exploits the presorted
    runs), sliding one sub-window at a time.
    """
    stream = np.asarray(stream, dtype=np.float64)
    n_chunks = len(stream) // spec.period
    presorted = [
        np.sort(stream[c * spec.period : (c + 1) * spec.period])
        for c in range(n_chunks)
    ]
    n = spec.n_subwindows
    for e in range(spec.n_evaluations(n_chunks * spec.period)):
        window = np.concatenate(presorted[e : e + n])
        window.sort(kind="mergesort")
        yield window


def exact_sliding_quantiles(
    stream: np.ndarray, spec: WindowSpec, phis: Sequence[float]
) -> np.ndarray:
    """(n_evaluations, n_phis) matrix of exact window quantiles."""
    phis = tuple(phis)
    rows = [exact_quantiles_sorted(w, phis) for w in sorted_windows(stream, spec)]
    return (
        np.array(rows, dtype=np.float64)
        if rows
        else np.empty((0, len(phis)), dtype=np.float64)
    )
