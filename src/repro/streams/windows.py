"""Windowing model (Section 2): tumbling and sliding count-based windows.

A window is defined by ``size`` (N elements) and ``period`` (K/P elements
between query evaluations). ``size == period`` is a tumbling window;
``size > period`` is a sliding window. Like the paper we require the window
size to be a multiple of the period so sub-windows align with periods
(Section 3.1: "the size of each sub-window is aligned with window period").
"""
from __future__ import annotations

from dataclasses import dataclass

import numpy as np

__all__ = ["WindowSpec"]


@dataclass(frozen=True)
class WindowSpec:
    """Count-based window: ``size`` elements evaluated every ``period``."""

    size: int
    period: int

    def __post_init__(self) -> None:
        if self.size <= 0 or self.period <= 0:
            raise ValueError(f"size and period must be positive: {self}")
        if self.period > self.size:
            raise ValueError(f"period larger than size: {self}")
        if self.size % self.period != 0:
            raise ValueError(f"size must be a multiple of period: {self}")

    @property
    def n_subwindows(self) -> int:
        """Number of sub-windows per window, ``n = N / P``."""
        return self.size // self.period

    @property
    def is_tumbling(self) -> bool:
        return self.size == self.period

    def sub_ids(self, seq: np.ndarray) -> np.ndarray:
        """Sub-window id of each 0-based stream sequence number."""
        return np.asarray(seq, dtype=np.int64) // self.period

    def n_evaluations(self, stream_len: int) -> int:
        """How many full-window evaluations a stream of this length yields.

        The first evaluation fires when sub-window ``n-1`` completes; one
        more per completed period after that.
        """
        complete_subwindows = stream_len // self.period
        return max(0, complete_subwindows - self.n_subwindows + 1)

    def window_bounds(self, eval_index: int) -> tuple[int, int]:
        """Half-open element range ``[start, stop)`` of the ``eval_index``-th
        evaluation's window (0-based)."""
        stop = (self.n_subwindows + eval_index) * self.period
        return stop - self.size, stop
