"""Per-sub-window summaries (Level-1 output, Section 3.1 / Figure 2).

A :class:`SubWindowSummary` is what QLOVE retains per completed sub-window:
the exact phi-quantiles (one float per requested quantile), the element
count, and — when few-k merging is on — per-quantile caches of the largest
raw values (top-k) and interval samples of the top-K values (sample-k),
plus a burst flag set by the Mann-Whitney detector.

Summaries are intentionally tiny: Level 2 deaccumulates an entire expiring
sub-window by dropping one summary (the paper's key scalability argument),
and the stored-variable count (:meth:`space`) is the paper's space metric.
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

__all__ = ["SubWindowSummary"]


@dataclass
class SubWindowSummary:
    """Summary of one completed sub-window.

    Attributes:
        sub_id: 0-based index of the sub-window in stream order.
        count: number of raw elements in the sub-window.
        quantiles: exact phi-quantiles of the sub-window (aligned with the
            operator's quantile list), paper rank convention.
        top_k: per-phi cache of the sub-window's ``k_t`` largest raw values,
            descending (Section 4.2, top-k merging).
        sample_k: per-phi interval samples of the sub-window's top-``K`` raw
            values, descending (Section 4.2, sample-k merging).
        bursty: True when the burst detector flagged this sub-window as
            stochastically larger than its predecessor (Section 4.3).
    """

    sub_id: int
    count: int
    quantiles: np.ndarray
    top_k: dict[float, np.ndarray] = field(default_factory=dict)
    sample_k: dict[float, np.ndarray] = field(default_factory=dict)
    bursty: bool = False

    def space(self) -> int:
        """Number of stored variables (the paper's space metric)."""
        return (
            len(self.quantiles)
            + sum(len(v) for v in self.top_k.values())
            + sum(len(v) for v in self.sample_k.values())
        )
