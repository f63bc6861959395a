"""Level-1 tumbling sub-window builder (Algorithm 1).

Maintains the in-flight sub-window's frequency-compressed state
``{value -> count}`` and, on sub-window completion, computes the exact
phi-quantiles plus the raw-tail caches few-k merging needs. The paper keeps
the state in a red-black tree to stay sorted under per-element inserts; in
Python a hash map plus one sort at ``ComputeResult`` has the same
per-unique-value asymptotics (O(u log u) per sub-window vs O(P log u)
amortized) and the identical output, so that is what we use. A vectorized
``accumulate_chunk`` (np.unique) serves the high-throughput path; both paths
produce bit-identical states.
"""
from __future__ import annotations

from typing import Sequence

import numpy as np

from repro.core.compression import quantize_sig
from repro.core.fewk import FewKConfig, interval_sample
from repro.core.quantile import exact_quantiles_freq
from repro.core.summary import SubWindowSummary

__all__ = ["SubWindowBuilder"]


class SubWindowBuilder:
    """Builds :class:`SubWindowSummary` objects from a stream of values.

    One instance handles consecutive sub-windows: callers accumulate values
    and call :meth:`finalize` at each sub-window boundary, which emits the
    summary and resets the state (the tumbling Level-1 of Figure 2 — no
    deaccumulation ever happens here).
    """

    def __init__(
        self,
        phis: Sequence[float],
        *,
        sig_digits: int | None = None,
        fewk: FewKConfig | None = None,
        l1_mode: str = "lazy",
    ):
        if l1_mode not in ("lazy", "tree"):
            raise ValueError(f"l1_mode must be 'lazy' or 'tree', got {l1_mode}")
        self.phis = tuple(phis)
        self.sig_digits = sig_digits
        self.fewk = fewk or FewKConfig()
        self.l1_mode = l1_mode
        self._freq: dict[float, int] = {}
        # "lazy" mode: chunked arrivals are buffered raw and
        # frequency-compressed at finalize (one np.unique per sub-window) —
        # the tumbling Level-1 never needs a running ordered state, and
        # skipping it is QLOVE's batch-discard advantage. "tree" mode keeps
        # the paper's running {value -> count} map instead, whose per-chunk
        # cost scales with the number of *unique* values — the
        # redundancy-sensitive cost model of Sections 3.2 / 5.4.
        self._pending: list[np.ndarray] = []
        self._count = 0
        self._next_sub_id = 0
        # Unique-value count of the most recently completed sub-window:
        # the steady-state size of the in-flight tree (the O(P) term),
        # reported by space accounting — at the evaluation instant the
        # in-flight state has just been reset, which would otherwise make
        # the observed space misleadingly omit it.
        self.last_unique = 0

    # -- InitialState -----------------------------------------------------
    def _reset(self) -> None:
        self._freq = {}
        self._pending = []
        self._count = 0

    # -- Accumulate -------------------------------------------------------
    def accumulate(self, value: float) -> None:
        """Per-element Accumulate of Algorithm 1 (with optional quantization)."""
        if self.sig_digits is not None:
            value = float(quantize_sig(np.array([value]), self.sig_digits)[0])
        self._freq[value] = self._freq.get(value, 0) + 1
        self._count += 1

    def accumulate_chunk(self, values: np.ndarray) -> None:
        """Vectorized Accumulate over a batch of values (same final state
        as the per-element path)."""
        values = np.asarray(values, dtype=np.float64)
        if self.sig_digits is not None:
            values = quantize_sig(values, self.sig_digits)
        if self.l1_mode == "tree":
            uniq, counts = np.unique(values, return_counts=True)
            freq = self._freq
            for v, c in zip(uniq.tolist(), counts.tolist()):
                freq[v] = freq.get(v, 0) + c
        else:
            self._pending.append(values)
        self._count += len(values)

    def _compressed_state(self) -> tuple[np.ndarray, np.ndarray]:
        """Current frequency state as ascending (unique, counts) arrays."""
        parts = list(self._pending)
        if self._freq:
            keys = np.fromiter(self._freq.keys(), dtype=np.float64, count=len(self._freq))
            cnts = np.fromiter(self._freq.values(), dtype=np.int64, count=len(self._freq))
            parts.append(np.repeat(keys, cnts))
        if not parts:
            return np.empty(0), np.empty(0, dtype=np.int64)
        return np.unique(np.concatenate(parts), return_counts=True)

    @property
    def in_flight_count(self) -> int:
        return self._count

    @property
    def in_flight_unique(self) -> int:
        """Observed size of the Level-1 state (the paper's O(P) term)."""
        return len(self._compressed_state()[0])

    # -- ComputeResult ----------------------------------------------------
    def finalize(self) -> SubWindowSummary:
        """Complete the in-flight sub-window: exact quantiles + tail caches."""
        if self._count == 0:
            raise ValueError("finalize() on an empty sub-window")
        uniq, counts = self._compressed_state()
        quantiles = exact_quantiles_freq(uniq, counts, self.phis)

        top_k: dict[float, np.ndarray] = {}
        sample_k: dict[float, np.ndarray] = {}
        tail_need = self.fewk.max_tail
        if tail_need > 0:
            ranked_desc = self._tail_prefix(uniq, counts, tail_need)
            for b in self.fewk.budgets:
                if b.k_t > 0:
                    top_k[b.phi] = ranked_desc[: b.k_t].copy()
                if b.k_s > 0:
                    sample_k[b.phi] = interval_sample(ranked_desc, b.k_s, b.big_k)

        summary = SubWindowSummary(
            sub_id=self._next_sub_id,
            count=self._count,
            quantiles=quantiles,
            top_k=top_k,
            sample_k=sample_k,
        )
        self.last_unique = len(uniq)
        self._next_sub_id += 1
        self._reset()
        return summary

    @staticmethod
    def _tail_prefix(uniq_asc: np.ndarray, counts: np.ndarray, k: int) -> np.ndarray:
        """Top-``k`` values (with multiplicity) of the frequency state,
        descending — expanded from the largest unique values down."""
        out = np.empty(min(k, int(counts.sum())), dtype=np.float64)
        filled = 0
        for i in range(len(uniq_asc) - 1, -1, -1):
            take = min(int(counts[i]), len(out) - filled)
            out[filled : filled + take] = uniq_asc[i]
            filled += take
            if filled == len(out):
                break
        return out
