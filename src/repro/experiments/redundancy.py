"""Section 5.4 data-redundancy study: throughput gain on low-precision
derived datasets.

"We discard two low-order digits from the original datasets ... data
precision of 100us, not 1us. With window period fixed with 1K elements, we
vary the window size from 1K to 1M" — the gain to reproduce in shape:
low-precision (higher duplicate density) processes faster, more so for
sliding windows than tumbling.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from repro.core.qlove import QloveOperator
from repro.experiments.harness import default_n_events
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon, search

PERIOD = 1_000
WINDOWS = (1_000, 100_000, 1_000_000)
PHIS = (0.5, 0.9, 0.99, 0.999)


def low_precision(stream: np.ndarray) -> np.ndarray:
    """Discard the two low-order decimal digits (1us -> 100us precision)."""
    return np.floor(stream / 100.0) * 100.0


def run(n_events: int | None = None, *, seed: int = 0, windows=WINDOWS) -> pd.DataFrame:
    n = n_events or default_n_events()
    rows = []
    for dataset, gen in (("NetMon", netmon), ("Search", search)):
        original = gen(n, seed=seed)
        derived = low_precision(original)
        for window in windows:
            if window * 2 > n:
                continue
            spec = WindowSpec(size=window, period=PERIOD)
            t = {}
            for label, stream in (("original", original), ("low-precision", derived)):
                # "tree" Level-1 mode: this study measures how duplicate
                # density shrinks the running {value -> count} state
                # (Section 5.4), so the redundancy-sensitive cost model is
                # the one under test.
                result = run_policy(QloveOperator(spec, PHIS, l1_mode="tree"), stream)
                t[label] = result.throughput_eps
            rows.append(
                {
                    "dataset": dataset,
                    "window": window,
                    "tumbling": spec.is_tumbling,
                    "orig_Mev/s": round(t["original"] / 1e6, 3),
                    "lowprec_Mev/s": round(t["low-precision"] / 1e6, 3),
                    "speedup": round(t["low-precision"] / t["original"], 2),
                }
            )
    return pd.DataFrame(rows)


def main(spark=None) -> pd.DataFrame:
    df = run()
    print(df.to_string(index=False))
    return df
