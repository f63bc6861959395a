"""Figure 5 (as a table; figures are out of scope): throughput vs window
size on the synthetic Normal and Uniform datasets, 1K period (Section 5.2).

The paper streams 1B entries and scales windows to 100M; container-scale
here streams ``REPRO_N`` entries (default 2M) and scales windows 1K -> 1M.
The shape to reproduce: Exact degrades sharply once the window slides
(deaccumulation + full-state evaluation cost grows with window size) while
QLOVE stays flat.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.experiments.harness import default_n_events
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import normal_ds, uniform_ds

PERIOD = 1_000
WINDOWS = (1_000, 10_000, 100_000, 1_000_000)
PHIS = (0.5, 0.9, 0.99, 0.999)


def run(n_events: int | None = None, *, seed: int = 0, windows=WINDOWS) -> pd.DataFrame:
    n = n_events or default_n_events()
    rows = []
    for dataset, gen in (("Normal", normal_ds), ("Uniform", uniform_ds)):
        stream = gen(n, seed=seed)
        for window in windows:
            if window * 2 > n:
                continue  # need at least two windows' worth of data
            spec = WindowSpec(size=window, period=PERIOD)
            for pol in (
                QloveOperator(spec, PHIS, sig_digits=3),
                ExactPolicy(spec, PHIS),
            ):
                result = run_policy(pol, stream)
                rows.append(
                    {
                        "dataset": dataset,
                        "window": window,
                        "policy": pol.name,
                        "throughput_Mev/s": round(result.throughput_eps / 1e6, 3),
                    }
                )
    return pd.DataFrame(rows)


def main(spark=None) -> pd.DataFrame:
    df = run()
    print(df.to_string(index=False))
    return df
