"""Figure 4 (as a table; figures are out of scope): throughput of QLOVE vs
CMQS at eps multipliers 1x..10x vs Exact, on a 100K window with 1K period
(Section 5.2).

The paper's finding to reproduce in *shape*: QLOVE beats CMQS at every
eps, CMQS at small eps (big sketches) is slower than Exact, and large eps
recovers throughput at the cost of a uselessly loose rank bound.
"""
from __future__ import annotations

import pandas as pd

from repro.baselines.cmqs import CmqsPolicy
from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.experiments.harness import default_n_events
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

SPEC = WindowSpec(size=100_000, period=1_000)
PHIS = (0.5, 0.9, 0.99, 0.999)
BASE_EPSILON = 0.02
MULTIPLIERS = (1, 2, 5, 10)


def policies():
    out = [("QLOVE", QloveOperator(SPEC, PHIS, sig_digits=3))]
    for m in MULTIPLIERS:
        out.append((f"CMQS {m}x", CmqsPolicy(SPEC, PHIS, epsilon=BASE_EPSILON * m)))
    out.append(("Exact", ExactPolicy(SPEC, PHIS)))
    return out


def run(n_events: int | None = None, *, seed: int = 0) -> pd.DataFrame:
    n = n_events or default_n_events(1_000_000)
    stream = netmon(n, seed=seed)
    rows = []
    for label, pol in policies():
        result = run_policy(pol, stream)
        rows.append(
            {
                "policy": label,
                "throughput_Mev/s": round(result.throughput_eps / 1e6, 3),
                "space_observed": pol.space_observed(),
            }
        )
    return pd.DataFrame(rows)


def main(spark=None) -> pd.DataFrame:
    df = run()
    print(df.to_string(index=False))
    return df
