"""End-to-end QLOVE over an events DataFrame (DESIGN.md section 3).

The heavy, data-parallel part — building per-sub-window summaries over
millions of events — runs as a Spark dataflow (:mod:`.level1`). What
remains per window is tiny (``n`` summaries of ``l + k`` floats), so:

  - without few-k merging, Level 2 stays in Spark SQL
    (:func:`repro.sparklayer.level2.sliding_mean_estimates`);
  - with few-k merging, the collected summaries (a few KB) are merged on
    the driver with the *same* kernel code the incremental operator uses
    (burst detection is inherently sequential over sub-window order — the
    paper's Level 2 is likewise a "static cost" serial stage).

Results are bit-identical to :class:`repro.core.qlove.QloveOperator`
(tested in ``tests/test_spark_qlove.py``).
"""
from __future__ import annotations

from typing import Sequence

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import functions as F

from repro.core.burst import BurstDetector
from repro.core.fewk import FewKConfig
from repro.core.qlove import window_result
from repro.core.summary import SubWindowSummary
from repro.sparklayer.level1 import subwindow_summaries
from repro.sparklayer.level2 import sliding_mean_estimates
from repro.streams.windows import WindowSpec

__all__ = ["qlove_estimates", "rows_to_summaries"]


def rows_to_summaries(
    rows: "list", fewk: FewKConfig, *, burst_alpha: float = 0.01
) -> list[SubWindowSummary]:
    """Rebuild kernel summaries from collected Level-1 rows (sorted by
    sub_id) and run the sequential burst detector over them."""
    budget_phis = [b.phi for b in fewk.budgets]
    burst_phi = max((b.phi for b in fewk.budgets if b.k_s > 0), default=None)
    detector = BurstDetector(alpha=burst_alpha)
    out: list[SubWindowSummary] = []
    for row in sorted(rows, key=lambda r: r.sub_id):
        top_k = {
            phi: np.asarray(row.top_k[i], dtype=np.float64)
            for i, phi in enumerate(budget_phis)
            if len(row.top_k[i])
        }
        sample_k = {
            phi: np.asarray(row.sample_k[i], dtype=np.float64)
            for i, phi in enumerate(budget_phis)
            if len(row.sample_k[i])
        }
        s = SubWindowSummary(
            sub_id=int(row.sub_id),
            count=int(row["count"]),
            quantiles=np.asarray(row.quantiles, dtype=np.float64),
            top_k=top_k,
            sample_k=sample_k,
        )
        if burst_phi is not None:
            s.bursty = detector.observe(s.sample_k.get(burst_phi, np.empty(0)))
        out.append(s)
    return out


def qlove_estimates(
    spark: SparkSession,
    events: DataFrame,
    spec: WindowSpec,
    phis: Sequence[float],
    *,
    sig_digits: int | None = None,
    fewk: FewKConfig | None = None,
    burst_alpha: float = 0.01,
) -> DataFrame:
    """QLOVE estimates per complete window: ``(w, estimates ARRAY<DOUBLE>)``.

    ``w`` is the sub_id of the window's last sub-window; ``estimates`` is
    aligned with ``phis``.
    """
    phis = tuple(phis)
    cfg = fewk or FewKConfig()
    summaries = subwindow_summaries(
        events, spec.period, phis, sig_digits=sig_digits, fewk=cfg
    )
    # A trailing partial sub-window never completes a period, so no query
    # evaluation sees it (count-based windows, Section 2).
    summaries = summaries.where(F.col("count") == spec.period)
    if not cfg.budgets:
        return sliding_mean_estimates(summaries, spec.n_subwindows)

    # Few-k path: driver-side merge over the (tiny) collected summaries.
    rows = summaries.collect()
    kernel_summaries = rows_to_summaries(rows, cfg, burst_alpha=burst_alpha)
    n = spec.n_subwindows
    records = []
    for i in range(n - 1, len(kernel_summaries)):
        window = kernel_summaries[i - n + 1 : i + 1]
        if [s.sub_id for s in window] != list(range(i - n + 1, i + 1)):
            raise RuntimeError("non-contiguous sub-window ids in summaries")
        res = window_result(window, phis, cfg)
        records.append((i, [res[p] for p in phis]))
    pdf = pd.DataFrame(records, columns=["w", "estimates"])
    return spark.createDataFrame(pdf, schema="w BIGINT, estimates ARRAY<DOUBLE>")
