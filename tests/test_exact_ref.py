"""Unit tests for the exact sliding reference (experiments/exact_ref.py)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.quantile import exact_quantiles
from repro.experiments.exact_ref import exact_sliding_quantiles, sorted_windows
from repro.oracle import assert_equivalent
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99)


class TestSortedWindows:
    def test_window_contents(self):
        stream = np.arange(20, dtype=np.float64)[::-1]  # descending 19..0
        spec = WindowSpec(size=8, period=4)
        wins = list(sorted_windows(stream, spec))
        assert len(wins) == spec.n_evaluations(20)
        for e, w in enumerate(wins):
            lo, hi = spec.window_bounds(e)
            np.testing.assert_array_equal(w, np.sort(stream[lo:hi]))

    def test_trailing_partial_dropped(self):
        stream = netmon(1_050, seed=0)
        spec = WindowSpec(size=400, period=200)
        assert len(list(sorted_windows(stream, spec))) == spec.n_evaluations(1_050)


class TestExactSlidingQuantiles:
    def test_matches_per_window_numpy(self):
        stream = netmon(4_000, seed=1)
        spec = WindowSpec(size=1_000, period=250)
        mat = exact_sliding_quantiles(stream, spec, PHIS)
        assert mat.shape == (spec.n_evaluations(4_000), len(PHIS))
        for e in range(mat.shape[0]):
            lo, hi = spec.window_bounds(e)
            np.testing.assert_array_equal(mat[e], exact_quantiles(stream[lo:hi], PHIS))

    def test_empty_stream(self):
        mat = exact_sliding_quantiles(np.empty(0), WindowSpec(size=4, period=2), PHIS)
        assert mat.shape == (0, len(PHIS))

    def test_matches_duckdb_oracle(self, spark):
        # Cross-check the reference itself against DuckDB window functions.
        stream = netmon(2_000, seed=2)
        spec = WindowSpec(size=500, period=250)
        mat = exact_sliding_quantiles(stream, spec, (0.5, 0.999))
        got = pd.DataFrame(
            {
                "w": np.arange(spec.n_subwindows - 1, spec.n_subwindows - 1 + len(mat)),
                "q50": mat[:, 0],
                "q999": mat[:, 1],
            }
        )
        events = pd.DataFrame(
            {"seq": np.arange(len(stream), dtype=np.int64), "value": stream}
        )
        n = spec.n_subwindows
        assert_equivalent(
            spark.createDataFrame(got),
            f"""
            WITH member AS (
              SELECT w.w AS w, e.value
              FROM events e
              JOIN (SELECT UNNEST(GENERATE_SERIES({n - 1}, 7)) AS w) w
                ON CAST(FLOOR(e.seq / {spec.period}) AS BIGINT)
                   BETWEEN w.w - {n - 1} AND w.w),
            ranked AS (
              SELECT w, value,
                     ROW_NUMBER() OVER (PARTITION BY w ORDER BY value) AS rnk,
                     COUNT(*) OVER (PARTITION BY w) AS cnt
              FROM member)
            SELECT w,
                   MAX(CASE WHEN rnk = CAST(CEIL(0.5 * cnt) AS BIGINT) THEN value END) AS q50,
                   MAX(CASE WHEN rnk = CAST(CEIL(0.999 * cnt) AS BIGINT) THEN value END) AS q999
            FROM ranked GROUP BY w
            """,
            events=events,
        )
