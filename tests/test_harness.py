"""Unit tests for the experiment harness (experiments/harness.py)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.experiments.harness import default_n_events, evaluate, run_and_evaluate
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9, 0.99)
SPEC = WindowSpec(size=1_000, period=250)


class TestEvaluate:
    def test_exact_policy_scores_zero(self):
        stream = netmon(4_000, seed=0)
        result = run_policy(ExactPolicy(SPEC, PHIS), stream)
        report = evaluate(result, stream, PHIS)
        for p in PHIS:
            assert report.value_err_pct[p] == 0.0
            assert report.rank_err[p] == 0.0

    def test_qlove_errors_positive_but_small(self):
        stream = netmon(8_000, seed=1)
        report = run_and_evaluate(QloveOperator(SPEC, PHIS), stream, PHIS)
        assert 0 <= report.value_err_pct[0.5] < 2.0
        assert report.rank_err[0.5] < 0.05

    def test_rank_error_skippable(self):
        stream = netmon(4_000, seed=2)
        report = run_and_evaluate(
            QloveOperator(SPEC, PHIS), stream, PHIS, with_rank_error=False
        )
        assert all(np.isnan(report.rank_err[p]) for p in PHIS)
        assert all(np.isfinite(report.value_err_pct[p]) for p in PHIS)

    def test_shape_mismatch_raises(self):
        stream = netmon(4_000, seed=3)
        result = run_policy(ExactPolicy(SPEC, PHIS), stream)
        with pytest.raises(ValueError):
            evaluate(result, stream[:2_000], PHIS)

    def test_row_format(self):
        stream = netmon(4_000, seed=4)
        report = run_and_evaluate(QloveOperator(SPEC, PHIS), stream, PHIS)
        row = report.row(PHIS)
        assert row["policy"] == "QLOVE"
        assert "value_err%@0.5" in row and "rank_err@0.99" in row
        assert row["space_observed"] > 0

    def test_spark_crosscheck(self, spark):
        # With spark passed, the harness must assert kernel == Spark — and
        # succeed on a healthy pipeline.
        stream = netmon(4_000, seed=5)
        report = run_and_evaluate(
            QloveOperator(SPEC, PHIS), stream, PHIS, spark=spark
        )
        assert report.n_evaluations == SPEC.n_evaluations(4_000)


class TestDefaultNEvents:
    def test_env_override(self, monkeypatch):
        monkeypatch.setenv("REPRO_N", "12345")
        assert default_n_events() == 12345

    def test_fallback(self, monkeypatch):
        monkeypatch.delenv("REPRO_N", raising=False)
        assert default_n_events(777) == 777
