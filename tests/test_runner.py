"""Unit tests for the stream runner (streams/runner.py)."""
import numpy as np
import pytest

from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon

PHIS = (0.5, 0.9)


class TestRunPolicy:
    def test_evaluation_count(self):
        spec = WindowSpec(size=400, period=100)
        res = run_policy(QloveOperator(spec, PHIS), netmon(2_000, seed=0))
        assert len(res.evaluations) == spec.n_evaluations(2_000)
        assert res.n_elements == 2_000

    def test_trailing_partial_period_dropped(self):
        spec = WindowSpec(size=400, period=100)
        res = run_policy(QloveOperator(spec, PHIS), netmon(2_050, seed=1))
        assert res.n_elements == 2_000

    def test_estimates_matrix_shape(self):
        spec = WindowSpec(size=300, period=100)
        res = run_policy(ExactPolicy(spec, PHIS), netmon(1_200, seed=2))
        m = res.estimates_matrix(PHIS)
        assert m.shape == (spec.n_evaluations(1_200), 2)
        assert (m > 0).all()

    def test_space_recorded(self):
        spec = WindowSpec(size=300, period=100)
        res = run_policy(ExactPolicy(spec, PHIS), netmon(1_200, seed=3))
        assert res.mean_space > 0
        assert all(e.space > 0 for e in res.evaluations)

    def test_throughput_positive(self):
        spec = WindowSpec(size=200, period=100)
        res = run_policy(QloveOperator(spec, PHIS), netmon(1_000, seed=4))
        assert res.throughput_eps > 0
        assert res.elapsed_s > 0

    def test_same_results_as_direct_call(self):
        spec = WindowSpec(size=400, period=200)
        stream = netmon(1_600, seed=5)
        res = run_policy(QloveOperator(spec, PHIS), stream)
        direct = QloveOperator(spec, PHIS).observe_chunk(stream)
        assert [e.estimates for e in res.evaluations] == direct

    def test_indices_sequential(self):
        spec = WindowSpec(size=200, period=50)
        res = run_policy(ExactPolicy(spec, PHIS), netmon(1_000, seed=6))
        assert [e.index for e in res.evaluations] == list(range(len(res.evaluations)))
