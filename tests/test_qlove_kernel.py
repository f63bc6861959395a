"""Unit tests for the QLOVE operator (core/qlove.py)."""
import numpy as np
import pytest

from repro.core.fewk import FewKConfig
from repro.core.qlove import QloveOperator
from repro.core.quantile import exact_quantiles, kth_largest_count
from repro.streams.windows import WindowSpec
from repro.synth_data import inject_burst, netmon


PHIS = (0.5, 0.9, 0.99)


def _brute_force_level2(stream, spec, phis):
    """Reference: mean of exact sub-window quantiles over each window."""
    n_evals = spec.n_evaluations(len(stream))
    sub_q = []
    for s in range(len(stream) // spec.period):
        sub = stream[s * spec.period : (s + 1) * spec.period]
        sub_q.append(exact_quantiles(sub, phis))
    sub_q = np.array(sub_q)
    out = []
    for e in range(n_evals):
        out.append(sub_q[e : e + spec.n_subwindows].mean(axis=0))
    return np.array(out)


class TestLevel2Mean:
    def test_matches_brute_force(self):
        g = np.random.default_rng(0)
        stream = np.rint(g.normal(1000, 100, 4000))
        spec = WindowSpec(size=800, period=200)
        op = QloveOperator(spec, PHIS)
        results = op.observe_chunk(stream)
        want = _brute_force_level2(stream, spec, PHIS)
        got = np.array([[r[p] for p in PHIS] for r in results])
        np.testing.assert_allclose(got, want, rtol=1e-12)

    def test_eval_count(self):
        spec = WindowSpec(size=400, period=100)
        op = QloveOperator(spec, PHIS)
        results = op.observe_chunk(np.arange(1000, dtype=np.float64))
        assert len(results) == spec.n_evaluations(1000)

    def test_per_element_matches_chunk(self):
        g = np.random.default_rng(1)
        stream = np.rint(g.normal(0, 10, 600))
        spec = WindowSpec(size=200, period=50)
        op1 = QloveOperator(spec, PHIS)
        op2 = QloveOperator(spec, PHIS)
        r1 = []
        for v in stream:
            res = op1.observe(float(v))
            if res is not None:
                r1.append(res)
        r2 = op2.observe_chunk(stream)
        assert r1 == r2

    def test_misaligned_chunks_match(self):
        g = np.random.default_rng(2)
        stream = np.rint(g.normal(0, 10, 900))
        spec = WindowSpec(size=300, period=100)
        op1, op2 = QloveOperator(spec, PHIS), QloveOperator(spec, PHIS)
        r1 = op1.observe_chunk(stream)
        r2 = []
        for lo in range(0, 900, 77):
            r2.extend(op2.observe_chunk(stream[lo : lo + 77]))
        assert r1 == r2

    def test_tumbling_window_is_exact(self):
        # n = 1: the Level-2 mean of one exact sub-window quantile IS exact.
        g = np.random.default_rng(3)
        stream = np.rint(g.normal(1000, 100, 1000))
        spec = WindowSpec(size=250, period=250)
        op = QloveOperator(spec, PHIS)
        results = op.observe_chunk(stream)
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            np.testing.assert_array_equal(
                [r[p] for p in PHIS], exact_quantiles(stream[lo:hi], PHIS)
            )

    def test_deaccumulation_only_drops_oldest(self):
        # After many slides the running sums must not drift from a fresh
        # recomputation (catches incremental-sum bugs).
        g = np.random.default_rng(4)
        stream = g.random(5000) * 1e6
        spec = WindowSpec(size=500, period=100)
        op = QloveOperator(spec, PHIS)
        results = op.observe_chunk(stream)
        want = _brute_force_level2(stream, spec, PHIS)
        got = np.array([[r[p] for p in PHIS] for r in results])
        np.testing.assert_allclose(got, want, rtol=1e-9)


class TestAccuracy:
    def test_netmon_median_close(self):
        stream = netmon(64_000, seed=5)
        spec = WindowSpec(size=8_000, period=1_000)
        op = QloveOperator(spec, PHIS)
        results = op.observe_chunk(stream)
        errs = []
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            exact = exact_quantiles(stream[lo:hi], [0.5])[0]
            errs.append(abs(r[0.5] - exact) / exact)
        assert np.mean(errs) < 0.01  # paper Table 2: Q0.5 errors < 0.4%

    def test_quantization_error_small(self):
        stream = netmon(32_000, seed=6)
        spec = WindowSpec(size=8_000, period=2_000)
        plain = QloveOperator(spec, PHIS).observe_chunk(stream)
        quant = QloveOperator(spec, PHIS, sig_digits=3).observe_chunk(stream)
        for rp, rq in zip(plain, quant):
            for p in PHIS:
                assert abs(rp[p] - rq[p]) / rp[p] < 0.011  # <1% quantization


class TestFewK:
    def test_topk_full_budget_exact_high_quantile(self):
        g = np.random.default_rng(7)
        stream = g.random(4000) * 1e4
        spec = WindowSpec(size=1000, period=250)
        phi = 0.99
        cfg = FewKConfig.from_fraction(
            window_size=spec.size, period=spec.period, phis=[phi], top_fraction=1.0
        )
        op = QloveOperator(spec, (phi,), fewk=cfg)
        results = op.observe_chunk(stream)
        for e, r in enumerate(results):
            lo, hi = spec.window_bounds(e)
            assert r[phi] == exact_quantiles(stream[lo:hi], [phi])[0]

    def test_topk_beats_mean_at_small_period(self):
        stream = netmon(128_000, seed=8)
        spec = WindowSpec(size=16_000, period=1_000)
        phi = 0.999
        plain = QloveOperator(spec, (phi,)).observe_chunk(stream)
        cfg = FewKConfig.from_fraction(
            window_size=spec.size, period=spec.period, phis=[phi], top_fraction=0.5
        )
        fewk = QloveOperator(spec, (phi,), fewk=cfg).observe_chunk(stream)

        def mean_err(results):
            errs = []
            for e, r in enumerate(results):
                lo, hi = spec.window_bounds(e)
                exact = exact_quantiles(stream[lo:hi], [phi])[0]
                errs.append(abs(r[phi] - exact) / exact)
            return np.mean(errs)

        assert mean_err(fewk) < mean_err(plain)

    def test_samplek_handles_burst(self):
        base = netmon(96_000, seed=9)
        spec = WindowSpec(size=16_000, period=4_000)
        phi = 0.999
        stream = inject_burst(
            base, window_size=spec.size, period=spec.period, phi=phi
        )
        plain = QloveOperator(spec, (phi,)).observe_chunk(stream)
        cfg = FewKConfig.from_fraction(
            window_size=spec.size, period=spec.period, phis=[phi], sample_fraction=0.5
        )
        fewk = QloveOperator(spec, (phi,), fewk=cfg).observe_chunk(stream)

        def mean_err(results):
            errs = []
            for e, r in enumerate(results):
                lo, hi = spec.window_bounds(e)
                exact = exact_quantiles(stream[lo:hi], [phi])[0]
                errs.append(abs(r[phi] - exact) / exact)
            return np.mean(errs)

        assert mean_err(fewk) < mean_err(plain) / 2

    def test_low_quantiles_unaffected_by_fewk(self):
        stream = netmon(48_000, seed=10)
        spec = WindowSpec(size=8_000, period=2_000)
        cfg = FewKConfig.from_fraction(
            window_size=spec.size, period=spec.period, phis=[0.999], top_fraction=0.5
        )
        plain = QloveOperator(spec, (0.5, 0.999)).observe_chunk(stream)
        fewk = QloveOperator(spec, (0.5, 0.999), fewk=cfg).observe_chunk(stream)
        for rp, rf in zip(plain, fewk):
            assert rp[0.5] == rf[0.5]


class TestWindowResult:
    """Direct tests of the shared Level-2 selection logic."""

    def _summaries(self, n=4, bursty=None):
        from repro.core.summary import SubWindowSummary

        out = []
        for i in range(n):
            out.append(
                SubWindowSummary(
                    sub_id=i,
                    count=100,
                    quantiles=np.array([10.0 + i, 100.0 + i]),
                    top_k={0.99: np.array([200.0 - i, 150.0 - i])},
                    sample_k={0.99: np.array([200.0 - i, 100.0 - i])},
                    bursty=bool(bursty and i in bursty),
                )
            )
        return out

    def test_plain_mean(self):
        from repro.core.fewk import FewKConfig
        from repro.core.qlove import window_result

        res = window_result(self._summaries(), (0.5, 0.99), FewKConfig())
        assert res[0.5] == pytest.approx(11.5)  # mean of 10..13
        assert res[0.99] == pytest.approx(101.5)

    def test_topk_outcome_when_enabled(self):
        from repro.core.fewk import FewKConfig, PhiBudget
        from repro.core.qlove import window_result

        cfg = FewKConfig(budgets=(PhiBudget(phi=0.99, big_k=3, k_t=2, k_s=0),))
        res = window_result(self._summaries(), (0.5, 0.99), cfg)
        # merged top-k = [200,199,198,197,150,149,148,147]; 3rd largest = 198
        assert res[0.99] == 198.0
        assert res[0.5] == pytest.approx(11.5)  # untouched

    def test_samplek_outcome_on_burst(self):
        from repro.core.fewk import FewKConfig, PhiBudget
        from repro.core.qlove import window_result

        cfg = FewKConfig(budgets=(PhiBudget(phi=0.99, big_k=2, k_t=1, k_s=2),))
        res = window_result(self._summaries(bursty={2}), (0.99,), cfg)
        # burst present -> sample-k path: merged samples, rank ceil(8/4)=2
        assert res[0.99] == 199.0

    def test_means_override_consistent(self):
        from repro.core.fewk import FewKConfig
        from repro.core.qlove import window_result

        s = self._summaries()
        means = np.mean([x.quantiles for x in s], axis=0)
        a = window_result(s, (0.5, 0.99), FewKConfig())
        b = window_result(s, (0.5, 0.99), FewKConfig(), means=means)
        assert a == b


class TestSpace:
    def test_analytical_formula(self):
        spec = WindowSpec(size=131_072, period=16_384)
        op = QloveOperator(spec, (0.5, 0.9, 0.99, 0.999))
        # Paper Table 1: l*(N/P) + O(P) = 4*8 + 16384 = 16,416.
        assert op.space_analytical() == 16_416

    def test_observed_below_analytical_on_redundant_data(self):
        stream = netmon(262_144, seed=11)
        spec = WindowSpec(size=131_072, period=16_384)
        op = QloveOperator(spec, (0.5, 0.9, 0.99, 0.999))
        op.observe_chunk(stream)
        assert 0 < op.space_observed() < op.space_analytical()
