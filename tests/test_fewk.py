"""Unit tests for few-k budgeting and merging (core/fewk.py)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.fewk import (
    STAT_INEFFICIENCY_THRESHOLD,
    FewKConfig,
    PhiBudget,
    interval_sample,
    samplek_merge,
    topk_merge,
)
from repro.core.quantile import exact_quantiles, kth_largest_count


class TestBudgets:
    def test_paper_table3_topk_sizes(self):
        # 128K window, Q0.999: K = 132; fraction 0.1 -> k_t = 14 (ceil).
        cfg = FewKConfig.from_fraction(
            window_size=131_072, period=8_192, phis=[0.999], top_fraction=0.1
        )
        b = cfg.budget_for(0.999)
        assert b.big_k == 132
        assert b.k_t == 14
        assert b.k_s == 0

    def test_paper_table4_samplek_sizes(self):
        cfg = FewKConfig.from_fraction(
            window_size=131_072, period=16_384, phis=[0.99, 0.999], sample_fraction=0.1
        )
        assert cfg.budget_for(0.99).big_k == kth_largest_count(0.99, 131_072)
        assert cfg.budget_for(0.999).k_s == 14

    def test_auto_topk_threshold(self):
        # P=16K: P*(1-0.999) = 16.4 >= 10 -> no top-k; P=4K: 4.1 < 10 -> on.
        on = FewKConfig.from_fraction(
            window_size=131_072, period=4_096, phis=[0.999], auto_topk=True
        )
        off = FewKConfig.from_fraction(
            window_size=131_072, period=16_384, phis=[0.999], auto_topk=True
        )
        assert on.budget_for(0.999).k_t == kth_largest_count(0.999, 4_096)
        assert off.budget_for(0.999) is None

    def test_threshold_constant(self):
        assert STAT_INEFFICIENCY_THRESHOLD == 10

    def test_budget_clamped_to_big_k(self):
        cfg = FewKConfig.from_fraction(
            window_size=1000, period=500, phis=[0.99], top_fraction=5.0
        )
        b = cfg.budget_for(0.99)
        assert b.k_t == b.big_k

    def test_alpha(self):
        b = PhiBudget(phi=0.999, big_k=132, k_t=0, k_s=66)
        assert b.alpha == pytest.approx(0.5)

    def test_max_tail(self):
        cfg = FewKConfig(
            budgets=(
                PhiBudget(phi=0.99, big_k=1311, k_t=20, k_s=0),
                PhiBudget(phi=0.999, big_k=132, k_t=0, k_s=14),
            )
        )
        # top-k needs 20; sample-k needs the full big_k prefix (132).
        assert cfg.max_tail == 132

    def test_empty_config(self):
        cfg = FewKConfig()
        assert cfg.budget_for(0.5) is None
        assert cfg.max_tail == 0


class TestIntervalSample:
    def test_alpha_one_full_prefix(self):
        ranked = np.array([9.0, 8.0, 7.0, 6.0, 5.0])
        np.testing.assert_array_equal(interval_sample(ranked, 5, 5), ranked)

    def test_every_second(self):
        ranked = np.arange(10, 0, -1, dtype=np.float64)
        np.testing.assert_array_equal(interval_sample(ranked, 5, 10), [9, 7, 5, 3, 1])

    def test_zero_ks(self):
        assert len(interval_sample(np.arange(5.0), 0, 5)) == 0

    @given(
        st.integers(min_value=1, max_value=50),
        st.integers(min_value=1, max_value=200),
    )
    @settings(max_examples=50)
    def test_size_bounded_by_ks(self, k_s, big_k):
        ranked = np.sort(np.random.default_rng(0).random(big_k))[::-1]
        out = interval_sample(ranked, k_s, big_k)
        assert 1 <= len(out) <= min(k_s, big_k)


class TestTopkMerge:
    def test_exact_when_full_budget(self):
        # With k_t = K per sub-window, top-k merging is exact (Section 4.2).
        g = np.random.default_rng(3)
        window = g.random(1000)
        parts = np.split(window, 4)
        phi, n = 0.99, len(window)
        big_k = kth_largest_count(phi, n)
        caches = [np.sort(p)[::-1][:big_k] for p in parts]
        assert topk_merge(caches, big_k) == exact_quantiles(window, [phi])[0]

    def test_best_effort_when_underfull(self):
        caches = [np.array([5.0, 4.0]), np.array([3.0])]
        assert topk_merge(caches, 10) == 3.0

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            topk_merge([], 5)

    @given(st.integers(min_value=2, max_value=8))
    @settings(max_examples=20)
    def test_merge_of_split_equals_concat(self, n_parts):
        g = np.random.default_rng(n_parts)
        window = g.random(n_parts * 100)
        big_k = 17
        caches = [np.sort(p)[::-1][:big_k] for p in np.split(window, n_parts)]
        want = np.sort(window)[::-1][big_k - 1]
        assert topk_merge(caches, big_k) == want


class TestSamplekMerge:
    def test_alpha_one_is_exact(self):
        g = np.random.default_rng(4)
        window = g.random(800)
        phi = 0.99
        big_k = kth_largest_count(phi, len(window))
        parts = np.split(window, 4)
        samples = [interval_sample(np.sort(p)[::-1], big_k, big_k) for p in parts]
        assert samplek_merge(samples, big_k) == exact_quantiles(window, [phi])[0]

    def test_half_fraction_close(self):
        g = np.random.default_rng(5)
        window = g.normal(1000, 100, 4000)
        phi = 0.99
        big_k = kth_largest_count(phi, len(window))
        k_s = big_k // 2
        parts = np.split(window, 4)
        samples = [interval_sample(np.sort(p)[::-1], k_s, big_k) for p in parts]
        est = samplek_merge(samples, big_k)
        exact = exact_quantiles(window, [phi])[0]
        assert abs(est - exact) / exact < 0.05

    def test_bursty_subwindow_dominates_correctly(self):
        # All top-K of the window sit in one bursty part (pattern E1 of
        # Figure 3); sample-k at half fraction must still land inside the
        # burst's value range.
        g = np.random.default_rng(6)
        parts = [g.normal(1000, 50, 500) for _ in range(4)]
        parts[1] = parts[1] * 1.0
        big_k = 20
        parts[1][:big_k] *= 10  # burst
        window = np.concatenate(parts)
        k_s = big_k // 2
        samples = [interval_sample(np.sort(p)[::-1], k_s, big_k) for p in parts]
        est = samplek_merge(samples, big_k)
        exact = np.sort(window)[::-1][big_k - 1]
        assert abs(est - exact) / exact < 0.15

    def test_empty_raises(self):
        with pytest.raises(ValueError):
            samplek_merge([], 5)
