"""Benchmark for Table 2: QLOVE (no few-k) across period sizes at a 128K
window — the cost side of the statistical-inefficiency sweep."""
import pytest

from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec

PHIS = (0.5, 0.9, 0.99, 0.999)
PERIODS = (65_536, 16_384, 4_096, 1_024)


@pytest.mark.parametrize("period", PERIODS, ids=lambda p: f"{p // 1024}K")
def test_table2_qlove_by_period(benchmark, netmon_stream, period):
    spec = WindowSpec(size=131_072, period=period)
    result = benchmark.pedantic(
        lambda: run_policy(QloveOperator(spec, PHIS, sig_digits=3), netmon_stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
