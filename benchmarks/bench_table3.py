"""Benchmark for Table 3: top-k merging cost vs cache fraction.

The paper notes a throughput penalty growing with the few-k cache size
(Section 5.3 "Throughput"); this measures QLOVE with top-k caching at the
fractions Table 3 evaluates.
"""
import pytest

from repro.core.fewk import FewKConfig
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec

PHI = 0.999
SPEC = WindowSpec(size=131_072, period=4_096)


@pytest.mark.parametrize("fraction", (0.0, 0.1, 0.5, 1.0))
def test_table3_topk_fraction(benchmark, netmon_stream, fraction):
    cfg = (
        FewKConfig.from_fraction(
            window_size=SPEC.size, period=SPEC.period, phis=[PHI], top_fraction=fraction
        )
        if fraction > 0
        else FewKConfig()
    )
    result = benchmark.pedantic(
        lambda: run_policy(
            QloveOperator(SPEC, (PHI,), sig_digits=3, fewk=cfg), netmon_stream
        ),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
