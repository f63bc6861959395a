"""Benchmark for Figure 4 (table form): QLOVE vs CMQS at eps 1x-10x vs
Exact, 100K window / 1K period (Section 5.2).

Shape to hold: QLOVE > CMQS at every eps; CMQS 1x (biggest sketches)
slowest; Exact degraded by per-slide deaccumulation + full-state
evaluation.
"""
import pytest

from repro.baselines.cmqs import CmqsPolicy
from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec

PHIS = (0.5, 0.9, 0.99, 0.999)
SPEC = WindowSpec(size=100_000, period=1_000)

FACTORIES = {
    "QLOVE": lambda: QloveOperator(SPEC, PHIS, sig_digits=3),
    "CMQS-1x": lambda: CmqsPolicy(SPEC, PHIS, epsilon=0.02),
    "CMQS-2x": lambda: CmqsPolicy(SPEC, PHIS, epsilon=0.04),
    "CMQS-5x": lambda: CmqsPolicy(SPEC, PHIS, epsilon=0.10),
    "CMQS-10x": lambda: CmqsPolicy(SPEC, PHIS, epsilon=0.20),
    "Exact": lambda: ExactPolicy(SPEC, PHIS),
}


@pytest.mark.parametrize("policy", FACTORIES)
def test_fig4_throughput(benchmark, netmon_stream, policy):
    result = benchmark.pedantic(
        lambda: run_policy(FACTORIES[policy](), netmon_stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
