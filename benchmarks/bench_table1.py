"""Benchmark for Table 1: per-policy stream-processing cost at the Table-1
configuration (NetMon-sim, 128K window, 16K period, 4 quantiles).

Regenerates Table 1's throughput dimension; the accuracy/space dimensions
come from ``jobs/table1.py`` (recorded in EXPERIMENTS.md).
"""
import pytest

from repro.baselines.am import AmPolicy
from repro.baselines.cmqs import CmqsPolicy
from repro.baselines.moment import MomentPolicy
from repro.baselines.random_sampling import RandomPolicy
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec

PHIS = (0.5, 0.9, 0.99, 0.999)
SPEC = WindowSpec(size=131_072, period=16_384)

FACTORIES = {
    "QLOVE": lambda: QloveOperator(SPEC, PHIS, sig_digits=3),
    "CMQS": lambda: CmqsPolicy(SPEC, PHIS, epsilon=0.02),
    "AM": lambda: AmPolicy(SPEC, PHIS, epsilon=0.02),
    "Random": lambda: RandomPolicy(SPEC, PHIS, epsilon=0.02),
    "Moment": lambda: MomentPolicy(SPEC, PHIS, k=12),
}


@pytest.mark.parametrize("policy", FACTORIES)
def test_table1_policy_throughput(benchmark, netmon_stream, policy):
    result = benchmark.pedantic(
        lambda: run_policy(FACTORIES[policy](), netmon_stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
    benchmark.extra_info["space_observed"] = result.mean_space
