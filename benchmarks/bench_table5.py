"""Benchmark for Table 5 / Section 5.4 sensitivity: QLOVE on AR(1) data
(non-i.i.d.) and the Pareto skew comparison policies."""
import pytest

from repro.baselines.am import AmPolicy
from repro.baselines.random_sampling import RandomPolicy
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import ar1, pareto_ds

from repro.experiments.harness import bench_stream_length as bench_n

SPEC = WindowSpec(size=131_072, period=16_384)
AR1_PHIS = (0.5, 0.9, 0.99)


@pytest.mark.parametrize("psi", (0.0, 0.8))
def test_table5_ar1(benchmark, psi):
    stream = ar1(bench_n(), psi=psi, seed=0)
    result = benchmark.pedantic(
        lambda: run_policy(QloveOperator(SPEC, AR1_PHIS), stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)


@pytest.mark.parametrize(
    "policy",
    ("QLOVE", "AM", "Random"),
)
def test_table5_pareto(benchmark, policy):
    stream = pareto_ds(bench_n(), seed=0)
    factories = {
        "QLOVE": lambda: QloveOperator(SPEC, (0.999,), sig_digits=3),
        "AM": lambda: AmPolicy(SPEC, (0.999,), epsilon=0.02),
        "Random": lambda: RandomPolicy(SPEC, (0.999,), epsilon=0.02),
    }
    result = benchmark.pedantic(
        lambda: run_policy(factories[policy](), stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
