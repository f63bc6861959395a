"""Benchmark for Figure 5 (table form): QLOVE vs Exact throughput as the
window size grows, 1K period, Normal and Uniform datasets (Section 5.2).

Shape to hold: QLOVE roughly flat across window sizes; Exact degrades as
soon as the window slides and keeps degrading with window size.
"""
import pytest

from repro.baselines.exact import ExactPolicy
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import normal_ds, uniform_ds

from repro.experiments.harness import bench_stream_length as bench_n

PHIS = (0.5, 0.9, 0.99, 0.999)
PERIOD = 1_000
WINDOWS = (1_000, 10_000, 100_000)


@pytest.fixture(scope="module", params=("Normal", "Uniform"))
def dataset(request):
    gen = {"Normal": normal_ds, "Uniform": uniform_ds}[request.param]
    return request.param, gen(bench_n(), seed=0)


@pytest.mark.parametrize("window", WINDOWS, ids=lambda w: f"{w // 1000}K")
@pytest.mark.parametrize("policy", ("QLOVE", "Exact"))
def test_fig5_scalability(benchmark, dataset, window, policy):
    name, stream = dataset
    spec = WindowSpec(size=window, period=PERIOD)
    factory = {
        "QLOVE": lambda: QloveOperator(spec, PHIS, sig_digits=3),
        "Exact": lambda: ExactPolicy(spec, PHIS),
    }[policy]
    result = benchmark.pedantic(
        lambda: run_policy(factory(), stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["dataset"] = name
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
