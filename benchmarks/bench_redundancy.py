"""Benchmark for the Section 5.4 data-redundancy study: QLOVE throughput on
original vs low-precision (100us) NetMon/Search streams, 100K window / 1K
period. Shape to hold: low-precision (more duplicates, smaller Level-1
state) is at least as fast, with a visible speedup on sliding windows."""
import pytest

from repro.core.qlove import QloveOperator
from repro.experiments.redundancy import low_precision
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import netmon, search

from repro.experiments.harness import bench_stream_length as bench_n

PHIS = (0.5, 0.9, 0.99, 0.999)
SPEC = WindowSpec(size=100_000, period=1_000)


@pytest.mark.parametrize("dataset", ("NetMon", "Search"))
@pytest.mark.parametrize("precision", ("original", "low"))
def test_redundancy_throughput(benchmark, dataset, precision):
    gen = {"NetMon": netmon, "Search": search}[dataset]
    stream = gen(bench_n(), seed=0)
    if precision == "low":
        stream = low_precision(stream)
    result = benchmark.pedantic(
        lambda: run_policy(QloveOperator(SPEC, PHIS, l1_mode="tree"), stream),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
