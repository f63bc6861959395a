"""Benchmark for Table 4: sample-k merging (incl. Mann-Whitney burst
detection) cost under injected bursty traffic."""
import pytest

from repro.core.fewk import FewKConfig
from repro.core.qlove import QloveOperator
from repro.streams.runner import run_policy
from repro.streams.windows import WindowSpec
from repro.synth_data import inject_burst

PHIS = (0.99, 0.999)
SPEC = WindowSpec(size=131_072, period=16_384)


@pytest.fixture(scope="module")
def bursty_stream(netmon_stream):
    return inject_burst(
        netmon_stream, window_size=SPEC.size, period=SPEC.period, phi=0.999
    )


@pytest.mark.parametrize("fraction", (0.0, 0.1, 0.5))
def test_table4_samplek_fraction(benchmark, bursty_stream, fraction):
    cfg = (
        FewKConfig.from_fraction(
            window_size=SPEC.size,
            period=SPEC.period,
            phis=list(PHIS),
            sample_fraction=fraction,
        )
        if fraction > 0
        else FewKConfig()
    )
    result = benchmark.pedantic(
        lambda: run_policy(
            QloveOperator(SPEC, PHIS, sig_digits=3, fewk=cfg), bursty_stream
        ),
        rounds=3,
        iterations=1,
        warmup_rounds=1,
    )
    benchmark.extra_info["M_ev_per_s"] = round(result.throughput_eps / 1e6, 2)
