"""Shared benchmark configuration.

Benchmarks measure single-pass stream-processing throughput of each policy
(the paper's M ev/s metric) at container scale. ``REPRO_BENCH_N`` overrides
the stream length (default 655,360 = 5 windows at the Table-1 config).
Each benchmark runs the policy once per round over a pre-generated stream;
throughput = n_elements / benchmark mean time.
"""
import pytest

from repro.experiments.harness import bench_stream_length


@pytest.fixture(scope="session")
def netmon_stream():
    from repro.synth_data import netmon

    return netmon(bench_stream_length(), seed=0)
