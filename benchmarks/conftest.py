"""Benchmark-wide fixtures: one derived configuration shared by all benches."""
import pytest

from repro.core.config import ConfigOptions, derive_config


@pytest.fixture(scope="session")
def cfg():
    """Full backward-derived configuration (driver-side profiling arithmetic;
    the Spark profiling path is benchmarked separately in bench_table2)."""
    return derive_config(options=ConfigOptions(profiler_mode="local"))


def one_shot(benchmark, fn, *args, **kwargs):
    """Run a heavyweight benchmark exactly once (no warmup rounds)."""
    return benchmark.pedantic(fn, args=args, kwargs=kwargs, rounds=1, iterations=1)
