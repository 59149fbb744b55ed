"""Benchmark for Table 3: high-performance codec compression at the
three error bounds; CR recorded in extra_info."""
import pytest

from repro import codecs


@pytest.mark.parametrize("eps", [1e-2, 1e-3, 1e-4])
@pytest.mark.parametrize("codec", codecs.HIGH_PERFORMANCE)
def test_highperf_cr(benchmark, codec, eps, cesm_bench):
    data = cesm_bench
    blob = benchmark.pedantic(
        codecs.compress, args=(codec, data, eps), rounds=1, iterations=1
    )
    benchmark.extra_info["cr"] = data.nbytes / len(blob)
    benchmark.extra_info["eps"] = eps
