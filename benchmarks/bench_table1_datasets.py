"""Benchmark for Table 1: synthetic dataset generation cost."""
import pytest

from repro.datasets import FP_DATASETS, generate


@pytest.mark.parametrize("name", FP_DATASETS)
def test_generate_bench_scale(benchmark, name):
    arr = benchmark.pedantic(
        generate, args=(name, "bench"), rounds=1, iterations=1
    )
    benchmark.extra_info["mb"] = arr.nbytes / 1e6
