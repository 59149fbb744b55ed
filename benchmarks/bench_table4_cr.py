"""Benchmark for Table 4: HPEZ vs high-ratio codec compression; CR in
extra_info."""
import pytest

from repro import codecs


@pytest.mark.parametrize("codec", codecs.HIGH_RATIO + ("hpez",))
def test_highratio_cr(benchmark, codec, jhtdb_bench):
    data = jhtdb_bench
    blob = benchmark.pedantic(
        codecs.compress, args=(codec, data, 1e-3), rounds=1, iterations=1
    )
    benchmark.extra_info["cr"] = data.nbytes / len(blob)
