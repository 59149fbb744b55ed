"""Benchmark for Table 2: compression and decompression speed of all
seven codecs (eps=1e-3). MB/s is recorded in extra_info; the full
6-dataset sweep is ``jobs/table2_speeds.py``."""
import pytest

from repro import codecs


@pytest.mark.parametrize("codec", codecs.ALL_CODECS)
def test_compress_speed(benchmark, codec, miranda_bench):
    data = miranda_bench
    blob = benchmark.pedantic(
        codecs.compress, args=(codec, data, 1e-3), rounds=1, iterations=1
    )
    benchmark.extra_info["cr"] = data.nbytes / len(blob)
    benchmark.extra_info["comp_mbps"] = (
        data.nbytes / 1e6 / benchmark.stats.stats.mean
    )


@pytest.mark.parametrize("codec", codecs.ALL_CODECS)
def test_decompress_speed(benchmark, codec, miranda_bench):
    data = miranda_bench
    blob = codecs.compress(codec, data, 1e-3)
    benchmark.pedantic(
        codecs.decompress, args=(blob,), rounds=1, iterations=1
    )
    benchmark.extra_info["decomp_mbps"] = (
        data.nbytes / 1e6 / benchmark.stats.stats.mean
    )
