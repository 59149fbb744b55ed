"""Benchmark for Table 5: the PSNR-80 transfer measurement (eps search +
timed roundtrip) per codec; modeled 2048-core transfer time recorded in
extra_info."""
import pytest

from repro.tables import PAPER_TABLE5_SIZES
from repro.transfer import measure_codec, transfer_time


@pytest.mark.parametrize("codec", ["sz3", "qoz", "sperr", "hpez"])
def test_transfer_measurement(benchmark, codec, miranda_bench):
    data = miranda_bench
    m = benchmark.pedantic(
        measure_codec, args=(codec, data, 80.0), rounds=1, iterations=1
    )
    t = transfer_time(PAPER_TABLE5_SIZES["Miranda"], 2048, 1e9, m)
    benchmark.extra_info["cr"] = m.cr
    benchmark.extra_info["modeled_transfer_s"] = t
