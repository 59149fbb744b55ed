"""Benchmark for Table 6: HPEZ with vs without fast-varying-first
interpolation (speed-only ablation, §5.4.1)."""
import pytest

from repro import codecs


@pytest.mark.parametrize("fvfi", [False, True], ids=["wo_fvfi", "fvfi"])
def test_hpez_fvfi(benchmark, fvfi, jhtdb_bench):
    data = jhtdb_bench
    blob = benchmark.pedantic(
        codecs.compress,
        args=("hpez", data, 1e-3),
        kwargs={"fvfi": fvfi},
        rounds=1,
        iterations=1,
    )
    benchmark.extra_info["comp_mbps"] = (
        data.nbytes / 1e6 / benchmark.stats.stats.mean
    )
