"""Parallel-transfer model tests (paper §7.2.4, Table 5)."""
import numpy as np
import pytest

from repro.transfer import (
    TransferMeasurement,
    measure_codec,
    search_eps_for_psnr,
    transfer_time,
)
from repro.datasets import generate


def _m(cr=100.0, comp=100.0, dec=400.0):
    return TransferMeasurement(
        codec="x", eps=1e-3, psnr=80.0, cr=cr, comp_mbps=comp, decomp_mbps=dec
    )


def test_transfer_time_formula():
    """T = S_core/v_c + S_total/(CR*bw) + S_core/v_d, exactly."""
    m = _m(cr=10.0, comp=100.0, dec=200.0)
    total = 2048e9
    t = transfer_time(total, 2048, 1e9, m)
    per_core = 1e9
    expect = per_core / 100e6 + total / 10 / 1e9 + per_core / 200e6
    assert t == pytest.approx(expect)


def test_higher_cr_reduces_time():
    t1 = transfer_time(1e12, 2048, 1e9, _m(cr=50))
    t2 = transfer_time(1e12, 2048, 1e9, _m(cr=100))
    assert t2 < t1


def test_faster_codec_reduces_time():
    t1 = transfer_time(1e12, 2048, 1e9, _m(comp=50))
    t2 = transfer_time(1e12, 2048, 1e9, _m(comp=200))
    assert t2 < t1


def test_more_cores_reduce_compute_share():
    t1 = transfer_time(1e12, 512, 1e9, _m())
    t2 = transfer_time(1e12, 4096, 1e9, _m())
    assert t2 < t1


def test_eps_search_hits_target():
    data = generate("Miranda", "test")
    eps, psnr = search_eps_for_psnr("qoz", data, 80.0, iters=7)
    assert 70.0 < psnr < 90.0


def test_measure_codec_fields():
    data = generate("SCALE", "test")
    m = measure_codec("zfp", data, 80.0)
    assert m.cr > 1.0
    assert m.comp_mbps > 0 and m.decomp_mbps > 0
    assert 65.0 < m.psnr < 95.0
