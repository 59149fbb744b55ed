"""Quality-metric tests (paper §7.1.3)."""
import numpy as np
import pytest

from repro.core import metrics


def test_value_range():
    assert metrics.value_range(np.array([1.0, 4.0, -2.0])) == 6.0


def test_psnr_identity_is_inf():
    x = np.random.default_rng(0).standard_normal((10, 10))
    assert metrics.psnr(x, x) == np.inf


def test_psnr_known_value():
    x = np.zeros(100)
    x[0] = 1.0  # range 1
    y = x + 0.1  # rmse 0.1
    assert metrics.psnr(x, y) == pytest.approx(20.0, abs=1e-9)


def test_psnr_monotone_in_noise():
    rng = np.random.default_rng(1)
    x = rng.standard_normal((20, 20))
    p1 = metrics.psnr(x, x + rng.standard_normal(x.shape) * 1e-3)
    p2 = metrics.psnr(x, x + rng.standard_normal(x.shape) * 1e-2)
    assert p1 > p2


def test_max_abs_err():
    assert metrics.max_abs_err(np.array([1.0, 2.0]), np.array([1.5, 1.0])) == 1.0


def test_bit_rate_and_cr():
    assert metrics.compression_ratio(4000, 100) == 40.0
    assert metrics.bit_rate(100, 800) == 1.0


def test_box_sum_matches_naive():
    rng = np.random.default_rng(2)
    x = rng.standard_normal((9, 11))
    w = 3
    got = metrics._box_sum(x, w)
    for i in range(x.shape[0] - w + 1):
        for j in range(x.shape[1] - w + 1):
            assert got[i, j] == pytest.approx(x[i : i + w, j : j + w].sum())


def test_ssim_identity():
    x = np.random.default_rng(3).standard_normal((16, 16, 16))
    assert metrics.ssim(x, x) == pytest.approx(1.0)


def test_ssim_decreases_with_noise():
    rng = np.random.default_rng(4)
    x = rng.standard_normal((24, 24))
    s1 = metrics.ssim(x, x + 0.01 * rng.standard_normal(x.shape))
    s2 = metrics.ssim(x, x + 0.5 * rng.standard_normal(x.shape))
    assert 0 < s2 < s1 <= 1.0


def test_ssim_constant_field():
    x = np.full((8, 8), 2.0)
    assert metrics.ssim(x, x) == 1.0
