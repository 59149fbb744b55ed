"""Dynamic-order Lorenzo codec tests (paper §6.5)."""
import numpy as np
import pytest

from repro.core import lorenzo


@pytest.mark.parametrize("shape", [(100,), (20, 30), (8, 9, 10)])
@pytest.mark.parametrize("e", [1e-1, 1e-3])
def test_roundtrip_bound(shape, e):
    rng = np.random.default_rng(0)
    x = rng.standard_normal(shape)
    out = lorenzo.decompress(lorenzo.compress(x, e))
    assert out.shape == shape
    assert np.abs(out - x).max() <= e


def test_forward_inverse_identity():
    rng = np.random.default_rng(1)
    u = rng.integers(-100, 100, (6, 7, 8)).astype(np.int64)
    for order in (1, 2):
        v = lorenzo._inverse(lorenzo._forward(u, order), order)
        np.testing.assert_array_equal(v, u)


def test_first_order_is_neighbour_difference_1d():
    """The vectorized codec equals classic sequential Lorenzo: the code
    for x_i is u_i - u_{i-1} on the quantized lattice."""
    x = np.array([0.0, 1.0, 3.0, 3.0, 2.0])
    e = 0.5
    u = np.rint(x / (2 * e)).astype(np.int64)
    d = lorenzo._forward(u, 1)
    expect = np.diff(u, prepend=0)
    np.testing.assert_array_equal(d, expect)


def test_smooth_data_small_codes():
    """On a linear ramp, second-order codes are ~all zero."""
    x = np.linspace(0, 10, 1000)
    u = np.rint(x / 2e-3).astype(np.int64)
    d2 = lorenzo._forward(u, 2)
    assert np.abs(d2[2:]).max() <= 1


def test_overflow_raises():
    x = np.array([1e30, -1e30])
    with pytest.raises(OverflowError):
        lorenzo.compress(x, 1e-10)


def test_invalid_bound():
    with pytest.raises(ValueError):
        lorenzo.compress(np.zeros(4), 0.0)


def test_rounding_nudge_keeps_exact_bound():
    """Values adversarially near bin edges still respect the bound."""
    e = 0.1
    x = (np.arange(1000) + 0.5) * 2 * e * (1 + 1e-15)
    out = lorenzo.decompress(lorenzo.compress(x, e))
    assert np.abs(out - x).max() <= e


@pytest.mark.parametrize("dtype", [np.float32, np.int32])
def test_dtypes(dtype):
    rng = np.random.default_rng(2)
    x = (rng.standard_normal((12, 13)) * 100).astype(dtype)
    e = 0.7
    out = lorenzo.decompress(lorenzo.compress(x, e))
    assert np.abs(out - x.astype(np.float64)).max() <= e
