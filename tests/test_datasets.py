"""Synthetic dataset generator tests (paper Table 1 analogues)."""
import numpy as np
import pytest

from repro.core import autotune
from repro.datasets import (
    BENCH_SHAPES,
    DATASETS,
    FP_DATASETS,
    INT_DATASETS,
    TEST_SHAPES,
    generate,
)


@pytest.mark.parametrize("name", list(DATASETS))
def test_shapes_and_dtype(name):
    arr = generate(name, "test")
    assert arr.shape == TEST_SHAPES[name]
    if name in INT_DATASETS:
        assert arr.dtype.kind == "i"
    else:
        assert arr.dtype == np.float32
    assert np.isfinite(arr.astype(np.float64)).all()


@pytest.mark.parametrize("name", list(DATASETS))
def test_deterministic(name):
    a = generate(name, "test")
    b = generate(name, "test")
    np.testing.assert_array_equal(a, b)


@pytest.mark.parametrize("name", list(DATASETS))
def test_scales_differ(name):
    a = generate(name, "test")
    assert BENCH_SHAPES[name] != TEST_SHAPES[name]
    assert a.shape == TEST_SHAPES[name]


@pytest.mark.parametrize("name", list(DATASETS))
def test_nonconstant(name):
    arr = generate(name, "test").astype(np.float64)
    assert arr.max() > arr.min()


@pytest.mark.parametrize("name", ["CESM-ATM", "SCALE"])
def test_vertical_axis_is_least_smooth(name):
    """The climate/weather analogues must reproduce the structural
    property that drives §6.3 dimension freezing (paper Fig. 17 b/e)."""
    arr = generate(name, "test")
    sigma2 = autotune.axis_interp_mse(arr)
    assert int(np.argmax(sigma2)) == 0


@pytest.mark.parametrize("name", ["RTM", "Miranda", "SegSalt"])
def test_smooth_sets_are_smooth(name):
    arr = generate(name, "test").astype(np.float64)
    rng = arr.max() - arr.min()
    d = np.abs(np.diff(arr, axis=-1)).mean()
    assert d < 0.1 * rng


def test_jhtdb_rougher_than_miranda():
    m = generate("Miranda", "test").astype(np.float64)
    j = generate("JHTDB", "test").astype(np.float64)

    def rough(a):
        return np.abs(np.diff(a, axis=-1)).mean() / (a.max() - a.min())

    assert rough(j) > rough(m)


def test_unknown_name_raises():
    with pytest.raises(KeyError):
        generate("nope", "test")
