"""Bulk quantization-code coder tests (byte-plane + Huffman paths)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import codes


@pytest.mark.parametrize("center", [0, 32768, -5])
@pytest.mark.parametrize("n", [0, 1, 10, 5000, 70000])
def test_roundtrip(center, n):
    rng = np.random.default_rng(n + 1)
    arr = rng.integers(center - 100, center + 100, n)
    out = codes.decode(codes.encode(arr, center=center))
    np.testing.assert_array_equal(out, arr)


def test_small_stream_uses_huffman():
    arr = np.arange(100)
    blob = codes.encode(arr)
    assert blob[:4] == b"CH01"


def test_large_stream_uses_byteplanes():
    arr = np.zeros(100000, dtype=np.int64)
    blob = codes.encode(arr)
    assert blob[:4] == b"BP01"


def test_concentrated_codes_compress_well():
    rng = np.random.default_rng(0)
    arr = 32768 + np.rint(rng.standard_normal(200000) * 1.5).astype(np.int64)
    blob = codes.encode(arr, center=32768)
    assert len(blob) * 8 / arr.size < 3.5  # ~2.8 bits marginal entropy


def test_ratio_parity_huffman_vs_byteplane():
    """The byte-plane path stands in for Huffman+Zstd on bulk streams
    (DESIGN.md §2); their sizes must stay within ~25 % on SZ-style
    quantization codes."""
    rng = np.random.default_rng(1)
    sym = np.rint(rng.standard_normal(40000) * 2.0).astype(np.int64)
    from repro.core import huffman, lossless

    hf = len(lossless.compress(huffman.encode(sym)))
    bp = len(codes.encode(sym, center=0))
    assert bp < hf * 1.25


def test_negative_values():
    arr = np.array([-(2**40), -1, 0, 1, 2**40])
    out = codes.decode(codes.encode(arr, center=0))
    np.testing.assert_array_equal(out, arr)


@settings(max_examples=40, deadline=None)
@given(
    st.lists(
        st.integers(min_value=-(2**50), max_value=2**50),
        min_size=0,
        max_size=200,
    )
)
def test_roundtrip_hypothesis(data):
    arr = np.array(data, dtype=np.int64)
    out = codes.decode(codes.encode(arr, center=0))
    np.testing.assert_array_equal(out, arr)


def test_rejects_garbage():
    with pytest.raises(ValueError):
        codes.decode(b"XXXXrest")
