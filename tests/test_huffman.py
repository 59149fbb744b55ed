"""Canonical Huffman codec tests (paper §4 step 4, from scratch)."""
import numpy as np
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import huffman


@pytest.mark.parametrize(
    "data",
    [
        [0],
        [0, 0, 0],
        [1, 2, 3, 4, 5],
        [-5, 0, 5],
        list(range(100)) * 3,
        [7] * 1000 + [8],
    ],
)
def test_roundtrip(data):
    arr = np.array(data, dtype=np.int64)
    out = huffman.decode(huffman.encode(arr))
    np.testing.assert_array_equal(out, arr)


def test_empty():
    out = huffman.decode(huffman.encode(np.empty(0, dtype=np.int64)))
    assert out.size == 0


def test_skewed_distribution_compresses():
    rng = np.random.default_rng(0)
    sym = rng.choice([0, 1, 2, 3], p=[0.94, 0.03, 0.02, 0.01], size=20000)
    blob = huffman.encode(sym)
    # Huffman floor is 1 bit/symbol; header must stay small
    assert len(blob) * 8 / sym.size < 1.2


def test_uniform_distribution_near_log2():
    rng = np.random.default_rng(1)
    sym = rng.integers(0, 16, 20000)
    blob = huffman.encode(sym)
    bits = len(blob) * 8 / sym.size
    assert 4.0 <= bits < 4.5


def test_code_lengths_kraft_inequality():
    rng = np.random.default_rng(2)
    freqs = rng.integers(1, 1000, 50)
    lengths = huffman._code_lengths(freqs)
    assert np.sum(0.5 ** lengths.astype(float)) <= 1.0 + 1e-12


def test_canonical_codes_prefix_free():
    rng = np.random.default_rng(3)
    freqs = rng.integers(1, 100, 20)
    lengths = huffman._code_lengths(freqs)
    codes = huffman._canonical_codes(lengths)
    bitstrings = [
        format(int(c), f"0{int(l)}b") for c, l in zip(codes, lengths)
    ]
    for i, a in enumerate(bitstrings):
        for j, b in enumerate(bitstrings):
            if i != j:
                assert not b.startswith(a)


@settings(max_examples=50, deadline=None)
@given(
    st.lists(st.integers(min_value=-(2**31), max_value=2**31), min_size=1, max_size=300)
)
def test_roundtrip_hypothesis(data):
    arr = np.array(data, dtype=np.int64)
    out = huffman.decode(huffman.encode(arr))
    np.testing.assert_array_equal(out, arr)


def test_rejects_garbage():
    with pytest.raises(ValueError):
        huffman.decode(b"nope")
