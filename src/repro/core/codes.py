"""Bulk coder for quantization-code streams (paper §4 steps 4-5).

The paper pipes quantization codes through Huffman then Zstd. A pure-
Python sequential Huffman *decode* of 10^6-10^8 symbols would dominate
every speed table, so bulk streams use an equivalent-entropy scheme that
is fully vectorized both ways:

* recenter codes around the quantizer radius (small signed ints),
* zigzag-map to unsigned,
* split into little-endian byte planes (plane 0 carries nearly all the
  entropy; higher planes are almost constant zero),
* DEFLATE each plane (DEFLATE's literal stage *is* Huffman coding, with
  LZ77 on top standing in for Zstd's match stage).

Streams below ``HUFFMAN_CUTOFF`` symbols use the real from-scratch
canonical Huffman codec + DEFLATE, exercising the paper's exact pipeline.
A ratio-parity test in ``tests/test_codes.py`` pins the two schemes
within a few percent of each other.
"""
from __future__ import annotations

import struct

import numpy as np

from . import huffman, lossless

_MAGIC_BP = b"BP01"
_MAGIC_HF = b"CH01"

HUFFMAN_CUTOFF = 4096


def _zigzag(v: np.ndarray) -> np.ndarray:
    v = v.astype(np.int64)
    return ((v << 1) ^ (v >> 63)).astype(np.uint64)


def _unzigzag(u: np.ndarray) -> np.ndarray:
    u = u.astype(np.uint64)
    return ((u >> np.uint64(1)) ^ (-(u & np.uint64(1))).astype(np.uint64)).astype(
        np.int64
    )


def encode(codes: np.ndarray, center: int = 0) -> bytes:
    """Encode an integer code stream; ``center`` is subtracted first."""
    codes = np.asarray(codes).ravel().astype(np.int64)
    n = codes.size
    if n and n <= HUFFMAN_CUTOFF:
        body = lossless.compress(huffman.encode(codes - center))
        return _MAGIC_HF + struct.pack("<Qq", n, center) + body
    z = _zigzag(codes - center)
    nbytes = 1
    if n:
        m = int(z.max())
        while m >> (8 * nbytes):
            nbytes += 1
    planes = []
    for b in range(nbytes):
        planes.append(((z >> np.uint64(8 * b)) & np.uint64(0xFF)).astype(np.uint8))
    out = [_MAGIC_BP, struct.pack("<QqB", n, center, nbytes)]
    for p in planes:
        blob = lossless.compress(p.tobytes())
        out.append(struct.pack("<Q", len(blob)))
        out.append(blob)
    return b"".join(out)


def decode(blob: bytes) -> np.ndarray:
    """Decode back to int64 codes (center re-added)."""
    magic = blob[:4]
    if magic == _MAGIC_HF:
        n, center = struct.unpack_from("<Qq", blob, 4)
        syms = huffman.decode(lossless.decompress(blob[4 + 16 :]))
        return syms + center
    if magic != _MAGIC_BP:
        raise ValueError("unknown code-stream blob")
    n, center, nbytes = struct.unpack_from("<QqB", blob, 4)
    off = 4 + 17
    z = np.zeros(n, dtype=np.uint64)
    for b in range(nbytes):
        (ln,) = struct.unpack_from("<Q", blob, off)
        off += 8
        plane = np.frombuffer(
            lossless.decompress(blob[off : off + ln]), dtype=np.uint8
        )
        off += ln
        z |= plane.astype(np.uint64) << np.uint64(8 * b)
    return _unzigzag(z) + center
