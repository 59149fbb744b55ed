"""Canonical Huffman codec, from scratch (paper §4 step 4).

Encodes an integer symbol array into a self-contained byte blob:
``header(n, nsym, symbols, code lengths) + packed bitstream``. The code
is canonical, so only lengths are stored per symbol.

The encoder is vectorized (one pass per bit position of the longest
code); the decoder walks the canonical first-code table byte... symbol by
symbol in Python, which is fine for the metadata-sized streams this codec
is used for (see ``codes.py`` for why bulk streams use the byte-plane
coder instead).
"""
from __future__ import annotations

import heapq
import struct

import numpy as np

_MAGIC = b"HF01"


def _code_lengths(freqs: np.ndarray) -> np.ndarray:
    """Huffman code length per symbol from frequencies (>0)."""
    n = freqs.size
    if n == 1:
        return np.array([1], dtype=np.int64)
    # heap items: (freq, tiebreak, node) where node is a symbol index or a
    # list of children node ids; we track depths by merging symbol sets.
    heap: list[tuple[int, int, list[int]]] = [
        (int(f), i, [i]) for i, f in enumerate(freqs)
    ]
    heapq.heapify(heap)
    depth = np.zeros(n, dtype=np.int64)
    tiebreak = n
    while len(heap) > 1:
        f1, _, s1 = heapq.heappop(heap)
        f2, _, s2 = heapq.heappop(heap)
        merged = s1 + s2
        depth[merged] += 1
        heapq.heappush(heap, (f1 + f2, tiebreak, merged))
        tiebreak += 1
    return depth


def _canonical_codes(lengths: np.ndarray) -> np.ndarray:
    """Canonical code value per symbol given its code length."""
    order = np.lexsort((np.arange(lengths.size), lengths))
    codes = np.zeros(lengths.size, dtype=np.uint64)
    code = 0
    prev_len = 0
    for sym in order:
        ln = int(lengths[sym])
        code <<= ln - prev_len
        codes[sym] = code
        code += 1
        prev_len = ln
    return codes


def encode(symbols: np.ndarray) -> bytes:
    """Encode an int array (any integer dtype) to a canonical-Huffman blob."""
    symbols = np.asarray(symbols).ravel()
    n = symbols.size
    if n == 0:
        return _MAGIC + struct.pack("<QI", 0, 0)
    uniq, inv = np.unique(symbols, return_inverse=True)
    freqs = np.bincount(inv)
    lengths = _code_lengths(freqs)
    codes = _canonical_codes(lengths)
    sym_codes = codes[inv]
    sym_lens = lengths[inv]
    total_bits = int(sym_lens.sum())
    offsets = np.concatenate(([0], np.cumsum(sym_lens)[:-1]))
    bits = np.zeros(total_bits, dtype=np.uint8)
    maxlen = int(lengths.max())
    for b in range(maxlen):
        mask = sym_lens > b
        pos = offsets[mask] + b
        bit = (sym_codes[mask] >> (sym_lens[mask] - 1 - b).astype(np.uint64)) & 1
        bits[pos] = bit.astype(np.uint8)
    packed = np.packbits(bits)
    header = _MAGIC + struct.pack("<QI", n, uniq.size)
    header += uniq.astype("<i8").tobytes()
    header += lengths.astype("<u1").tobytes()
    return header + packed.tobytes()


def decode(blob: bytes) -> np.ndarray:
    """Decode a blob produced by :func:`encode` back to int64 symbols."""
    if blob[:4] != _MAGIC:
        raise ValueError("not a huffman blob")
    n, nsym = struct.unpack_from("<QI", blob, 4)
    off = 4 + 12
    if n == 0:
        return np.empty(0, dtype=np.int64)
    uniq = np.frombuffer(blob, dtype="<i8", count=nsym, offset=off)
    off += 8 * nsym
    lengths = np.frombuffer(blob, dtype="<u1", count=nsym, offset=off).astype(np.int64)
    off += nsym
    bits = np.unpackbits(np.frombuffer(blob, dtype=np.uint8, offset=off))
    # Canonical decoding tables: for each length, the first code value and
    # the index (into length-sorted symbol order) where that length starts.
    order = np.lexsort((np.arange(nsym), lengths))
    sorted_lens = lengths[order]
    maxlen = int(sorted_lens.max())
    first_code = np.zeros(maxlen + 2, dtype=np.int64)
    first_index = np.zeros(maxlen + 2, dtype=np.int64)
    count = np.bincount(sorted_lens, minlength=maxlen + 1)
    code = 0
    idx = 0
    for ln in range(1, maxlen + 1):
        code <<= 1
        first_code[ln] = code
        first_index[ln] = idx
        code += int(count[ln])
        idx += int(count[ln])
    out = np.empty(n, dtype=np.int64)
    pos = 0
    code = 0
    ln = 0
    produced = 0
    nbits = bits.size
    lim_code = first_code
    while produced < n:
        if pos >= nbits:
            raise ValueError("huffman bitstream exhausted")
        code = (code << 1) | int(bits[pos])
        pos += 1
        ln += 1
        # valid iff code < first_code[ln] + count[ln]
        if ln <= maxlen and count[ln] and code - lim_code[ln] < count[ln]:
            out[produced] = uniq[order[first_index[ln] + code - lim_code[ln]]]
            produced += 1
            code = 0
            ln = 0
    return out
