"""FAZ-like hybrid codec (DESIGN.md §2).

FAZ [36] is "a hybrid compression framework combining diverse
compression techniques, adaptively generating the compression pipeline
for varying inputs, while suffering from low compression speed" (paper
§2). This reproduction runs both of the strongest pipelines in this
repo — the rate-distortion-tuned interpolation compressor (HPEZ core
with psnr target) and the wavelet compressor (SPERR-like) — and keeps
the smaller payload. Compression time ~= the sum of both pipelines,
reproducing FAZ's Table 2 position; ratio = max of the two archetypes,
reproducing its Table 4 position.
"""
from __future__ import annotations

import numpy as np

from .. import sperr
from ..core import container, hpez

_INTERP = hpez.make_codec(target="psnr", name="faz-interp")


def compress(data: np.ndarray, eps: float, mode: str = "rel") -> bytes:
    a = np.asarray(data)
    interp_blob = _INTERP.compress(a, eps, mode=mode)
    wave_blob = sperr.compress(a, eps, mode=mode)
    if len(wave_blob) < len(interp_blob):
        kind, inner = "wavelet", wave_blob
    else:
        kind, inner = "interp", interp_blob
    meta = {"kind": kind}
    return container.pack(
        [("meta", container.json_section(meta)), ("inner", inner)]
    )


def decompress(blob: bytes) -> np.ndarray:
    sec = container.unpack(blob)
    meta = container.from_json(sec["meta"])
    if meta["kind"] == "wavelet":
        return sperr.decompress(sec["inner"])
    return _INTERP.decompress(sec["inner"])
