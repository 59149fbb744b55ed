"""Spline interpolation stencils for HPEZ / QoZ / SZ3 (paper §5.2, §5.4.2).

Each stencil maps a point's neighbours along one axis (in units of the
current interpolation stride ``s``) to a prediction. Offsets are in v-grid
units, where ``v`` is the stride-``s`` subsampled line: offset 1 == distance
``s`` in the original array.

Stencils (paper equation numbers):

* ``linear``       — Eq. 2:  (d[i-1] + d[i+1]) / 2
* ``cubic_nak``    — Eq. 6:  not-a-knot cubic spline, 4 points at +-1, +-3
* ``cubic_nat``    — Eq. 8:  natural cubic spline,    4 points at +-1, +-3
* ``cubic_nak_sl`` — Eq. 13: same-level not-a-knot,   4 points at +-1, +-2
* ``cubic_nat_sl`` — Eq. 14: same-level natural,      6 points at +-1..+-3

All weights sum to 1, so predictions are affine-invariant (exact on
constants); the inter-level cubics are exact on cubic polynomials and the
linear stencil on linear ones — properties pinned by unit tests.
"""
from __future__ import annotations

import numpy as np

#: name -> tuple of (offset, weight) pairs, offsets in stride units.
STENCILS: dict[str, tuple[tuple[int, float], ...]] = {
    "linear": ((-1, 0.5), (1, 0.5)),
    "cubic_nak": ((-3, -1 / 16), (-1, 9 / 16), (1, 9 / 16), (3, -1 / 16)),
    "cubic_nat": ((-3, -3 / 40), (-1, 23 / 40), (1, 23 / 40), (3, -3 / 40)),
    "cubic_nak_sl": ((-2, -1 / 6), (-1, 4 / 6), (1, 4 / 6), (2, -1 / 6)),
    "cubic_nat_sl": (
        (-3, 3 / 62),
        (-2, -18 / 62),
        (-1, 46 / 62),
        (1, 46 / 62),
        (2, -18 / 62),
        (3, 3 / 62),
    ),
}

#: splines selectable by the tuner as the per-level interpolation function.
SPLINE_CHOICES = ("linear", "cubic_nak", "cubic_nat")

#: inter-level spline -> matching same-level variant (paper §5.4.2).
SAME_LEVEL_OF = {"cubic_nak": "cubic_nak_sl", "cubic_nat": "cubic_nat_sl"}


def line_predict(
    v: np.ndarray, tpos: np.ndarray, stencil: str
) -> np.ndarray:
    """Predict values at indices ``tpos`` along the last axis of ``v``.

    ``v`` is the stride-subsampled working line (last axis length n); the
    neighbours used are ``v[..., tpos + off]`` with out-of-range indices
    clipped to the array edge (edge replication — the deterministic
    boundary fallback shared by compressor and decompressor).
    """
    n = v.shape[-1]
    acc: np.ndarray | None = None
    for off, w in STENCILS[stencil]:
        idx = np.clip(tpos + off, 0, n - 1)
        term = w * np.take(v, idx, axis=-1)
        acc = term if acc is None else acc + term
    assert acc is not None
    return acc
