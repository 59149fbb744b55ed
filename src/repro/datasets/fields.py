"""Synthetic analogues of the 8 SDRBench datasets of paper Table 1.

The real datasets (RTM, SEGSalt, Miranda, SCALE-LetKF, CESM-ATM, JHTDB,
NSTX-GPI, APS) are 1-17 GB products of scientific instruments and
simulations that are not available in this offline container. Each
generator below reproduces the *structural* property that drives
interpolation-based compression behaviour on its namesake (DESIGN.md §2):

* ``rtm``      — smooth oscillatory seismic wavefronts (Ricker shells)
* ``segsalt``  — layered geology: piecewise-constant layers with smooth
                 undulating interfaces plus a salt body
* ``miranda``  — turbulence density, k^-5/3 energy spectrum (smooth)
* ``scale``    — climate: smooth horizontal fields, weakly correlated
                 vertical levels (dimension-freezing candidate)
* ``cesm``     — atmosphere: 26 nearly independent smooth 2-D levels
                 (strong dimension-freezing candidate)
* ``jhtdb``    — forced isotropic turbulence, shallower spectrum (rough)
* ``nstx``     — integer GPI camera movie: drifting Gaussian blobs + noise
* ``aps``      — integer detector image: smooth background + rings + noise

All generators are deterministic in ``seed`` and parameterized only by
``shape``, so tests (small shapes) and benchmarks (large shapes) draw
from the same distribution.
"""
from __future__ import annotations

import numpy as np


def _rng(seed: int) -> np.random.Generator:
    return np.random.default_rng(seed)


def _coords(shape: tuple[int, ...]) -> list[np.ndarray]:
    """Normalized [0,1) coordinate grids (broadcastable, open)."""
    return list(np.ogrid[tuple(slice(0.0, 1.0, complex(0, n)) for n in shape)])


def _spectral_field(
    shape: tuple[int, ...], slope: float, seed: int, kc: float | None = None
) -> np.ndarray:
    """Band-limited Gaussian random field, amplitude ~ k^-slope e^-(k/kc)^2.

    Real scientific grids oversample their physics; the Gaussian cutoff
    ``kc`` (in cycles per domain, an *absolute* physical scale) models
    that: larger grids of the same physics are smoother per cell, exactly
    like the paper's full-resolution datasets versus our reduced grids."""
    g = _rng(seed)
    white = g.standard_normal(shape)
    spec = np.fft.rfftn(white)
    freqs = [np.fft.fftfreq(n) * n for n in shape[:-1]]
    freqs.append(np.fft.rfftfreq(shape[-1]) * shape[-1])
    k2 = np.zeros(spec.shape)
    for ax, fr in enumerate(freqs):
        sh = [1] * len(shape)
        sh[ax] = -1
        k2 = k2 + fr.reshape(sh) ** 2
    k = np.sqrt(k2)
    k[tuple([0] * len(shape))] = 1.0
    amp = k**-slope
    if kc is not None:
        amp = amp * np.exp(-((k / kc) ** 2))
    amp[tuple([0] * len(shape))] = 0.0
    f = np.fft.irfftn(spec * amp, s=shape)
    f /= np.abs(f).max() + 1e-30
    return f


def rtm(shape: tuple[int, ...] = (64, 64, 48), seed: int = 11) -> np.ndarray:
    """Seismic wavefield: superposed Ricker wavefront shells (smooth)."""
    g = _rng(seed)
    zz, yy, xx = _coords(shape)
    f = np.zeros(shape)
    for _ in range(4):
        c = g.random(3)
        radius = 0.15 + 0.5 * g.random()
        freq = 2.0 + 2.0 * g.random()  # wavelength >= ~8 grid cells
        r = np.sqrt((zz - c[0]) ** 2 + (yy - c[1]) ** 2 + (xx - c[2]) ** 2)
        arg = (np.pi * freq * (r - radius)) ** 2
        f = f + (1 - 2 * arg) * np.exp(-arg)
    f = f + 0.1 * _spectral_field(shape, 2.5, seed + 1, kc=6.0)
    return f.astype(np.float32)


def segsalt(shape: tuple[int, ...] = (64, 64, 48), seed: int = 12) -> np.ndarray:
    """Layered velocity model with undulating interfaces and a salt body."""
    g = _rng(seed)
    nz = shape[0]
    zz, yy, xx = _coords(shape)
    undul = 0.06 * _spectral_field(shape[1:], 2.5, seed + 1, kc=4.0)
    f = np.zeros(shape)
    n_layers = 8
    bounds = np.sort(g.random(n_layers - 1))
    vels = 1.5 + np.cumsum(0.2 + 0.4 * g.random(n_layers))
    depth = zz + undul[None, :, :]
    # Soft (few-cell) interfaces: real migrated velocity models are smooth
    # at the sampling scale; hard steps would turn this into a Lorenzo
    # showcase instead of an interpolation one.
    w = 0.05  # interface half-width, fraction of depth range
    f += vels[0]
    for b, v_lo, v_hi in zip(bounds, vels[:-1], vels[1:]):
        f = f + (v_hi - v_lo) * 0.5 * (1 + np.tanh((depth - b) / w))
    f = f + 0.3 * zz  # gentle compaction gradient
    c = np.array([0.55, 0.5, 0.5])
    r = np.sqrt(
        ((zz - c[0]) / 0.3) ** 2 + ((yy - c[1]) / 0.22) ** 2 + ((xx - c[2]) / 0.22) ** 2
    )
    f = f + (4.5 - f) * 0.5 * (1 + np.tanh((1.0 - r) / 0.1))
    return f.astype(np.float32)


def miranda(shape: tuple[int, ...] = (64, 64, 48), seed: int = 13) -> np.ndarray:
    """Turbulent density, Kolmogorov-like spectrum (smooth)."""
    f = _spectral_field(shape, 11.0 / 6.0, seed, kc=5.0)
    return (1.5 + f).astype(np.float32)


def jhtdb(shape: tuple[int, ...] = (64, 64, 48), seed: int = 14) -> np.ndarray:
    """Forced isotropic turbulence velocity component (rougher)."""
    return _spectral_field(shape, 7.0 / 6.0, seed, kc=9.0).astype(np.float32)


def scale(shape: tuple[int, ...] = (24, 64, 64), seed: int = 15) -> np.ndarray:
    """Climate analogue: smooth horizontal structure, weak vertical
    correlation — the §6.3 dimension-freezing case."""
    g = _rng(seed)
    nlev = shape[0]
    kc = 7.0
    base = _spectral_field(shape[1:], 2.2, seed + 1, kc=kc)
    f = np.empty(shape)
    amp = np.exp(g.standard_normal(nlev) * 0.8)
    mix = 0.3 + 0.5 * g.random(nlev)
    for l in range(nlev):
        own = _spectral_field(shape[1:], 2.2, seed + 10 + l, kc=kc)
        f[l] = amp[l] * ((1 - mix[l]) * base + mix[l] * own) + 0.5 * g.standard_normal()
    return f.astype(np.float32)


def cesm(shape: tuple[int, ...] = (26, 64, 64), seed: int = 16) -> np.ndarray:
    """Atmosphere analogue: nearly independent smooth 2-D levels with
    heterogeneous amplitudes — the strongest freezing case."""
    g = _rng(seed)
    nlev = shape[0]
    kc = 7.0
    f = np.empty(shape)
    for l in range(nlev):
        lvl = _spectral_field(shape[1:], 2.0, seed + 100 + l, kc=kc)
        f[l] = float(np.exp(g.standard_normal() * 1.5)) * lvl + 10.0 * g.standard_normal()
    return f.astype(np.float32)


def nstx(shape: tuple[int, ...] = (48, 40, 32), seed: int = 17) -> np.ndarray:
    """Fusion GPI camera movie (integer): drifting blobs + shot noise."""
    g = _rng(seed)
    nt, ny, nx = shape
    yy, xx = np.meshgrid(
        np.linspace(0, 1, ny), np.linspace(0, 1, nx), indexing="ij"
    )
    out = np.empty(shape, dtype=np.int32)
    blobs = [
        (g.random(2), g.random(2) * 0.4 - 0.2, 0.05 + 0.1 * g.random(), 400 + 600 * g.random())
        for _ in range(3)
    ]
    for t in range(nt):
        frame = 200.0 + 100.0 * yy
        tt = t / max(nt - 1, 1)
        for (p0, v, w, a) in blobs:
            cy = (p0[0] + v[0] * tt) % 1.0
            cx = (p0[1] + v[1] * tt) % 1.0
            frame = frame + a * np.exp(-(((yy - cy) ** 2 + (xx - cx) ** 2) / w**2))
        frame = frame + g.normal(0, 5.0, (ny, nx))
        out[t] = np.rint(frame).astype(np.int32)
    return out


def aps(shape: tuple[int, ...] = (96, 128), seed: int = 18) -> np.ndarray:
    """Synchrotron detector image (integer): background + rings + noise."""
    g = _rng(seed)
    yy, xx = _coords(shape)
    r = np.sqrt((yy - 0.5) ** 2 + (xx - 0.5) ** 2)
    f = 5000.0 * np.exp(-3.0 * r) + 800.0 * (1 + np.sin(60.0 * r)) / (1 + 20 * r)
    f = f + g.normal(0, 20.0, shape)
    return np.rint(f).astype(np.int32)


DATASETS = {
    "RTM": rtm,
    "SegSalt": segsalt,
    "Miranda": miranda,
    "SCALE": scale,
    "CESM-ATM": cesm,
    "JHTDB": jhtdb,
    "NSTX-GPI": nstx,
    "APS": aps,
}

FP_DATASETS = ("RTM", "SegSalt", "Miranda", "SCALE", "CESM-ATM", "JHTDB")
INT_DATASETS = ("NSTX-GPI", "APS")

#: small shapes for unit tests (fast; ~100-300 KB per field)
TEST_SHAPES = {
    "RTM": (40, 44, 36),
    "SegSalt": (44, 40, 36),
    "Miranda": (40, 40, 36),
    "SCALE": (16, 48, 48),
    "CESM-ATM": (13, 56, 56),
    "JHTDB": (40, 40, 36),
    "NSTX-GPI": (32, 40, 32),
    "APS": (96, 128),
}

#: bench shapes (~2-8 MB per field), proportioned like paper Table 1
BENCH_SHAPES = {
    "RTM": (112, 112, 60),
    "SegSalt": (126, 126, 44),
    "Miranda": (64, 96, 96),
    "SCALE": (25, 150, 150),
    "CESM-ATM": (26, 180, 360),
    "JHTDB": (96, 96, 96),
    "NSTX-GPI": (196, 80, 64),
    "APS": (448, 512),
}


def generate(name: str, scale_: str = "test", seed_offset: int = 0) -> np.ndarray:
    """Generate dataset ``name`` at ``"test"`` or ``"bench"`` scale."""
    shapes = TEST_SHAPES if scale_ == "test" else BENCH_SHAPES
    fn = DATASETS[name]
    base_seed = {"test": 0, "bench": 1000}[scale_]
    # str hash() is randomized per process; use a stable name digest.
    digest = sum(ord(c) for c in name) % 97
    return fn(shape=shapes[name], seed=base_seed + seed_offset + digest)
