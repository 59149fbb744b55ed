"""Computation behind every evaluation table (paper §7.2).

Each ``table*`` function returns plain row dicts so the ``jobs/``
entrypoints can print them, tests can assert on them, and benchmarks can
time their pieces. Paper reference numbers live in EXPERIMENTS.md next
to the measured output of these functions.
"""
from __future__ import annotations

import time
from typing import Sequence

import numpy as np

from . import codecs
from .core import metrics
from .datasets import BENCH_SHAPES, FP_DATASETS, TEST_SHAPES, generate
from .transfer import TransferMeasurement, measure_codec, transfer_time

#: total dataset sizes used in paper Table 5 (bytes), after the x2048
#: augmentation described in §7.2.4.
PAPER_TABLE5_SIZES = {
    "CESM-ATM": 41e12,
    "RTM": 14e12,
    "Miranda": 2e12,
    "SCALE": 13e12,
    "JHTDB": 10e12,
    "SegSalt": 8e12,
}

DOMAINS = {
    "RTM": "Seismic Wave",
    "SegSalt": "Geology",
    "Miranda": "Turbulence",
    "SCALE": "Climate",
    "CESM-ATM": "Weather",
    "JHTDB": "Turbulence",
    "NSTX-GPI": "Fusion",
    "APS": "Material",
}


def table1_datasets(scale: str = "bench") -> list[dict]:
    """Table 1: dataset inventory (our synthetic analogues)."""
    shapes = BENCH_SHAPES if scale == "bench" else TEST_SHAPES
    rows = []
    for name, shape in shapes.items():
        arr = generate(name, scale)
        rows.append(
            {
                "dataset": name,
                "dimensions": "x".join(map(str, shape)),
                "size_mb": arr.nbytes / 1e6,
                "domain": DOMAINS[name],
                "type": "Integer" if arr.dtype.kind == "i" else "Floating points",
            }
        )
    return rows


#: minimum bytes for speed measurements — the paper times GB-scale files,
#: where the auto-tuner's constant cost fully amortizes; we tile the bench
#: field along axis 0 until the array is at least this large.
SPEED_BYTES = 24_000_000


def speed_data(name: str, scale: str = "bench") -> np.ndarray:
    """Bench field tiled along axis 0 for speed measurements. Tiling
    repeats structure at distances far beyond the DEFLATE window, so
    per-byte behaviour matches the untiled field."""
    data = generate(name, scale)
    if scale != "bench":
        return data
    reps = max(1, int(np.ceil(SPEED_BYTES / data.nbytes)))
    if reps == 1:
        return data
    return np.concatenate([data] * reps, axis=0)


def _timed_roundtrip(
    codec: str, data: np.ndarray, eps: float
) -> tuple[float, float, float, float]:
    """(comp MB/s, decomp MB/s, CR, max|err|/e) for one codec run."""
    mb = data.nbytes / 1e6
    t0 = time.perf_counter()
    blob = codecs.compress(codec, data, eps)
    t_comp = time.perf_counter() - t0
    t0 = time.perf_counter()
    recon = codecs.decompress(blob)
    t_dec = time.perf_counter() - t0
    e = metrics.value_range(data) * eps
    rel = metrics.max_abs_err(data, recon) / e if e else 0.0
    return mb / t_comp, mb / t_dec, data.nbytes / len(blob), rel


def table2_speeds(
    scale: str = "bench",
    eps: float = 1e-3,
    codec_names: Sequence[str] = codecs.ALL_CODECS,
    datasets: Sequence[str] = FP_DATASETS,
) -> list[dict]:
    """Table 2: compression/decompression speeds (MB/s) at eps=1e-3."""
    rows = []
    for ds in datasets:
        data = speed_data(ds, scale)
        for c in codec_names:
            comp, dec, cr, rel = _timed_roundtrip(c, data, eps)
            assert rel <= 1 + 1e-6, f"bound violated: {c} on {ds}"
            rows.append(
                {
                    "dataset": ds,
                    "codec": c,
                    "comp_mbps": comp,
                    "decomp_mbps": dec,
                    "cr": cr,
                }
            )
    return rows


def _cr_table(
    codec_names: Sequence[str],
    scale: str,
    eps_list: Sequence[float],
    datasets: Sequence[str],
    improve_of: str | None,
) -> list[dict]:
    rows = []
    for ds in datasets:
        data = generate(ds, scale)
        for eps in eps_list:
            crs = {}
            for c in codec_names:
                blob = codecs.compress(c, data, eps)
                recon = codecs.decompress(blob)
                e = metrics.value_range(data) * eps
                assert metrics.max_abs_err(data, recon) <= e * (1 + 1e-6)
                crs[c] = data.nbytes / len(blob)
            row = {"dataset": ds, "eps": eps, **crs}
            if improve_of:
                others = [v for k, v in crs.items() if k != improve_of]
                row["improve_pct"] = (
                    (crs[improve_of] / max(others) - 1.0) * 100.0
                )
            rows.append(row)
    return rows


def table3_cr_highperf(
    scale: str = "bench",
    eps_list: Sequence[float] = (1e-2, 1e-3, 1e-4),
    datasets: Sequence[str] = FP_DATASETS,
) -> list[dict]:
    """Table 3: CR of high-performance codecs + HPEZ improvement %."""
    return _cr_table(
        ("sz3", "zfp", "qoz", "hpez"), scale, eps_list, datasets, "hpez"
    )


def table4_cr_highratio(
    scale: str = "bench",
    eps_list: Sequence[float] = (1e-2, 1e-3, 1e-4),
    datasets: Sequence[str] = FP_DATASETS,
) -> list[dict]:
    """Table 4: CR of HPEZ vs high-ratio codecs."""
    return _cr_table(
        ("sperr", "faz", "tthresh", "hpez"), scale, eps_list, datasets, None
    )


def table5_transfer(
    scale: str = "bench",
    p: int = 2048,
    bw: float = 1e8,
    target_psnr: float = 80.0,
    codec_names: Sequence[str] = codecs.ALL_CODECS,
    datasets: Sequence[str] = tuple(PAPER_TABLE5_SIZES),
) -> list[dict]:
    """Table 5: parallel transfer times at PSNR=80 via the paper's
    analytic model (§7.2.4) with our measured speeds and ratios, the
    paper's dataset sizes and p=2048 cores.

    The paper's setup pairs ~100-600 MB/s per-core C++ codecs with a
    1 GB/s Globus link; our NumPy kernels run ~10x slower per core, so
    the default simulated bandwidth is scaled by the same factor
    (0.1 GB/s) to preserve the compute : network balance that determines
    which codec wins — the quantity Table 5 is about."""
    rows = []
    for ds in datasets:
        data = generate(ds, scale)
        timing = speed_data(ds, scale)
        total = PAPER_TABLE5_SIZES[ds]
        times: dict[str, float] = {}
        meas: dict[str, TransferMeasurement] = {}
        for c in codec_names:
            m = measure_codec(c, data, target_psnr, timing_data=timing)
            meas[c] = m
            times[c] = transfer_time(total, p, bw, m)
        others = [v for k, v in times.items() if k != "hpez"]
        improve = (min(others) / times["hpez"] - 1.0) * 100.0
        for c in codec_names:
            m = meas[c]
            rows.append(
                {
                    "dataset": ds,
                    "codec": c,
                    "eps": m.eps,
                    "psnr": m.psnr,
                    "cr": m.cr,
                    "comp_mbps": m.comp_mbps,
                    "decomp_mbps": m.decomp_mbps,
                    "time_s": times[c],
                    "improve_pct": improve if c == "hpez" else None,
                }
            )
    return rows


def table6_fvfi(
    scale: str = "bench",
    eps: float = 1e-3,
    datasets: Sequence[str] = FP_DATASETS,
) -> list[dict]:
    """Table 6: HPEZ speeds with vs without fast-varying-first
    interpolation (§5.4.1)."""
    rows = []
    for ds in datasets:
        # untiled: both variants share the tuner cost, and the FVFI
        # traversal contrast is a per-pass effect best seen at the
        # bench field's own working-set size
        data = generate(ds, scale)
        mb = data.nbytes / 1e6
        for fvfi in (False, True):
            t0 = time.perf_counter()
            blob = codecs.compress("hpez", data, eps, fvfi=fvfi)
            t_comp = time.perf_counter() - t0
            t0 = time.perf_counter()
            recon = codecs.decompress(blob)
            t_dec = time.perf_counter() - t0
            e = metrics.value_range(data) * eps
            assert metrics.max_abs_err(data, recon) <= e * (1 + 1e-6)
            rows.append(
                {
                    "dataset": ds,
                    "fvfi": fvfi,
                    "comp_mbps": mb / t_comp,
                    "decomp_mbps": mb / t_dec,
                }
            )
    return rows


def format_rows(rows: list[dict], floatfmt: str = "{:.4g}") -> str:
    """Plain-text table for job output."""
    if not rows:
        return "(empty)"
    cols = list(rows[0].keys())
    widths = {c: len(c) for c in cols}
    rendered = []
    for r in rows:
        rr = {}
        for c in cols:
            v = r.get(c)
            if isinstance(v, float):
                rr[c] = floatfmt.format(v)
            elif v is None:
                rr[c] = ""
            else:
                rr[c] = str(v)
            widths[c] = max(widths[c], len(rr[c]))
        rendered.append(rr)
    head = "  ".join(c.ljust(widths[c]) for c in cols)
    lines = [head, "-" * len(head)]
    for rr in rendered:
        lines.append("  ".join(rr[c].ljust(widths[c]) for c in cols))
    return "\n".join(lines)
