"""HPEZ auto-tuning module (paper §6, Fig. 7).

Pipeline (each step optional, controlled by the preset in hpez/qoz/sz3):

1. **Sampling & statistical analysis** (§6.1): per-axis 1-D interpolation
   MSE on ~0.2 % uniformly sampled points → the sigma_i^2 estimates of
   Eq. 12 and the most non-smooth axis for dimension freezing.
2. **Global interpolation tuning** (§6.2): per level, pick the
   (paradigm, spline, same-level, dim-order) that minimizes the estimated
   quantization-code entropy (tie-broken by mean absolute prediction
   error — the paper's criterion; entropy is what the Huffman stage
   actually pays for) on sampled blocks spread across the input.
3. **Dynamic dimension freezing** (§6.3): compression tests on the crop
   with/without freezing the most non-smooth axis; keep the better ratio.
4. **Error-bound tuning** (§6.4, Eq. 15): crop compression tests over an
   (alpha, beta) candidate grid, scored by the quality-metric target.
5. **Lorenzo tuning** (§6.5): one Lorenzo crop test; selected when its
   bit-rate estimate (with the multiplicative coefficient of [36]) beats
   the tuned interpolation pipeline.
6. **Block-wise interpolation tuning** (§6.6): per 32^d block, choose the
   spline with the lowest prediction error on the 4 % center sub-block.

Quality-metric targets: ``"cr"`` maximizes estimated compression ratio;
``"psnr"`` maximizes ``PSNR + 3*log2(CR)`` (rate-distortion proxy; the
paper does not specify QoZ's exact scoring function — see DESIGN.md).
"""
from __future__ import annotations

from dataclasses import dataclass
from itertools import permutations

import numpy as np

from . import interp, lorenzo, metrics
from .interp import EngineConfig, InterpConfig
from .splines import SPLINE_CHOICES

SAMPLE_RATE = 0.002  # §6.1 default
CROP_TARGET = 32  # sample-block side for per-level candidate probing
TEST_TARGET = 48  # sample-block side for cross-family compression tests
                  # (small blocks bias against interpolation: more of the
                  # block sits in the stencil's boundary-fallback region)
N_SAMPLE_BLOCKS = 3  # sample blocks spread along the main diagonal
N_TUNED_LEVELS = 2  # levels probed individually; higher use the reference
LORENZO_COEF = 1.15  # §6.5 bit-rate multiplier (value of [36] unpublished)
EB_CANDIDATES = (  # §6.4 (alpha, beta) grid, QoZ-style
    (1.0, 1.0),
    (1.25, 1.5),
    (1.5, 2.0),
    (2.0, 2.0),
    (2.0, 3.0),
)


@dataclass
class TuneOptions:
    """Which auto-tuning features a preset enables."""

    target: str = "cr"  # "cr" | "psnr"
    splines: tuple[str, ...] = SPLINE_CHOICES  # allowed spline functions
    paradigms: tuple[str, ...] = ("1d", "md")  # allowed paradigms
    same_level: bool = True  # §5.4.2 allowed
    tune_dim_order: bool = True
    tune_eb: bool = True  # §6.4
    dim_freeze: bool = True  # §6.3
    lorenzo: bool = True  # §6.5
    blockwise: bool = True  # §6.6
    anchor_stride: int = 32
    block_size: int = 32
    fvfi: bool = True
    seed: int = 17


@dataclass
class TuneResult:
    use_lorenzo: bool
    cfg: EngineConfig
    sigma2: tuple[float, ...]


# ---------------------------------------------------------------------------
# §6.1 sampling & statistical analysis
# ---------------------------------------------------------------------------
def axis_interp_mse(data: np.ndarray, seed: int = 17) -> np.ndarray:
    """Per-axis cubic-interpolation MSE on ~0.2 % sampled points (§6.1)."""
    a = np.asarray(data, dtype=np.float64)
    rng = np.random.default_rng(seed)
    n_samples = max(256, int(a.size * SAMPLE_RATE))
    out = np.zeros(a.ndim)
    w = (-1 / 16, 9 / 16, 9 / 16, -1 / 16)
    for d in range(a.ndim):
        n = a.shape[d]
        if n < 7:
            # Too short for the +-3 stencil: treat as maximally non-smooth
            # only if it varies at all; a singleton axis is perfectly smooth.
            if n < 2:
                out[d] = 0.0
            else:
                diffs = np.diff(a, axis=d)
                out[d] = float(np.mean(diffs**2))
            continue
        idx = [
            rng.integers(0, a.shape[ax], n_samples) if ax != d
            else rng.integers(3, n - 3, n_samples)
            for ax in range(a.ndim)
        ]
        center = a[tuple(idx)]
        pred = np.zeros(n_samples)
        for off, wi in zip((-3, -1, 1, 3), w):
            nb = list(idx)
            nb[d] = idx[d] + off
            pred += wi * a[tuple(nb)]
        out[d] = float(np.mean((center - pred) ** 2))
    return out


def _center_crop(data: np.ndarray, sides: tuple[int, ...]) -> np.ndarray:
    sel = []
    for n, w in zip(data.shape, sides):
        w = min(n, w)
        lo = (n - w) // 2
        sel.append(slice(lo, lo + w))
    return np.ascontiguousarray(data[tuple(sel)])


def sample_blocks(
    data: np.ndarray, side: int = CROP_TARGET, k: int = N_SAMPLE_BLOCKS
) -> list[np.ndarray]:
    """Sample blocks spread along the main diagonal (a uniform spatial
    sample standing in for §6.1's 0.2 % point sampling in block form)."""
    blocks: list[np.ndarray] = []
    for i in range(k):
        sel = []
        whole = True
        for n in data.shape:
            w = min(n, side)
            lo = 0 if n == w else round(i * (n - w) / max(k - 1, 1))
            sel.append(slice(lo, lo + w))
            whole = whole and w == n
        blocks.append(np.ascontiguousarray(data[tuple(sel)]))
        if whole:
            break  # data no bigger than one block: one sample suffices
    return blocks


# ---------------------------------------------------------------------------
# §6.2 global interpolation tuning
# ---------------------------------------------------------------------------
class _ErrProbe:
    """qfun for the §6.2 compression tests: accumulates |pred - truth| and
    writes the *quantized* reconstruction back, so configurations whose
    same-level neighbours carry quantization noise are scored honestly.
    Points of higher levels hold original values (each level is probed
    independently)."""

    RADIUS = 32768

    def __init__(self, a: np.ndarray, e: float) -> None:
        self.a = a
        self.e = e
        self.abs_err = 0.0
        self.count = 0
        self.codes = np.full(a.shape, self.RADIUS, dtype=np.int32)

    def __call__(self, pred: np.ndarray, sel: tuple, e_l: float) -> np.ndarray:
        truth = self.a[sel]
        self.abs_err += float(np.abs(truth - pred).sum())
        self.count += truth.size
        q = np.rint((truth - pred) / (2.0 * e_l))
        self.codes[sel] = (
            np.clip(q, -self.RADIUS + 1, self.RADIUS - 1).astype(np.int32)
            + self.RADIUS
        )
        return pred + 2.0 * e_l * q

    def encoded_bytes(self, cfg: "EngineConfig", level: int) -> int:
        """Actual coded size of this level's codes under the real lossless
        stage (the LZ stage is order/run-sensitive, so marginal entropy
        would mis-rank configurations — measured, see DESIGN.md)."""
        sels = interp.pass_selections(self.a.shape, cfg, levels=(level,))
        if not sels:
            return 0
        stream = np.concatenate([self.codes[sl].ravel() for sl in sels])
        from . import codes as codes_mod

        return len(codes_mod.encode(stream, center=self.RADIUS))


def _candidate_configs(opts: TuneOptions, active: tuple[int, ...]) -> list[InterpConfig]:
    out: list[InterpConfig] = []
    orders: list[tuple[int, ...] | None] = [None]
    if opts.tune_dim_order and len(active) > 1:
        # Forward and reversed axis orders (the full permutation set grows
        # the tuning cost beyond HPEZ's "high-performance" envelope).
        orders = [tuple(active), tuple(reversed(active))]
    for paradigm in opts.paradigms:
        for spline in opts.splines:
            sls = (False, True) if (opts.same_level and spline != "linear") else (False,)
            for sl in sls:
                if paradigm == "1d":
                    for o in orders:
                        out.append(InterpConfig("1d", spline, sl, o))
                else:
                    out.append(InterpConfig("md", spline, sl, None))
    return out


def tune_global_interp(
    blocks: list[np.ndarray], opts: TuneOptions, base: EngineConfig, e: float
) -> tuple[InterpConfig, ...]:
    """Per-level best config by lowest estimated code entropy (§6.2).

    Levels are tuned from the highest stride down, *advancing the
    quantized state* between levels (QoZ's compression-test flow): when
    level ``l`` is scored, the sample blocks already contain the
    reconstruction of all higher levels, so noise amplification by
    wide stencils is priced in honestly.
    """
    crop = blocks[0]
    active = tuple(
        d
        for d in range(crop.ndim)
        if d not in base.frozen_axes and crop.shape[d] >= 2
    )
    cands = _candidate_configs(opts, active)
    m = int(base.anchor_stride).bit_length() - 1
    states = [b.astype(np.float64) for b in blocks]
    # Reference config for pricing the *downstream* effect of a level
    # choice: the reconstruction a candidate leaves behind feeds the next
    # level's predictions, so its entropy there is part of the cost.
    ref = InterpConfig("1d", "cubic_nak", False, None)

    def mk_cfg(c: InterpConfig) -> EngineConfig:
        return EngineConfig(
            anchor_stride=base.anchor_stride,
            level_configs=(c,),
            alpha=base.alpha,
            beta=base.beta,
            frozen_axes=base.frozen_axes,
            md_sigma2=base.md_sigma2,
            block_cfg=None,
            fvfi=True,
        )

    chosen: list[InterpConfig | None] = [None] * m
    for level in range(m, 0, -1):
        if level > N_TUNED_LEVELS:
            # Levels above the tuned range hold <2 % of the points and a
            # 32^d sample gives only a handful of codes there — scoring is
            # coder-overhead noise and a bad pick cascades down. Use the
            # reference config (SZ3's default interpolation).
            chosen[level - 1] = ref
            for a in states:
                interp._Walk(a, e, mk_cfg(ref), _ErrProbe(a, e))._level_passes(level)
            continue
        best: tuple[tuple[float, float], InterpConfig, list[np.ndarray]] | None = None
        # Same-level interpolation (§5.4.2) is only offered where the
        # sample is statistically meaningful (the final level holds 50 %+
        # of all points); at higher levels its small-sample score is
        # unreliable and a wrong pick is costly downstream.
        level_cands = (
            cands if level == 1 else [c for c in cands if not c.same_level]
        )
        # Reference-first with a selection margin: a challenger must beat
        # the incumbent's coded size by >1 % — probe noise otherwise flips
        # configs whose real cost is slightly worse (measured; DESIGN.md).
        level_cands = sorted(
            level_cands, key=lambda c: c != ref
        )
        for c in level_cands:
            nbytes = 0
            abs_err = 0.0
            count = 0
            trial: list[np.ndarray] = []
            for st in states:
                a = st.copy()
                probe = _ErrProbe(a, e)
                interp._Walk(a, e, mk_cfg(c), probe)._level_passes(level)
                trial.append(a)
                if probe.count:
                    nbytes += probe.encoded_bytes(mk_cfg(c), level)
                    abs_err += probe.abs_err
                    count += probe.count
                if level > 1:
                    a2 = a.copy()
                    probe2 = _ErrProbe(a2, e)
                    interp._Walk(a2, e, mk_cfg(ref), probe2)._level_passes(level - 1)
                    if probe2.count:
                        nbytes += probe2.encoded_bytes(mk_cfg(ref), level - 1)
                        count += probe2.count
            score = (
                (nbytes / count, abs_err / max(count, 1))
                if count
                else (np.inf, np.inf)
            )
            # Margin grows with level: coarse-level samples are smaller
            # and flips there propagate error into everything below.
            margin = 0.99 if level == 1 else 0.985
            if best is None or score[0] < best[0][0] * margin:
                best = (score, c, trial)
        assert best is not None
        chosen[level - 1] = best[1]
        states = best[2]
    return tuple(c for c in chosen if c is not None)


# ---------------------------------------------------------------------------
# crop compression tests (§6.3, §6.4, §6.5 share this)
# ---------------------------------------------------------------------------
def _crop_test(
    blocks: list[np.ndarray], e: float, cfg: EngineConfig
) -> tuple[int, float]:
    """Sum of compressed bytes and size-weighted mean PSNR over blocks."""
    total = 0
    sse = 0.0
    count = 0
    rng = 0.0
    for crop in blocks:
        payload, recon = interp.compress(crop.astype(np.float32), e, cfg)
        total += len(payload)
        sse += metrics.mse(crop, recon) * crop.size
        count += crop.size
        rng = max(rng, metrics.value_range(crop))
    if rng == 0 or sse == 0:
        return total, float("inf")
    p = float(20.0 * np.log10(rng) - 10.0 * np.log10(sse / count))
    return total, p


def _score(nbytes: int, psnr: float, crop_bytes: int, target: str) -> float:
    cr = crop_bytes / max(nbytes, 1)
    if target == "psnr":
        return psnr + 3.0 * np.log2(max(cr, 1e-9))
    return cr


# ---------------------------------------------------------------------------
# §6.6 block-wise interpolation tuning
# ---------------------------------------------------------------------------
def tune_blocks(
    data: np.ndarray,
    opts: TuneOptions,
    frozen: tuple[int, ...],
    global_spline: str = "cubic_nak",
    e: float = 1.0,
) -> np.ndarray | None:
    """Per-block spline id (index into SPLINE_CHOICES) via prediction
    tests on the 4 % center sub-block of each 32^d block (§6.6).

    A block only overrides the globally tuned level-1 spline when its
    best spline beats the global one by >10 % prediction error — the
    stride-1 sub-block test is a proxy, so near-ties go to the global
    choice."""
    B = opts.block_size
    shape = data.shape
    nblocks = tuple((n + B - 1) // B for n in shape)
    if int(np.prod(nblocks)) <= 1:
        return None
    cfg_map = np.zeros(nblocks, dtype=np.uint8)
    # 4 % of the block volume, centered (§6.6): side = B * 0.04^(1/d).
    sub = max(7, int(round(B * 0.04 ** (1.0 / data.ndim))))
    active = [d for d in range(data.ndim) if d not in frozen and shape[d] >= 8]
    if not active:
        return None
    for bidx in np.ndindex(*nblocks):
        sel = []
        for d, bi in enumerate(bidx):
            lo = bi * B
            hi = min(lo + B, shape[d])
            w = min(sub, hi - lo)
            c = (lo + hi) // 2
            s0 = max(lo, min(c - w // 2, hi - w))
            sel.append(slice(s0, s0 + w))
        blk = data[tuple(sel)].astype(np.float64)
        errs = []
        for name in opts.splines:
            # Cost proxy: codes the quantizer would emit (nonzero bins are
            # what the entropy stage pays for), abs error as tiebreak.
            nz = 0
            total = 0.0
            for d in active:
                if blk.shape[d] < 7:
                    continue
                v = np.moveaxis(blk, d, -1)
                tpos = np.arange(3, v.shape[-1] - 3)
                if tpos.size == 0:
                    continue
                pred = interp._line_predict_safe(v, tpos, name)
                err = np.take(v, tpos, axis=-1) - pred
                nz += int(np.count_nonzero(np.rint(err / (2.0 * e))))
                total += float(np.abs(err).sum())
            errs.append((nz, total))
        gi = opts.splines.index(global_spline) if global_spline in opts.splines else 0
        bi = min(range(len(errs)), key=lambda i: errs[i])
        # Clean-data stride-1 probing is an optimistic proxy (real level-1
        # neighbours carry reconstruction noise): only a decisive winner
        # (<60 % of the global spline's cost) may override.
        if errs[bi][0] >= 0.6 * errs[gi][0]:
            bi = gi
        # Map into the engine-global spline id space (interp.BLOCK_SPLINES).
        cfg_map[bidx] = SPLINE_CHOICES.index(opts.splines[bi])
    if np.unique(cfg_map).size == 1:
        return None  # uniform map == global config; skip the metadata
    return cfg_map


def _validate_blockcfg(data: np.ndarray, e: float, cfg: EngineConfig) -> bool:
    """End-to-end check of a proposed block map (§6.6): compress a
    block-aligned crop around an overridden region with and without the
    map; keep it only if the payload actually shrinks. The stride-1
    sub-block probe is optimistic on clean data, and the lossless stage
    is sensitive to mixed code distributions (DESIGN.md §2)."""
    assert cfg.block_cfg is not None
    B = cfg.block_size
    gid = SPLINE_CHOICES.index(cfg.level_configs[0].spline)
    overridden = np.argwhere(cfg.block_cfg != gid)
    if overridden.size == 0:
        return False
    bidx = overridden[0]
    sel = []
    bsel = []
    for ax, bi in enumerate(bidx):
        n = data.shape[ax]
        o = min(int(bi) * B, max(0, n - 2 * B))
        o = (o // B) * B
        w = min(2 * B, n - o)
        sel.append(slice(o, o + w))
        bsel.append(slice(o // B, (o + w + B - 1) // B))
    crop = np.ascontiguousarray(data[tuple(sel)])
    sub = EngineConfig(**{**cfg.__dict__})
    sub.block_cfg = np.ascontiguousarray(cfg.block_cfg[tuple(bsel)])
    with_map, _ = interp.compress(crop, e, sub)
    sub.block_cfg = None
    without, _ = interp.compress(crop, e, sub)
    return len(with_map) < len(without)


# ---------------------------------------------------------------------------
# full pipeline
# ---------------------------------------------------------------------------
def tune(data: np.ndarray, e: float, opts: TuneOptions) -> TuneResult:
    """Run the full auto-tuning pipeline of Fig. 7; returns the engine
    config (and whether the Lorenzo predictor was selected instead)."""
    sigma2 = axis_interp_mse(data, opts.seed)
    probe_blocks = sample_blocks(data, CROP_TARGET, k=2)
    blocks = sample_blocks(data, TEST_TARGET)
    crop_bytes = sum(b.size for b in blocks) * np.asarray(data).dtype.itemsize

    def build(frozen: tuple[int, ...]) -> EngineConfig:
        base = EngineConfig(
            anchor_stride=opts.anchor_stride,
            frozen_axes=frozen,
            md_sigma2=tuple(float(s) for s in sigma2),
            block_size=opts.block_size,
            fvfi=opts.fvfi,
        )
        base.level_configs = tune_global_interp(probe_blocks, opts, base, e)
        return base

    cfg = build(())
    best_bytes, best_psnr = _crop_test(blocks, e, cfg)

    # §6.3 dynamic dimension freezing
    if opts.dim_freeze and data.ndim >= 2:
        cand_axis = int(np.argmax(sigma2))
        # Reuse the globally tuned level configs (re-tuning under the
        # frozen geometry doubles tuning cost for marginal gain); only
        # drop the frozen axis from any explicit dim orders.
        fcfg = EngineConfig(**{**cfg.__dict__})
        fcfg.frozen_axes = (cand_axis,)
        fcfg.level_configs = tuple(
            InterpConfig(
                c.paradigm,
                c.spline,
                c.same_level,
                tuple(d for d in c.dim_order if d != cand_axis)
                if c.dim_order
                else None,
            )
            for c in cfg.level_configs
        )
        fbytes, fpsnr = _crop_test(blocks, e, fcfg)
        if _score(fbytes, fpsnr, crop_bytes, opts.target) > _score(
            best_bytes, best_psnr, crop_bytes, opts.target
        ):
            cfg = fcfg
            best_bytes, best_psnr = fbytes, fpsnr

    # §6.4 level-wise error-bound tuning (Eq. 15)
    if opts.tune_eb:
        best = _score(best_bytes, best_psnr, crop_bytes, opts.target)
        for alpha, beta in EB_CANDIDATES[1:]:
            trial = EngineConfig(**{**cfg.__dict__, "alpha": alpha, "beta": beta})
            tbytes, tpsnr = _crop_test(blocks, e, trial)
            sc = _score(tbytes, tpsnr, crop_bytes, opts.target)
            if sc > best:
                best = sc
                cfg = trial
                best_bytes, best_psnr = tbytes, tpsnr

    # §6.5 Lorenzo tuning
    use_lorenzo = False
    if opts.lorenzo:
        try:
            lbytes = sum(len(lorenzo.compress(b, e)) for b in blocks)
            if lbytes * LORENZO_COEF < best_bytes:
                use_lorenzo = True
        except OverflowError:
            pass

    # §6.6 block-wise interpolation tuning
    if opts.blockwise and not use_lorenzo:
        cfg.block_cfg = tune_blocks(
            data, opts, cfg.frozen_axes, cfg.level_configs[0].spline, e
        )
        if cfg.block_cfg is not None and not _validate_blockcfg(data, e, cfg):
            cfg.block_cfg = None

    return TuneResult(use_lorenzo=use_lorenzo, cfg=cfg, sigma2=tuple(sigma2))
