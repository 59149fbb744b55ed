"""Interpolation engine tests (paper §5): roundtrip identity, strict
error bound, grid coverage, freezing, block configs, level error bounds."""
import numpy as np
import pytest

from repro.core import interp
from repro.core.interp import EngineConfig, InterpConfig, pass_selections


def _field(shape, seed=0):
    rng = np.random.default_rng(seed)
    grids = np.ogrid[tuple(slice(0.0, 1.0, complex(0, n)) for n in shape)]
    f = np.zeros(shape)
    for g in grids:
        f = f + np.sin(3.1 * np.pi * g)
    return (f + 0.05 * rng.standard_normal(shape)).astype(np.float32)


def _roundtrip(f, cfg, rel_eps=1e-3):
    e = rel_eps * float(f.max() - f.min())
    blob, recon = interp.compress(f, e, cfg)
    out = interp.decompress(blob)
    return e, recon, out


@pytest.mark.parametrize("paradigm", ["1d", "md"])
@pytest.mark.parametrize("spline", ["linear", "cubic_nak", "cubic_nat"])
@pytest.mark.parametrize("same_level", [False, True])
def test_roundtrip_bound_3d(paradigm, spline, same_level):
    f = _field((33, 20, 18))
    cfg = EngineConfig(
        level_configs=(InterpConfig(paradigm, spline, same_level, None),)
    )
    e, recon, out = _roundtrip(f, cfg)
    np.testing.assert_array_equal(out, recon)
    assert np.abs(out - f.astype(np.float64)).max() <= e


@pytest.mark.parametrize("shape", [(257,), (40, 41), (9, 10, 11), (6, 7, 8, 9)])
def test_roundtrip_all_dims(shape):
    f = _field(shape)
    cfg = EngineConfig()
    e, recon, out = _roundtrip(f, cfg)
    np.testing.assert_array_equal(out, recon)
    assert np.isfinite(out).all()
    assert np.abs(out - f.astype(np.float64)).max() <= e


@pytest.mark.parametrize("fvfi", [False, True])
@pytest.mark.parametrize("paradigm", ["1d", "md"])
def test_fvfi_traversals_equivalent(fvfi, paradigm):
    """fvfi changes traversal (speed), never values (§5.4.1)."""
    f = _field((24, 18, 22), seed=3)
    cfg = EngineConfig(
        level_configs=(InterpConfig(paradigm, "cubic_nak", True, None),),
        fvfi=fvfi,
    )
    e, recon, out = _roundtrip(f, cfg)
    np.testing.assert_array_equal(out, recon)
    assert np.abs(out - f.astype(np.float64)).max() <= e


def test_fvfi_same_reconstruction():
    """Same final reconstruction either way — only the literal stream
    order differs."""
    f = _field((20, 22, 24), seed=4)
    e = 1e-3 * float(f.max() - f.min())
    _, r1 = interp.compress(f, e, EngineConfig(fvfi=True))
    _, r2 = interp.compress(f, e, EngineConfig(fvfi=False))
    np.testing.assert_allclose(r1, r2, atol=0, rtol=0)


@pytest.mark.parametrize("frozen", [(0,), (1,), (2,)])
def test_dimension_freezing(frozen):
    """§6.3: no interpolation along the frozen axis; bound still holds."""
    f = _field((12, 20, 24), seed=5)
    cfg = EngineConfig(frozen_axes=frozen)
    e, recon, out = _roundtrip(f, cfg)
    np.testing.assert_array_equal(out, recon)
    assert np.abs(out - f.astype(np.float64)).max() <= e


def test_frozen_axis_anchor_density():
    """Anchors cover every position of the frozen axis (Fig. 8)."""
    shape = (8, 40, 40)
    cfg = EngineConfig(frozen_axes=(0,))
    sels = pass_selections(shape, cfg)
    covered = np.zeros(shape, dtype=int)
    for sel in sels:
        covered[sel] += 1
    # anchors = positions never targeted by a pass
    anchors = covered == 0
    assert anchors[:, 0, 0].all()  # whole frozen axis at anchor column


@pytest.mark.parametrize(
    "shape", [(31,), (32,), (33,), (17, 23), (16, 16, 16), (33, 20, 18), (5, 64, 3)]
)
@pytest.mark.parametrize("paradigm", ["1d", "md"])
def test_pass_selections_cover_exactly_once(shape, paradigm):
    """Every non-anchor point is targeted by exactly one pass — the
    serialization order and the walk stay in lockstep."""
    cfg = EngineConfig(
        level_configs=(InterpConfig(paradigm, "cubic_nak", False, None),)
    )
    covered = np.zeros(shape, dtype=int)
    for sel in pass_selections(shape, cfg):
        covered[sel] += 1
    frozen = ()
    active = tuple(d for d in range(len(shape)) if shape[d] >= 2)
    anchor_sel = tuple(
        slice(0, None, cfg.anchor_stride) if d in active else slice(None)
        for d in range(len(shape))
    )
    expect = np.ones(shape, dtype=int)
    expect[anchor_sel] = 0
    np.testing.assert_array_equal(covered, expect)


def test_decompress_no_nan():
    """The decompressor starts from NaN; a NaN in the output would mean
    it read an unwritten point."""
    f = _field((19, 21, 23), seed=6)
    for paradigm in ("1d", "md"):
        for sl in (False, True):
            cfg = EngineConfig(
                level_configs=(InterpConfig(paradigm, "cubic_nat", sl, None),)
            )
            e = 1e-3 * float(f.max() - f.min())
            blob, _ = interp.compress(f, e, cfg)
            assert np.isfinite(interp.decompress(blob)).all()


def test_level_error_bounds_eq15():
    """Higher levels quantize tighter: with alpha=2, beta=4 the observed
    per-level max error respects e/min(2^(l-1), 4)."""
    f = _field((65, 40), seed=7)
    e = 1e-2 * float(f.max() - f.min())
    cfg = EngineConfig(alpha=2.0, beta=4.0)
    blob, recon = interp.compress(f, e, cfg)
    err = np.abs(recon - f.astype(np.float64))
    # stride-2 grid points belong to level >= 2 -> bound e/2
    lvl2 = err[0::2, 0::2]
    assert lvl2.max() <= e / 2 + 1e-12
    assert err.max() <= e + 1e-12


def test_block_cfg_roundtrip():
    """Per-block spline overrides reproduce bit-exactly on both sides."""
    f = _field((40, 40), seed=8)
    bc = np.array([[0, 1], [2, 1]], dtype=np.uint8)
    cfg = EngineConfig(block_size=32, block_cfg=bc)
    e, recon, out = _roundtrip(f, cfg)
    np.testing.assert_array_equal(out, recon)
    assert np.abs(out - f.astype(np.float64)).max() <= e


def test_md_weights_used():
    """Multi-dimensional combination weights follow Eq. 12: an axis with
    huge estimated variance is effectively excluded."""
    shape = (24, 24)
    rng = np.random.default_rng(9)
    # smooth along axis 1, noisy along axis 0
    f = (
        np.sin(np.linspace(0, 4, shape[1]))[None, :]
        + rng.standard_normal((shape[0], 1)) * 0.5
    ).astype(np.float32)
    e = 1e-3 * float(f.max() - f.min())
    big = EngineConfig(
        level_configs=(InterpConfig("md", "cubic_nak", False, None),),
        md_sigma2=(1e6, 1e-6),
    )
    flat = EngineConfig(
        level_configs=(InterpConfig("md", "cubic_nak", False, None),),
        md_sigma2=(1.0, 1.0),
    )
    b_big, _ = interp.compress(f, e, big)
    b_flat, _ = interp.compress(f, e, flat)
    assert len(b_big) < len(b_flat)


def test_integer_input_bound():
    rng = np.random.default_rng(10)
    f = rng.integers(0, 1000, (20, 20)).astype(np.int32)
    e = 5.0
    blob, recon = interp.compress(f, e, EngineConfig())
    out = interp.decompress(blob)
    np.testing.assert_array_equal(out, recon)
    assert np.abs(out - f.astype(np.float64)).max() <= e


def test_rejects_nonpositive_bound():
    with pytest.raises(ValueError):
        interp.compress(np.zeros((4, 4), dtype=np.float32), 0.0, EngineConfig())


def test_anchor_values_exact():
    """Anchor points are stored losslessly (§5.1)."""
    f = _field((65, 33), seed=11)
    e = 1e-2 * float(f.max() - f.min())
    blob, _ = interp.compress(f, e, EngineConfig(anchor_stride=32))
    out = interp.decompress(blob)
    np.testing.assert_array_equal(
        out[0::32, 0::32], f.astype(np.float64)[0::32, 0::32]
    )


def test_config_serialization_roundtrip():
    cfg = EngineConfig(
        anchor_stride=16,
        level_configs=(
            InterpConfig("md", "cubic_nat", True, None),
            InterpConfig("1d", "linear", False, (1, 0)),
        ),
        alpha=1.5,
        beta=3.0,
        frozen_axes=(0,),
        md_sigma2=(1.0, 2.0),
        fvfi=False,
    )
    back = EngineConfig.from_dict(cfg.to_dict())
    assert back.to_dict() == cfg.to_dict()
