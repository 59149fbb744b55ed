"""Auto-tuning module tests (paper §6, Fig. 7)."""
import numpy as np
import pytest

from repro.core import autotune, interp
from repro.core.autotune import TuneOptions
from repro.core.interp import EngineConfig, InterpConfig


def _freeze_friendly(shape=(10, 48, 48), seed=0):
    """Nearly independent smooth 2-D slices: axis 0 is non-smooth."""
    rng = np.random.default_rng(seed)
    x = np.linspace(0, 2 * np.pi, shape[1])
    y = np.linspace(0, 2 * np.pi, shape[2])
    base = np.sin(x)[:, None] * np.cos(y)[None, :]
    f = np.stack(
        [float(rng.normal(0, 5)) + float(rng.normal(1, 2)) * base for _ in range(shape[0])]
    )
    return f.astype(np.float32)


def _smooth(shape=(40, 40, 36), seed=1):
    g = np.ogrid[tuple(slice(0.0, 1.0, complex(0, n)) for n in shape)]
    f = np.ones(shape)
    for gr in g:
        f = f * np.sin(2.5 * np.pi * gr)
    return f.astype(np.float32)


def test_axis_mse_detects_rough_axis():
    f = _freeze_friendly()
    sigma2 = autotune.axis_interp_mse(f)
    assert int(np.argmax(sigma2)) == 0


def test_axis_mse_smooth_data_small():
    f = _smooth()
    sigma2 = autotune.axis_interp_mse(f)
    assert sigma2.max() < 1e-2


def test_dimension_freezing_selected():
    f = _freeze_friendly()
    e = 1e-3 * float(f.max() - f.min())
    res = autotune.tune(f, e, TuneOptions())
    assert res.cfg.frozen_axes == (0,)


def test_freezing_actually_helps_here():
    f = _freeze_friendly()
    e = 1e-3 * float(f.max() - f.min())
    res = autotune.tune(f, e, TuneOptions())
    frozen_cfg = res.cfg
    unfrozen = EngineConfig(**{**frozen_cfg.__dict__})
    unfrozen.frozen_axes = ()
    unfrozen.block_cfg = None
    b_frozen, _ = interp.compress(f, e, frozen_cfg)
    b_unfrozen, _ = interp.compress(f, e, unfrozen)
    assert len(b_frozen) < len(b_unfrozen)


def test_no_freeze_on_isotropic_data():
    """Isotropic turbulence offers no bad axis to freeze (§6.3 tests
    both ways and keeps the better ratio)."""
    from repro.datasets import generate

    f = generate("Miranda", "test")
    e = 1e-3 * float(f.max() - f.min())
    res = autotune.tune(f, e, TuneOptions())
    assert res.cfg.frozen_axes == ()


def test_eb_tuning_within_candidates():
    f = _smooth()
    e = 1e-3 * float(f.max() - f.min())
    res = autotune.tune(f, e, TuneOptions())
    assert (res.cfg.alpha, res.cfg.beta) in autotune.EB_CANDIDATES


def test_sample_blocks_cover_small_data():
    f = _smooth((16, 16, 16))
    blocks = autotune.sample_blocks(f)
    assert len(blocks) == 1
    assert blocks[0].shape == f.shape


def test_sample_blocks_spread():
    f = np.zeros((100, 40, 40), dtype=np.float32)
    blocks = autotune.sample_blocks(f, side=32)
    assert len(blocks) == autotune.N_SAMPLE_BLOCKS
    assert all(b.shape == (32, 32, 32) for b in blocks)


def test_lorenzo_chosen_on_lattice_data():
    """Piecewise-constant integer-lattice data is a Lorenzo showcase."""
    rng = np.random.default_rng(3)
    steps = np.cumsum(rng.integers(-2, 3, 4000))
    f = np.repeat(steps, 4).astype(np.float32).reshape(100, 160)
    e = 0.4
    res = autotune.tune(f, e, TuneOptions())
    assert res.use_lorenzo


def test_disabled_features_stay_disabled():
    f = _freeze_friendly()
    e = 1e-3 * float(f.max() - f.min())
    opts = TuneOptions(
        splines=("linear", "cubic_nak"),
        paradigms=("1d",),
        same_level=False,
        dim_freeze=False,
        lorenzo=False,
        blockwise=False,
    )
    res = autotune.tune(f, e, opts)
    assert not res.use_lorenzo
    assert res.cfg.frozen_axes == ()
    assert res.cfg.block_cfg is None
    for c in res.cfg.level_configs:
        assert c.paradigm == "1d"
        assert c.spline in ("linear", "cubic_nak")
        assert not c.same_level


def test_block_map_shape():
    f = _freeze_friendly((8, 80, 70))
    m = autotune.tune_blocks(f, TuneOptions(), (), "cubic_nak", 1e-3)
    if m is not None:
        assert m.shape == (1, 3, 3)


def test_tuned_config_compresses_within_bound():
    for maker in (_smooth, _freeze_friendly):
        f = maker()
        e = 1e-3 * float(f.max() - f.min())
        res = autotune.tune(f, e, TuneOptions())
        if res.use_lorenzo:
            continue
        blob, recon = interp.compress(f, e, res.cfg)
        assert np.abs(recon - f.astype(np.float64)).max() <= e * (1 + 1e-9)
