"""Integration tests: every codec x dataset x eps holds the bound and
roundtrips through the self-describing registry (paper §7.1.2/§7.1.3)."""
import numpy as np
import pytest

from repro import codecs
from repro.core import metrics
from repro.datasets import DATASETS, FP_DATASETS, INT_DATASETS, generate

_EPS = (1e-2, 1e-3)

#: slow high-ratio codecs are exercised on a subset to keep CI sane;
#: the bench jobs cover the full matrix.
_FULL_MATRIX = [
    (c, d) for c in codecs.HIGH_PERFORMANCE for d in DATASETS
] + [
    (c, d)
    for c in codecs.HIGH_RATIO
    for d in ("RTM", "Miranda", "SCALE", "JHTDB")
]


@pytest.mark.parametrize("codec,dataset", _FULL_MATRIX)
@pytest.mark.parametrize("eps", _EPS)
def test_bound_and_roundtrip(codec, dataset, eps):
    data = generate(dataset, "test")
    blob = codecs.compress(codec, data, eps)
    assert codecs.codec_of(blob) == codec
    recon = codecs.decompress(blob)
    assert recon.shape == data.shape
    e = metrics.value_range(data) * eps
    assert metrics.max_abs_err(data, recon) <= e * (1 + 1e-6), (
        codec,
        dataset,
        eps,
    )


@pytest.mark.parametrize("codec", codecs.ALL_CODECS)
def test_cr_monotone_in_eps(codec):
    data = generate("Miranda", "test")
    sizes = [
        len(codecs.compress(codec, data, eps)) for eps in (1e-2, 1e-3, 1e-4)
    ]
    assert sizes[0] <= sizes[1] <= sizes[2]


@pytest.mark.parametrize("codec", codecs.ALL_CODECS)
def test_determinism(codec):
    data = generate("SCALE", "test")
    b1 = codecs.compress(codec, data, 1e-3)
    b2 = codecs.compress(codec, data, 1e-3)
    assert b1 == b2


@pytest.mark.parametrize("dataset", INT_DATASETS)
@pytest.mark.parametrize("codec", ("sz3", "qoz", "hpez"))
def test_integer_datasets(codec, dataset):
    """§7.2.6: integer-supportive codecs on the integer datasets."""
    data = generate(dataset, "test")
    blob = codecs.compress(codec, data, 1e-3)
    recon = codecs.decompress(blob)
    e = metrics.value_range(data) * 1e-3
    assert metrics.max_abs_err(data, recon) <= e * (1 + 1e-6)


def test_hpez_beats_or_matches_qoz_on_freeze_data():
    """The paper's headline: HPEZ >= QoZ, by a lot where dimension
    freezing applies (CESM-ATM / SCALE; Table 3, Fig. 17)."""
    for ds in ("CESM-ATM", "SCALE"):
        data = generate(ds, "test")
        hp = len(codecs.compress("hpez", data, 1e-3))
        qz = len(codecs.compress("qoz", data, 1e-3))
        assert hp < qz, ds


def test_hpez_competitive_on_smooth_data():
    """On smooth sets HPEZ stays within a few percent of QoZ even when
    the new features do not fire (never catastrophically worse)."""
    for ds in ("RTM", "Miranda", "SegSalt", "JHTDB"):
        data = generate(ds, "test")
        hp = len(codecs.compress("hpez", data, 1e-3))
        qz = len(codecs.compress("qoz", data, 1e-3))
        assert hp < qz * 1.10, ds


def test_zfp_lowest_ratio_archetype():
    """ZFP's local 4^d transform gives the lowest CR of the high-
    performance group (paper Table 3)."""
    data = generate("Miranda", "test")
    zf = len(codecs.compress("zfp", data, 1e-3))
    for other in ("sz3", "qoz", "hpez"):
        assert zf > len(codecs.compress(other, data, 1e-3))


def test_faz_at_least_best_of_parents():
    """FAZ keeps the smaller of its two pipelines (within framing
    overhead)."""
    data = generate("SCALE", "test")
    fz = len(codecs.compress("faz", data, 1e-3))
    sp = len(codecs.compress("sperr", data, 1e-3))
    assert fz <= sp * 1.01


def test_psnr_target_mode():
    """hpez accepts the rate-distortion tuning target (§3.1 metric M)."""
    data = generate("Miranda", "test")
    blob = codecs.compress("hpez", data, 1e-3, target="psnr")
    recon = codecs.decompress(blob)
    e = metrics.value_range(data) * 1e-3
    assert metrics.max_abs_err(data, recon) <= e * (1 + 1e-6)


def test_unknown_codec_raises():
    with pytest.raises(KeyError):
        codecs.compress("nope", np.zeros((4, 4), dtype=np.float32), 1e-3)
