"""Linear quantization invariants (paper §4 step 3)."""
import numpy as np
import pytest

from repro.core.quantizer import QuantDecoder, QuantEncoder


def _roundtrip(pred, truth, eb, radius=32768):
    enc = QuantEncoder(truth.shape, radius)
    sel = tuple(slice(None) for _ in truth.shape)
    recon = enc.quantize(pred, truth, eb, sel)
    dec = QuantDecoder(enc.codes, enc.literals(), radius)
    recon2 = dec.dequantize(pred, eb, sel)
    return recon, recon2


@pytest.mark.parametrize("eb", [1e-1, 1e-3, 1e-6])
def test_bound_holds(eb):
    rng = np.random.default_rng(0)
    truth = rng.standard_normal((50, 40))
    pred = truth + rng.standard_normal((50, 40)) * 10 * eb
    recon, recon2 = _roundtrip(pred, truth, eb)
    assert np.abs(truth - recon).max() <= eb
    np.testing.assert_array_equal(recon, recon2)


def test_outliers_roundtrip_exactly():
    """Residuals beyond the radius are carried as exact literals."""
    eb = 1e-6
    truth = np.array([0.0, 1.0, 5.0, -3.0])
    pred = np.zeros(4)
    recon, recon2 = _roundtrip(pred, truth, eb, radius=8)
    np.testing.assert_array_equal(recon, truth)
    np.testing.assert_array_equal(recon2, truth)


def test_zero_error_gives_center_codes():
    truth = np.linspace(0, 1, 16)
    enc = QuantEncoder(truth.shape)
    enc.quantize(truth.copy(), truth, 1e-3, (slice(None),))
    assert (enc.codes == enc.radius).all()


def test_codes_scattered_by_selection():
    truth = np.arange(8, dtype=np.float64)
    enc = QuantEncoder(truth.shape)
    sel = (slice(1, None, 2),)
    enc.quantize(np.zeros(4), truth[sel], 0.5, sel)
    assert (enc.codes[0::2] == enc.radius).all()
    assert (enc.codes[1::2] != enc.radius).any()


def test_decoder_consumes_literals_in_order():
    eb = 1e-9
    truth = np.array([10.0, 20.0, 30.0])
    pred = np.zeros(3)
    enc = QuantEncoder(truth.shape, radius=4)
    sel = (slice(None),)
    enc.quantize(pred, truth, eb, sel)
    dec = QuantDecoder(enc.codes, enc.literals(), radius=4)
    out = dec.dequantize(pred, eb, sel)
    np.testing.assert_array_equal(out, truth)


@pytest.mark.parametrize("shape", [(7,), (5, 9), (4, 3, 6)])
def test_multi_pass_scatter(shape):
    """Several disjoint selections fill the code array consistently."""
    rng = np.random.default_rng(2)
    truth = rng.standard_normal(shape)
    pred = np.zeros_like(truth)
    eb = 1e-2
    enc = QuantEncoder(shape)
    sels = [
        tuple([slice(0, None, 2)] + [slice(None)] * (len(shape) - 1)),
        tuple([slice(1, None, 2)] + [slice(None)] * (len(shape) - 1)),
    ]
    for sel in sels:
        enc.quantize(pred[sel], truth[sel], eb, sel)
    dec = QuantDecoder(enc.codes, enc.literals())
    for sel in sels:
        out = dec.dequantize(pred[sel], eb, sel)
        assert np.abs(out - truth[sel]).max() <= eb
