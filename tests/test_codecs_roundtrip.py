"""Bit-exact roundtrip tests for every codec on every data shape.

This is the core lossless-compression contract: compress→decompress must
reproduce the input bit pattern exactly, including NaN payloads, signed
zeros, infinities, and denormals.
"""
import numpy as np
import pytest

from repro.codecs.base import TABLE4_METHODS, CodecFailure, load_codec

ALL_METHODS = TABLE4_METHODS + ["Dzip"]


def _cases():
    g = np.random.default_rng(42)
    smooth1d = np.cumsum(g.normal(size=5000)) / 7.0
    cases = {
        "empty": np.zeros(0, dtype=np.float64),
        "single": np.array([3.14159]),
        "constant": np.full(700, 2.5),
        "smooth-1d": smooth1d,
        "random-f64": g.random(3000) * 1e6,
        "random-f32": (g.random(3000) * 1e6).astype(np.float32),
        "smooth-f32": smooth1d.astype(np.float32),
        "low-precision": np.round(g.random(2500) * 100, 2),
        "integers": np.floor(g.random(1000) * 1000),
        "odd-length": g.random(4097),
        "tiny": g.random(3),
        "denormals": g.random(500) * 5e-324 * 10,
        "negatives": -g.random(1000) * 1e3,
    }
    return cases


def _special_cases():
    g = np.random.default_rng(7)
    x = g.random(512)
    x[::17] = np.nan
    x[1::29] = np.inf
    x[2::31] = -np.inf
    x[3::37] = -0.0
    return {
        "specials-f64": x,
        "specials-f32": x.astype(np.float32),
    }


CASES = _cases()
SPECIALS = _special_cases()


def _assert_roundtrip(name, arr, dims=None):
    codec = load_codec(name)
    blob = codec.compress(arr, dims=dims)
    out = codec.decompress(blob)
    assert out.dtype == arr.dtype
    assert out.shape == arr.reshape(-1).shape
    np.testing.assert_array_equal(
        out.view(np.uint8), np.ascontiguousarray(arr).reshape(-1).view(np.uint8)
    )
    return blob


@pytest.mark.parametrize("case", sorted(CASES))
@pytest.mark.parametrize("name", ALL_METHODS)
def test_roundtrip_1d(name, case):
    arr = CASES[case]
    if name == "Dzip" and arr.size > 600:
        arr = arr[:600]  # Dzip-lite is KB/s by design (§4.5)
    _assert_roundtrip(name, arr)


@pytest.mark.parametrize("case", sorted(SPECIALS))
@pytest.mark.parametrize("name", [m for m in ALL_METHODS if m != "BUFF"])
def test_roundtrip_specials(name, case):
    arr = SPECIALS[case]
    if name == "Dzip":
        arr = arr[:300]
    _assert_roundtrip(name, arr)


def test_buff_rejects_non_finite():
    codec = load_codec("BUFF")
    with pytest.raises(CodecFailure):
        codec.compress(SPECIALS["specials-f64"])


@pytest.mark.parametrize("name", TABLE4_METHODS)
@pytest.mark.parametrize("dtype", [np.float32, np.float64], ids=["f32", "f64"])
def test_roundtrip_2d(name, dtype):
    g = np.random.default_rng(3)
    base = np.add.outer(np.sin(np.linspace(0, 9, 100)), np.cos(np.linspace(0, 7, 90)))
    arr = (base + g.normal(scale=1e-3, size=base.shape)).astype(dtype)
    _assert_roundtrip(name, arr)


@pytest.mark.parametrize("name", TABLE4_METHODS)
def test_roundtrip_3d(name):
    g = np.random.default_rng(4)
    t = np.linspace(0, 4, 24)
    arr = (
        np.sin(t)[:, None, None] + np.cos(t * 2)[None, :, None] + t[None, None, :]
    ) + g.normal(scale=1e-4, size=(24, 24, 24))
    _assert_roundtrip(name, arr)


@pytest.mark.parametrize("name", ["fpzip", "ndzip-C", "ndzip-G", "MPC", "GFC"])
def test_dims_passed_separately(name):
    """dims metadata (Table 9's 'md' configuration) must not break decode."""
    g = np.random.default_rng(5)
    arr = np.cumsum(np.cumsum(g.normal(size=(64, 64)), axis=0), axis=1) / 1e3
    flat = arr.reshape(-1)
    codec = load_codec(name)
    blob = codec.compress(flat, dims=(64, 64))
    np.testing.assert_array_equal(codec.decompress(blob), flat)


@pytest.mark.parametrize("name", ["fpzip", "ndzip-C"])
def test_dims_help_structured_data(name):
    """On a smooth 2-D field the md configuration should not lose to 1d badly."""
    x = np.linspace(0, 10, 128)
    arr = np.add.outer(np.sin(x), np.cos(x))  # very smooth, separable
    codec = load_codec(name)
    md = len(codec.compress(arr, dims=arr.shape))
    one_d = len(codec.compress(arr.reshape(-1)))
    assert md <= one_d * 1.15


def test_unknown_codec_raises():
    with pytest.raises(KeyError):
        load_codec("nope")


@pytest.mark.parametrize("name", ALL_METHODS)
def test_compression_actually_happens_on_constant(name):
    """Every method must beat CR=1 on the easiest possible input."""
    arr = np.full(4096, 1.5)
    blob = _assert_roundtrip(name, arr)
    assert len(blob) < arr.nbytes


@pytest.mark.parametrize("name", ALL_METHODS)
def test_envelope_dtype_preserved(name):
    arr = np.array([1.5, 2.5, -3.5], dtype=np.float32)
    codec = load_codec(name)
    out = codec.decompress(codec.compress(arr))
    assert out.dtype == np.float32
