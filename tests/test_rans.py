"""rANS baseline tests: lossless roundtrip and entropy behaviour."""
import numpy as np
import pytest

from repro.baselines.rans import RANSCodec


@pytest.mark.parametrize("dtype_bits", [32, 64])
def test_roundtrip_random(dtype_bits):
    g = np.random.default_rng(0)
    v = g.integers(0, 1 << (dtype_bits - 2), 5000)
    codec = RANSCodec()
    enc = codec.encode(v, dtype_bits=dtype_bits)
    assert np.array_equal(codec.decode(enc), v)


def test_roundtrip_skewed_bytes():
    """Heavily skewed byte distribution → ratio well below 1."""
    g = np.random.default_rng(1)
    v = g.choice([0, 1, 2], 20_000, p=[0.9, 0.09, 0.01]).astype(np.int64)
    codec = RANSCodec()
    enc = codec.encode(v, dtype_bits=32)
    assert np.array_equal(codec.decode(enc), v)
    assert enc.ratio() < 0.25  # mostly zero bytes compress hard


def test_uniform_bytes_do_not_compress():
    g = np.random.default_rng(2)
    v = g.integers(0, 2**31, 5000)
    enc = RANSCodec().encode(v, dtype_bits=32)
    assert enc.ratio() > 0.9


def test_no_random_access():
    codec = RANSCodec()
    enc = codec.encode(np.arange(100), dtype_bits=32)
    assert not codec.supports_random_access
    with pytest.raises(NotImplementedError):
        codec.access(enc, 3)


def test_single_value():
    codec = RANSCodec()
    enc = codec.encode(np.array([42]), dtype_bits=64)
    assert list(codec.decode(enc)) == [42]


def test_negative_values():
    v = np.array([-5, -1, 0, 3, -5], dtype=np.int64)
    codec = RANSCodec()
    enc = codec.encode(v, dtype_bits=64)
    assert np.array_equal(codec.decode(enc), v)


def test_compressed_size_near_entropy():
    """For an i.i.d. byte source the rANS size approaches n·H bits."""
    g = np.random.default_rng(3)
    v = g.choice(256, 40_000, p=np.r_[np.full(16, 0.05), np.full(240, 0.2 / 240)]).astype(np.int64)
    enc = RANSCodec().encode(v, dtype_bits=32)
    # the coder sees the interleaved little-endian byte stream (3 of every
    # 4 bytes are zero); compare against that stream's empirical entropy
    data = np.ascontiguousarray(v.astype("<i4")).view(np.uint8)
    counts = np.bincount(data, minlength=256)
    p_emp = counts[counts > 0] / counts.sum()
    h_bits = float(-(p_emp * np.log2(p_emp)).sum())
    expected = len(data) * h_bits / 8 + 600
    assert enc.nbytes() <= expected * 1.15
