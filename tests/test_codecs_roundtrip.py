"""Cross-codec roundtrip matrix: every codec × every §4.1 data set.

These are the core lossless-compression guarantees: decode(encode(v)) == v
and access(encode(v), i) == v[i], across all nine integer distributions at
two sizes, plus adversarial mini-inputs.
"""
import numpy as np
import pytest

from repro.core.codec_api import registry
from repro.core.format import EncodedSequence
from repro.datasets import INTEGER_DATASETS, UNSORTED

CODECS = list(registry())
DATASETS = list(INTEGER_DATASETS)


def _skip_inapplicable(codec, dataset):
    if codec == "Elias-Fano" and dataset in UNSORTED:
        pytest.skip("Elias-Fano requires sorted input")


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", CODECS)
@pytest.mark.parametrize("n", [500, 6000])
def test_roundtrip(dataset, codec_name, n):
    _skip_inapplicable(codec_name, dataset)
    values, bits = INTEGER_DATASETS[dataset](n)
    codec = registry()[codec_name]
    enc = codec.encode(values, dtype_bits=bits)
    assert np.array_equal(codec.decode(enc), values)
    assert 0 < enc.ratio() < 2.0
    assert enc.nbytes() > 0


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize("codec_name", [c for c in CODECS if c != "rANS"])
def test_random_access(dataset, codec_name):
    _skip_inapplicable(codec_name, dataset)
    values, bits = INTEGER_DATASETS[dataset](3000)
    codec = registry()[codec_name]
    enc = codec.encode(values, dtype_bits=bits)
    g = np.random.default_rng(7)
    for i in [0, len(values) - 1, *g.integers(0, len(values), 25)]:
        assert codec.access(enc, int(i)) == values[i], f"position {i}"


@pytest.mark.parametrize("codec_name", CODECS)
def test_constant_sequence(codec_name):
    v = np.full(1000, 123_456, dtype=np.int64)
    codec = registry()[codec_name]
    enc = codec.encode(v, dtype_bits=64)
    assert np.array_equal(codec.decode(enc), v)
    if codec_name not in ("rANS",):
        # a constant sequence compresses to near nothing under Model+Delta
        assert enc.ratio() < 0.1


@pytest.mark.parametrize("codec_name", CODECS)
def test_tiny_inputs(codec_name):
    for v in ([5], [5, 9], [3, 3, 3], [0, 1, 2, 3]):
        arr = np.array(v, dtype=np.int64)
        codec = registry()[codec_name]
        enc = codec.encode(arr, dtype_bits=64)
        assert np.array_equal(codec.decode(enc), arr)


@pytest.mark.parametrize("codec_name", [c for c in CODECS if c not in ("Elias-Fano", "rANS")])
def test_negative_values(codec_name):
    g = np.random.default_rng(11)
    v = g.integers(-1_000_000, 1_000_000, 2000)
    codec = registry()[codec_name]
    enc = codec.encode(v, dtype_bits=64)
    assert np.array_equal(codec.decode(enc), v)


@pytest.mark.parametrize("codec_name", [c for c in CODECS if c != "rANS"])
def test_huge_values(codec_name):
    """Values near 2^62 exercise float64-imprecision handling."""
    g = np.random.default_rng(13)
    v = np.sort(g.integers(2**61, 2**62, 2000))
    codec = registry()[codec_name]
    enc = codec.encode(v, dtype_bits=64)
    assert np.array_equal(codec.decode(enc), v)
    for i in (0, 999, 1999):
        assert codec.access(enc, i) == v[i]


@pytest.mark.parametrize("dataset", DATASETS)
@pytest.mark.parametrize(
    "codec_name", ["FOR", "Delta-fix", "Delta-var", "LeCo-fix", "LeCo-var"]
)
def test_serialization_roundtrip(dataset, codec_name):
    """The §3.3 self-describing format: to_bytes → from_bytes → decode."""
    values, bits = INTEGER_DATASETS[dataset](2000)
    codec = registry()[codec_name]
    enc = codec.encode(values, dtype_bits=bits)
    blob = enc.to_bytes()
    assert len(blob) == enc.nbytes()
    rt = EncodedSequence.from_bytes(blob)
    assert rt.scheme == enc.scheme and rt.n == enc.n
    assert np.array_equal(codec.decode(rt), values)
    assert codec.access(rt, len(values) // 2) == values[len(values) // 2]


def test_leco_never_worse_than_for_same_partitions():
    """§4.3.1: FOR is a special case of LeCo, so with identical partition
    lengths LeCo's compressed size is never larger."""
    from repro.baselines.for_codec import FORCodec
    from repro.core.leco import LeCoFix

    for name in DATASETS:
        v, bits = INTEGER_DATASETS[name](4000)
        for L in (256, 1024):
            a = LeCoFix(L).encode(v, dtype_bits=bits).nbytes()
            b = FORCodec(L).encode(v, dtype_bits=bits).nbytes()
            assert a <= b, f"{name} L={L}: LeCo {a} > FOR {b}"
