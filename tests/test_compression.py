"""Unit tests for the codec registry (repro.baselines.compression)."""
import numpy as np
import pickle
import pytest

from repro.baselines.compression import CODEC_NAMES, get_codec

COMPRESSIBLE = pickle.dumps(np.zeros(50_000, dtype=np.int64))
RANDOMISH = pickle.dumps(np.random.default_rng(0).integers(0, 2**62, 20_000))


@pytest.mark.parametrize("name", CODEC_NAMES)
def test_roundtrip_compressible(name):
    c = get_codec(name)
    assert c.decompress(c.compress(COMPRESSIBLE)) == COMPRESSIBLE


@pytest.mark.parametrize("name", CODEC_NAMES)
def test_roundtrip_random(name):
    c = get_codec(name)
    assert c.decompress(c.compress(RANDOMISH)) == RANDOMISH


@pytest.mark.parametrize("name", CODEC_NAMES)
def test_roundtrip_empty(name):
    c = get_codec(name)
    assert c.decompress(c.compress(b"")) == b""


@pytest.mark.parametrize("name", ["z", "gzip", "lzma"])
def test_compresses_redundant_data(name):
    c = get_codec(name)
    assert len(c.compress(COMPRESSIBLE)) < len(COMPRESSIBLE) / 10


def test_identity_codecs_do_not_change_bytes():
    for name in ("none", "dict"):
        assert get_codec(name).compress(COMPRESSIBLE) == COMPRESSIBLE


def test_ratio_ordering_lzma_best():
    """The paper's codec roles (DESIGN.md §2.2): LZMA highest ratio."""
    sizes = {n: len(get_codec(n).compress(COMPRESSIBLE)) for n in ("z", "gzip", "lzma")}
    assert sizes["lzma"] <= sizes["gzip"] <= sizes["z"]


def test_unknown_codec_raises():
    with pytest.raises(KeyError):
        get_codec("snappy")


def test_codec_is_named():
    for n in CODEC_NAMES:
        assert get_codec(n).name == n
