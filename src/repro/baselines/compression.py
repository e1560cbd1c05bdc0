"""Byte-level compression codecs used by DeepMapping and the baselines.

Paper codecs → ours (see DESIGN.md §2 for the substitution argument):

* ``none``  — identity (AB / HB).
* ``gzip``  — gzip, i.e. zlib level 9 wrapped (ABC-G).
* ``z``     — the paper's Z-Standard role (fast codec). ``zstandard`` is
  not installed in this container; we use raw zlib level 1, which keeps
  the property every conclusion relies on: fastest (de)compression,
  moderate ratio (DM-Z, ABC-Z, HBC-Z).
* ``lzma``  — LZMA (DM-L, ABC-L, HBC-L): best ratio, slowest.
* ``dict``  — Dictionary Encoding (ABC-D) is a *value-level* transform,
  not a byte codec; it is implemented inside the array store (payload
  columns re-coded to minimal-width integers + a dictionary) and uses the
  identity byte codec here.
"""
from __future__ import annotations

import gzip
import lzma
import zlib
from dataclasses import dataclass
from typing import Callable

__all__ = ["Codec", "get_codec", "CODEC_NAMES"]


@dataclass(frozen=True)
class Codec:
    name: str
    compress: Callable[[bytes], bytes]
    decompress: Callable[[bytes], bytes]


def _identity(b: bytes) -> bytes:
    return b


def _z_compress(b: bytes) -> bytes:
    return zlib.compress(b, 1)


def _gzip_compress(b: bytes) -> bytes:
    return gzip.compress(b, compresslevel=9)


def _lzma_compress(b: bytes) -> bytes:
    return lzma.compress(b, preset=2)


_CODECS: dict[str, Codec] = {
    "none": Codec("none", _identity, _identity),
    "dict": Codec("dict", _identity, _identity),
    "z": Codec("z", _z_compress, zlib.decompress),
    "gzip": Codec("gzip", _gzip_compress, gzip.decompress),
    "lzma": Codec("lzma", _lzma_compress, lzma.decompress),
}

CODEC_NAMES = tuple(_CODECS)


def get_codec(name: str) -> Codec:
    try:
        return _CODECS[name]
    except KeyError:
        raise KeyError(f"unknown codec {name!r}; known: {CODEC_NAMES}") from None
