"""Key and value encodings for DeepMapping (paper Sec. IV-A, IV-B).

The paper one-hot encodes keys ("strings or categorical data are encoded
as integers using one-hot encoding before training and inference") and
keeps a decoding map ``f_decode`` that converts predicted integer codes
back to the original values.

We provide:

* :class:`KeySpace` — describes a (possibly composite) integer key. Maps
  each key tuple to a *dense index* via mixed-radix positional encoding,
  which is what the existence bit vector ``V_exist`` is addressed by, and
  produces the one-hot digit feature matrix fed to the neural network.
* :class:`LabelCodec` — per-value-column dictionary encoder: original
  values → contiguous integer class codes and back (the ``f_decode`` of
  the paper, one codec per output head).
"""
from __future__ import annotations

import pickle
import zlib
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

__all__ = ["KeySpace", "LabelCodec", "decode_map_bytes"]


def _ndigits(card: int) -> int:
    """Number of base-10 digits needed to render ``card`` distinct values."""
    return max(1, len(str(max(0, card - 1))))


@dataclass(frozen=True)
class KeySpace:
    """A composite integer key domain.

    ``lows[i]``/``cards[i]`` give the minimum value and cardinality of the
    i-th key component; component values must lie in
    ``[lows[i], lows[i] + cards[i])``. Dense index = mixed-radix value of
    the offsets, so the full key range maps to ``[0, size)`` — the address
    space of ``V_exist``.

    ``feature_radices`` optionally overrides the network input encoding:
    instead of base-10 digits per component, the *dense index* is
    decomposed in the given mixed radices (most-significant first) and
    each digit one-hot encoded. Workloads whose values are periodic in
    non-decimal radices (e.g. TPC-DS customer_demographics, a cross
    product of its dimension cardinalities) declare those radices so the
    one-hot key encoding exposes the structure the paper's models exploit
    (see DESIGN.md §6).
    """

    lows: tuple[int, ...]
    cards: tuple[int, ...]
    feature_radices: tuple[int, ...] | None = None

    @staticmethod
    def from_columns(df: pd.DataFrame, key_cols: list[str]) -> "KeySpace":
        """Infer the key space from observed key columns (min..max each)."""
        lows, cards = [], []
        for c in key_cols:
            v = df[c].to_numpy()
            lo, hi = int(v.min()), int(v.max())
            lows.append(lo)
            cards.append(hi - lo + 1)
        return KeySpace(tuple(lows), tuple(cards))

    @property
    def size(self) -> int:
        n = 1
        for c in self.cards:
            n *= c
        return n

    @property
    def n_components(self) -> int:
        return len(self.cards)

    @property
    def input_dim(self) -> int:
        """Width of the one-hot digit feature vector."""
        if self.feature_radices is not None:
            return sum(self.feature_radices)
        return sum(_ndigits(c) * 10 for c in self.cards)

    def with_radices(self, radices: tuple[int, ...]) -> "KeySpace":
        prod = 1
        for r in radices:
            prod *= r
        if prod < self.size:
            raise ValueError("feature radices cover less than the key space")
        return KeySpace(self.lows, self.cards, tuple(radices))

    def _check(self, keys: np.ndarray) -> np.ndarray:
        keys = np.asarray(keys, dtype=np.int64)
        if keys.ndim == 1:
            keys = keys[:, None]
        if keys.shape[1] != self.n_components:
            raise ValueError(
                f"expected {self.n_components} key components, got {keys.shape[1]}"
            )
        return keys

    def dense_index(self, keys: np.ndarray) -> np.ndarray:
        """Map key tuples [n, ncomp] (or [n] for simple keys) to [0, size)."""
        keys = self._check(keys)
        idx = np.zeros(len(keys), dtype=np.int64)
        for i, (lo, card) in enumerate(zip(self.lows, self.cards)):
            off = keys[:, i] - lo
            if (off < 0).any() or (off >= card).any():
                raise ValueError(f"key component {i} out of range [{lo},{lo + card})")
            idx = idx * card + off
        return idx

    def from_dense(self, idx: np.ndarray) -> np.ndarray:
        """Inverse of :meth:`dense_index`; returns [n, ncomp]."""
        idx = np.asarray(idx, dtype=np.int64)
        out = np.empty((len(idx), self.n_components), dtype=np.int64)
        rem = idx.copy()
        for i in range(self.n_components - 1, -1, -1):
            card = self.cards[i]
            out[:, i] = rem % card + self.lows[i]
            rem //= card
        return out

    def contains(self, keys: np.ndarray) -> np.ndarray:
        """Boolean mask of key tuples that fall inside the domain."""
        keys = np.asarray(keys, dtype=np.int64)
        if keys.ndim == 1:
            keys = keys[:, None]
        ok = np.ones(len(keys), dtype=bool)
        for i, (lo, card) in enumerate(zip(self.lows, self.cards)):
            ok &= (keys[:, i] >= lo) & (keys[:, i] < lo + card)
        return ok

    def features(self, keys: np.ndarray) -> np.ndarray:
        """One-hot base-10 digit features [n, input_dim], float32.

        Each key component is rendered as fixed-width decimal digits of its
        offset within the component range; each digit becomes a 10-wide
        one-hot block. This is the network's input representation.
        """
        keys = self._check(keys)
        if self.feature_radices is not None:
            return self._features_radix(self.dense_index(keys))
        n = len(keys)
        out = np.zeros((n, self.input_dim), dtype=np.float32)
        col = 0
        rows = np.arange(n)
        for i, (lo, card) in enumerate(zip(self.lows, self.cards)):
            off = keys[:, i] - lo
            nd = _ndigits(card)
            for d in range(nd - 1, -1, -1):
                digit = (off // 10**d) % 10
                out[rows, col + digit] = 1.0
                col += 10
        return out

    def _features_radix(self, dense: np.ndarray) -> np.ndarray:
        radices = self.feature_radices
        n = len(dense)
        out = np.zeros((n, self.input_dim), dtype=np.float32)
        rows = np.arange(n)
        rem = dense.copy()
        col = self.input_dim
        for r in reversed(radices):  # least-significant digit last
            digit = rem % r
            rem //= r
            col -= r
            out[rows, col + digit] = 1.0
        return out

    def features_from_dense(self, idx: np.ndarray) -> np.ndarray:
        return self.features(self.from_dense(idx))


class LabelCodec:
    """Dictionary encoder for one value column (one entry of ``f_decode``).

    Maps arbitrary hashable column values to contiguous int32 codes
    ``[0, n_classes)`` and back. Fitting sorts the distinct values so the
    code assignment is deterministic for a given data set.
    """

    def __init__(self, values: np.ndarray | pd.Series):
        vals = pd.Series(values)
        cats = pd.unique(vals)
        try:
            cats = np.sort(cats)
        except TypeError:  # mixed types — keep first-seen order
            pass
        self.classes_ = np.asarray(cats)
        self._index = pd.Index(self.classes_)

    @property
    def n_classes(self) -> int:
        return len(self.classes_)

    def encode(self, values: np.ndarray | pd.Series) -> np.ndarray:
        codes = self._index.get_indexer(pd.Series(values))
        if (codes < 0).any():
            raise KeyError("value not present in the fitted dictionary")
        return codes.astype(np.int32)

    def decode(self, codes: np.ndarray) -> np.ndarray:
        codes = np.asarray(codes)
        if ((codes < 0) | (codes >= self.n_classes)).any():
            raise IndexError("code out of range for decode map")
        return self.classes_[codes]

    def __getstate__(self):  # the pd.Index is rebuilt on load
        return {"classes_": self.classes_}

    def __setstate__(self, state):
        self.classes_ = state["classes_"]
        self._index = pd.Index(self.classes_)


@dataclass
class _SizedPickle:
    payload: bytes = field(repr=False, default=b"")


def decode_map_bytes(codecs: dict[str, LabelCodec]) -> int:
    """Serialized (zlib-compressed pickle) size of ``f_decode`` in bytes."""
    raw = pickle.dumps({k: v.classes_ for k, v in codecs.items()})
    return len(zlib.compress(raw, 6))
