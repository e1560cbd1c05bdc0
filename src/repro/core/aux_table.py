"""Auxiliary accuracy-assurance table ``T_aux`` (paper Sec. IV-B.1).

Row-level, as in Algorithm 1 (``R[i] = T_aux[Q[i]]`` returns the row's
*values*): a key whose tuple is misclassified on any value column is
stored once, with the correct integer codes of **all** its value
columns. The store is sorted by dense key, range-partitioned, each
partition compressed with the configured codec, and served through the
LRU memory pool; a lookup routes to a partition, loads/decompresses it,
and binary-searches the key array — Algorithm 1's validation step.

Modifications (Algorithms 3–5) *materialize into this structure*: the
master arrays are merged with the delta and the on-disk partitions
rebuilt, keeping keys sorted. The master copy lives only on the
build/driver side; the query path touches disk + pool only.
"""
from __future__ import annotations

import os

import numpy as np

from ..baselines.array_store import ArrayStore
from ..baselines.memory_pool import MemoryPool

__all__ = ["AuxTable"]


class AuxTable:
    """Row-level misclassified-tuple store with rebuild-on-modify."""

    def __init__(
        self,
        workdir: str,
        *,
        codec: str = "z",
        partition_bytes: int = 128 * 1024,
        pool: MemoryPool | None = None,
    ):
        self.workdir = workdir
        self.codec_name = codec
        self.partition_bytes = int(partition_bytes)
        self.pool = pool if pool is not None else MemoryPool(None)
        self.columns: list[str] = []
        self._keys = np.empty(0, dtype=np.int64)
        self._codes: dict[str, np.ndarray] = {}
        self._store: ArrayStore | None = None
        self._gen = 0

    # -- construction ---------------------------------------------------------
    def build(self, keys: np.ndarray, codes: dict[str, np.ndarray]) -> None:
        """``keys`` are the dense keys of misclassified tuples; ``codes``
        holds the correct int32 code of *every* value column, aligned."""
        keys = np.asarray(keys, dtype=np.int64)
        order = np.argsort(keys, kind="stable")
        self.columns = list(codes)
        self._keys = keys[order]
        self._codes = {
            c: np.asarray(v, dtype=np.int32)[order] for c, v in codes.items()
        }
        self._rebuild()

    def _rebuild(self) -> None:
        self._gen += 1
        old = self._store
        st = ArrayStore(
            self.workdir,
            codec=self.codec_name,
            partition_bytes=self.partition_bytes,
            pool=self.pool,
            name=f"aux-g{self._gen}",
        )
        st.build(self._keys, dict(self._codes))
        if old is not None:  # invalidate cached partitions of the old store
            for pi in range(old.n_partitions):
                self.pool.invalidate((old.name, pi))
        self._store = st

    # -- query path ------------------------------------------------------------
    def lookup(self, keys: np.ndarray) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        """(found_mask, {col: int32 codes for found keys, in query order})."""
        keys = np.asarray(keys, dtype=np.int64)
        if self._store is None or self._store.n_partitions == 0:
            return (
                np.zeros(len(keys), dtype=bool),
                {c: np.empty(0, dtype=np.int32) for c in self.columns},
            )
        mask, vals = self._store.lookup_batch(keys)
        out = {}
        for c in self.columns:
            out[c] = (
                vals[c][mask].astype(np.int32)
                if mask.any()
                else np.empty(0, dtype=np.int32)
            )
        return mask, out

    def contains(self, keys: np.ndarray) -> np.ndarray:
        return self.lookup(keys)[0]

    # -- modifications (driver side; Algorithms 3–5 materialize here) ---------
    def apply(
        self,
        *,
        upsert_keys: np.ndarray | None = None,
        upsert_codes: dict[str, np.ndarray] | None = None,
        remove_keys: np.ndarray | None = None,
        rebuild: bool = True,
    ) -> None:
        """Merge row upserts and removals into the master arrays."""
        keys, codes = self._keys, self._codes
        if remove_keys is not None and len(remove_keys):
            keep = ~np.isin(keys, np.asarray(remove_keys, dtype=np.int64))
            keys = keys[keep]
            codes = {c: v[keep] for c, v in codes.items()}
        if upsert_keys is not None and len(upsert_keys):
            uk = np.asarray(upsert_keys, dtype=np.int64)
            keep = ~np.isin(keys, uk)
            keys = np.concatenate([keys[keep], uk])
            codes = {
                c: np.concatenate(
                    [codes[c][keep], np.asarray(upsert_codes[c], dtype=np.int32)]
                )
                for c in self.columns
            }
            order = np.argsort(keys, kind="stable")
            keys = keys[order]
            codes = {c: v[order] for c, v in codes.items()}
        self._keys, self._codes = keys, codes
        if rebuild:
            self._rebuild()

    def remove_keys(self, keys: np.ndarray, rebuild: bool = True) -> None:
        self.apply(remove_keys=keys, rebuild=rebuild)

    # -- size -----------------------------------------------------------------
    @property
    def n_entries(self) -> int:
        """Number of misclassified tuples resident in T_aux."""
        return len(self._keys)

    @property
    def nbytes_disk(self) -> int:
        return self._store.nbytes_disk if self._store is not None else 0

    def master(self) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        return self._keys, dict(self._codes)

    def drop_files(self) -> None:
        """Delete this table's on-disk partitions (cleanup helper)."""
        if self._store is not None:
            for f in self._store._files:
                try:
                    os.remove(f)
                except OSError:
                    pass
