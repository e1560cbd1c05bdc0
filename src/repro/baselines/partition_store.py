"""Range-partitioned on-disk store — shared substrate of every method.

The paper stores each representation (arrays, hash tables, DeepMapping's
auxiliary table) as key-range partitions on disk; each partition is
serialized (pickle) and optionally compressed, and is loaded through the
LRU memory pool at query time (Sec. V-A.5 "Partition Size Tuning").

Subclasses define how a partition's rows are represented
(:meth:`_make_payload`) and how a lookup proceeds within a loaded
partition (:meth:`_lookup_in_payload`). Keys are the *dense indices* of
the workload's :class:`~repro.core.encoding.KeySpace`, always sorted
within and across partitions; query batches are sorted before routing so
each partition is decompressed at most once per batch (paper Sec. IV-B).
"""
from __future__ import annotations

import os
import pickle
import time
import uuid
from typing import Any

import numpy as np

from .compression import get_codec
from .memory_pool import MemoryPool

__all__ = ["PartitionedStore"]


class PartitionedStore:
    """Base class: sorted dense keys + per-column value arrays, partitioned."""

    def __init__(
        self,
        workdir: str,
        *,
        codec: str = "none",
        partition_bytes: int = 256 * 1024,
        pool: MemoryPool | None = None,
        name: str | None = None,
    ):
        self.codec = get_codec(codec)
        self.partition_bytes = int(partition_bytes)
        self.pool = pool if pool is not None else MemoryPool(None)
        self.name = name or f"{type(self).__name__}-{uuid.uuid4().hex[:8]}"
        self.dir = os.path.join(workdir, self.name)
        os.makedirs(self.dir, exist_ok=True)
        self.columns: list[str] = []
        # partition i covers dense keys in [self._lo[i], self._hi[i]]
        self._lo = np.empty(0, dtype=np.int64)
        self._hi = np.empty(0, dtype=np.int64)
        self._files: list[str] = []
        self._nbytes_disk = 0

    # -- subclass contract ----------------------------------------------------
    def _make_payload(self, keys: np.ndarray, values: dict[str, np.ndarray]) -> Any:
        raise NotImplementedError

    def _payload_nbytes(self, payload: Any) -> int:
        """Resident size estimate for the pool."""
        raise NotImplementedError

    def _lookup_in_payload(
        self, payload: Any, keys: np.ndarray
    ) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        """Return (found_mask, {col: values for found keys in order})."""
        raise NotImplementedError

    # -- build ------------------------------------------------------------
    def build(self, keys: np.ndarray, values: dict[str, np.ndarray]) -> None:
        """Partition sorted (key, values) rows and write them to disk.

        ``keys`` are dense int64 indices; duplicates are not allowed (the
        mapping's key identifies a tuple). Rows are sorted here, so callers
        may pass unsorted input.
        """
        keys = np.asarray(keys, dtype=np.int64)
        order = np.argsort(keys, kind="stable")
        keys = keys[order]
        if len(keys) > 1 and (np.diff(keys) == 0).any():
            raise ValueError("duplicate dense keys in store build")
        values = {c: np.asarray(v)[order] for c, v in values.items()}
        self.columns = list(values)

        row_bytes = 8 + sum(
            v.dtype.itemsize if v.dtype != object else 24 for v in values.values()
        )
        rows_per_part = max(1, self.partition_bytes // max(1, row_bytes))
        n = len(keys)
        los, his, files = [], [], []
        total = 0
        for pi, s in enumerate(range(0, n, rows_per_part)):
            e = min(n, s + rows_per_part)
            payload = self._make_payload(keys[s:e], {c: v[s:e] for c, v in values.items()})
            raw = pickle.dumps(payload, protocol=pickle.HIGHEST_PROTOCOL)
            comp = self.codec.compress(raw)
            path = os.path.join(self.dir, f"part_{pi:06d}.bin")
            with open(path, "wb") as f:
                f.write(comp)
            files.append(path)
            los.append(int(keys[s]))
            his.append(int(keys[e - 1]))
            total += len(comp)
        self._lo = np.array(los, dtype=np.int64)
        self._hi = np.array(his, dtype=np.int64)
        self._files = files
        self._nbytes_disk = total

    # -- size ---------------------------------------------------------------
    @property
    def n_partitions(self) -> int:
        return len(self._files)

    @property
    def nbytes_disk(self) -> int:
        """Total on-disk (compressed) bytes — the paper's 'storage size'."""
        return self._nbytes_disk

    # -- lookup --------------------------------------------------------------
    def _load_partition(self, pi: int) -> Any:
        def loader():
            t0 = time.perf_counter()
            with open(self._files[pi], "rb") as f:
                comp = f.read()
            self.pool.stats.io_time += time.perf_counter() - t0
            self.pool.stats.bytes_read += len(comp)
            self.pool.simulate_io(len(comp))
            raw = self.pool.timed("decompress", lambda: self.codec.decompress(comp))
            payload = self.pool.timed("deserialize", lambda: pickle.loads(raw))
            return payload, self._payload_nbytes(payload)

        return self.pool.get((self.name, pi), loader)

    def route(self, keys: np.ndarray) -> np.ndarray:
        """Partition id per key (-1 when outside all partition ranges)."""
        keys = np.asarray(keys, dtype=np.int64)
        pi = np.searchsorted(self._lo, keys, side="right") - 1
        pi = np.clip(pi, 0, max(0, self.n_partitions - 1))
        if self.n_partitions == 0:
            return np.full(len(keys), -1, dtype=np.int64)
        ok = (keys >= self._lo[pi]) & (keys <= self._hi[pi])
        return np.where(ok, pi, -1)

    def lookup_batch(self, keys: np.ndarray) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        """Batch point lookup by dense key.

        Returns ``(found_mask, values)`` where each ``values[col]`` is an
        object array aligned with ``keys`` (None where not found). Query
        keys are processed in sorted order, grouped by partition.
        """
        keys = np.asarray(keys, dtype=np.int64)
        n = len(keys)
        found = np.zeros(n, dtype=bool)
        out = {c: np.full(n, None, dtype=object) for c in self.columns}
        if n == 0 or self.n_partitions == 0:
            return found, out
        order = np.argsort(keys, kind="stable")
        skeys = keys[order]
        pids = self.route(skeys)
        valid = pids >= 0
        # contiguous runs of equal partition id over the sorted keys
        for pi in np.unique(pids[valid]):
            sel = np.flatnonzero(pids == pi)
            payload = self._load_partition(int(pi))
            mask, vals = self._lookup_in_payload(payload, skeys[sel])
            idx = order[sel[mask]]
            found[idx] = True
            for c in self.columns:
                out[c][idx] = vals[c]
        return found, out

    # -- pickling (for Spark broadcast): drop the pool's runtime cache ------
    def __getstate__(self):
        d = self.__dict__.copy()
        return d

    def __setstate__(self, state):
        self.__dict__.update(state)
