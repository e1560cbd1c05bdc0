"""Measurement harness behind every evaluation table (paper Sec. V).

For one workload it builds each method's store (AB, HB, ABC-D/G/Z/L,
HBC-Z/L, DS, DM-Z, DM-L), measures the at-rest storage size, and times
random-key batch lookups through an LRU memory pool of a given byte
budget — the paper's two regimes:

* *exceeds memory* (Table I): ``pool_fraction`` < 1 of the uncompressed
  (AB) bytes, so baselines continually evict/reload/decompress
  partitions while DeepMapping's resident structure fits;
* *fits memory* (Table II): unbounded pool.

Latency per batch is the mean of ``repeats`` timed runs (paper: 5),
after the store answered one warm-up batch when ``warm=True``.
Lookup results are cross-checked for exactness against the source
relation (every method must be lossless except DS, which is checked
through its corrections — also exact for categorical data).
"""
from __future__ import annotations

import os
import time
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..baselines.array_store import ArrayStore
from ..baselines.deepsqueeze import DeepSqueezeStore
from ..baselines.hash_store import HashStore
from ..baselines.memory_pool import MemoryPool
from ..core.deepmapping import DeepMapping, DeepMappingConfig
from ..core.model import TrainConfig
from ..core.nn import ArchSpec
from ..workloads.datasets import Workload, uncompressed_nbytes
from ..workloads.queries import random_key_batch

__all__ = ["MethodResult", "ExperimentConfig", "run_lookup_experiment", "build_method", "METHODS"]

# method name → (store kind, codec)
METHODS: dict[str, tuple[str, str]] = {
    "AB": ("array", "none"),
    "HB": ("hash", "none"),
    "ABC-D": ("array", "dict"),
    "ABC-G": ("array", "gzip"),
    "ABC-Z": ("array", "z"),
    "ABC-L": ("array", "lzma"),
    "HBC-Z": ("hash", "z"),
    "HBC-L": ("hash", "lzma"),
    "DS": ("deepsqueeze", "none"),
    "DM-Z": ("deepmapping", "z"),
    "DM-L": ("deepmapping", "lzma"),
}


@dataclass
class MethodResult:
    method: str
    storage_mb: float
    latency_s: dict[int, float] = field(default_factory=dict)  # batch size → sec
    breakdown: dict = field(default_factory=dict)
    pool_stats: dict = field(default_factory=dict)
    extra: dict = field(default_factory=dict)


@dataclass(frozen=True)
class ExperimentConfig:
    batch_sizes: tuple[int, ...] = (100, 1000, 10000)
    pool_fraction: float | None = 0.3  # None → unbounded (fits-memory regime)
    # simulated storage-device bandwidth (bytes/s); None = page-cache speed.
    # 25 MB/s stands in for the paper's edge/EBS disk (DESIGN.md §2.6)
    io_bandwidth: float | None = 25e6
    partition_bytes: int = 64 * 1024
    repeats: int = 3
    warm: bool = True
    seed: int = 0
    verify_rows: int = 2000  # lookups cross-checked for exactness
    dm_arch: ArchSpec = ArchSpec((128,), {})
    dm_train: TrainConfig = TrainConfig()
    dm_partition_bytes: int = 64 * 1024


class _StoreAdapter:
    """Uniform facade: lookup_batch(raw key tuples) → value dict."""

    def __init__(self, kind: str, obj, key_space, value_cols):
        self.kind = kind
        self.obj = obj
        self.key_space = key_space
        self.value_cols = value_cols

    def lookup(self, keys: np.ndarray) -> tuple[np.ndarray, dict[str, np.ndarray]]:
        if self.kind == "deepmapping":
            df = self.obj.lookup(keys)
            found = df[self.value_cols[0]].notna().to_numpy()
            return found, {c: df[c].to_numpy() for c in self.value_cols}
        keys = np.asarray(keys, dtype=np.int64)
        if keys.ndim == 1:
            keys = keys[:, None]
        in_dom = self.key_space.contains(keys)
        dense = np.full(len(keys), -1, dtype=np.int64)
        if in_dom.any():
            dense[in_dom] = self.key_space.dense_index(keys[in_dom])
        found = np.zeros(len(keys), dtype=bool)
        out = {c: np.full(len(keys), None, dtype=object) for c in self.value_cols}
        if in_dom.any():
            f, vals = self.obj.lookup_batch(dense[in_dom])
            idx = np.flatnonzero(in_dom)
            found[idx] = f
            for c in self.value_cols:
                out[c][idx] = vals[c]
        return found, out

    @property
    def nbytes_disk(self) -> int:
        return self.obj.nbytes_disk

    @property
    def pool(self) -> MemoryPool | None:
        return getattr(self.obj, "pool", None)


def build_method(
    method: str,
    workload: Workload,
    pdf: pd.DataFrame,
    workdir: str,
    *,
    pool: MemoryPool | None = None,
    cfg: ExperimentConfig = ExperimentConfig(),
    dm_model=None,
) -> _StoreAdapter:
    """Build one method's store over the relation ``pdf``."""
    kind, codec = METHODS[method]
    ks = workload.key_space(pdf)
    dense = ks.dense_index(pdf[list(workload.key_cols)].to_numpy())
    values = {c: pdf[c].to_numpy() for c in workload.value_cols}
    os.makedirs(workdir, exist_ok=True)

    if kind == "array":
        st = ArrayStore(workdir, codec=codec, partition_bytes=cfg.partition_bytes,
                        pool=pool, name=f"{method}-{workload.name}")
        st.build(dense, values)
        return _StoreAdapter(kind, st, ks, list(workload.value_cols))
    if kind == "hash":
        st = HashStore(workdir, codec=codec, partition_bytes=cfg.partition_bytes,
                       pool=pool, name=f"{method}-{workload.name}")
        st.build(dense, values)
        return _StoreAdapter(kind, st, ks, list(workload.value_cols))
    if kind == "deepsqueeze":
        st = DeepSqueezeStore(pool=pool)
        st.build(dense, values)
        return _StoreAdapter(kind, st, ks, list(workload.value_cols))
    if kind == "deepmapping":
        dm_cfg = DeepMappingConfig(
            arch=cfg.dm_arch, train=cfg.dm_train, codec=codec,
            partition_bytes=cfg.dm_partition_bytes,
        )
        dm = DeepMapping.build(
            pdf, list(workload.key_cols), list(workload.value_cols), dm_cfg,
            workdir=workdir, pool=pool, key_space=ks, model=dm_model,
        )
        return _StoreAdapter(kind, dm, ks, list(workload.value_cols))
    raise KeyError(method)


def _verify(adapter: _StoreAdapter, pdf: pd.DataFrame, workload: Workload, n: int, seed: int) -> None:
    rng = np.random.default_rng(seed)
    idx = rng.choice(len(pdf), size=min(n, len(pdf)), replace=False)
    keys = pdf.iloc[idx][list(workload.key_cols)].to_numpy(np.int64)
    found, vals = adapter.lookup(keys)
    if not found.all():
        raise AssertionError(f"{adapter.kind}: {int((~found).sum())} existing keys not found")
    for c in workload.value_cols:
        expect = pdf.iloc[idx][c].to_numpy()
        got = vals[c]
        if not all(g == e for g, e in zip(got, expect)):
            bad = next(i for i, (g, e) in enumerate(zip(got, expect)) if g != e)
            raise AssertionError(
                f"{adapter.kind}: wrong value col={c} key={keys[bad]} got={got[bad]} want={expect[bad]}"
            )


def run_lookup_experiment(
    workload: Workload,
    pdf: pd.DataFrame,
    methods: list[str],
    workdir: str,
    cfg: ExperimentConfig = ExperimentConfig(),
    *,
    verify: bool = True,
) -> dict[str, MethodResult]:
    """Build every method and measure storage + per-batch-size latency."""
    raw_bytes = uncompressed_nbytes(pdf[list(workload.key_cols) + list(workload.value_cols)])
    results: dict[str, MethodResult] = {}
    batches = {
        b: random_key_batch(pdf, list(workload.key_cols), b, seed=cfg.seed + b)
        for b in cfg.batch_sizes
    }
    # one shared MHAS/model across DM variants would be fair; each DM variant
    # trains its own identical-config model here (deterministic seed → same net)
    for method in methods:
        budget = None
        if cfg.pool_fraction is not None:
            budget = max(1 << 16, int(raw_bytes * cfg.pool_fraction))
        pool = MemoryPool(budget, io_bandwidth=cfg.io_bandwidth)
        adapter = build_method(
            method, workload, pdf, os.path.join(workdir, method), pool=pool, cfg=cfg
        )
        if verify:
            _verify(adapter, pdf, workload, cfg.verify_rows, cfg.seed)
            pool.clear()
            pool.stats.reset()
        res = MethodResult(method=method, storage_mb=adapter.nbytes_disk / 1e6)
        if adapter.kind == "deepmapping":
            res.breakdown = adapter.obj.storage_breakdown()
            res.extra["memorized_fraction"] = adapter.obj.memorized_fraction
        for b, keys in batches.items():
            if cfg.warm:
                adapter.lookup(keys)
            times = []
            for _ in range(cfg.repeats):
                t0 = time.perf_counter()
                adapter.lookup(keys)
                times.append(time.perf_counter() - t0)
            res.latency_s[b] = float(np.mean(times))
        st = pool.stats
        res.pool_stats = dict(
            hits=st.hits, misses=st.misses, evictions=st.evictions,
            bytes_read=st.bytes_read, io_time=st.io_time,
            decompress_time=st.decompress_time, deserialize_time=st.deserialize_time,
        )
        res.extra["raw_bytes"] = raw_bytes
        res.extra["compression_ratio"] = adapter.nbytes_disk / max(1, raw_bytes)
        results[method] = res
    return results
