"""DeepMapping hybrid data representation (paper Sec. IV).

``DeepMapping = ⟨M, T_aux, V_exist, f_decode⟩``:

* ``M``       — multi-task MLP memorizing key→value mappings (nn.py),
* ``T_aux``   — per-column compressed store of misclassified mappings,
* ``V_exist`` — existence bit vector over the dense key space,
* ``f_decode``— per-column dictionary decoding maps.

Implements:
* :meth:`DeepMapping.build` — trains (or accepts) the model, runs every
  key through it, stores the misclassified mappings in ``T_aux``
  (misclassification detection can run distributed via Spark
  ``mapInPandas``, see ``lookup_spark.py``),
* :meth:`lookup` — Algorithm 1 (batch inference → existence check →
  auxiliary validation → decode),
* :meth:`insert` / :meth:`delete` / :meth:`update` — Algorithms 3/4/5,
  piggy-backing on ``T_aux`` with a size-threshold retrain trigger,
* :meth:`lookup_range` — Sec. IV-E batch-inference range extension,
* :meth:`storage_breakdown` — the per-component sizes behind Fig. 6 and
  the Eq. 1 objective.
"""
from __future__ import annotations

import time
from dataclasses import dataclass

import numpy as np
import pandas as pd

from ..baselines.memory_pool import MemoryPool
from .aux_table import AuxTable
from .bitvector import BitVector
from .encoding import KeySpace, LabelCodec, decode_map_bytes
from .model import MappingModel, TrainConfig, evaluate_accuracy, train_model
from .nn import ArchSpec

__all__ = ["DeepMappingConfig", "DeepMapping", "LookupStats"]


@dataclass(frozen=True)
class DeepMappingConfig:
    """Build-time configuration of the hybrid structure."""

    arch: ArchSpec = ArchSpec((128,), {})
    train: TrainConfig = TrainConfig()
    codec: str = "z"  # 'z' → DM-Z, 'lzma' → DM-L
    partition_bytes: int = 128 * 1024
    # retrain when T_aux grows beyond this many bytes (None = never; the
    # paper's DM-Z vs DM-Z1 distinction)
    retrain_threshold_bytes: int | None = None
    infer_batch: int = 65536


@dataclass
class LookupStats:
    """Per-phase latency counters (the paper's Fig. 7 breakdown)."""

    inference_time: float = 0.0
    existence_time: float = 0.0
    aux_time: float = 0.0
    decode_time: float = 0.0

    def reset(self):
        self.inference_time = self.existence_time = 0.0
        self.aux_time = self.decode_time = 0.0


class DeepMapping:
    """The hybrid learned data mapping structure."""

    def __init__(
        self,
        key_space: KeySpace,
        key_cols: list[str],
        value_cols: list[str],
        model: MappingModel,
        codecs: dict[str, LabelCodec],
        aux: AuxTable,
        vexist: BitVector,
        config: DeepMappingConfig,
        workdir: str,
        pool: MemoryPool,
    ):
        self.key_space = key_space
        self.key_cols = list(key_cols)
        self.value_cols = list(value_cols)
        self.model = model
        self.codecs = codecs
        self.aux = aux
        self.vexist = vexist
        self.config = config
        self.workdir = workdir
        self.pool = pool
        self.stats = LookupStats()
        self.retrain_count = 0
        self._pin_residents()

    # ------------------------------------------------------------------ build
    @staticmethod
    def build(
        df: pd.DataFrame,
        key_cols: list[str],
        value_cols: list[str],
        config: DeepMappingConfig = DeepMappingConfig(),
        *,
        workdir: str,
        pool: MemoryPool | None = None,
        key_space: KeySpace | None = None,
        model: MappingModel | None = None,
    ) -> "DeepMapping":
        """Construct the hybrid structure from a pandas relation.

        ``key_space`` may be passed explicitly with headroom so later
        insertions of new keys stay inside ``V_exist``'s address range
        (the paper assumes the bit vector's "range corresponds to the key
        range"). ``model`` may be a pre-trained/MHAS-searched network.
        """
        pool = pool if pool is not None else MemoryPool(None)
        ks = key_space or KeySpace.from_columns(df, key_cols)
        dense = ks.dense_index(df[key_cols].to_numpy())
        if len(np.unique(dense)) != len(dense):
            raise ValueError("key columns do not uniquely identify rows")

        codecs = {c: LabelCodec(df[c]) for c in value_cols}
        codes = {c: codecs[c].encode(df[c]) for c in value_cols}
        n_classes = {c: codecs[c].n_classes for c in value_cols}

        if model is None:
            model = train_model(ks, dense, codes, n_classes, config.arch, config.train)

        # run every key through the model; tuples misclassified on any
        # column go to T_aux with the correct codes of all columns
        aux_keys, aux_codes = [], {c: [] for c in value_cols}
        for s in range(0, len(dense), config.infer_batch):
            sl = slice(s, s + config.infer_batch)
            pred = model.predict(ks.features_from_dense(dense[sl]))
            wrong = np.zeros(len(dense[sl]), dtype=bool)
            for c in value_cols:
                wrong |= pred[c] != codes[c][sl]
            aux_keys.append(dense[sl][wrong])
            for c in value_cols:
                aux_codes[c].append(codes[c][sl][wrong])
        aux = AuxTable(
            workdir,
            codec=config.codec,
            partition_bytes=config.partition_bytes,
            pool=pool,
        )
        aux.build(
            np.concatenate(aux_keys) if aux_keys else np.empty(0, np.int64),
            {c: np.concatenate(v) for c, v in aux_codes.items()},
        )

        vexist = BitVector(ks.size)
        vexist.set(dense)
        return DeepMapping(
            ks, key_cols, value_cols, model, codecs, aux, vexist, config, workdir, pool
        )

    def _pin_residents(self) -> None:
        """Model, V_exist and f_decode stay resident in the memory pool."""
        self.pool.pin("dm:model", self.model.nbytes_resident())
        self.pool.pin("dm:vexist", self.vexist.nbytes_resident())
        self.pool.pin("dm:fdecode", decode_map_bytes(self.codecs))

    # --------------------------------------------------------------- Algorithm 1
    def lookup(self, keys: np.ndarray, cols: list[str] | None = None) -> pd.DataFrame:
        """Batch key lookup. ``keys`` is [n] or [n, n_components]; returns a
        DataFrame with the key columns and requested value columns, with
        None for non-existing keys (Algorithm 1's NULL)."""
        cols = cols or self.value_cols
        keys = np.asarray(keys, dtype=np.int64)
        if keys.ndim == 1:
            keys = keys[:, None]
        n = len(keys)

        t0 = time.perf_counter()
        in_domain = self.key_space.contains(keys)
        dense = np.full(n, -1, dtype=np.int64)
        if in_domain.any():
            dense[in_domain] = self.key_space.dense_index(keys[in_domain])
        exists = np.zeros(n, dtype=bool)
        if in_domain.any():
            exists[in_domain] = self.vexist.get(dense[in_domain])
        self.stats.existence_time += time.perf_counter() - t0

        # batch inference over existing keys only (paper runs the model on
        # the whole batch; restricting to existing keys is the same work
        # modulo the spurious rows, which the existence check discards)
        t0 = time.perf_counter()
        pred: dict[str, np.ndarray] = {c: np.full(n, -1, dtype=np.int32) for c in cols}
        ex_idx = np.flatnonzero(exists)
        for s in range(0, len(ex_idx), self.config.infer_batch):
            b = ex_idx[s : s + self.config.infer_batch]
            p = self.model.predict(self.key_space.features_from_dense(dense[b]))
            for c in cols:
                pred[c][b] = p[c]
        self.stats.inference_time += time.perf_counter() - t0

        # auxiliary validation: tuples found in T_aux override the model
        t0 = time.perf_counter()
        if len(ex_idx):
            mask, aux_codes = self.aux.lookup(dense[ex_idx])
            if mask.any():
                for c in cols:
                    pred[c][ex_idx[mask]] = aux_codes[c]
        self.stats.aux_time += time.perf_counter() - t0

        # decode to original values; non-existing → None
        t0 = time.perf_counter()
        out = {}
        for i, kc in enumerate(self.key_cols):
            out[kc] = keys[:, i]
        for c in cols:
            vals = np.full(n, None, dtype=object)
            if len(ex_idx):
                vals[ex_idx] = self.codecs[c].decode(pred[c][ex_idx])
            out[c] = vals
        self.stats.decode_time += time.perf_counter() - t0
        return pd.DataFrame(out)

    # ---------------------------------------------------------- Sec. IV-E range
    def lookup_range(
        self, lo: int, hi: int, cols: list[str] | None = None
    ) -> pd.DataFrame:
        """Range query (first approach of Sec. IV-E): filter ``V_exist`` for
        dense keys in [lo, hi), then batch-lookup the surviving keys.
        Bounds are dense indices (== key values for simple 0-offset keys)."""
        dense = self.vexist.set_indices_in_range(lo, hi)
        keys = self.key_space.from_dense(dense)
        return self.lookup(keys, cols)

    # ------------------------------------------------------------- Algorithm 3
    def insert(self, df: pd.DataFrame) -> None:
        """Insert rows; only model-misclassified mappings enter T_aux."""
        dense = self.key_space.dense_index(df[self.key_cols].to_numpy())
        if self.vexist.get(dense).any():
            raise ValueError("insert of an existing key — use update()")
        self.vexist.set(dense)
        self.pool.pin("dm:vexist", self.vexist.nbytes_resident())

        pred = self._predict_dense(dense)
        codes = {c: self._encode_extend(c, df[c]) for c in self.value_cols}
        wrong = np.zeros(len(dense), dtype=bool)
        for c in self.value_cols:
            wrong |= pred[c] != codes[c]
        if wrong.any():
            self.aux.apply(
                upsert_keys=dense[wrong],
                upsert_codes={c: v[wrong] for c, v in codes.items()},
            )
        self._maybe_retrain()

    # ------------------------------------------------------------- Algorithm 4
    def delete(self, keys: np.ndarray) -> None:
        """Delete keys: clear existence bits, purge from T_aux."""
        keys = np.asarray(keys, dtype=np.int64)
        if keys.ndim == 1:
            keys = keys[:, None]
        dense = self.key_space.dense_index(keys)
        self.vexist.set(dense, False)
        self.pool.pin("dm:vexist", self.vexist.nbytes_resident())
        self.aux.remove_keys(dense)
        self._maybe_retrain()

    # ------------------------------------------------------------- Algorithm 5
    def update(self, df: pd.DataFrame) -> None:
        """Replace values of existing keys; mis-learned values go to T_aux,
        values the model now predicts correctly leave T_aux."""
        dense = self.key_space.dense_index(df[self.key_cols].to_numpy())
        if not self.vexist.get(dense).all():
            raise KeyError("update of a non-existing key — use insert()")
        pred = self._predict_dense(dense)
        codes = {c: self._encode_extend(c, df[c]) for c in self.value_cols}
        wrong = np.zeros(len(dense), dtype=bool)
        for c in self.value_cols:
            wrong |= pred[c] != codes[c]
        self.aux.apply(
            upsert_keys=dense[wrong],
            upsert_codes={c: v[wrong] for c, v in codes.items()},
            remove_keys=dense[~wrong],
        )
        self._maybe_retrain()

    # ------------------------------------------------------------ retraining
    def _maybe_retrain(self) -> None:
        th = self.config.retrain_threshold_bytes
        if th is not None and self.aux.nbytes_disk > th:
            self.retrain()

    def retrain(self) -> None:
        """Materialize current contents, retrain M, rebuild T_aux/V_exist.

        The paper triggers this offline when T_aux exceeds its threshold;
        model search (MHAS) is re-run separately — here we retrain the
        current architecture (DESIGN.md §6)."""
        snapshot = self.materialize()
        codecs = {c: LabelCodec(snapshot[c]) for c in self.value_cols}
        codes = {c: codecs[c].encode(snapshot[c]) for c in self.value_cols}
        n_classes = {c: codecs[c].n_classes for c in self.value_cols}
        dense = self.key_space.dense_index(snapshot[self.key_cols].to_numpy())
        model = train_model(
            self.key_space, dense, codes, n_classes, self.config.arch, self.config.train
        )
        aux_keys, aux_codes = [], {c: [] for c in self.value_cols}
        for s in range(0, len(dense), self.config.infer_batch):
            sl = slice(s, s + self.config.infer_batch)
            p = model.predict(self.key_space.features_from_dense(dense[sl]))
            w = np.zeros(len(dense[sl]), dtype=bool)
            for c in self.value_cols:
                w |= p[c] != codes[c][sl]
            aux_keys.append(dense[sl][w])
            for c in self.value_cols:
                aux_codes[c].append(codes[c][sl][w])
        self.model = model
        self.codecs = codecs
        self.aux.build(
            np.concatenate(aux_keys) if aux_keys else np.empty(0, np.int64),
            {c: np.concatenate(v) for c, v in aux_codes.items()},
        )
        self.retrain_count += 1
        self._pin_residents()

    def materialize(self) -> pd.DataFrame:
        """All currently existing rows, reconstructed through lookup()."""
        dense = self.vexist.set_indices()
        frames = []
        step = 1 << 18
        for s in range(0, len(dense), step):
            keys = self.key_space.from_dense(dense[s : s + step])
            frames.append(self.lookup(keys))
        if not frames:
            return pd.DataFrame(columns=self.key_cols + self.value_cols)
        return pd.concat(frames, ignore_index=True)

    # --------------------------------------------------------------- helpers
    def _predict_dense(self, dense: np.ndarray) -> dict[str, np.ndarray]:
        out = {c: np.empty(len(dense), dtype=np.int32) for c in self.value_cols}
        for s in range(0, len(dense), self.config.infer_batch):
            sl = slice(s, s + self.config.infer_batch)
            p = self.model.predict(self.key_space.features_from_dense(dense[sl]))
            for c in self.value_cols:
                out[c][sl] = p[c]
        return out

    def _encode_extend(self, col: str, values: pd.Series) -> np.ndarray:
        """Encode values, extending f_decode with unseen categories (these
        can never be predicted by the fixed-output model, so the rows land
        in T_aux — exactly the lazy-update semantics of Sec. IV-D)."""
        codec = self.codecs[col]
        new = pd.unique(pd.Series(values))
        unseen = [v for v in new if v not in set(codec.classes_.tolist())]
        if unseen:
            # np.concatenate promotes to a common dtype (e.g. wider strings)
            codec.__setstate__(
                {"classes_": np.concatenate([codec.classes_, np.asarray(unseen)])}
            )
            self.pool.pin("dm:fdecode", decode_map_bytes(self.codecs))
        return codec.encode(values)

    # ---------------------------------------------------------------- sizing
    def storage_breakdown(self) -> dict[str, int]:
        """Per-component at-rest bytes (paper Fig. 6 / Eq. 1 numerator)."""
        return {
            "model": self.model.nbytes_stored(),
            "aux_table": self.aux.nbytes_disk,
            "vexist": self.vexist.nbytes_stored(),
            "fdecode": decode_map_bytes(self.codecs),
        }

    @property
    def nbytes_disk(self) -> int:
        return sum(self.storage_breakdown().values())

    def compression_ratio(self, uncompressed_bytes: int) -> float:
        """Eq. 1: hybrid structure size over raw data size."""
        return self.nbytes_disk / max(1, uncompressed_bytes)

    @property
    def memorized_fraction(self) -> float:
        """Fraction of tuples the model alone answers fully correctly —
        the paper's 'model memorized N% of the tuples' (Fig. 6)."""
        n_exist = self.vexist.count()
        if n_exist == 0:
            return 1.0
        return 1.0 - self.aux.n_entries / n_exist

    def accuracy_on(self, df: pd.DataFrame) -> dict[str, float]:
        """Model-only accuracy per column over the rows of ``df``."""
        dense = self.key_space.dense_index(df[self.key_cols].to_numpy())
        codes = {c: self.codecs[c].encode(df[c]) for c in self.value_cols}
        return evaluate_accuracy(self.model, self.key_space, dense, codes)
