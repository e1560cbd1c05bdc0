"""Mapping model: the multi-task network plus value-label codecs shared
by DeepMapping and MHAS.

High-cardinality value columns (e.g. TPC-H ``l_partkey``: millions of
distinct values at the paper's scale) cannot be one softmax head — the
output layer alone would dwarf the data. Like the keys, such values are
decomposed into base-10 digits, one 10-class sub-task per digit
(:class:`MappingModel`); a column's prediction is correct iff every
digit is correct, and any mismatch is repaired by ``T_aux`` exactly as
for direct heads. Low-cardinality columns keep one direct softmax head.
"""
from __future__ import annotations

import pickle
from dataclasses import dataclass

import numpy as np

from .encoding import KeySpace
from .nn import ArchSpec, MultiTaskMLP

__all__ = ["TrainConfig", "MappingModel", "train_model", "evaluate_accuracy"]

# columns with more classes than this get per-digit sub-task heads
DIGIT_THRESHOLD = 64


class MappingModel:
    """Column-level facade over :class:`MultiTaskMLP`.

    ``fit``/``predict`` speak column codes; internally, columns whose
    cardinality exceeds ``digit_threshold`` are split into base-10 digit
    sub-tasks (named ``col#d<i>``). Private-layer specs given per column
    are applied to each of that column's sub-task heads.
    """

    def __init__(
        self,
        input_dim: int,
        arch: ArchSpec,
        n_classes: dict[str, int],
        seed: int = 0,
        layer_factory=None,
        digit_threshold: int = DIGIT_THRESHOLD,
    ):
        self.col_classes = dict(n_classes)
        self.digit_threshold = int(digit_threshold)
        self._digits: dict[str, int] = {}
        model_classes: dict[str, int] = {}
        private: dict[str, tuple[int, ...]] = {}
        for c, nc in n_classes.items():
            spec = tuple(arch.private.get(c, ()))
            if nc > self.digit_threshold:
                nd = len(str(nc - 1))
                self._digits[c] = nd
                for d in range(nd):
                    model_classes[f"{c}#d{d}"] = 10
                    private[f"{c}#d{d}"] = spec
            else:
                self._digits[c] = 0
                model_classes[c] = nc
                private[c] = spec
        self.net = MultiTaskMLP(
            input_dim, ArchSpec(arch.shared, private), model_classes,
            seed=seed, layer_factory=layer_factory,
        )

    # -- label translation ---------------------------------------------------
    def split_labels(self, codes: dict[str, np.ndarray]) -> dict[str, np.ndarray]:
        out = {}
        for c, v in codes.items():
            v = np.asarray(v, dtype=np.int64)
            nd = self._digits[c]
            if nd == 0:
                out[c] = v
            else:
                for d in range(nd):
                    out[f"{c}#d{d}"] = (v // 10**d) % 10
        return out

    def predict(self, x: np.ndarray) -> dict[str, np.ndarray]:
        """Column-level argmax codes (digit heads recombined)."""
        sub = self.net.predict(x)
        out = {}
        for c, nd in self._digits.items():
            if nd == 0:
                out[c] = sub[c]
            else:
                code = np.zeros(len(x), dtype=np.int64)
                for d in range(nd):
                    code += sub[f"{c}#d{d}"].astype(np.int64) * 10**d
                # recombined digits may form a code outside the dictionary;
                # clip so downstream decode stays in range (such rows are
                # misclassified by construction and live in T_aux)
                out[c] = np.minimum(code, self.col_classes[c] - 1).astype(np.int32)
        return out

    def fit(self, x: np.ndarray, codes: dict[str, np.ndarray], **kw) -> list[float]:
        return self.net.fit(x, self.split_labels(codes), **kw)

    # -- delegation -------------------------------------------------------------
    @property
    def input_dim(self) -> int:
        return self.net.input_dim

    @property
    def n_params(self) -> int:
        return self.net.n_params

    def nbytes_resident(self) -> int:
        return self.net.nbytes_resident()

    def nbytes_stored(self) -> int:
        return len(self.to_bytes())

    def to_bytes(self) -> bytes:
        return pickle.dumps(
            {
                "col_classes": self.col_classes,
                "digit_threshold": self.digit_threshold,
                "net": self.net.to_bytes(),
            }
        )

    @staticmethod
    def from_bytes(data: bytes) -> "MappingModel":
        blob = pickle.loads(data)
        m = object.__new__(MappingModel)
        m.col_classes = blob["col_classes"]
        m.digit_threshold = blob["digit_threshold"]
        m.net = MultiTaskMLP.from_bytes(blob["net"])
        m._digits = {
            c: (len(str(nc - 1)) if nc > m.digit_threshold else 0)
            for c, nc in m.col_classes.items()
        }
        return m


@dataclass(frozen=True)
class TrainConfig:
    """Training hyper-parameters (paper Sec. V-A.6, scaled — DESIGN.md §6)."""

    epochs: int = 30
    batch_size: int = 512
    lr: float = 1e-3
    lr_decay: float = 0.999
    seed: int = 0
    tol: float = 1e-4


def train_model(
    key_space: KeySpace,
    dense_keys: np.ndarray,
    codes: dict[str, np.ndarray],
    n_classes: dict[str, int],
    arch: ArchSpec,
    cfg: TrainConfig = TrainConfig(),
) -> MappingModel:
    """Train a multi-task mapping model to memorize ``dense_keys -> codes``."""
    x = key_space.features_from_dense(np.asarray(dense_keys, dtype=np.int64))
    model = MappingModel(key_space.input_dim, arch, n_classes, seed=cfg.seed)
    model.fit(
        x,
        {c: np.asarray(v, dtype=np.int64) for c, v in codes.items()},
        epochs=cfg.epochs,
        batch_size=cfg.batch_size,
        lr=cfg.lr,
        lr_decay=cfg.lr_decay,
        seed=cfg.seed,
        tol=cfg.tol,
    )
    return model


def evaluate_accuracy(
    model: MappingModel,
    key_space: KeySpace,
    dense_keys: np.ndarray,
    codes: dict[str, np.ndarray],
    batch: int = 65536,
) -> dict[str, float]:
    """Fraction of keys whose prediction matches, per task (paper's
    'model memorized N% of tuples' metric is the mean of these)."""
    n = len(dense_keys)
    correct = {c: 0 for c in codes}
    for s in range(0, n, batch):
        x = key_space.features_from_dense(dense_keys[s : s + batch])
        pred = model.predict(x)
        for c in codes:
            correct[c] += int((pred[c] == codes[c][s : s + batch]).sum())
    return {c: correct[c] / max(1, n) for c in codes}
