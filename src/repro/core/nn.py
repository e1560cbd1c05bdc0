"""Multi-task fully-connected network `M` (paper Sec. IV-A) in numpy.

No NN framework is installed in this container (see DESIGN.md §2), so the
network — a trunk of *shared* dense+ReLU layers feeding one *private*
dense+ReLU stack and softmax output head per value column — is
implemented directly: forward, softmax cross-entropy backward, and Adam.
Batch inference is dense float32 matmul, the same computation the paper's
ONNX-on-CPU path performs on the small-size machine.

Weights may be *views into a shared weight bank* (MHAS / ENAS parameter
sharing): layers are created through a factory so `mhas.py` can hand out
bank-owned arrays that persist across sampled child models.
"""
from __future__ import annotations

import pickle
from dataclasses import dataclass, field

import numpy as np

__all__ = ["ArchSpec", "MultiTaskMLP", "softmax"]


def softmax(z: np.ndarray) -> np.ndarray:
    z = z - z.max(axis=1, keepdims=True)
    e = np.exp(z)
    return e / e.sum(axis=1, keepdims=True)


@dataclass(frozen=True)
class ArchSpec:
    """Architecture of the multi-task network.

    ``shared``: hidden sizes of the shared trunk (may be empty).
    ``private``: per-task hidden sizes, keyed by value-column name
    (may be empty lists — the head is then a single output layer).
    """

    shared: tuple[int, ...]
    private: dict[str, tuple[int, ...]] = field(default_factory=dict)

    def for_tasks(self, tasks: list[str]) -> "ArchSpec":
        return ArchSpec(
            self.shared, {t: tuple(self.private.get(t, ())) for t in tasks}
        )


class _Dense:
    """One fully-connected layer with optional externally-owned weights."""

    def __init__(self, w: np.ndarray, b: np.ndarray):
        self.w, self.b = w, b
        self.mw = np.zeros_like(w)
        self.vw = np.zeros_like(w)
        self.mb = np.zeros_like(b)
        self.vb = np.zeros_like(b)

    @staticmethod
    def init(d_in: int, d_out: int, rng: np.random.Generator) -> "_Dense":
        scale = np.sqrt(2.0 / d_in).astype(np.float32)
        w = (rng.standard_normal((d_in, d_out)) * scale).astype(np.float32)
        return _Dense(w, np.zeros(d_out, dtype=np.float32))

    def forward(self, x: np.ndarray) -> np.ndarray:
        return x @ self.w + self.b

    def adam_step(self, gw, gb, lr, t, beta1=0.9, beta2=0.999, eps=1e-8):
        for g, p, m, v in ((gw, self.w, self.mw, self.vw), (gb, self.b, self.mb, self.vb)):
            m *= beta1
            m += (1 - beta1) * g
            v *= beta2
            v += (1 - beta2) * g * g
            mhat = m / (1 - beta1**t)
            vhat = v / (1 - beta2**t)
            p -= lr * mhat / (np.sqrt(vhat) + eps)

    @property
    def nbytes(self) -> int:
        return int(self.w.nbytes + self.b.nbytes)


class MultiTaskMLP:
    """Shared-trunk / private-head classifier over one-hot key features."""

    def __init__(
        self,
        input_dim: int,
        spec: ArchSpec,
        n_classes: dict[str, int],
        seed: int = 0,
        layer_factory=None,
    ):
        """``layer_factory(scope, slot, d_in, d_out, rng) -> _Dense`` lets
        MHAS substitute bank-shared layers; default creates fresh ones."""
        self.input_dim = input_dim
        self.spec = spec.for_tasks(list(n_classes))
        self.n_classes = dict(n_classes)
        rng = np.random.default_rng(seed)
        mk = layer_factory or (lambda scope, slot, di, do, r: _Dense.init(di, do, r))

        self.shared: list[_Dense] = []
        d = input_dim
        for i, h in enumerate(self.spec.shared):
            self.shared.append(mk("shared", i, d, h, rng))
            d = h
        self._trunk_out = d

        self.heads: dict[str, list[_Dense]] = {}
        for task, nc in self.n_classes.items():
            layers, di = [], d
            for i, h in enumerate(self.spec.private[task]):
                layers.append(mk(f"private:{task}", i, di, h, rng))
                di = h
            layers.append(mk(f"out:{task}", 0, di, nc, rng))
            self.heads[task] = layers
        self._t = 0  # Adam step counter

    # -- forward -----------------------------------------------------------
    def _trunk(self, x: np.ndarray, keep: bool = False):
        acts = [x]
        h = x
        for lyr in self.shared:
            h = np.maximum(lyr.forward(h), 0.0)
            acts.append(h)
        return (h, acts) if keep else (h, None)

    def logits(self, x: np.ndarray) -> dict[str, np.ndarray]:
        h, _ = self._trunk(x)
        out = {}
        for task, layers in self.heads.items():
            a = h
            for lyr in layers[:-1]:
                a = np.maximum(lyr.forward(a), 0.0)
            out[task] = layers[-1].forward(a)
        return out

    def predict(self, x: np.ndarray) -> dict[str, np.ndarray]:
        """Argmax class code per task — paper's ``M.infer`` batch path."""
        return {t: z.argmax(axis=1).astype(np.int32) for t, z in self.logits(x).items()}

    # -- training ------------------------------------------------------------
    def train_batch(self, x: np.ndarray, y: dict[str, np.ndarray], lr: float) -> float:
        """One Adam step on summed softmax cross-entropy; returns mean loss."""
        n = len(x)
        h, acts = self._trunk(x, keep=True)
        self._t += 1
        total_loss = 0.0
        d_trunk = np.zeros_like(h)

        for task, layers in self.heads.items():
            # head forward with activations kept
            a_list = [h]
            a = h
            for lyr in layers[:-1]:
                a = np.maximum(lyr.forward(a), 0.0)
                a_list.append(a)
            z = layers[-1].forward(a)
            p = softmax(z)
            yt = y[task]
            total_loss += float(-np.log(p[np.arange(n), yt] + 1e-12).mean())
            # backward through the head
            dz = p
            dz[np.arange(n), yt] -= 1.0
            dz /= n
            grad = dz
            for li in range(len(layers) - 1, -1, -1):
                lyr = layers[li]
                a_in = a_list[li]
                gw = a_in.T @ grad
                gb = grad.sum(axis=0)
                d_in = grad @ lyr.w.T
                if li > 0:
                    d_in *= a_list[li] > 0  # ReLU of this head layer's input
                lyr.adam_step(gw, gb, lr, self._t)
                grad = d_in
            d_trunk += grad

        # backward through the shared trunk
        grad = d_trunk
        for li in range(len(self.shared) - 1, -1, -1):
            lyr = self.shared[li]
            grad = grad * (acts[li + 1] > 0)
            gw = acts[li].T @ grad
            gb = grad.sum(axis=0)
            grad = grad @ lyr.w.T
            lyr.adam_step(gw, gb, lr, self._t)
        return total_loss

    def fit(
        self,
        x: np.ndarray,
        y: dict[str, np.ndarray],
        *,
        epochs: int = 20,
        batch_size: int = 4096,
        lr: float = 1e-3,
        lr_decay: float = 0.999,
        seed: int = 0,
        tol: float = 1e-4,
    ) -> list[float]:
        """Mini-batch training; stops early when the loss change < ``tol``
        (the paper's convergence criterion). Returns per-epoch losses."""
        rng = np.random.default_rng(seed)
        n = len(x)
        losses: list[float] = []
        cur_lr = lr
        for _ in range(epochs):
            order = rng.permutation(n)
            ep_loss, steps = 0.0, 0
            for s in range(0, n, batch_size):
                b = order[s : s + batch_size]
                ep_loss += self.train_batch(x[b], {t: v[b] for t, v in y.items()}, cur_lr)
                steps += 1
                cur_lr *= lr_decay
            losses.append(ep_loss / max(1, steps))
            if len(losses) >= 2 and abs(losses[-1] - losses[-2]) < tol:
                break
        return losses

    # -- size accounting -----------------------------------------------------
    def all_layers(self) -> list[_Dense]:
        out = list(self.shared)
        for layers in self.heads.values():
            out.extend(layers)
        return out

    @property
    def n_params(self) -> int:
        return sum(l.w.size + l.b.size for l in self.all_layers())

    def nbytes_resident(self) -> int:
        """In-memory float32 parameter bytes (what the pool must hold)."""
        return sum(l.nbytes for l in self.all_layers())

    def nbytes_stored(self) -> int:
        """At-rest serialized size — counts toward Eq. 1's size(M)."""
        return len(self.to_bytes())

    def to_bytes(self) -> bytes:
        blob = {
            "input_dim": self.input_dim,
            "spec": (self.spec.shared, self.spec.private),
            "n_classes": self.n_classes,
            "params": [(l.w, l.b) for l in self.all_layers()],
        }
        return pickle.dumps(blob, protocol=pickle.HIGHEST_PROTOCOL)

    @staticmethod
    def from_bytes(data: bytes) -> "MultiTaskMLP":
        blob = pickle.loads(data)
        spec = ArchSpec(tuple(blob["spec"][0]), {k: tuple(v) for k, v in blob["spec"][1].items()})
        m = MultiTaskMLP(blob["input_dim"], spec, blob["n_classes"])
        for lyr, (w, b) in zip(m.all_layers(), blob["params"]):
            lyr.w, lyr.b = w, b
        return m
