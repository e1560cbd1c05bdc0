"""Multi-task Hybrid Architecture Search (MHAS) — paper Sec. IV-C, Alg. 2.

ENAS-style [Pham et al. '18] search over the paper's space: up to
``max_shared`` shared hidden layers and up to ``max_private`` private
hidden layers per task, each layer's width chosen from a size grid
(paper: [100, 2000]; scaled here, DESIGN.md §6).

* **Controller** — an LSTM (64 hidden units, as in the paper) sampling
  decisions autoregressively via softmax heads: number of shared layers,
  each shared layer's size, then per task the number and sizes of private
  layers. Trained with REINFORCE against the Eq. 1 objective
  ``(size(M)+size(T_aux)+size(V_exist)+size(f_decode)) / size(D)``
  (reward = −ratio, exponential-moving-average baseline). Implemented in
  numpy (forward + full BPTT) since no NN framework is installed.
* **Shared weight bank** — sampled child models draw their layers from a
  bank keyed by (scope, slot, fan-in, fan-out), so weights persist across
  sampled architectures (ENAS parameter sharing; also the mechanism that
  encourages cross-task layer sharing).
* **Algorithm 2 loop** — alternating model-training iterations (train the
  sampled child on data mini-batches, controller fixed) and controller
  iterations (update θ from sampled-architecture rewards, weights fixed).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np

from .encoding import KeySpace
from .model import MappingModel
from .nn import ArchSpec, _Dense, softmax

__all__ = ["MHASConfig", "MHASResult", "mhas_search", "WeightBank", "estimate_ratio"]


@dataclass(frozen=True)
class MHASConfig:
    size_grid: tuple[int, ...] = (16, 32, 64, 128, 256)
    max_shared: int = 2  # paper: up to two shared hidden layers
    max_private: int = 2  # paper: up to two private hidden layers per task
    n_iterations: int = 40  # N_t (paper 2000, scaled)
    n_model_train: int = 30  # N_m
    n_controller_train: int = 8  # N_c
    child_epochs: int = 1  # m_epochs per model-training iteration
    child_batch: int = 4096
    child_lr: float = 1e-3
    controller_lr: float = 3.5e-4  # paper Sec. V-A.6
    controller_hidden: int = 64  # paper Sec. V-A.6
    controller_samples: int = 4  # architectures sampled per controller step
    reward_rows: int = 8192  # rows sampled for the Eq. 1 accuracy estimate
    aux_bytes_per_entry: float = 7.0  # compressed (key, code) pair estimate
    baseline_decay: float = 0.8
    seed: int = 0


@dataclass
class MHASResult:
    best_arch: ArchSpec
    best_ratio: float
    history: list = field(default_factory=list)  # (iteration, ratio, arch)


# --------------------------------------------------------------------------
# shared weight bank (ENAS parameter sharing)
# --------------------------------------------------------------------------
class WeightBank:
    """Layer cache keyed by (scope, slot, d_in, d_out); layers persist and
    keep their Adam state across sampled child models."""

    def __init__(self, seed: int = 0):
        self._bank: dict[tuple, _Dense] = {}
        self._rng = np.random.default_rng(seed)

    def factory(self, scope: str, slot: int, d_in: int, d_out: int, rng) -> _Dense:
        key = (scope, slot, d_in, d_out)
        if key not in self._bank:
            self._bank[key] = _Dense.init(d_in, d_out, self._rng)
        return self._bank[key]

    def __len__(self) -> int:
        return len(self._bank)


# --------------------------------------------------------------------------
# Eq. 1 objective
# --------------------------------------------------------------------------
def estimate_ratio(
    model: MappingModel,
    key_space: KeySpace,
    dense_keys: np.ndarray,
    codes: dict[str, np.ndarray],
    data_bytes: int,
    *,
    vexist_bytes: int,
    fdecode_bytes: int,
    sample_rows: int = 8192,
    aux_bytes_per_entry: float = 7.0,
    rng: np.random.Generator | None = None,
) -> float:
    """Eq. 1 on a row sample: model accuracy per column estimates the
    auxiliary table's entry count (full T_aux builds are too expensive to
    run per controller sample; the estimator is linear in the miss rate,
    matching how T_aux size actually scales)."""
    n = len(dense_keys)
    rng = rng or np.random.default_rng(0)
    idx = rng.choice(n, size=min(sample_rows, n), replace=False)
    x = key_space.features_from_dense(dense_keys[idx])
    pred = model.predict(x)
    aux_est = 0.0
    for c, y in codes.items():
        miss = float((pred[c] != y[idx]).mean())
        aux_est += miss * n * aux_bytes_per_entry
    size = model.nbytes_resident() + aux_est + vexist_bytes + fdecode_bytes
    return size / max(1, data_bytes)


# --------------------------------------------------------------------------
# LSTM controller (numpy, REINFORCE)
# --------------------------------------------------------------------------
def _sigmoid(z):
    return 1.0 / (1.0 + np.exp(-z))


class LSTMController:
    """Autoregressive architecture sampler.

    Decision types: ``('n', k)`` — how many layers (choices 0..k) — and
    ``('size', g)`` — which width from the grid. Each step feeds the
    embedding of the previous decision into the LSTM and samples the next
    decision from a per-type softmax head.
    """

    EMB = 24

    def __init__(self, cfg: MHASConfig, n_tasks: int, seed: int = 0):
        self.cfg = cfg
        H, E = cfg.controller_hidden, self.EMB
        rng = np.random.default_rng(seed)
        # paper: parameters initialized uniformly-ish around 0 (N(0, 0.05^2))
        def init(*shape):
            return (rng.standard_normal(shape) * 0.05).astype(np.float64)

        self.params: dict[str, np.ndarray] = {
            "Wx": init(E, 4 * H),
            "Wh": init(H, 4 * H),
            "b": np.zeros(4 * H),
            "start": init(E),
        }
        self._types: dict[str, int] = {}  # type name -> n_choices
        self._register("n_layers", max(cfg.max_shared, cfg.max_private) + 1)
        self._register("size", len(cfg.size_grid))
        for name, n in self._types.items():
            self.params[f"emb:{name}"] = init(n, E)
            self.params[f"Wo:{name}"] = init(self.cfg.controller_hidden, n)
            self.params[f"bo:{name}"] = np.zeros(n)
        self._adam = {k: (np.zeros_like(v), np.zeros_like(v)) for k, v in self.params.items()}
        self._t = 0
        self.baseline: float | None = None

    def _register(self, name: str, n_choices: int) -> None:
        self._types[name] = n_choices

    # -- one forward pass, sampling a full decision sequence ---------------
    def sample(self, n_tasks: int, rng: np.random.Generator, greedy: bool = False):
        """Returns (decisions, cache). ``decisions`` is a flat list of
        (type, choice); ``cache`` holds everything BPTT needs."""
        H = self.cfg.controller_hidden
        h = np.zeros(H)
        c = np.zeros(H)
        x = self.params["start"]
        steps = []  # per step: dict of forward tensors
        decisions: list[tuple[str, int]] = []

        def step(dtype: str, max_choice: int | None = None) -> int:
            nonlocal h, c, x
            z = x @ self.params["Wx"] + h @ self.params["Wh"] + self.params["b"]
            i, f, g, o = (
                _sigmoid(z[:H]),
                _sigmoid(z[H : 2 * H]),
                np.tanh(z[2 * H : 3 * H]),
                _sigmoid(z[3 * H :]),
            )
            c_new = f * c + i * g
            h_new = o * np.tanh(c_new)
            logits = h_new @ self.params[f"Wo:{dtype}"] + self.params[f"bo:{dtype}"]
            p = softmax(logits[None, :])[0]
            if max_choice is not None:  # e.g. n_private capped below n_layers max
                mask = np.zeros_like(p)
                mask[: max_choice + 1] = 1
                p = p * mask
                p = p / p.sum()
            choice = int(p.argmax()) if greedy else int(rng.choice(len(p), p=p))
            steps.append(
                dict(dtype=dtype, x=x, h_prev=h, c_prev=c, i=i, f=f, g=g, o=o,
                     c=c_new, h=h_new, p=p, choice=choice)
            )
            decisions.append((dtype, choice))
            h, c = h_new, c_new
            x = self.params[f"emb:{dtype}"][choice]
            return choice

        n_shared = step("n_layers", self.cfg.max_shared)
        for _ in range(n_shared):
            step("size")
        for _ in range(n_tasks):
            n_priv = step("n_layers", self.cfg.max_private)
            for _ in range(n_priv):
                step("size")
        return decisions, steps

    def decisions_to_arch(self, decisions, tasks: list[str]) -> ArchSpec:
        grid = self.cfg.size_grid
        it = iter(decisions)
        n_shared = next(it)[1]
        shared = tuple(grid[next(it)[1]] for _ in range(n_shared))
        private = {}
        for t in tasks:
            n_priv = next(it)[1]
            private[t] = tuple(grid[next(it)[1]] for _ in range(n_priv))
        return ArchSpec(shared, private)

    # -- REINFORCE update over a set of sampled sequences --------------------
    def update(self, traces: list[tuple[list[dict], float]]) -> None:
        """``traces`` = [(steps, reward)]. Minimizes −E[advantage·log π]."""
        grads = {k: np.zeros_like(v) for k, v in self.params.items()}
        H = self.cfg.controller_hidden
        for steps, reward in traces:
            if self.baseline is None:
                self.baseline = reward
            adv = reward - self.baseline
            self.baseline = (
                self.cfg.baseline_decay * self.baseline
                + (1 - self.cfg.baseline_decay) * reward
            )
            dh_next = np.zeros(H)
            dc_next = np.zeros(H)
            dx_next = np.zeros(self.EMB)  # grad wrt the embedding fed forward
            for t in range(len(steps) - 1, -1, -1):
                s = steps[t]
                # output-head gradient: d(−adv·log p[choice])/dlogits
                dlogit = s["p"].copy()
                dlogit[s["choice"]] -= 1.0
                dlogit *= adv
                grads[f"Wo:{s['dtype']}"] += np.outer(s["h"], dlogit)
                grads[f"bo:{s['dtype']}"] += dlogit
                dh = dlogit @ self.params[f"Wo:{s['dtype']}"].T + dh_next
                # the embedding of this step's choice was the *next* step's x
                if t + 1 < len(steps):
                    grads[f"emb:{s['dtype']}"][s["choice"]] += dx_next
                # LSTM cell backward
                do = dh * np.tanh(s["c"])
                dct = dh * s["o"] * (1 - np.tanh(s["c"]) ** 2) + dc_next
                di = dct * s["g"]
                dg = dct * s["i"]
                df = dct * s["c_prev"]
                dc_next = dct * s["f"]
                dz = np.concatenate(
                    [
                        di * s["i"] * (1 - s["i"]),
                        df * s["f"] * (1 - s["f"]),
                        dg * (1 - s["g"] ** 2),
                        do * s["o"] * (1 - s["o"]),
                    ]
                )
                grads["Wx"] += np.outer(s["x"], dz)
                grads["Wh"] += np.outer(s["h_prev"], dz)
                grads["b"] += dz
                dx_next = dz @ self.params["Wx"].T
                dh_next = dz @ self.params["Wh"].T
            grads["start"] += dx_next  # x at t=0 is the start token
        self._adam_step(grads, scale=1.0 / max(1, len(traces)))

    def _adam_step(self, grads, scale=1.0, beta1=0.9, beta2=0.999, eps=1e-8):
        self._t += 1
        lr = self.cfg.controller_lr
        for k, p in self.params.items():
            g = grads[k] * scale
            m, v = self._adam[k]
            m[:] = beta1 * m + (1 - beta1) * g
            v[:] = beta2 * v + (1 - beta2) * g * g
            p -= lr * (m / (1 - beta1**self._t)) / (np.sqrt(v / (1 - beta2**self._t)) + eps)


# --------------------------------------------------------------------------
# Algorithm 2
# --------------------------------------------------------------------------
def mhas_search(
    key_space: KeySpace,
    dense_keys: np.ndarray,
    codes: dict[str, np.ndarray],
    n_classes: dict[str, int],
    data_bytes: int,
    cfg: MHASConfig = MHASConfig(),
    *,
    vexist_bytes: int | None = None,
    fdecode_bytes: int = 0,
) -> MHASResult:
    """Run the MHAS loop and return the best architecture found.

    ``data_bytes`` is size(D) in Eq. 1. The returned architecture is then
    trained from scratch by ``DeepMapping.build`` (the paper's post-search
    fine-tuning)."""
    tasks = list(n_classes)
    rng = np.random.default_rng(cfg.seed)
    bank = WeightBank(seed=cfg.seed)
    controller = LSTMController(cfg, n_tasks=len(tasks), seed=cfg.seed)
    dense_keys = np.asarray(dense_keys, dtype=np.int64)
    codes = {c: np.asarray(v, dtype=np.int64) for c, v in codes.items()}
    n = len(dense_keys)
    if vexist_bytes is None:
        vexist_bytes = key_space.size // 8 // 4  # compressed bitmap estimate

    def make_child(arch: ArchSpec) -> MappingModel:
        return MappingModel(
            key_space.input_dim, arch, n_classes, seed=cfg.seed, layer_factory=bank.factory
        )

    def ratio_of(model: MultiTaskMLP) -> float:
        return estimate_ratio(
            model, key_space, dense_keys, codes, data_bytes,
            vexist_bytes=vexist_bytes, fdecode_bytes=fdecode_bytes,
            sample_rows=cfg.reward_rows,
            aux_bytes_per_entry=cfg.aux_bytes_per_entry, rng=rng,
        )

    result = MHASResult(best_arch=ArchSpec((cfg.size_grid[0],), {}), best_ratio=np.inf)
    every_m = max(1, cfg.n_iterations // max(1, cfg.n_model_train))
    every_c = max(1, cfg.n_iterations // max(1, cfg.n_controller_train))

    for it in range(1, cfg.n_iterations + 1):
        if it % every_m == 0:  # model-training iteration (θ fixed)
            decisions, _ = controller.sample(len(tasks), rng)
            arch = controller.decisions_to_arch(decisions, tasks)
            child = make_child(arch)
            for _ in range(cfg.child_epochs):
                order = rng.permutation(n)
                for s in range(0, n, cfg.child_batch):
                    b = order[s : s + cfg.child_batch]
                    child.net.train_batch(
                        key_space.features_from_dense(dense_keys[b]),
                        child.split_labels({c: v[b] for c, v in codes.items()}),
                        cfg.child_lr,
                    )
        if it % every_c == 0:  # controller-training iteration (W fixed)
            traces = []
            for _ in range(cfg.controller_samples):
                decisions, steps = controller.sample(len(tasks), rng)
                arch = controller.decisions_to_arch(decisions, tasks)
                r = ratio_of(make_child(arch))
                result.history.append((it, r, arch))
                if r < result.best_ratio:
                    result.best_ratio, result.best_arch = r, arch
                traces.append((steps, -r))  # reward = −Eq.1 ratio
            controller.update(traces)

    # final greedy sample — often the converged architecture
    decisions, _ = controller.sample(len(tasks), rng, greedy=True)
    arch = controller.decisions_to_arch(decisions, tasks)
    r = ratio_of(make_child(arch))
    result.history.append((cfg.n_iterations, r, arch))
    if r < result.best_ratio:
        result.best_ratio, result.best_arch = r, arch
    return result
