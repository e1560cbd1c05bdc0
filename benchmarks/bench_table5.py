"""Benchmark for paper Table V: lookup latency after deleting a fraction
of the data (DeepMapping evolves via Algorithm 4)."""
import numpy as np
import pytest

from repro.core.deepmapping import DeepMapping, DeepMappingConfig
from repro.experiments.tables import _synth_mod_data
from repro.workloads.datasets import REGISTRY
from repro.workloads.queries import random_key_batch

from .common import BENCH_CFG_EXCEEDS, B

N_BASE = 20_000


@pytest.fixture(scope="module", params=["low", "high"])
def setup(request, spark, tmp_path_factory):
    corr = request.param
    wl = REGISTRY[f"synth_multi_{corr}"]
    base, _ = _synth_mod_data(
        spark, n_base=N_BASE, n_steps=1, step_frac=0.1,
        base_corr=corr == "high", insert_corr=corr == "high",
    )
    cfg = BENCH_CFG_EXCEEDS
    dm = DeepMapping.build(
        base, list(wl.key_cols), list(wl.value_cols),
        DeepMappingConfig(arch=cfg.dm_arch, train=cfg.dm_train, codec="z"),
        workdir=str(tmp_path_factory.mktemp(f"t5-{corr}")),
        key_space=wl.key_space(base),
    )
    rng = np.random.default_rng(0)
    gone = rng.choice(base["key"].to_numpy(), N_BASE // 5, replace=False)
    dm.delete(gone)
    remaining = base[~base["key"].isin(gone)]
    keys = random_key_batch(remaining, list(wl.key_cols), B, seed=3)
    return corr, dm, gone, keys


def test_lookup_after_delete(benchmark, setup):
    corr, dm, _, keys = setup
    benchmark.group = f"table5:{corr}"
    benchmark.extra_info["storage_mb"] = dm.nbytes_disk / 1e6
    benchmark(dm.lookup, keys)


def test_deleted_keys_answer_null_fast(benchmark, setup):
    """Deleted keys short-circuit on V_exist — no aux/model work needed."""
    corr, dm, gone, _ = setup
    qk = gone[:B]
    benchmark.group = f"table5:{corr}"
    out = benchmark(dm.lookup, qk)
    assert out[dm.value_cols[0]].isna().all()
