"""Benchmark for paper Table IV: lookup latency after inserting data that
does NOT follow the original distribution (cross-correlation inserts)."""
import pandas as pd
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
    base, steps = _synth_mod_data(
        spark, n_base=N_BASE, n_steps=2, step_frac=0.1,
        base_corr=corr == "high", insert_corr=corr != "high",  # cross
    )
    cfg = BENCH_CFG_EXCEEDS
    dm = DeepMapping.build(
        base, list(wl.key_cols), list(wl.value_cols),
        DeepMappingConfig(arch=cfg.dm_arch, train=cfg.dm_train, codec="z"),
        workdir=str(tmp_path_factory.mktemp(f"t4-{corr}")),
        key_space=wl.key_space(base),
    )
    dm.insert(steps[0])
    dm.insert(steps[1])
    current = pd.concat([base, steps[0], steps[1]], ignore_index=True)
    keys = random_key_batch(current, list(wl.key_cols), B, seed=2)
    return corr, dm, keys


def test_lookup_after_cross_insert(benchmark, setup):
    corr, dm, keys = setup
    benchmark.group = f"table4:{corr}"
    benchmark.extra_info["storage_mb"] = dm.nbytes_disk / 1e6
    benchmark.extra_info["aux_entries"] = dm.aux.n_entries
    benchmark(dm.lookup, keys)


def test_lookup_after_cross_insert_and_retrain(benchmark, setup):
    """DM-Z1: the structure after its one-time retrain (paper Tab. IV)."""
    corr, dm, keys = setup
    import pickle
    dm1 = pickle.loads(pickle.dumps(dm))  # independent copy with own pools
    dm1.retrain()
    benchmark.group = f"table4:{corr}"
    benchmark.extra_info["storage_mb"] = dm1.nbytes_disk / 1e6
    benchmark(dm1.lookup, keys)
