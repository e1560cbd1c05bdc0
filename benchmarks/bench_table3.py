"""Benchmark for paper Table III: lookup latency after inserting data that
follows the original distribution (DeepMapping evolves via Algorithm 3),
plus the insertion operation itself (paper Fig. 8)."""
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
        base_corr=corr == "high", insert_corr=corr == "high",
    )
    cfg = BENCH_CFG_EXCEEDS
    dm = DeepMapping.build(
        base, list(wl.key_cols), list(wl.value_cols),
        DeepMappingConfig(arch=cfg.dm_arch, train=cfg.dm_train, codec="z"),
        workdir=str(tmp_path_factory.mktemp(f"t3-{corr}")),
        key_space=wl.key_space(base),
    )
    dm.insert(steps[0])
    import pandas as pd
    current = pd.concat([base, steps[0]], ignore_index=True)
    keys = random_key_batch(current, list(wl.key_cols), B, seed=1)
    return corr, dm, steps[1], keys


def test_lookup_after_insert(benchmark, setup):
    corr, dm, _, keys = setup
    benchmark.group = f"table3:{corr}:lookup"
    benchmark.extra_info["storage_mb"] = dm.nbytes_disk / 1e6
    benchmark(dm.lookup, keys)


def test_insert_throughput(benchmark, setup):
    """Fig. 8 companion: DM-Z insertion cost (no retraining)."""
    corr, dm, next_batch, _ = setup
    benchmark.group = f"table3:{corr}:insert"
    counter = {"i": 0}

    def do_insert():
        # shift keys each round so inserts never collide
        batch = next_batch.copy()
        batch["key"] = batch["key"] + counter["i"] * len(batch) * 2
        counter["i"] += 1
        dm.insert(batch)

    benchmark.pedantic(do_insert, rounds=3, iterations=1)
