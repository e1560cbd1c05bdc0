"""Benchmark for paper Table I: batch lookup latency when the dataset
exceeds the memory pool (pool = 30% of raw bytes)."""
import pytest

from .common import BENCH_CFG_EXCEEDS, build_stores

METHODS = ["AB", "HB", "ABC-D", "ABC-G", "ABC-Z", "ABC-L", "HBC-Z", "DS", "DM-Z", "DM-L"]
WORKLOADS = ["synth_multi_low", "synth_multi_high", "tpch_lineitem"]


@pytest.fixture(scope="module", params=WORKLOADS)
def setup(request, spark, tmp_path_factory):
    wl, pdf, stores, keys = build_stores(
        spark, request.param, METHODS,
        str(tmp_path_factory.mktemp(f"t1-{request.param}")), BENCH_CFG_EXCEEDS,
    )
    return request.param, stores, keys


@pytest.mark.parametrize("method", METHODS)
def test_lookup_exceeds_memory(benchmark, setup, method):
    name, stores, keys = setup
    adapter = stores[method]
    benchmark.group = f"table1:{name}"
    benchmark.extra_info["storage_mb"] = adapter.nbytes_disk / 1e6
    benchmark(adapter.lookup, keys)
