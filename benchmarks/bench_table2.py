"""Benchmark for paper Table II: batch lookup latency when the dataset
fits in memory (unbounded pool)."""
import pytest

from .common import BENCH_CFG_FITS, build_stores

METHODS = ["AB", "HB", "ABC-Z", "ABC-L", "HBC-Z", "DM-Z", "DM-L"]
WORKLOADS = ["tpch_orders", "tpcds_customer_demographics", "tpcds_catalog_returns"]


@pytest.fixture(scope="module", params=WORKLOADS)
def setup(request, spark, tmp_path_factory):
    wl, pdf, stores, keys = build_stores(
        spark, request.param, METHODS,
        str(tmp_path_factory.mktemp(f"t2-{request.param}")), BENCH_CFG_FITS,
    )
    # warm: the fits-memory regime measures resident lookups
    for st in stores.values():
        st.lookup(keys)
    return request.param, stores, keys


@pytest.mark.parametrize("method", METHODS)
def test_lookup_fits_memory(benchmark, setup, method):
    name, stores, keys = setup
    adapter = stores[method]
    benchmark.group = f"table2:{name}"
    benchmark.extra_info["storage_mb"] = adapter.nbytes_disk / 1e6
    benchmark(adapter.lookup, keys)
