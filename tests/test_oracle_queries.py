"""DuckDB-oracle correctness for lookups over the paper workloads.

Every store (learned and baseline) must agree with the SQL point-lookup
semantics ``SELECT ... FROM data WHERE key IN (batch)`` executed by
DuckDB over the same relation — 'it ran' is not 'it is correct'.
"""
import numpy as np
import pandas as pd
import pytest

from repro.core.model import TrainConfig
from repro.core.nn import ArchSpec
from repro.experiments.harness import ExperimentConfig, build_method
from repro.oracle import assert_equivalent
from repro.workloads.datasets import REGISTRY
from repro.workloads.queries import random_key_batch

SF = 0.003
CFG = ExperimentConfig(
    dm_arch=ArchSpec((32,), {}), dm_train=TrainConfig(epochs=12, batch_size=256)
)

CASES = [
    ("tpch_orders", "AB"),
    ("tpch_orders", "ABC-L"),
    ("tpch_orders", "DM-Z"),
    ("tpch_part", "HB"),
    ("tpch_part", "DM-Z"),
    ("tpcds_customer_demographics", "DM-Z"),
    ("tpcds_catalog_returns", "ABC-D"),
    ("tpcds_catalog_returns", "DM-L"),
    ("synth_single_high", "DM-Z"),
    ("synth_multi_low", "HBC-Z"),
    ("synth_multi_low", "DM-Z"),
]


@pytest.fixture(scope="module")
def frames(spark):
    names = sorted({w for w, _ in CASES})
    return {name: REGISTRY[name].pandas(spark, SF) for name in names}


@pytest.mark.parametrize("wname,method", CASES, ids=[f"{w}-{m}" for w, m in CASES])
def test_store_matches_duckdb(spark, frames, tmp_path, wname, method):
    wl = REGISTRY[wname]
    pdf = frames[wname]
    adapter = build_method(method, wl, pdf, str(tmp_path), cfg=CFG)

    qkeys = np.unique(
        random_key_batch(pdf, list(wl.key_cols), 300, seed=7), axis=0
    )
    found, vals = adapter.lookup(qkeys)
    assert found.all()
    got = pd.DataFrame({k: qkeys[:, i] for i, k in enumerate(wl.key_cols)})
    for c in wl.value_cols:
        got[c] = vals[c]
    got_sdf = spark.createDataFrame(got)

    on = " AND ".join(f"q.{k} = t.{k}" for k in wl.key_cols)
    proj = ", ".join([f"q.{k} AS {k}" for k in wl.key_cols]
                     + [f"t.{c} AS {c}" for c in wl.value_cols])
    assert_equivalent(
        got_sdf,
        f"SELECT {proj} FROM queries q JOIN data t ON {on}",
        queries=got[[*wl.key_cols]],
        data=pdf,
    )


def test_oracle_rejects_wrong_values(spark, frames, tmp_path):
    wl = REGISTRY["tpch_orders"]
    pdf = frames["tpch_orders"]
    adapter = build_method("AB", wl, pdf, str(tmp_path), cfg=CFG)
    qkeys = np.unique(random_key_batch(pdf, list(wl.key_cols), 50, seed=3), axis=0)
    _, vals = adapter.lookup(qkeys)
    got = pd.DataFrame({"o_orderkey": qkeys[:, 0]})
    for c in wl.value_cols:
        got[c] = vals[c]
    got["o_custkey"] = np.asarray(got["o_custkey"], dtype=np.int64) + 1  # corrupt
    with pytest.raises(AssertionError):
        assert_equivalent(
            spark.createDataFrame(got),
            "SELECT q.o_orderkey AS o_orderkey, t.o_custkey AS o_custkey, "
            "t.o_orderstatus AS o_orderstatus, t.o_orderpriority AS o_orderpriority, "
            "t.o_orderdate_days AS o_orderdate_days "
            "FROM queries q JOIN data t ON q.o_orderkey = t.o_orderkey",
            queries=got[["o_orderkey"]],
            data=pdf,
        )
