"""Registry of the paper's evaluation workloads (Sec. V-A.1), scaled.

Each :class:`Workload` names its key/value columns, builds the relation
as a Spark DataFrame at a scale factor, and carries the DeepMapping
encoding hints (key-space headroom for insertions, feature radices for
radix-periodic data). The paper's workload → registry name mapping:

* TPC-H Lineitem / Orders / Part            → ``tpch_lineitem`` / ``tpch_orders`` / ``tpch_part``
* TPC-DS Catalog_sales / Catalog_returns /
  Customer_demographics                     → ``tpcds_catalog_sales`` / ``tpcds_catalog_returns`` / ``tpcds_customer_demographics``
* Synthetic single/multi-column × low/high
  correlation                               → ``synth_{single,multi}_{low,high}``
* Real-world crop dataset                   → ``crop``
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from .. import synth_data as sd
from ..core.encoding import KeySpace

__all__ = ["Workload", "REGISTRY", "get_workload", "uncompressed_nbytes"]

# rows per scale factor in the synthetic-correlation datasets (paper: 1 GB
# and 10 GB; ours: ~sf × this many rows, see DESIGN.md §2.8)
_SYNTH_ROWS_PER_SF = 2_000_000


@dataclass(frozen=True)
class Workload:
    name: str
    key_cols: tuple[str, ...]
    value_cols: tuple[str, ...]
    build: Callable[[SparkSession, float], DataFrame]
    # multiply each key component's observed cardinality by this factor when
    # deriving the KeySpace, leaving V_exist headroom for insertions
    key_headroom: float = 1.0
    # optional mixed radices for the NN input encoding (DESIGN.md §6)
    feature_radices: tuple[int, ...] | None = None

    def dataframe(self, spark: SparkSession, sf: float = 0.01) -> DataFrame:
        return self.build(spark, sf)

    def pandas(self, spark: SparkSession, sf: float = 0.01) -> pd.DataFrame:
        return self.dataframe(spark, sf).toPandas()

    def key_space(self, pdf: pd.DataFrame) -> KeySpace:
        ks = KeySpace.from_columns(pdf, list(self.key_cols))
        if self.key_headroom != 1.0:
            cards = tuple(
                int(np.ceil(c * self.key_headroom)) for c in ks.cards
            )
            ks = KeySpace(ks.lows, cards)
        if self.feature_radices is not None:
            radices = list(self.feature_radices)
            prod = int(np.prod(radices))
            while prod < ks.size:  # headroom grows the leading radix
                radices[0] *= 2
                prod *= 2
            ks = ks.with_radices(tuple(radices))
        return ks


def _cd_radices() -> tuple[int, ...]:
    return tuple(len(vals) for _, vals in sd._CD_DIMS)


REGISTRY: dict[str, Workload] = {
    "tpch_lineitem": Workload(
        "tpch_lineitem",
        ("l_orderkey", "l_linenumber"),
        ("l_partkey", "l_quantity", "l_returnflag", "l_linestatus", "l_shipdate_days"),
        lambda spark, sf: sd.lineitem_keyed(spark, sf=sf),
        key_headroom=2.0,
    ),
    "tpch_orders": Workload(
        "tpch_orders",
        ("o_orderkey",),
        ("o_custkey", "o_orderstatus", "o_orderpriority", "o_orderdate_days"),
        lambda spark, sf: sd.orders_keyed(spark, sf=sf),
        key_headroom=2.0,
    ),
    "tpch_part": Workload(
        "tpch_part",
        ("p_partkey",),
        ("p_type", "p_brand", "p_size"),
        lambda spark, sf: sd.part(spark, sf=sf),
        key_headroom=2.0,
    ),
    "tpcds_catalog_sales": Workload(
        "tpcds_catalog_sales",
        ("cs_order_number",),
        ("cs_item_sk", "cs_call_center_sk", "cs_ship_mode_sk", "cs_warehouse_sk", "cs_quantity"),
        lambda spark, sf: sd.catalog_sales(spark, sf=sf),
        key_headroom=2.0,
    ),
    "tpcds_catalog_returns": Workload(
        "tpcds_catalog_returns",
        ("cr_order_number",),
        ("cr_return_quantity", "cr_reason_sk", "cr_call_center_sk"),
        lambda spark, sf: sd.catalog_returns(spark, sf=sf),
        key_headroom=2.0,
    ),
    "tpcds_customer_demographics": Workload(
        "tpcds_customer_demographics",
        ("cd_demo_sk",),
        tuple(name for name, _ in sd._CD_DIMS),
        lambda spark, sf: sd.customer_demographics(spark, sf=sf),
        key_headroom=1.0,
        feature_radices=_cd_radices(),
    ),
    "synth_single_low": Workload(
        "synth_single_low",
        ("key",),
        ("v0",),
        lambda spark, sf: sd.synth_correlation(
            spark, n=max(1, int(_SYNTH_ROWS_PER_SF * sf)), n_value_cols=1,
            correlated=False, seed=31,
        ),
        key_headroom=2.0,
    ),
    "synth_single_high": Workload(
        "synth_single_high",
        ("key",),
        ("v0",),
        lambda spark, sf: sd.synth_correlation(
            spark, n=max(1, int(_SYNTH_ROWS_PER_SF * sf)), n_value_cols=1,
            correlated=True, seed=32,
        ),
        key_headroom=2.0,
    ),
    "synth_multi_low": Workload(
        "synth_multi_low",
        ("key",),
        ("v0", "v1", "v2", "v3"),
        lambda spark, sf: sd.synth_correlation(
            spark, n=max(1, int(_SYNTH_ROWS_PER_SF * sf)), n_value_cols=4,
            correlated=False, seed=33,
        ),
        key_headroom=2.0,
    ),
    "synth_multi_high": Workload(
        "synth_multi_high",
        ("key",),
        ("v0", "v1", "v2", "v3"),
        lambda spark, sf: sd.synth_correlation(
            spark, n=max(1, int(_SYNTH_ROWS_PER_SF * sf)), n_value_cols=4,
            correlated=True, seed=34,
        ),
        key_headroom=2.0,
    ),
    "crop": Workload(
        "crop",
        ("lat", "lon"),
        ("crop_type",),
        lambda spark, sf: sd.crop_raster(spark, side=max(16, int(1024 * np.sqrt(sf)))),
        key_headroom=1.0,
    ),
}


def get_workload(name: str) -> Workload:
    try:
        return REGISTRY[name]
    except KeyError:
        raise KeyError(f"unknown workload {name!r}; known: {sorted(REGISTRY)}") from None


def uncompressed_nbytes(pdf: pd.DataFrame) -> int:
    """Raw (serialized-array) size of a relation — the size(D) of Eq. 1 and
    the '1.0 compression ratio' reference. Object (string) columns count
    their actual character payload."""
    total = 0
    for c in pdf.columns:
        v = pdf[c].to_numpy()
        if v.dtype == object:
            total += int(sum(len(str(x)) for x in v))
        else:
            total += int(v.nbytes)
    return total
