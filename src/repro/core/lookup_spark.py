"""Spark integration: distributed build and batch lookup (Algorithm 1,
"(Parallel) Batch Key Lookup").

The hybrid structure is a read-only object once built, so it is shipped
to executors with ``SparkContext.broadcast`` (memory pools drop their
runtime caches on pickle; partition files live on the shared local FS).
Lookups then run as an Arrow-backed ``mapInPandas`` over the query-key
DataFrame — the paper's batched, parallel inference path. The build-side
misclassification sweep (every key run through the trained model) is also
expressed as ``mapInPandas`` so Catalyst scans the relation once.
"""
from __future__ import annotations

from typing import Iterator

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession
from pyspark.sql import types as T

from .deepmapping import DeepMapping, DeepMappingConfig
from .encoding import KeySpace, LabelCodec
from .model import train_model
from ..baselines.memory_pool import MemoryPool
from .aux_table import AuxTable
from .bitvector import BitVector

__all__ = ["lookup_distributed", "build_distributed", "misclassified_distributed"]


def _spark_type_for(values: np.ndarray) -> T.DataType:
    kind = np.asarray(values).dtype.kind
    if kind in "iu":
        return T.LongType()
    if kind == "f":
        return T.DoubleType()
    if kind == "b":
        return T.BooleanType()
    return T.StringType()


def lookup_distributed(
    spark: SparkSession, dm: DeepMapping, keys_df: DataFrame, cols: list[str] | None = None
) -> DataFrame:
    """Answer a DataFrame of query keys with a DataFrame of values.

    ``keys_df`` must contain the structure's key columns. Non-existing
    keys yield NULL values (Algorithm 1 line 10).
    """
    cols = cols or dm.value_cols
    bc = spark.sparkContext.broadcast(dm)
    key_cols = dm.key_cols
    fields = [T.StructField(k, T.LongType(), False) for k in key_cols]
    for c in cols:
        fields.append(T.StructField(c, _spark_type_for(dm.codecs[c].classes_), True))
    schema = T.StructType(fields)

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = bc.value
        for pdf in batches:
            if len(pdf) == 0:
                continue
            res = local.lookup(pdf[key_cols].to_numpy(), cols)
            for c in cols:  # object→native for Arrow
                if local.codecs[c].classes_.dtype.kind in "iu":
                    res[c] = pd.array(
                        [None if v is None else int(v) for v in res[c]], dtype="Int64"
                    )
            yield res

    return keys_df.select(*key_cols).mapInPandas(run, schema=schema)


def misclassified_distributed(
    spark: SparkSession,
    sdf: DataFrame,
    key_cols: list[str],
    value_cols: list[str],
    key_space: KeySpace,
    codecs: dict[str, LabelCodec],
    model_bytes: bytes,
) -> tuple[np.ndarray, dict[str, np.ndarray]]:
    """Run every key of ``sdf`` through the model on executors and collect
    the misclassified tuples: dense keys plus the correct codes of all
    value columns (row-level, as ``T_aux`` stores them)."""
    from .model import MappingModel

    bc = spark.sparkContext.broadcast((model_bytes, key_space, codecs))
    schema = T.StructType(
        [T.StructField("dense_key", T.LongType(), False)]
        + [T.StructField(f"code_{c}", T.IntegerType(), False) for c in value_cols]
    )

    def run(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        mb, ks, cds = bc.value
        model = MappingModel.from_bytes(mb)
        for pdf in batches:
            if len(pdf) == 0:
                continue
            dense = ks.dense_index(pdf[key_cols].to_numpy())
            pred = model.predict(ks.features_from_dense(dense))
            codes = {c: cds[c].encode(pdf[c]) for c in value_cols}
            wrong = np.zeros(len(dense), dtype=bool)
            for c in value_cols:
                wrong |= pred[c] != codes[c]
            out = {"dense_key": dense[wrong]}
            for c in value_cols:
                out[f"code_{c}"] = codes[c][wrong].astype(np.int32)
            yield pd.DataFrame(out)

    res = sdf.select(*key_cols, *value_cols).mapInPandas(run, schema=schema).toPandas()
    return (
        res["dense_key"].to_numpy(np.int64),
        {c: res[f"code_{c}"].to_numpy(np.int32) for c in value_cols},
    )


def build_distributed(
    spark: SparkSession,
    sdf: DataFrame,
    key_cols: list[str],
    value_cols: list[str],
    config: DeepMappingConfig = DeepMappingConfig(),
    *,
    workdir: str,
    pool: MemoryPool | None = None,
    key_space: KeySpace | None = None,
) -> DeepMapping:
    """Spark-side hybrid build: dictionaries from Spark SQL ``DISTINCT``,
    model trained on the driver (the paper trains centrally too), and the
    misclassification sweep distributed via ``mapInPandas``."""
    pool = pool if pool is not None else MemoryPool(None)
    pdf_keys = sdf.select(*key_cols, *value_cols).toPandas()
    ks = key_space or KeySpace.from_columns(pdf_keys, key_cols)
    dense = ks.dense_index(pdf_keys[key_cols].to_numpy())
    if len(np.unique(dense)) != len(dense):
        raise ValueError("key columns do not uniquely identify rows")

    codecs = {}
    for c in value_cols:  # Catalyst DISTINCT per column
        vals = [r[0] for r in sdf.select(c).distinct().collect()]
        codecs[c] = LabelCodec(np.asarray(vals))
    codes = {c: codecs[c].encode(pdf_keys[c]) for c in value_cols}
    n_classes = {c: codecs[c].n_classes for c in value_cols}
    model = train_model(ks, dense, codes, n_classes, config.arch, config.train)

    mis_keys, mis_codes = misclassified_distributed(
        spark, sdf, key_cols, value_cols, ks, codecs, model.to_bytes()
    )
    aux = AuxTable(
        workdir, codec=config.codec, partition_bytes=config.partition_bytes, pool=pool
    )
    aux.build(mis_keys, mis_codes)
    vexist = BitVector(ks.size)
    vexist.set(dense)
    return DeepMapping(
        ks, key_cols, value_cols, model, codecs, aux, vexist, config, workdir, pool
    )
