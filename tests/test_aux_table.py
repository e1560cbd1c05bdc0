"""Tests for the row-level auxiliary table (repro.core.aux_table)."""
import numpy as np
import pytest

from repro.baselines.memory_pool import MemoryPool
from repro.core.aux_table import AuxTable


@pytest.fixture
def aux(tmp_path):
    t = AuxTable(str(tmp_path), codec="z", partition_bytes=2048)
    t.build(
        np.array([5, 1, 9]),
        {
            "a": np.array([50, 10, 90], dtype=np.int32),
            "b": np.array([5, 1, 9], dtype=np.int32),
        },
    )
    return t


def test_lookup_found_all_columns(aux):
    mask, codes = aux.lookup(np.array([1, 5, 9]))
    assert mask.all()
    assert codes["a"].tolist() == [10, 50, 90]
    assert codes["b"].tolist() == [1, 5, 9]


def test_lookup_missing(aux):
    mask, codes = aux.lookup(np.array([2, 3]))
    assert not mask.any() and len(codes["a"]) == 0


def test_lookup_mixed_order_preserved(aux):
    mask, codes = aux.lookup(np.array([9, 4, 1]))
    assert mask.tolist() == [True, False, True]
    assert codes["a"].tolist() == [90, 10]  # found keys in query order


def test_contains(aux):
    assert aux.contains(np.array([5, 6])).tolist() == [True, False]


def test_n_entries(aux):
    assert aux.n_entries == 3


def test_apply_upsert_new(aux):
    aux.apply(
        upsert_keys=np.array([7]),
        upsert_codes={"a": np.array([70]), "b": np.array([7])},
    )
    mask, codes = aux.lookup(np.array([7]))
    assert mask.all() and codes["a"].tolist() == [70]
    assert aux.n_entries == 4


def test_apply_upsert_overwrites(aux):
    aux.apply(
        upsert_keys=np.array([5]),
        upsert_codes={"a": np.array([55]), "b": np.array([5])},
    )
    _, codes = aux.lookup(np.array([5]))
    assert codes["a"].tolist() == [55]
    assert aux.n_entries == 3  # no duplicate entry


def test_apply_remove(aux):
    aux.apply(remove_keys=np.array([5, 9]))
    assert aux.n_entries == 1
    assert not aux.contains(np.array([5]))[0]


def test_remove_keys(aux):
    aux.remove_keys(np.array([1, 9]))
    assert aux.n_entries == 1
    assert aux.contains(np.array([5]))[0]


def test_rebuild_invalidates_stale_cache(tmp_path):
    pool = MemoryPool(None)
    t = AuxTable(str(tmp_path), pool=pool)
    t.build(np.array([1]), {"a": np.array([10], dtype=np.int32)})
    t.lookup(np.array([1]))  # warm the cache
    t.apply(upsert_keys=np.array([1]), upsert_codes={"a": np.array([99])})
    _, codes = t.lookup(np.array([1]))
    assert codes["a"].tolist() == [99]


def test_keys_sorted_within_store(aux):
    payload = aux._store._load_partition(0)
    assert (np.diff(payload["keys"]) > 0).all()


def test_master_roundtrip(aux):
    keys, codes = aux.master()
    assert keys.tolist() == [1, 5, 9]
    assert codes["a"].tolist() == [10, 50, 90]


def test_nbytes_disk_positive_and_grows(aux):
    before = aux.nbytes_disk
    aux.apply(
        upsert_keys=np.arange(100, 1100),
        upsert_codes={
            "a": np.arange(1000, dtype=np.int32),
            "b": np.arange(1000, dtype=np.int32),
        },
    )
    assert aux.nbytes_disk > before


def test_empty_build(tmp_path):
    t = AuxTable(str(tmp_path))
    t.build(np.empty(0, np.int64), {"a": np.empty(0, np.int32)})
    mask, _ = t.lookup(np.array([1, 2]))
    assert not mask.any()
    assert t.nbytes_disk == 0


def test_compression_applied(tmp_path):
    keys = np.arange(50_000)
    codes = {"a": np.zeros(50_000, dtype=np.int32)}
    tz = AuxTable(str(tmp_path), codec="z")
    tn = AuxTable(str(tmp_path), codec="none")
    tz.build(keys, dict(codes))
    tn.build(keys, dict(codes))
    assert tz.nbytes_disk < tn.nbytes_disk / 3


def test_row_level_stores_key_once(tmp_path):
    """A misclassified tuple costs one key entry regardless of column count
    (the Algorithm 1 row-level layout)."""
    keys = np.arange(10_000)
    many = {f"c{i}": np.zeros(10_000, dtype=np.int32) for i in range(4)}
    one = {"c0": np.zeros(10_000, dtype=np.int32)}
    t4 = AuxTable(str(tmp_path), codec="none")
    t1 = AuxTable(str(tmp_path), codec="none")
    t4.build(keys, many)
    t1.build(keys, one)
    # 4 columns cost 3 extra int32 arrays, NOT 3 extra key arrays
    assert t4.nbytes_disk - t1.nbytes_disk < 3 * 4 * 10_000 * 1.2
