"""Tests for the hybrid DeepMapping structure: build and Algorithm 1 lookup."""
import numpy as np
import pandas as pd
import pytest

from repro.baselines.memory_pool import MemoryPool
from repro.core.deepmapping import DeepMapping, DeepMappingConfig
from repro.core.encoding import KeySpace
from repro.core.model import TrainConfig
from repro.core.nn import ArchSpec

CFG = DeepMappingConfig(
    arch=ArchSpec((48,), {}), train=TrainConfig(epochs=25, batch_size=256), codec="z"
)


def _relation(n=2000, seed=0):
    """Mixed learnable/unlearnable columns with string + int types."""
    rng = np.random.default_rng(seed)
    key = np.arange(1, n + 1)
    return pd.DataFrame(
        {
            "key": key,
            "easy": (key - 1) % 10 % 7,  # function of the last digit
            "hard": rng.integers(0, 5, n),  # pure noise → mostly in T_aux
            "txt": np.array(["red", "green", "blue"])[(key - 1) // 10 % 10 % 3],
        }
    )


@pytest.fixture(scope="module")
def dm(tmp_path_factory):
    df = _relation()
    return (
        DeepMapping.build(
            df, ["key"], ["easy", "hard", "txt"], CFG,
            workdir=str(tmp_path_factory.mktemp("dm")),
        ),
        df,
    )


class TestBuild:
    def test_lossless_full_scan(self, dm):
        d, df = dm
        out = d.lookup(df["key"].to_numpy())
        for c in ["easy", "hard", "txt"]:
            assert (out[c].to_numpy() == df[c].to_numpy()).all()

    def test_easy_column_memorized(self, dm):
        d, df = dm
        acc = d.accuracy_on(df)
        assert acc["easy"] > 0.95 and acc["txt"] > 0.95

    def test_noise_rows_in_aux(self, dm):
        d, _ = dm
        # the 'hard' column is noise → most tuples are misclassified rows
        assert d.aux.n_entries > 1000

    def test_storage_breakdown_keys(self, dm):
        d, _ = dm
        bd = d.storage_breakdown()
        assert set(bd) == {"model", "aux_table", "vexist", "fdecode"}
        assert all(v >= 0 for v in bd.values())
        assert d.nbytes_disk == sum(bd.values())

    def test_memorized_fraction_range(self, dm):
        d, _ = dm
        # row-level: a tuple counts only if every column is right, and the
        # noise column caps that near its majority-class rate (~1/5)
        assert 0.05 < d.memorized_fraction < 0.6

    def test_compression_ratio(self, dm):
        d, _ = dm
        assert 0 < d.compression_ratio(10**7) < 1

    def test_duplicate_keys_rejected(self, tmp_path):
        df = pd.DataFrame({"key": [1, 1], "v": [2, 3]})
        with pytest.raises(ValueError):
            DeepMapping.build(df, ["key"], ["v"], CFG, workdir=str(tmp_path))

    def test_explicit_keyspace_headroom(self, tmp_path):
        df = _relation(200)
        ks = KeySpace((1,), (1000,))
        d = DeepMapping.build(
            df, ["key"], ["easy"], CFG, workdir=str(tmp_path), key_space=ks
        )
        assert d.vexist.size == 1000
        assert d.vexist.count() == 200

    def test_residents_pinned(self, dm):
        d, _ = dm
        assert d.pool.pinned_bytes >= d.model.nbytes_resident()


class TestLookup:
    def test_nonexistent_key_null(self, dm):
        d, _ = dm
        out = d.lookup(np.array([100_000]))
        assert out["easy"][0] is None and out["txt"][0] is None

    def test_deleted_gap_key_null(self, tmp_path):
        df = _relation(100).drop(index=[49]).reset_index(drop=True)  # key 50 missing
        d = DeepMapping.build(df, ["key"], ["easy"], CFG, workdir=str(tmp_path))
        out = d.lookup(np.array([50]))
        assert out["easy"][0] is None  # existence check beats hallucination

    def test_column_subset(self, dm):
        d, df = dm
        out = d.lookup(np.array([5]), cols=["txt"])
        assert list(out.columns) == ["key", "txt"]
        assert out["txt"][0] == df["txt"][4]

    def test_duplicate_query_keys(self, dm):
        d, df = dm
        out = d.lookup(np.array([7, 7, 7]))
        assert (out["easy"].to_numpy() == df["easy"][6]).all()

    def test_empty_batch(self, dm):
        d, _ = dm
        out = d.lookup(np.empty(0, np.int64))
        assert len(out) == 0

    def test_stats_counters_advance(self, dm):
        d, df = dm
        d.stats.reset()
        d.lookup(df["key"].to_numpy()[:500])
        assert d.stats.inference_time > 0
        assert d.stats.aux_time >= 0 and d.stats.decode_time > 0

    def test_pool_budget_still_correct(self, tmp_path):
        df = _relation(1500, seed=3)
        pool = MemoryPool(32 * 1024)
        d = DeepMapping.build(
            df, ["key"], ["easy", "hard"], CFG, workdir=str(tmp_path), pool=pool
        )
        out = d.lookup(df["key"].to_numpy())
        assert (out["hard"].to_numpy() == df["hard"].to_numpy()).all()


class TestCompositeKey:
    def test_composite_lossless(self, tmp_path):
        n_o, n_l = 300, 4
        keys = np.array([[o, l] for o in range(1, n_o + 1) for l in range(1, n_l + 1)])
        rng = np.random.default_rng(1)
        df = pd.DataFrame(
            {
                "ok": keys[:, 0], "ln": keys[:, 1],
                "v": rng.integers(0, 6, len(keys)),
            }
        )
        d = DeepMapping.build(
            df, ["ok", "ln"], ["v"],
            DeepMappingConfig(arch=ArchSpec((32,), {}), train=TrainConfig(epochs=5)),
            workdir=str(tmp_path),
        )
        out = d.lookup(keys)
        assert (out["v"].to_numpy() == df["v"].to_numpy()).all()
        miss = d.lookup(np.array([[n_o + 1, 1]]))
        assert miss["v"][0] is None


class TestRangeQuery:
    def test_range_matches_pandas(self, dm):
        d, df = dm
        lo, hi = 100, 160  # dense = key - 1
        out = d.lookup_range(lo, hi)
        expect = df[(df["key"] >= lo + 1) & (df["key"] <= hi)]
        assert len(out) == len(expect)
        assert (out["easy"].to_numpy() == expect["easy"].to_numpy()).all()

    def test_range_respects_deletion_gaps(self, tmp_path):
        df = _relation(100)
        df = df[~df["key"].isin([10, 11])].reset_index(drop=True)
        d = DeepMapping.build(df, ["key"], ["easy"], CFG, workdir=str(tmp_path))
        out = d.lookup_range(5, 15)  # dense 5..14 → keys 6..15 minus 10, 11
        assert set(out["key"]) == {6, 7, 8, 9, 12, 13, 14, 15}

    def test_empty_range(self, dm):
        d, _ = dm
        assert len(d.lookup_range(5, 5)) == 0


class TestSerialization:
    def test_pickle_roundtrip_lookup(self, dm):
        import pickle
        d, df = dm
        d2 = pickle.loads(pickle.dumps(d))
        out = d2.lookup(df["key"].to_numpy()[:100])
        assert (out["hard"].to_numpy() == df["hard"].to_numpy()[:100]).all()
