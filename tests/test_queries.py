"""Tests for lookup workload generation (repro.workloads.queries)."""
import numpy as np
import pandas as pd

from repro.workloads.queries import key_batches, random_key_batch

PDF = pd.DataFrame({"k1": np.arange(1, 101), "k2": np.arange(1, 101) % 7 + 1})


def test_batch_size():
    b = random_key_batch(PDF, ["k1"], 37, seed=0)
    assert b.shape == (37, 1)


def test_keys_exist_by_default():
    b = random_key_batch(PDF, ["k1"], 50, seed=1)
    assert np.isin(b[:, 0], PDF["k1"]).all()


def test_composite_keys_sampled_rowwise():
    b = random_key_batch(PDF, ["k1", "k2"], 50, seed=2)
    valid = set(zip(PDF["k1"], PDF["k2"]))
    assert all(tuple(r) in valid for r in b)


def test_miss_fraction_produces_misses():
    b = random_key_batch(PDF, ["k1"], 100, seed=3, miss_fraction=0.2)
    misses = ~np.isin(b[:, 0], PDF["k1"])
    assert misses.sum() == 20


def test_deterministic_seed():
    a = random_key_batch(PDF, ["k1"], 10, seed=9)
    b = random_key_batch(PDF, ["k1"], 10, seed=9)
    assert (a == b).all()


def test_key_batches_shapes():
    out = key_batches(PDF, ["k1"], [5, 10], seed=0)
    assert set(out) == {5, 10}
    assert out[5].shape == (5, 1) and out[10].shape == (10, 1)
