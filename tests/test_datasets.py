"""Tests for the paper workload generators and the registry (Spark-backed)."""
import numpy as np
import pytest

from repro import synth_data as sd
from repro.workloads.datasets import REGISTRY, get_workload, uncompressed_nbytes

SF = 0.005


@pytest.fixture(scope="module")
def frames(spark):
    """Build every registry workload once at tiny scale."""
    return {name: wl.pandas(spark, SF) for name, wl in REGISTRY.items()}


@pytest.mark.parametrize("name", sorted(REGISTRY))
def test_workload_nonempty_with_columns(frames, name):
    wl, pdf = REGISTRY[name], frames[name]
    assert len(pdf) > 0
    for c in wl.key_cols + wl.value_cols:
        assert c in pdf.columns


@pytest.mark.parametrize("name", sorted(REGISTRY))
def test_keys_unique(frames, name):
    wl, pdf = REGISTRY[name], frames[name]
    assert not pdf.duplicated(subset=list(wl.key_cols)).any()


@pytest.mark.parametrize("name", sorted(REGISTRY))
def test_key_space_covers_data(frames, name):
    wl, pdf = REGISTRY[name], frames[name]
    ks = wl.key_space(pdf)
    dense = ks.dense_index(pdf[list(wl.key_cols)].to_numpy())
    assert len(np.unique(dense)) == len(pdf)
    assert dense.max() < ks.size


@pytest.mark.parametrize("name", sorted(REGISTRY))
def test_integer_key_columns(frames, name):
    wl, pdf = REGISTRY[name], frames[name]
    for c in wl.key_cols:
        assert np.issubdtype(pdf[c].dtype, np.integer), c


def test_registry_lookup_errors():
    with pytest.raises(KeyError):
        get_workload("nope")
    assert get_workload("crop").name == "crop"


def test_scaling_grows_rows(spark):
    small = sd.orders_keyed(spark, sf=0.002).count()
    big = sd.orders_keyed(spark, sf=0.004).count()
    assert big > small


def test_determinism(spark):
    a = sd.catalog_sales(spark, sf=0.002).toPandas()
    b = sd.catalog_sales(spark, sf=0.002).toPandas()
    assert a.equals(b)


class TestLineitem:
    def test_composite_key_unique(self, frames):
        pdf = frames["tpch_lineitem"]
        assert not pdf.duplicated(["l_orderkey", "l_linenumber"]).any()

    def test_lines_per_order_in_range(self, frames):
        counts = frames["tpch_lineitem"].groupby("l_orderkey").size()
        assert counts.between(1, 7).all()

    def test_no_float_attributes(self, frames):
        # the paper removes float attributes; everything is int or string
        for dtype in frames["tpch_lineitem"].dtypes:
            assert dtype.kind in "iuO", dtype


class TestCustomerDemographics:
    def test_cross_product_structure(self, frames):
        """Attributes are deterministic mixed-radix digits of cd_demo_sk."""
        pdf = frames["tpcds_customer_demographics"]
        sk = pdf["cd_demo_sk"].to_numpy() - 1
        rem = sk.copy()
        for name, vals in reversed(sd._CD_DIMS):
            assert (pdf[name].to_numpy() == vals[rem % len(vals)]).all(), name
            rem //= len(vals)

    def test_feature_radices_cover(self, frames):
        wl = REGISTRY["tpcds_customer_demographics"]
        ks = wl.key_space(frames["tpcds_customer_demographics"])
        assert ks.feature_radices is not None
        assert int(np.prod(ks.feature_radices)) >= ks.size

    def test_gender_alternates(self, frames):
        pdf = frames["tpcds_customer_demographics"]
        g = pdf.sort_values("cd_demo_sk")["cd_gender"].to_numpy()[:10]
        # innermost dimension in the generator loop alternates fastest or
        # slowest depending on dim order — it must be exactly periodic
        period_vals = set(map(tuple, [g[:2], g[2:4], g[4:6]]))
        assert len(period_vals) == 1


class TestSynthCorrelation:
    def test_high_corr_is_noisy_periodic(self, spark):
        pdf = sd.synth_correlation(
            spark, n=5000, n_value_cols=2, correlated=True, noise=0.02, seed=1
        ).toPandas()
        key = pdf["key"].to_numpy()
        clean0 = (key - 1) % 10 % 7
        agree = (pdf["v0"].to_numpy() == clean0).mean()
        assert 0.95 < agree < 1.0  # periodic up to the noise fraction

    def test_low_corr_not_periodic(self, spark):
        pdf = sd.synth_correlation(
            spark, n=5000, n_value_cols=1, correlated=False, seed=2
        ).toPandas()
        key = pdf["key"].to_numpy()
        clean0 = (key - 1) % 10 % 7
        assert (pdf["v0"].to_numpy() == clean0).mean() < 0.5

    def test_zero_noise_fully_deterministic(self, spark):
        pdf = sd.synth_correlation(
            spark, n=1000, n_value_cols=1, correlated=True, noise=0.0, seed=3
        ).toPandas()
        key = pdf["key"].to_numpy()
        assert (pdf["v0"].to_numpy() == (key - 1) % 10 % 7).all()


class TestCrop:
    def test_spatially_autocorrelated(self, spark):
        pdf = sd.crop_raster(spark, side=64, block=16, noise=0.0).toPandas()
        grid = (
            pdf.pivot(index="lat", columns="lon", values="crop_type").to_numpy()
        )
        # with zero noise, horizontal neighbours agree except at block edges
        agree = (grid[:, :-1] == grid[:, 1:]).mean()
        assert agree > 0.9

    def test_composite_latlon_key(self, frames):
        pdf = frames["crop"]
        assert not pdf.duplicated(["lat", "lon"]).any()

    def test_crop_types_are_strings(self, frames):
        assert frames["crop"]["crop_type"].map(lambda s: isinstance(s, str)).all()


def test_uncompressed_nbytes_counts_strings():
    import pandas as pd
    pdf = pd.DataFrame({"a": np.arange(10, dtype=np.int64), "s": ["xy"] * 10})
    assert uncompressed_nbytes(pdf) == 80 + 20


def test_uncompressed_nbytes_monotone(frames):
    pdf = frames["tpch_orders"]
    assert uncompressed_nbytes(pdf.iloc[:10]) < uncompressed_nbytes(pdf)
