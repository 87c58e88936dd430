"""Tests for the synthetic data generators (provided + extensions)."""
import numpy as np
import pytest

from repro import synth_data as sd


class TestStreamArray:
    KINDS = ["permutation", "sorted", "reversed", "uniform", "lognormal", "zipf_values"]

    @pytest.mark.parametrize("kind", KINDS)
    def test_length_and_dtype(self, kind):
        a = sd.stream_array(kind, 1000, seed=1)
        assert a.shape == (1000,) and a.dtype == np.float64

    @pytest.mark.parametrize("kind", KINDS)
    def test_deterministic_in_seed(self, kind):
        assert np.array_equal(
            sd.stream_array(kind, 500, seed=7), sd.stream_array(kind, 500, seed=7)
        )

    def test_permutation_is_1_to_n(self):
        a = sd.stream_array("permutation", 256, seed=2)
        assert set(a) == set(range(1, 257))

    def test_sorted_orders(self):
        assert np.all(np.diff(sd.stream_array("sorted", 100)) > 0)
        assert np.all(np.diff(sd.stream_array("reversed", 100)) < 0)

    def test_lognormal_heavy_tail(self):
        a = sd.stream_array("lognormal", 50_000, seed=3)
        assert np.all(a > 0)
        # p99.9 / median is large — long tail, the latency story.
        assert np.quantile(a, 0.999) / np.quantile(a, 0.5) > 20

    def test_unknown_kind(self):
        with pytest.raises(ValueError):
            sd.stream_array("nope", 10)


class TestStreamDf:
    def test_schema_and_count(self, spark):
        df = sd.stream_df(spark, "uniform", 2000, seed=4)
        assert df.columns == ["x"]
        assert df.count() == 2000

    def test_partitioning(self, spark):
        df = sd.stream_df(spark, "uniform", 2000, seed=4, num_partitions=8)
        assert df.rdd.getNumPartitions() == 8

    def test_values_match_array(self, spark):
        arr = sd.stream_array("permutation", 500, seed=5)
        df = sd.stream_df(spark, "permutation", 500, seed=5)
        got = np.sort(np.array([r["x"] for r in df.collect()]))
        assert np.array_equal(got, np.sort(arr))


class TestTpchLite:
    def test_lineitem_sf_scales(self, spark):
        small = sd.lineitem(spark, sf=0.001).count()
        assert small == 6000

    def test_lineitem_columns(self, spark):
        cols = sd.lineitem(spark, sf=0.001).columns
        assert "l_extendedprice" in cols and "l_returnflag" in cols

    def test_orders_deterministic(self, spark):
        a = sd.orders(spark, sf=0.001).toPandas()
        b = sd.orders(spark, sf=0.001).toPandas()
        assert a.equals(b)
