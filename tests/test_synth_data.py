"""Data generators: determinism, schema, distribution properties."""
import numpy as np
import pytest

from repro import synth_data


class TestNpGroupbyInput:
    @pytest.mark.parametrize("dist", ["uniform12", "exp1", "mixed", "prices"])
    def test_deterministic(self, dist):
        a = synth_data.np_groupby_input(1000, 10, dist=dist, seed=5)
        b = synth_data.np_groupby_input(1000, 10, dist=dist, seed=5)
        assert np.array_equal(a[0], b[0]) and np.array_equal(a[1], b[1])

    def test_key_range(self):
        keys, _ = synth_data.np_groupby_input(5000, 37, seed=1)
        assert keys.min() >= 0 and keys.max() < 37

    def test_uniform12_support(self):
        _, v = synth_data.np_groupby_input(5000, 4, dist="uniform12", seed=2)
        assert v.min() >= 1.0 and v.max() < 2.0

    def test_exp1_positive_mean_one(self):
        _, v = synth_data.np_groupby_input(50000, 4, dist="exp1", seed=3)
        assert v.min() > 0 and abs(v.mean() - 1.0) < 0.05

    def test_prices_two_decimals(self):
        _, v = synth_data.np_groupby_input(1000, 4, dist="prices", seed=4)
        assert np.allclose(v, np.round(v, 2))

    def test_mixed_wide_range(self):
        _, v = synth_data.np_groupby_input(20000, 4, dist="mixed", seed=5)
        assert v.max() / v.min() > 1e12

    def test_dtype(self):
        _, v = synth_data.np_groupby_input(100, 4, dtype=np.float32)
        assert v.dtype == np.float32

    def test_unknown_dist(self):
        with pytest.raises(ValueError):
            synth_data.np_groupby_input(10, 2, dist="nope")


class TestSparkGenerators:
    def test_groupby_pairs_schema(self, spark):
        df = synth_data.groupby_pairs(spark, n=100, n_groups=5)
        assert [f.name for f in df.schema.fields] == ["k", "v"]
        assert df.count() == 100

    def test_lineitem_schema_and_size(self, spark):
        df = synth_data.lineitem(spark, sf=0.001)
        assert df.count() == 6000
        names = {f.name for f in df.schema.fields}
        assert {"l_returnflag", "l_linestatus", "l_extendedprice",
                "l_discount", "l_tax", "l_shipdate"} <= names

    def test_lineitem_deterministic(self, spark):
        a = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        b = synth_data.lineitem(spark, sf=0.0005, seed=3).toPandas()
        assert a.equals(b)
