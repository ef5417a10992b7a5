"""The Spark reproducible GROUPBY: bit-stability, oracle equivalence, UDAF."""
import numpy as np
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core import BinnedSum
from repro.oracle import assert_equivalent
from repro.spark import repro_sum_udf, rsum_groupby
from repro.synth_data import groupby_pairs, np_groupby_input


def _bits(a: np.ndarray) -> np.ndarray:
    return a.view(np.int64) if a.dtype == np.float64 else a.view(np.int32)


def _local_ref(n, n_groups, dist, seed, L):
    keys, vals = np_groupby_input(n, n_groups, dist=dist, seed=seed)
    return np.array(
        [BinnedSum(L=L).add_vector(vals[keys == k]).finalize() for k in range(n_groups)]
    )


class TestBitExactness:
    @pytest.mark.parametrize("L", [1, 2, 4])
    def test_matches_local_binned_sum(self, spark, L):
        df = groupby_pairs(spark, n=50_000, n_groups=64, dist="mixed", seed=L)
        got = (
            rsum_groupby(df, "k", "v", L=L)
            .toPandas().sort_values("k").reset_index(drop=True)
        )
        ref = _local_ref(50_000, 64, "mixed", L, L)
        assert np.array_equal(_bits(got["v_rsum"].to_numpy()), _bits(ref))

    @pytest.mark.parametrize("buffered", [True, False])
    def test_buffered_and_unbuffered_identical(self, spark, buffered):
        df = groupby_pairs(spark, n=30_000, n_groups=10, dist="mixed", seed=2)
        ref = _local_ref(30_000, 10, "mixed", 2, 2)
        got = (
            rsum_groupby(df, "k", "v", L=2, buffered=buffered, bsz=13)
            .toPandas().sort_values("k")
        )
        assert np.array_equal(_bits(got["v_rsum"].to_numpy()), _bits(ref))

    @pytest.mark.parametrize("parts", [1, 3, 16])
    def test_repartition_bit_stable(self, spark, parts):
        df = groupby_pairs(spark, n=40_000, n_groups=32, dist="mixed", seed=3)
        ref = _local_ref(40_000, 32, "mixed", 3, 2)
        got = (
            rsum_groupby(df.repartition(parts), "k", "v", L=2)
            .toPandas().sort_values("k")
        )
        assert np.array_equal(_bits(got["v_rsum"].to_numpy()), _bits(ref))

    def test_reordered_input_bit_stable(self, spark):
        df = groupby_pairs(spark, n=40_000, n_groups=32, dist="mixed", seed=3)
        ref = _local_ref(40_000, 32, "mixed", 3, 2)
        shuffled = df.orderBy(F.col("v").desc()).repartition(5)
        got = rsum_groupby(shuffled, "k", "v", L=2).toPandas().sort_values("k")
        assert np.array_equal(_bits(got["v_rsum"].to_numpy()), _bits(ref))

    def test_shuffle_partitions_setting_bit_stable(self, spark):
        df = groupby_pairs(spark, n=20_000, n_groups=16, dist="mixed", seed=4)
        ref = _local_ref(20_000, 16, "mixed", 4, 2)
        old = spark.conf.get("spark.sql.shuffle.partitions")
        try:
            for n in ("7", "64"):
                spark.conf.set("spark.sql.shuffle.partitions", n)
                got = rsum_groupby(df, "k", "v", L=2).toPandas().sort_values("k")
                assert np.array_equal(_bits(got["v_rsum"].to_numpy()), _bits(ref))
        finally:
            spark.conf.set("spark.sql.shuffle.partitions", old)


class TestOracleEquivalence:
    def test_against_duckdb_sum(self, spark):
        df = groupby_pairs(spark, n=30_000, n_groups=50, dist="uniform12", seed=5)
        got = rsum_groupby(df, "k", "v", L=2).withColumnRenamed("v_rsum", "s")
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)

    def test_multicolumn_against_duckdb(self, spark):
        keys, v1 = np_groupby_input(20_000, 20, dist="uniform12", seed=6)
        _, v2 = np_groupby_input(20_000, 20, dist="exp1", seed=7)
        pdf = pd.DataFrame({"k": keys, "a": v1, "b": v2})
        df = spark.createDataFrame(pdf)
        got = (
            rsum_groupby(df, "k", ["a", "b"], L=2)
            .withColumnRenamed("a_rsum", "sa").withColumnRenamed("b_rsum", "sb")
        )
        assert_equivalent(
            got, "SELECT k, sum(a) AS sa, sum(b) AS sb FROM t GROUP BY k", t=pdf
        )

    def test_udaf_against_duckdb(self, spark):
        df = groupby_pairs(spark, n=20_000, n_groups=25, dist="uniform12", seed=8)
        got = df.groupBy("k").agg(repro_sum_udf(L=2)(F.col("v")).alias("s"))
        assert_equivalent(got, "SELECT k, sum(v) AS s FROM t GROUP BY k", t=df)


class TestUdaf:
    def test_udaf_matches_two_phase_bits(self, spark):
        df = groupby_pairs(spark, n=25_000, n_groups=40, dist="mixed", seed=9)
        a = (
            df.groupBy("k").agg(repro_sum_udf(L=3)(F.col("v")).alias("s"))
            .toPandas().sort_values("k")
        )
        b = rsum_groupby(df, "k", "v", L=3).toPandas().sort_values("k")
        assert np.array_equal(_bits(a["s"].to_numpy()), _bits(b["v_rsum"].to_numpy()))

    def test_udaf_repartition_stable(self, spark):
        df = groupby_pairs(spark, n=20_000, n_groups=8, dist="mixed", seed=10)
        f = repro_sum_udf(L=2)
        a = df.groupBy("k").agg(f(F.col("v")).alias("s")).toPandas().sort_values("k")
        b = (
            df.repartition(11).groupBy("k").agg(f(F.col("v")).alias("s"))
            .toPandas().sort_values("k")
        )
        assert np.array_equal(_bits(a["s"].to_numpy()), _bits(b["s"].to_numpy()))


class TestSemantics:
    def test_multiple_key_columns(self, spark):
        pdf = pd.DataFrame({
            "k1": ["a", "a", "b", "b", "a"],
            "k2": [1, 2, 1, 1, 1],
            "v": [1.0, 2.0, 3.0, 4.0, 0.5],
        })
        df = spark.createDataFrame(pdf)
        got = rsum_groupby(df, ["k1", "k2"], "v", L=2).toPandas()
        got = got.sort_values(["k1", "k2"]).reset_index(drop=True)
        assert got["v_rsum"].tolist() == [1.5, 2.0, 7.0]

    def test_float32_output_type(self, spark):
        df = groupby_pairs(spark, n=1000, n_groups=4, seed=11)
        out = rsum_groupby(df, "k", "v", L=2, dtype="float32")
        assert dict(out.dtypes)["v_rsum"] == "float"
        assert out.count() == 4

    def test_nulls_ignored_like_sql_sum(self, spark):
        pdf = pd.DataFrame({"k": [0, 0, 1, 1], "v": [1.0, None, None, None]})
        df = spark.createDataFrame(pdf)
        got = (
            rsum_groupby(df, "k", "v", L=2).toPandas()
            .sort_values("k").reset_index(drop=True)
        )
        assert got["v_rsum"][0] == 1.0
        # documented deviation: an all-NULL group yields 0.0, not NULL
        assert got["v_rsum"][1] == 0.0

    def test_empty_input(self, spark):
        df = groupby_pairs(spark, n=10, n_groups=2, seed=12).where(F.lit(False))
        assert rsum_groupby(df, "k", "v", L=2).count() == 0

    def test_infinity_raises(self, spark):
        pdf = pd.DataFrame({"k": [0], "v": [np.inf]})
        df = spark.createDataFrame(pdf)
        with pytest.raises(Exception, match="finite"):
            rsum_groupby(df, "k", "v", L=2).collect()


class TestNonReproDemo:
    """The paper's Algorithm 1: same rows, different physical order,
    different native result — while rsum is bit-identical."""

    def test_native_sum_order_dependent(self, spark):
        rows = [(0, 1.0), (0, 1e16), (0, -1e16)]
        asc = spark.createDataFrame(rows, "k long, v double").coalesce(1)
        desc = (
            spark.createDataFrame(rows[::-1], "k long, v double").coalesce(1)
        )
        a = asc.groupBy("k").agg(F.sum("v")).collect()[0][1]
        b = desc.groupBy("k").agg(F.sum("v")).collect()[0][1]
        assert a != b  # 0.0 vs 1.0 — data independence violated

    def test_rsum_order_independent(self, spark):
        rows = [(0, 1.0), (0, 1e16), (0, -1e16)]
        asc = spark.createDataFrame(rows, "k long, v double").coalesce(1)
        desc = spark.createDataFrame(rows[::-1], "k long, v double").coalesce(1)
        a = rsum_groupby(asc, "k", "v", L=2).collect()[0][1]
        b = rsum_groupby(desc, "k", "v", L=2).collect()[0][1]
        assert a == b == 1.0
