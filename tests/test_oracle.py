"""Tests for the DuckDB result-equality oracle itself (it guards every
query-result test, so its failure modes must be known-good)."""
import numpy as np
import pandas as pd
import pytest

from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def tiny(spark):
    pdf = pd.DataFrame({"k": [1, 2, 2, 3], "v": [10.0, 20.0, 21.0, 30.0]})
    return pdf, spark.createDataFrame(pdf)


class TestAssertEquivalent:
    def test_accepts_matching_result(self, spark, tiny):
        pdf, df = tiny
        got = df.groupBy("k").count().withColumnRenamed("count", "n")
        assert_equivalent(got, "select k, count(*) as n from t group by k", t=pdf)

    def test_rejects_wrong_rows(self, spark, tiny):
        pdf, df = tiny
        got = df.groupBy("k").count().withColumnRenamed("count", "n")
        with pytest.raises(AssertionError):
            assert_equivalent(got, "select k, count(*) + 1 as n from t group by k", t=pdf)

    def test_rejects_column_mismatch(self, spark, tiny):
        pdf, df = tiny
        got = df.groupBy("k").count()
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "select k, count(*) as n from t group by k", t=pdf)

    def test_row_order_irrelevant(self, spark, tiny):
        pdf, df = tiny
        got = df.orderBy(df.k.desc()).select("k", "v")
        assert_equivalent(got, "select k, v from t order by k asc", t=pdf)

    def test_accepts_spark_df_as_table(self, spark, tiny):
        pdf, df = tiny
        got = df.select("k")
        assert_equivalent(got, "select k from t", t=df)

    def test_float_rounding_tolerance(self, spark, tiny):
        pdf, df = tiny
        noisy = pdf.copy()
        noisy["v"] = noisy["v"] + 1e-9  # below the 6-decimal canon
        got = spark.createDataFrame(noisy)
        assert_equivalent(got, "select k, v from t", t=pdf)

    def test_band_join_oracle_roundtrip(self, spark):
        rng = np.random.default_rng(0)
        s = pd.DataFrame({"id": range(50), "a": rng.random(50) * 10})
        t = pd.DataFrame({"id": range(50), "a": rng.random(50) * 10})
        sd = spark.createDataFrame(s).alias("s")
        td = spark.createDataFrame(t).alias("t")
        got = sd.join(td, (sd["a"] - td["a"] <= 1.0) & (td["a"] - sd["a"] <= 1.0)).select(
            sd["id"].alias("s_id"), td["id"].alias("t_id")
        )
        assert_equivalent(
            got,
            "select s.id as s_id, t.id as t_id from s, t where abs(s.a - t.a) <= 1.0",
            s=s,
            t=t,
        )
