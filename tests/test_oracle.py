"""Tests for the DuckDB result-equality oracle itself, plus extra
oracle-checked Spark queries over the generated ER data."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.er_data import load, to_spark
from repro.oracle import assert_equivalent


class TestOracleMechanics:
    def test_accepts_matching_result(self, spark):
        pdf = pd.DataFrame({"k": [1, 2, 2], "v": [1.0, 2.0, 3.0]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(
            F.sum("v").alias("s"))
        assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k",
                          t=pdf)

    def test_rejects_wrong_values(self, spark):
        pdf = pd.DataFrame({"k": [1, 2], "v": [1.0, 2.0]})
        got = spark.createDataFrame(pdf).groupBy("k").agg(
            F.sum(F.col("v") * 2).alias("s"))
        with pytest.raises(AssertionError):
            assert_equivalent(got, "SELECT k, SUM(v) AS s FROM t GROUP BY k",
                              t=pdf)

    def test_rejects_column_mismatch(self, spark):
        pdf = pd.DataFrame({"k": [1]})
        got = spark.createDataFrame(pdf).select(F.col("k").alias("wrong"))
        with pytest.raises(AssertionError, match="column mismatch"):
            assert_equivalent(got, "SELECT k FROM t", t=pdf)

    def test_row_order_irrelevant(self, spark):
        pdf = pd.DataFrame({"k": [3, 1, 2]})
        got = spark.createDataFrame(pdf).orderBy(F.desc("k"))
        assert_equivalent(got, "SELECT k FROM t ORDER BY k", t=pdf)


class TestOracleOnERData:
    def test_match_count_join(self, spark):
        """The ground-truth match relation joins consistently with both
        tables — checked as a three-way join in Spark vs DuckDB."""
        ds = load("rest_fz", scale=0.4)
        df_a, df_b = to_spark(spark, ds)
        m = pd.DataFrame(sorted(ds.matches), columns=["id_a", "id_b"])
        df_m = spark.createDataFrame(m)
        got = (df_m.join(df_a.withColumnRenamed("id", "id_a"), on="id_a")
                    .join(df_b.withColumnRenamed("id", "id_b"), on="id_b")
                    .groupBy().count().withColumnRenamed("count", "n"))
        assert_equivalent(
            got,
            """SELECT COUNT(*) AS n FROM m
               JOIN a ON m.id_a = a.id JOIN b ON m.id_b = b.id""",
            m=m, a=ds.table_a, b=ds.table_b,
        )

    def test_null_attribute_counts(self, spark):
        ds = load("prod_wa", scale=0.2)
        _, df_b = to_spark(spark, ds)
        got = df_b.select(
            F.sum(F.when(F.col("model").isNull(), 1).otherwise(0))
            .alias("nulls"))
        assert_equivalent(
            got,
            "SELECT SUM(CASE WHEN model IS NULL THEN 1 ELSE 0 END)::BIGINT"
            " AS nulls FROM b",
            b=ds.table_b,
        )

    def test_tier_vocab_size_agg(self, spark):
        ds = load("pub_da", scale=0.2)
        df_a, _ = to_spark(spark, ds)
        got = (df_a.select(F.explode(F.split(F.lower("title"), " "))
                           .alias("w"))
               .agg(F.countDistinct("w").alias("n")))
        assert_equivalent(
            got,
            """SELECT COUNT(DISTINCT w) AS n FROM
               (SELECT UNNEST(STRING_SPLIT(LOWER(title), ' ')) AS w
                FROM a)""",
            a=ds.table_a,
        )
