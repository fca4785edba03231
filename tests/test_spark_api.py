"""The Spark DataFrame API: fit on a sample, apply via mapInPandas."""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.core.spark_api import clean_column, fit_column_cleaner
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def code_df(spark):
    rows = [(i, f"US-{100 + i}") for i in range(40)]
    rows += [(98, "usa_837"), (99, "uk:12")]
    return spark.createDataFrame(rows, "id int, Code string").repartition(4)


class TestFit:
    def test_cleaner_learns_patterns(self, code_df):
        cleaner = fit_column_cleaner(code_df, "Code")
        assert cleaner.sig

    def test_cleaner_picklable(self, code_df):
        import pickle

        cleaner = fit_column_cleaner(code_df, "Code")
        clone = pickle.loads(pickle.dumps(cleaner))
        assert clone.check("usa_837")[0]

    def test_check_clean_and_dirty(self, code_df):
        cleaner = fit_column_cleaner(code_df, "Code")
        assert cleaner.check("US-123") == (False, None)
        is_err, rep = cleaner.check("usa_999")
        assert is_err and rep == "US-999"


class TestCleanColumn:
    def test_adds_columns_and_flags(self, code_df):
        out = clean_column(code_df, "Code").cache()
        assert {"Code__error", "Code__repair"} <= set(out.columns)
        flagged = out.filter("Code__error").select("Code").toPandas()
        assert set(flagged["Code"]) == {"usa_837", "uk:12"}

    def test_repairs_follow_model(self, code_df):
        out = clean_column(code_df, "Code")
        reps = dict(
            out.filter("Code__error")
            .select("Code", "Code__repair")
            .collect()
        )
        assert reps["usa_837"] == "US-837"

    def test_row_count_preserved(self, code_df):
        out = clean_column(code_df, "Code")
        assert out.count() == code_df.count()

    def test_flag_counts_against_oracle(self, spark, code_df):
        out = clean_column(code_df, "Code")
        agg = out.agg(
            F.sum(F.col("Code__error").cast("int")).alias("n_flagged")
        )
        assert_equivalent(
            agg,
            "SELECT SUM(CASE WHEN Code__error THEN 1 ELSE 0 END) AS n_flagged "
            "FROM result",
            result=out.toPandas(),
        )

    def test_out_of_sample_values_processed(self, spark):
        # Fit sample covers part of the data; remaining partitions still
        # get detection via the broadcast model.
        rows = [(i, f"AB-{i:03d}") for i in range(30)] + [(99, "ab999")]
        df = spark.createDataFrame(rows, "id int, Ref string")
        out = clean_column(df, "Ref", sample_rows=20)
        bad = out.filter("Ref__error").select("Ref").collect()
        assert {r.Ref for r in bad} == {"ab999"}
