"""Spark evaluation harness: cells round-trip, system fan-out, metrics.

Metric aggregations are cross-checked against DuckDB via the oracle, so a
wrong join or aggregation in :mod:`repro.eval.metrics` is caught as a
result mismatch, not just "it ran".
"""
import pandas as pd
import pytest
from pyspark.sql import functions as F

from repro.benchgen.builders import wikipedia_tables
from repro.eval.cells import group_to_table, tables_to_rows, to_cells_df
from repro.eval.harness import run_system
from repro.eval.metrics import detection_metrics, joined, repair_metrics
from repro.oracle import assert_equivalent


@pytest.fixture(scope="module")
def bench(spark):
    tables = wikipedia_tables(6, seed=21)
    cells = to_cells_df(spark, tables).cache()
    cells.count()
    return tables, cells


@pytest.fixture(scope="module")
def dv_preds(spark, bench):
    _, cells = bench
    preds = run_system(cells, "DataVinci").cache()
    preds.count()
    return preds


class TestCells:
    def test_row_count(self, bench):
        tables, cells = bench
        expected = sum(len(t.df) * len(t.df.columns) for t in tables)
        assert cells.count() == expected

    def test_group_roundtrip(self, bench):
        tables, cells = bench
        bt = tables[0]
        pdf = cells.filter(F.col("table_id") == bt.table_id).toPandas()
        wide, clean, errors = group_to_table(pdf)
        assert list(wide.columns) == [str(c) for c in bt.df.columns]
        assert wide.equals(bt.df.astype(str).reset_index(drop=True))
        assert errors == bt.error_cells()
        assert clean == bt.clean

    def test_error_cells_marked(self, bench):
        tables, cells = bench
        total_err = sum(len(t.error_cells()) for t in tables)
        assert cells.filter("is_err").count() == total_err

    def test_oracle_on_error_counts(self, spark, bench):
        tables, cells = bench
        agg = (
            cells.groupBy("table_id")
            .agg(F.sum(F.col("is_err").cast("int")).alias("n_err"))
        )
        pdf = pd.DataFrame(
            tables_to_rows(tables),
            columns=[
                "table_id", "col", "col_idx", "row",
                "value", "clean", "is_err", "domain",
            ],
        )
        assert_equivalent(
            agg,
            "SELECT table_id, SUM(CASE WHEN is_err THEN 1 ELSE 0 END) AS n_err "
            "FROM cells GROUP BY table_id",
            cells=pdf,
        )


class TestHarness:
    def test_predictions_reference_real_cells(self, bench, dv_preds):
        _, cells = bench
        j = joined(cells, dv_preds)
        assert j.count() == dv_preds.count()

    def test_datavinci_flags_mostly_errors(self, bench, dv_preds):
        _, cells = bench
        j = joined(cells, dv_preds)
        tp = j.filter("is_err").count()
        assert tp / max(1, j.count()) > 0.6

    def test_labels_only_affect_raha(self, bench):
        _, cells = bench
        # Raha runs with harness-provided labels and flags something.
        preds = run_system(cells, "Raha + GPT-3.5")
        assert preds.count() > 0


class TestMetrics:
    def test_detection_metric_fields(self, bench, dv_preds):
        _, cells = bench
        m = detection_metrics(cells, dv_preds)
        assert set(m) == {"precision", "recall", "f1", "fire_rate"}
        assert 0 <= m["precision"] <= 100
        assert 0 <= m["fire_rate"] <= 100

    def test_precision_against_oracle(self, spark, bench, dv_preds):
        _, cells = bench
        j = joined(cells, dv_preds)
        spark_counts = j.agg(
            F.count("*").alias("flagged"),
            F.sum(F.col("is_err").cast("int")).alias("tp"),
        )
        assert_equivalent(
            spark_counts,
            "SELECT COUNT(*) AS flagged, "
            "SUM(CASE WHEN c.is_err THEN 1 ELSE 0 END) AS tp "
            "FROM preds p JOIN cells c USING (table_id, col, row)",
            preds=dv_preds.toPandas(),
            cells=cells.toPandas(),
        )

    def test_fire_rate_against_oracle(self, spark, bench, dv_preds):
        _, cells = bench
        col_rows = cells.groupBy("table_id", "col").agg(
            F.count("*").alias("n_rows")
        )
        col_flags = dv_preds.groupBy("table_id", "col").agg(
            F.count("*").alias("n_flagged")
        )
        rates = (
            col_rows.join(col_flags, on=["table_id", "col"], how="left")
            .na.fill({"n_flagged": 0})
            .agg(F.avg(F.col("n_flagged") / F.col("n_rows")).alias("fire"))
        )
        assert_equivalent(
            rates,
            """
            SELECT AVG(rate) AS fire FROM (
              SELECT c.table_id, c.col,
                     COALESCE(p.n, 0) * 1.0 / COUNT(*) AS rate
              FROM cells c
              LEFT JOIN (
                SELECT table_id, col, COUNT(*) AS n
                FROM preds GROUP BY table_id, col
              ) p ON p.table_id = c.table_id AND p.col = c.col
              GROUP BY c.table_id, c.col, p.n
            )
            """,
            preds=dv_preds.toPandas(),
            cells=cells.toPandas(),
        )

    def test_repair_metric_fields(self, bench, dv_preds):
        _, cells = bench
        m = repair_metrics(cells, dv_preds)
        assert {"p_certain", "p_possible", "precision", "recall", "f1"} <= set(m)
        assert m["recall"] <= 100

    def test_empty_predictions(self, spark, bench):
        _, cells = bench
        empty = spark.createDataFrame(
            [],
            schema="table_id string, col string, row int, "
            "original string, repair string",
        )
        m = detection_metrics(cells, empty)
        assert m["precision"] == 0.0 and m["fire_rate"] == 0.0
