"""Spark fan-out: run a system over every benchmark table in parallel.

The benchmark lives as a long cell DataFrame; ``run_system`` groups it by
``table_id`` and runs the system inside ``applyInPandas``, so per-table
model fitting (majority patterns, constraint trees, …) executes where the
group lands — the distributed-dataflow shape of the reproduction hint.
Labels for semi-supervised systems (Raha's 5 known errors per column) are
derived from the group's ground truth inside the UDF, mirroring the
paper's protocol of handing Raha the first five errors top-to-bottom.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame

PRED_SCHEMA = (
    "table_id string, col string, row int, original string, repair string"
)


def _labels_for(clean: dict, errors: set) -> dict:
    """First (top-to-bottom) 5 ground-truth errors per column."""
    labels: dict = {}
    per_col: dict[str, int] = {}
    for col, row in sorted(errors, key=lambda cr: (cr[0], cr[1])):
        if per_col.get(col, 0) >= 5:
            continue
        per_col[col] = per_col.get(col, 0) + 1
        labels[(col, row)] = clean.get((col, row), "")
    return labels


def run_system(cells_df: DataFrame, system_name: str) -> DataFrame:
    """Predictions of ``system_name`` over every table of the benchmark."""

    def udf(pdf: pd.DataFrame) -> pd.DataFrame:
        # Imports inside the UDF: this function is shipped to executors.
        from repro.eval.cells import group_to_table
        from repro.eval.systems import get_system

        table_id = str(pdf["table_id"].iloc[0])
        wide, clean, errors = group_to_table(pdf)
        preds = get_system(system_name)(wide, _labels_for(clean, errors))
        return pd.DataFrame(
            {
                "table_id": [table_id] * len(preds),
                "col": [p.column for p in preds],
                "row": [p.row for p in preds],
                "original": [p.original for p in preds],
                "repair": [p.repair for p in preds],
            }
        )

    return cells_df.groupBy("table_id").applyInPandas(udf, PRED_SCHEMA)
