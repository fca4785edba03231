"""Long-format cell DataFrames — the benchmark's on-cluster representation.

A benchmark is a Spark DataFrame with one row per cell:

    table_id, col, col_idx, row, value, clean, is_err, domain

``clean`` is the ground-truth value for corrupted cells (null elsewhere),
``is_err`` marks cells whose dirty value differs from ground truth, and
``domain`` names the generator domain (used to judge "possible" repairs
via the domain's latent language). ``group_to_table`` reassembles a wide
pandas table inside a grouped UDF.
"""
from __future__ import annotations

import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from ..benchgen.corrupt import BenchTable

CELLS_SCHEMA = (
    "table_id string, col string, col_idx int, row int, "
    "value string, clean string, is_err boolean, domain string"
)


def tables_to_rows(tables: list[BenchTable]) -> list[tuple]:
    rows: list[tuple] = []
    for bt in tables:
        errors = bt.error_cells()
        for ci, col in enumerate(bt.df.columns):
            cname = str(col)
            dom = bt.domains.get(cname, "")
            for r in range(len(bt.df)):
                key = (cname, r)
                clean = bt.clean.get(key)
                rows.append(
                    (
                        bt.table_id,
                        cname,
                        ci,
                        r,
                        str(bt.df.iloc[r][col]),
                        clean,
                        key in errors,
                        dom,
                    )
                )
    return rows


def to_cells_df(spark: SparkSession, tables: list[BenchTable]) -> DataFrame:
    """Benchmark tables → long-format Spark DataFrame of cells."""
    return spark.createDataFrame(tables_to_rows(tables), schema=CELLS_SCHEMA)


def group_to_table(pdf: pd.DataFrame) -> tuple[pd.DataFrame, dict, set]:
    """Inside a grouped UDF: one table's cells → (wide table, ground
    truth dict {(col,row): clean}, set of true-error cells)."""
    pdf = pdf.sort_values(["col_idx", "row"])
    cols = (
        pdf[["col", "col_idx"]]
        .drop_duplicates()
        .sort_values("col_idx")["col"]
        .tolist()
    )
    n_rows = int(pdf["row"].max()) + 1 if len(pdf) else 0
    data = {}
    for c in cols:
        sub = pdf[pdf["col"] == c].sort_values("row")
        vals = [""] * n_rows
        for r, v in zip(sub["row"], sub["value"]):
            vals[int(r)] = "" if pd.isna(v) else str(v)
        data[c] = vals
    wide = pd.DataFrame(data)
    clean = {
        (str(row.col), int(row.row)): str(row.clean)
        for row in pdf.itertuples()
        if not pd.isna(row.clean)
    }
    errors = {
        (str(row.col), int(row.row)) for row in pdf.itertuples() if bool(row.is_err)
    }
    return wide, clean, errors
