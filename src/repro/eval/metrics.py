"""Detection and repair metrics over (cells, predictions) DataFrames.

Ground truth replaces the paper's manual annotation (the corruptors
record the clean value of every touched cell), so:

* detection **precision** — flagged cells that are true errors / flagged;
* detection **recall** (Synthetic only) — flagged true errors / injected
  errors;
* **fire rate** — the per-column fraction of flagged cells, averaged over
  all benchmark columns (§5.1's definition);
* repair **Precision (Certain)** — among repairs proposed for true-error
  cells (where the unique ground truth is known), the fraction equal to
  it;
* repair **Precision (Possible)** — over *all* proposed repairs
  (including ones on clean cells, which can never be right), the fraction
  that are the ground truth or at least inside the column domain's latent
  regular language (Definition 2.4's "reasonable but not uniquely
  determined" reading). Including false-positive detections in the
  denominator is what makes Possible < Certain, as in Table 6;
* **repair-given-detect** (Table 7) — correct repairs / correctly
  detected errors;
* synthetic repair precision/recall/F1 — exact-match repairs over all
  repairs / over all injected errors.

All aggregations are Spark DataFrame ops; tests cross-check them against
DuckDB via ``repro.oracle.assert_equivalent``.
"""
from __future__ import annotations

import re

import pandas as pd
from pyspark.sql import DataFrame, functions as F
from pyspark.sql.types import BooleanType

from ..benchgen.domains import DOMAINS


def _in_language_udf():
    langs = {name: d.language for name, d in DOMAINS.items()}

    @F.pandas_udf(BooleanType())
    def in_language(domain: pd.Series, value: pd.Series) -> pd.Series:
        out = []
        for d, v in zip(domain, value):
            pat = langs.get(d or "")
            out.append(
                bool(pat) and v is not None and re.fullmatch(pat, str(v)) is not None
            )
        return pd.Series(out)

    return in_language


def joined(cells: DataFrame, preds: DataFrame) -> DataFrame:
    """Predictions annotated with ground truth (inner join on the cell)."""
    return preds.alias("p").join(
        cells.alias("c"),
        on=[
            F.col("p.table_id") == F.col("c.table_id"),
            F.col("p.col") == F.col("c.col"),
            F.col("p.row") == F.col("c.row"),
        ],
        how="inner",
    ).select(
        "p.table_id",
        "p.col",
        "p.row",
        "p.repair",
        "c.value",
        "c.clean",
        "c.is_err",
        "c.domain",
    )


def detection_metrics(cells: DataFrame, preds: DataFrame) -> dict[str, float]:
    j = joined(cells, preds).cache()
    flagged = j.count()
    tp = j.filter("is_err").count()
    total_err = cells.filter("is_err").count()
    precision = 100.0 * tp / flagged if flagged else 0.0
    recall = 100.0 * tp / total_err if total_err else 0.0
    f1 = (
        2 * precision * recall / (precision + recall)
        if precision + recall > 0
        else 0.0
    )
    # Fire rate: per-column flagged fraction, averaged over all columns.
    col_rows = cells.groupBy("table_id", "col").agg(
        F.count("*").alias("n_rows")
    )
    col_flags = preds.groupBy("table_id", "col").agg(
        F.count("*").alias("n_flagged")
    )
    rates = (
        col_rows.join(col_flags, on=["table_id", "col"], how="left")
        .na.fill({"n_flagged": 0})
        .select((F.col("n_flagged") / F.col("n_rows")).alias("rate"))
    )
    fire = 100.0 * (rates.agg(F.avg("rate")).collect()[0][0] or 0.0)
    j.unpersist()
    return {
        "precision": precision,
        "recall": recall,
        "f1": f1,
        "fire_rate": fire,
    }


def repair_metrics(cells: DataFrame, preds: DataFrame) -> dict[str, float]:
    j = joined(cells, preds)
    rep = j.filter(F.col("repair").isNotNull()).withColumn(
        "exact", F.col("is_err") & (F.col("repair") == F.col("clean"))
    )
    in_lang = _in_language_udf()
    rep = rep.withColumn(
        "reasonable",
        F.col("exact") | (F.col("is_err") & in_lang("domain", "repair")),
    ).cache()
    n_repairs = rep.count()
    n_on_errors = rep.filter("is_err").count()
    n_exact = rep.filter("exact").count()
    n_reasonable = rep.filter("reasonable").count()
    detected_errors = j.filter("is_err").count()
    total_err = cells.filter("is_err").count()
    p_certain = 100.0 * n_exact / n_on_errors if n_on_errors else 0.0
    p_possible = 100.0 * n_reasonable / n_repairs if n_repairs else 0.0
    precision = 100.0 * n_exact / n_repairs if n_repairs else 0.0
    recall = 100.0 * n_exact / total_err if total_err else 0.0
    f1 = (
        2 * precision * recall / (precision + recall)
        if precision + recall > 0
        else 0.0
    )
    given_detect = (
        100.0 * n_exact / detected_errors if detected_errors else 0.0
    )
    rep.unpersist()
    return {
        "p_certain": p_certain,
        "p_possible": p_possible,
        "precision": precision,
        "recall": recall,
        "f1": f1,
        "repair_given_detect": given_detect,
    }
