"""Spark DataFrame API for DataVinci — fit on a sample, apply per partition.

This is the distributed-dataflow layering of the paper's per-column model:
``fit_column_cleaner`` collects a bounded sample of the target column (and
its sibling columns, for concretization constraints) to the driver, learns
the significant patterns, semantic abstraction, and value constraints
there, and returns a picklable :class:`ColumnCleaner`. ``clean_column``
then broadcasts that model inside a ``mapInPandas`` over the full
DataFrame, adding ``<col>__error`` and ``<col>__repair`` columns without
ever collecting the full data.

Out-of-sample rows are detected and repaired with the fitted model; their
concretization constraints fall back from the decision tree to the
learned majority value (the tree needs the row's feature vector, which is
only materialized for the fit sample).
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Iterator

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql.types import BooleanType, StringType, StructField, StructType

from . import semantics
from .datavinci import (
    CellRepair,
    DataVinciConfig,
    _SlotConstraints,
    repair_one,
)
from .nfa import matches
from .profiler import LearnedPattern, learn_patterns, significant_patterns


@dataclass
class ColumnCleaner:
    """A fitted per-column DataVinci model, applicable to new values."""

    column: str
    config: DataVinciConfig
    model: semantics.SemanticModel
    masked: list[str]
    sig: list[LearnedPattern]
    clean_unmasked: list[str] = field(default_factory=list)
    constraints: _SlotConstraints | None = None
    _repair_cache: dict[str, tuple[bool, str | None]] = field(default_factory=dict)

    def check(self, value: str) -> tuple[bool, str | None]:
        """(is_error, repair or None) for one value under the fit model."""
        if not self.sig:
            return False, None
        if value in self._repair_cache:
            return self._repair_cache[value]
        mv = self.model.mask_new(value)
        syntactic = not any(matches(lp.pattern, mv.masked) for lp in self.sig)
        semantic = bool(self.config.semantic) and self.model.semantic_changed_value(mv)
        if not (syntactic or semantic):
            self._repair_cache[value] = (False, None)
            return False, None
        repaired = repair_one(
            mv,
            None,
            self.model,
            self.sig,
            self.masked,
            len(self.masked),
            self.constraints,
            self.clean_unmasked,
            self.config,
        )
        self._repair_cache[value] = (True, repaired)
        return True, repaired

    def __getstate__(self):
        state = dict(self.__dict__)
        state["_repair_cache"] = {}
        return state


def fit_column_cleaner(
    df: DataFrame,
    column: str,
    config: DataVinciConfig | None = None,
    *,
    sample_rows: int = 2000,
    seed: int = 0,
) -> ColumnCleaner:
    """Learn a DataVinci model for ``df[column]`` from a driver-side sample."""
    config = config or DataVinciConfig()
    n = df.count()
    fraction = min(1.0, (sample_rows * 1.2) / max(1, n))
    sample = df if fraction >= 1.0 else df.sample(fraction=fraction, seed=seed)
    pdf = sample.limit(sample_rows).toPandas().astype(str).fillna("")
    values = ["" if v in ("None", "nan", "<NA>") else v for v in pdf[column]]
    model = semantics.abstract_column(values, enabled=config.semantic)
    masked = [mv.masked for mv in model.masked_values]
    learned = learn_patterns(
        masked, max_patterns=config.max_patterns, mask_types=model.mask_types
    )
    sig = significant_patterns(learned, len(values), config.delta)
    flagged = {
        i
        for i, v in enumerate(masked)
        if sig and not any(matches(lp.pattern, v) for lp in sig)
    }
    clean_rows = [i for i in range(len(values)) if i not in flagged]
    constraints = _SlotConstraints(pdf, clean_rows, config)
    return ColumnCleaner(
        column=column,
        config=config,
        model=model,
        masked=masked,
        sig=sig,
        clean_unmasked=[values[i] for i in clean_rows][:200],
        constraints=constraints,
    )


def clean_column(
    df: DataFrame,
    column: str,
    config: DataVinciConfig | None = None,
    *,
    sample_rows: int = 2000,
    seed: int = 0,
) -> DataFrame:
    """Add ``<column>__error`` / ``<column>__repair`` to ``df``.

    The model is fit once on the driver from a sample, then applied in
    parallel over partitions with ``mapInPandas`` — the majority-pattern
    match and the repair derivation run where the data lives.
    """
    cleaner = fit_column_cleaner(
        df, column, config, sample_rows=sample_rows, seed=seed
    )
    out_schema = StructType(
        df.schema.fields
        + [
            StructField(f"{column}__error", BooleanType(), False),
            StructField(f"{column}__repair", StringType(), True),
        ]
    )
    sc = df.sparkSession.sparkContext
    bc = sc.broadcast(cleaner)

    def apply(batches: Iterator[pd.DataFrame]) -> Iterator[pd.DataFrame]:
        local = bc.value
        for batch in batches:
            flags: list[bool] = []
            repairs: list[str | None] = []
            for v in batch[column]:
                sv = "" if pd.isna(v) else str(v)
                is_err, rep = local.check(sv)
                flags.append(is_err)
                repairs.append(rep)
            batch = batch.copy()
            batch[f"{column}__error"] = flags
            batch[f"{column}__repair"] = repairs
            yield batch

    return df.mapInPandas(apply, schema=out_schema)


def repairs_to_df(df: DataFrame, repairs: list[CellRepair]):  # pragma: no cover
    """Convenience: a Spark DataFrame of CellRepair rows."""
    rows = [(r.column, r.row, r.original, r.repaired) for r in repairs]
    return df.sparkSession.createDataFrame(
        rows, schema="column string, row long, original string, repaired string"
    )


__all__ = [
    "ColumnCleaner",
    "fit_column_cleaner",
    "clean_column",
    "repairs_to_df",
]
