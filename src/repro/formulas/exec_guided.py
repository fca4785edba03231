"""Execution-guided detection and repair (§3.6).

Given a column-transformation program (an Excel formula) over a table:

1. execute the formula per row and split rows into successes and failures
   (an :class:`repro.formulas.engine.ExcelError` result is a failure);
2. treat the input values of failing rows as data errors;
3. learn patterns **only over the successful rows'** input values and
   treat *all* of them as significant (the execution outcome replaces the
   majority assumption — this is what lets ``C30`` be repaired even when
   ``C[0-9]{2}`` is frequent enough to look significant, Fig 8);
4. run the standard §3.3–§3.5 repair procedure on the failing inputs.

The module also provides the §5.3 experimental harness pieces: applying a
system's repairs only to inputs of failing rows and measuring cell- and
formula-level execution success.
"""
from __future__ import annotations

from dataclasses import dataclass

import pandas as pd

from ..core import semantics
from ..core.datavinci import CellRepair, DataVinciConfig, repair_errors
from ..core.profiler import learn_patterns
from .engine import is_error_value, referenced_columns, run_formula


def failing_rows(table: pd.DataFrame, formula: str) -> list[int]:
    """Row positions whose formula result is an Excel error value."""
    results = run_formula(formula, table)
    return [i for i, r in enumerate(results) if is_error_value(r)]


@dataclass
class ExecOutcome:
    """Execution success statistics for one (formula, table) pair."""

    n_rows: int
    n_failing: int

    @property
    def cell_success(self) -> float:
        return 1.0 - (self.n_failing / self.n_rows) if self.n_rows else 1.0

    @property
    def formula_success(self) -> bool:
        return self.n_failing == 0


def measure(table: pd.DataFrame, formula: str) -> ExecOutcome:
    fails = failing_rows(table, formula)
    return ExecOutcome(n_rows=len(table), n_failing=len(fails))


def exec_guided_repairs(
    table: pd.DataFrame,
    formula: str,
    config: DataVinciConfig | None = None,
) -> list[CellRepair]:
    """DataVinci+Execution: repairs for the failing rows' input values."""
    config = config or DataVinciConfig()
    fails = failing_rows(table, formula)
    if not fails or len(fails) == len(table):
        return []  # nothing failing, or no success group to learn from
    cols = referenced_columns(formula, [str(c) for c in table.columns])
    str_table = table.astype("string").fillna("").astype(str)
    out: list[CellRepair] = []
    fail_set = set(fails)
    for col in cols:
        values = [str(v) for v in str_table[col]]
        model = semantics.abstract_column(values, enabled=config.semantic)
        masked = [mv.masked for mv in model.masked_values]
        success_masked = [masked[i] for i in range(len(values)) if i not in fail_set]
        if not success_masked:
            continue
        learned = learn_patterns(
            success_masked,
            max_patterns=config.max_patterns,
            mask_types=model.mask_types,
        )
        # §3.6: every pattern learned over successes is significant.
        out.extend(
            repair_errors(
                masked, model, learned, sorted(fail_set), str_table, config, col
            )
        )
    return out


def apply_repairs(table: pd.DataFrame, repairs: list[CellRepair]) -> pd.DataFrame:
    """Return a copy of ``table`` with the non-None repairs applied."""
    out = table.astype("string").fillna("").astype(str).copy()
    for r in repairs:
        if r.repaired is not None and r.column in out.columns:
            out.iloc[r.row, out.columns.get_loc(r.column)] = r.repaired
    return out


def success_after_repairs(
    table: pd.DataFrame, formula: str, repairs: list[CellRepair]
) -> ExecOutcome:
    """Execution outcome after applying repairs (only rows that originally
    failed may change — repairs are only produced for those)."""
    return measure(apply_repairs(table, repairs), formula)
