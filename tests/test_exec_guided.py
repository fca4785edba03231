"""Execution-guided repair (§3.6)."""
import pandas as pd

from repro.core.datavinci import CellRepair, clean_table
from repro.formulas.exec_guided import (
    apply_repairs,
    exec_guided_repairs,
    failing_rows,
    measure,
    success_after_repairs,
)

FIG8 = pd.DataFrame(
    {
        "Option": [
            "Chrome23", "Chrome21", "C30", "Chrome19", "Chrome22",
            "C15", "C26", "Chrome17", "Chrome20", "Chrome25", "Chrome18",
        ]
    }
)
FIG8_FORMULA = '=RIGHT(A1, LEN(A1) - SEARCH("Chrome", A1) - LEN("Chrome") + 1)'


class TestFailingRows:
    def test_fig8(self):
        assert failing_rows(FIG8, FIG8_FORMULA) == [2, 5, 6]

    def test_measure(self):
        out = measure(FIG8, FIG8_FORMULA)
        assert out.n_rows == 11 and out.n_failing == 3
        assert not out.formula_success
        assert abs(out.cell_success - 8 / 11) < 1e-9


class TestExecGuided:
    def test_fig8_repairs(self):
        reps = exec_guided_repairs(FIG8, FIG8_FORMULA)
        assert {(r.row, r.repaired) for r in reps} == {
            (2, "Chrome30"), (5, "Chrome15"), (6, "Chrome26"),
        }

    def test_unsupervised_misses_fig8(self):
        # C[0-9]{2} recurs often enough to be significant on its own.
        assert clean_table(FIG8) == []

    def test_after_repairs_formula_succeeds(self):
        reps = exec_guided_repairs(FIG8, FIG8_FORMULA)
        out = success_after_repairs(FIG8, FIG8_FORMULA, reps)
        assert out.formula_success and out.cell_success == 1.0

    def test_intro_example(self):
        t = pd.DataFrame({"col1": ["c-1", "c-2", "c3", "c4"]})
        reps = exec_guided_repairs(t, '=SEARCH("-", [@col1])')
        assert {(r.row, r.repaired) for r in reps} == {
            (2, "c-3"), (3, "c-4"),
        }

    def test_no_failures_no_repairs(self):
        t = pd.DataFrame({"c": ["a", "b", "c"]})
        assert exec_guided_repairs(t, "=LEN([@c])") == []

    def test_all_failing_no_success_group(self):
        t = pd.DataFrame({"c": ["a", "b", "c"]})
        assert exec_guided_repairs(t, '=SEARCH("-", [@c])') == []

    def test_multi_column_inputs(self):
        t = pd.DataFrame(
            {"n1": ["1", "2", "x3", "4"], "n2": ["5", "6", "7", "8"]}
        )
        reps = exec_guided_repairs(t, "=VALUE([@n1]) + VALUE([@n2])")
        fixed = apply_repairs(t, reps)
        assert failing_rows(fixed, "=VALUE([@n1]) + VALUE([@n2])") == []


class TestApplyRepairs:
    def test_apply_changes_only_named_cells(self):
        t = pd.DataFrame({"c": ["a", "b"]})
        out = apply_repairs(t, [CellRepair("c", 1, "b", "z")])
        assert list(out["c"]) == ["a", "z"]
        assert list(t["c"]) == ["a", "b"]  # original untouched

    def test_none_repairs_skipped(self):
        t = pd.DataFrame({"c": ["a", "b"]})
        out = apply_repairs(t, [CellRepair("c", 0, "a", None)])
        assert list(out["c"]) == ["a", "b"]
