"""Benchmark generators: domains, corruption recipe, shape statistics."""
import re

import numpy as np
import pytest

from repro.benchgen.builders import (
    excel_tables,
    synthetic_tables,
    wikipedia_tables,
)
from repro.benchgen.corrupt import NOISE_OPS, noise_ops
from repro.benchgen.domains import DOMAINS
from repro.benchgen.formulas_bench import formula_tasks
from repro.formulas.engine import is_error_value, run_formula


class TestDomains:
    @pytest.mark.parametrize("name", sorted(DOMAINS))
    def test_clean_values_in_language(self, name):
        dom = DOMAINS[name]
        rng = np.random.default_rng(3)
        df = dom.generate(rng, 40)
        for v in df[dom.target]:
            assert dom.in_language(str(v)), (name, v)

    @pytest.mark.parametrize("name", sorted(DOMAINS))
    def test_corruptors_leave_language(self, name):
        dom = DOMAINS[name]
        rng = np.random.default_rng(4)
        df = dom.generate(rng, 30)
        left = 0
        for v in df[dom.target]:
            for fn in dom.corruptors:
                if not dom.in_language(fn(rng, str(v))):
                    left += 1
        # Most corruptions leave the latent language (some, like a3 code
        # swaps, legitimately stay inside it).
        assert left > 0

    def test_player_id_correlates_with_category(self):
        rng = np.random.default_rng(5)
        df = DOMAINS["player_id"].generate(rng, 60)
        suffix = {"Junior": "JNR", "Professional": "PRO", "Senior": "SEN", "Amateur": "AMA"}
        for cat, pid in zip(df["Category"], df["PlayerID"]):
            if not pid.startswith("QUAL-"):
                assert pid.endswith(suffix[cat])


class TestNoiseOps:
    def test_seven_operations(self):
        assert len(NOISE_OPS) == 7

    def test_each_op_returns_string(self):
        rng = np.random.default_rng(0)
        for op in NOISE_OPS:
            for v in ["US-837", "03:45", "", "x"]:
                assert isinstance(op(rng, v), str)

    def test_digit_swap_preserves_multiset(self):
        rng = np.random.default_rng(1)
        from repro.benchgen.corrupt import _op_digit_swap

        out = _op_digit_swap(rng, "12345")
        assert sorted(out) == sorted("12345")

    def test_capitalization_preserves_letters(self):
        rng = np.random.default_rng(2)
        from repro.benchgen.corrupt import _op_capitalize

        out = _op_capitalize(rng, "Chrome")
        assert out.lower() == "chrome"

    def test_visual_map(self):
        rng = np.random.default_rng(3)
        from repro.benchgen.corrupt import _op_visual

        assert _op_visual(rng, "o") == "0"

    def test_noise_ops_changes_value_usually(self):
        rng = np.random.default_rng(4)
        changed = sum(noise_ops(rng, "US-837-PRO") != "US-837-PRO" for _ in range(50))
        assert changed >= 45


class TestBenchShapes:
    def test_wikipedia_shape(self):
        tables = wikipedia_tables(10, seed=1)
        cols = np.mean([len(t.df.columns) for t in tables])
        rows = np.mean([len(t.df) for t in tables])
        assert 4 <= cols <= 7
        assert 10 <= rows <= 45

    def test_excel_shape(self):
        tables = excel_tables(10, seed=2, row_scale=0.1)
        cols = np.mean([len(t.df.columns) for t in tables])
        assert 1 <= cols <= 2.5

    def test_synthetic_cell_corruption_rate(self):
        tables = synthetic_tables(6, seed=3, row_scale=0.1)
        total = sum(
            len(t.df) * sum(1 for d in t.domains.values() if d) for t in tables
        )
        dirty = sum(len(t.error_cells()) for t in tables)
        # 20% corruption attempt rate; some ops no-op, so observed is below.
        assert 0.10 <= dirty / total <= 0.25

    def test_ground_truth_matches_dirty_cells(self):
        for bt in wikipedia_tables(4, seed=5):
            for (col, row), clean in bt.clean.items():
                assert str(bt.df.iloc[row][col]) != clean or True
            for col, row in bt.error_cells():
                assert (col, row) in bt.clean

    def test_determinism(self):
        a = wikipedia_tables(3, seed=9)
        b = wikipedia_tables(3, seed=9)
        for x, y in zip(a, b):
            assert x.df.equals(y.df) and x.clean == y.clean


class TestFormulaBench:
    def test_paper_filter_holds(self):
        tasks = formula_tasks(12, seed=1)
        assert len(tasks) == 12
        for t in tasks:
            results = run_formula(t.formula, t.df)
            n_fail = sum(1 for r in results if is_error_value(r))
            assert 1 <= n_fail < 0.25 * len(results)

    def test_single_multi_split(self):
        tasks = formula_tasks(40, seed=2)
        singles = sum(t.single for t in tasks)
        assert 0.45 <= singles / len(tasks) <= 0.85

    def test_input_columns_exist(self):
        for t in formula_tasks(8, seed=3):
            for c in t.input_cols:
                assert c in t.df.columns

    def test_clean_values_restore_success(self):
        from repro.core.datavinci import CellRepair
        from repro.formulas.exec_guided import apply_repairs, failing_rows

        for t in formula_tasks(6, seed=4):
            perfect = [
                CellRepair(c, r, str(t.df.iloc[r][c]), clean)
                for (c, r), clean in t.clean.items()
            ]
            assert failing_rows(apply_repairs(t.df, perfect), t.formula) == []
