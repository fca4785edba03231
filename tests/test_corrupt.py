"""corrupt_table invariants and BenchTable bookkeeping."""
import numpy as np
import pandas as pd
import pytest

from repro.benchgen.corrupt import BenchTable, corrupt_table
from repro.benchgen.domains import DOMAINS


@pytest.fixture
def rng():
    return np.random.default_rng(7)


class TestCorruptTable:
    def _make(self, rng, *, realistic, cell_prob=0.5):
        dom = DOMAINS["code"]
        clean = dom.generate(rng, 60)
        return clean, corrupt_table(
            "t0", clean, {"Code": dom}, rng,
            cell_prob=cell_prob, realistic=realistic,
        )

    def test_ground_truth_consistency(self, rng):
        clean, bt = self._make(rng, realistic=True)
        for (col, row), v in bt.clean.items():
            assert v == str(clean.iloc[row][col])

    def test_error_cells_subset_of_clean_keys(self, rng):
        _, bt = self._make(rng, realistic=False)
        assert bt.error_cells() <= set(bt.clean)

    def test_untargeted_columns_untouched(self, rng):
        dom = DOMAINS["player_id"]
        clean = dom.generate(rng, 40)
        bt = corrupt_table(
            "t1", clean, {"PlayerID": dom}, rng, cell_prob=0.5, realistic=True
        )
        # the Category column is not a corruption target
        assert list(bt.df["Category"]) == list(clean["Category"].astype(str))

    def test_zero_probability_is_identity(self, rng):
        clean, bt = self._make(rng, realistic=True, cell_prob=0.0)
        assert bt.clean == {}
        assert bt.df.equals(clean.astype(str).reset_index(drop=True))

    def test_original_frame_not_mutated(self, rng):
        dom = DOMAINS["code"]
        clean = dom.generate(rng, 30)
        before = clean.copy()
        corrupt_table("t2", clean, {"Code": dom}, rng, cell_prob=1.0, realistic=True)
        assert clean.equals(before)

    def test_domains_recorded(self, rng):
        _, bt = self._make(rng, realistic=True)
        assert bt.domains == {"Code": "code"}


class TestBenchTable:
    def test_error_cells_reflect_current_df(self):
        df = pd.DataFrame({"c": ["dirty", "ok"]})
        bt = BenchTable("x", df, {("c", 0): "clean", ("c", 1): "ok"})
        assert bt.error_cells() == {("c", 0)}
