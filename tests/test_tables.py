"""The table-reproduction layer (paper vs measured plumbing)."""
import pandas as pd
import pytest

from repro.eval.tables import (
    PAPER_TABLE5,
    PAPER_TABLE8,
    EvalRun,
    Scale,
    table3,
    table5,
    table8,
    table10,
)


@pytest.fixture(scope="module")
def run(spark):
    scale = Scale(wikipedia=6, excel=4, synthetic=4, formulas=10, row_scale=0.1)
    return EvalRun(spark, scale=scale).build()


class TestScale:
    def test_presets(self):
        assert Scale.paper().wikipedia == 1000
        assert Scale.tiny().wikipedia < Scale().wikipedia


class TestTable3(object):
    def test_rows_and_columns(self, run):
        t3 = table3(run)
        assert list(t3["dataset"]) == [
            "Wikipedia Tables", "Excel", "Synthetic Errors", "Excel Formulas",
        ]
        wiki = t3.iloc[0]
        assert wiki["repro_tables"] == 6
        assert 4 <= wiki["repro_cols"] <= 7


class TestTable5(object):
    def test_structure_and_pairing(self, run):
        t5 = table5(run)
        assert set(t5["system"]) == set(PAPER_TABLE5)
        dv = t5[t5["system"] == "DataVinci"].iloc[0]
        paper, measured = dv["wikipedia_precision"]
        assert paper == 80.1
        assert measured is not None and 0 <= measured <= 100
        # Potter's Wheel only reports on Wikipedia, as in the paper.
        pw = t5[t5["system"] == "Potters-Wheel"].iloc[0]
        assert pw["excel_precision"][1] is None


class TestTable8(object):
    def test_structure(self, run):
        t8 = table8(run)
        assert list(t8["system"]) == list(PAPER_TABLE8)
        nr = t8[t8["system"] == "No Repair"].iloc[0]
        assert nr["single_formula"][1] == 0.0  # every task has a failure
        dv = t8[t8["system"] == "DataVinci+Execution"].iloc[0]
        assert dv["single_formula"][1] >= nr["single_formula"][1]


class TestTable10(object):
    def test_measures_all_systems(self, run):
        t10 = table10(run, n_tables=3)
        assert len(t10) == 8
        assert (pd.Series([r[1] for r in t10["time_ms"]]) > 0).all()
