"""End-to-end DataVinci pipeline tests, including the paper's examples."""
import pandas as pd
import pytest

from repro.core.datavinci import (
    CellRepair,
    DataVinciConfig,
    clean_column,
    clean_table,
)


def _repairs(table, **cfg):
    return clean_table(pd.DataFrame(table), DataVinciConfig(**cfg))


class TestDetection:
    def test_intro_c_column_no_majority(self):
        # Two equal patterns: no value is an error under majority (§1).
        assert _repairs({"col1": ["c-1", "c-2", "c3", "c4"]}) == []

    def test_majority_flags_minority(self):
        reps = _repairs({"c": ["c-1", "c-2", "c-3", "c-4", "c5"]})
        assert [r.original for r in reps] == ["c5"]
        assert reps[0].repaired == "c-5"

    def test_irregular_column_flags_nothing(self):
        # Fig 6 ②: no significant pattern -> no detections.
        assert _repairs({"c": ["alpha", "9-9-9", "x_1", "??", "zz z"]}) == []

    def test_error_covered_by_significant_pattern_missed(self):
        # Fig 6 ①: the error recurs enough to be significant.
        vals = ["AB", "CD", "EF", "GH", "X0", "Y0", "Z0"]
        assert _repairs({"c": vals}) == []

    def test_numeric_columns_skipped(self):
        assert _repairs({"n": ["1", "2", "3", "400"]}) == []

    def test_short_columns_skipped(self):
        assert _repairs({"c": ["a-1", "b2"]}) == []

    def test_delta_controls_significance(self):
        vals = ["a-1"] * 6 + ["b_2"] * 2
        loose = clean_table(pd.DataFrame({"c": vals}), DataVinciConfig(delta=0.1))
        strict = clean_table(pd.DataFrame({"c": vals}), DataVinciConfig(delta=0.5))
        assert loose == []  # both patterns significant at δ=0.1
        assert len(strict) == 2  # only the majority survives at δ=0.5


class TestRepair:
    def test_fig2_player_id(self):
        t = {
            "Category": [
                "Junior", "Professional", "Professional", "Junior",
                "Junior", "Professional", "Junior",
            ],
            "PlayerID": [
                "IN-674-CAT", "US-292-PRO", "usa_837", "PL-121-CAT",
                "UK-230-CAT", "FR-111-PRO", "DE-009-CAT",
            ],
        }
        reps = _repairs(t)
        assert reps == [
            CellRepair("PlayerID", 2, "usa_837", "US-837-PRO")
        ]

    def test_city_typo_repaired_semantically(self):
        t = {
            "Area": [
                "Birmingham", "London", "Wales", "Hampton", "Rockford",
                "Birminxham", "London", "Wales",
            ]
        }
        reps = _repairs(t)
        assert reps == [
            CellRepair("Area", 5, "Birminxham", "Birmingham")
        ]

    def test_county_example(self):
        # §5.1: Nevad210 -> Nevada_210 (mixed syntactic + semantic).
        vals = ["Alpine_231", "Kings_721", "Lake_201", "Marin_246", "Nevad210"]
        reps = _repairs({"County": vals})
        assert len(reps) == 1
        assert reps[0].repaired == "Nevada_210"

    def test_cross_column_concretization(self):
        t = {
            "Region": ["East", "West", "North", "South", "East", "West"],
            "SiteID": ["E-100", "W-200", "N-300", "S-400", "-500", "W-600"],
        }
        reps = [r for r in _repairs(t) if r.column == "SiteID"]
        assert reps and reps[0].repaired == "E-500"

    def test_repair_matches_significant_language(self):
        reps = _repairs({"c": ["03:45", "04:12", "05:59", "03.22", "09:01"]})
        assert reps and reps[0].repaired == "03:22"


class TestAblations:
    t_semantic = {
        "Code": ["US-1", "UK-2", "IN-3", "FR-4", "usa_5", "DE-6", "PL-7"]
    }

    def test_full_repairs_semantics(self):
        reps = _repairs(self.t_semantic)
        assert reps[0].repaired == "US-5"

    def test_no_semantic_abstraction(self):
        reps = _repairs(self.t_semantic, semantic=False)
        # Without masking, the column has no single significant pattern
        # covering the country slot semantically; whatever is suggested
        # must not be the semantic repair US-5.
        assert all(r.repaired != "US-5" for r in reps)

    def test_limited_semantic_concretization(self):
        reps = _repairs(self.t_semantic, semantic_repair=False)
        assert reps and reps[0].repaired == "usa-5"

    def test_edit_distance_ranking_runs(self):
        reps = _repairs(self.t_semantic, edit_distance_ranking=True)
        assert reps and reps[0].original == "usa_5"

    def test_no_learned_concretization_loses_cross_column(self):
        t = {
            "Region": ["East", "West", "North", "South"] * 3,
            "SiteID": [f"{r[0]}-{100+i}" for i, r in enumerate(
                ["East", "West", "North", "South"] * 3
            )],
        }
        t["SiteID"][5] = t["SiteID"][5][1:]  # drop the region letter
        full = [r for r in _repairs(t) if r.column == "SiteID"]
        ablated = [
            r
            for r in _repairs(t, learned_concretization=False)
            if r.column == "SiteID"
        ]
        assert full and full[0].repaired == "W-105"
        assert ablated and ablated[0].repaired != "W-105"


class TestColumnReport:
    def test_report_contents(self):
        rep = clean_column(
            ["a-1", "a-2", "a-3", "b9"], None, DataVinciConfig(), "c"
        )
        assert len(rep.significant) == 1
        assert rep.flagged == [3]
        assert rep.repairs[0].repaired == "a-9" or rep.repairs[0].repaired

    def test_empty_column(self):
        rep = clean_column([], None, DataVinciConfig(), "c")
        assert rep.flagged == [] and rep.repairs == []

    def test_long_values_guarded(self):
        vals = ["ab-1"] * 5 + ["x" * 500]
        rep = clean_column(
            vals, None, DataVinciConfig(max_value_len=50), "c"
        )
        assert rep.flagged == [5]
        assert rep.repairs[0].repaired is None  # detected, not repaired


class TestCleanTableShape:
    def test_multiple_columns_independent(self):
        t = {
            "a": ["x-1", "x-2", "x-3", "x4"],
            "b": ["ok", "ok", "ok", "ok"],
        }
        reps = _repairs(t)
        assert {r.column for r in reps} == {"a"}

    def test_handles_nan(self):
        t = pd.DataFrame({"a": ["x-1", "x-2", None, "x-3", "x-4"]})
        clean_table(t)  # must not raise

    @pytest.mark.parametrize("n", [4, 16])
    def test_scales_with_rows(self, n):
        t = {"a": [f"v-{i}" for i in range(n - 1)] + ["broken"]}
        reps = _repairs(t)
        assert [r.original for r in reps] == ["broken"]
