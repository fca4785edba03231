"""Baseline systems: each keeps its characteristic strengths and blind
spots (§4.3, §5.1-5.2)."""
import pandas as pd
import pytest

from repro.baselines import (
    autodetect_lite,
    gpt_sim,
    holoclean_lite,
    potters_wheel,
    raha_lite,
    t5_sim,
    wmrr,
)
from repro.baselines.common import (
    format_align,
    is_numeric_column,
    nearest_frequent,
    value_counts,
)


def T(**cols):
    return pd.DataFrame(cols)


def flagged(preds):
    return {(p.column, p.row) for p in preds}


class TestCommon:
    def test_nearest_frequent_basic(self):
        counts = value_counts(["red"] * 5 + ["blue"] * 4 + ["rad"])
        assert nearest_frequent("rad", counts) == "red"

    def test_nearest_frequent_guard_blocks_distinct_ids(self):
        vals = [f"Q1-{20 + i}" for i in range(10)] + ["Q1-22"]
        counts = value_counts(vals)
        assert nearest_frequent("Q1-29", counts) is None

    def test_is_numeric_column(self):
        assert is_numeric_column(["1", "2.5", "-3"])
        assert not is_numeric_column(["1", "x"])

    def test_format_align_delimiter_swap(self):
        vals = ["03:45", "04:12", "09:59", "11:11", "03.22"]
        assert format_align("03.22", vals) == "03:22"

    def test_format_align_run_split(self):
        vals = ["03:45", "04:12", "09:59", "11:11", "0334"]
        assert format_align("0334", vals) == "03:34"

    def test_format_align_missing_dot(self):
        vals = ["S.1.2", "S.2.3", "S.1.3", "S.2.1", "S1.4"]
        assert format_align("S1.4", vals) == "S.1.4"

    def test_format_align_none_for_conforming(self):
        vals = ["a-1", "b-2", "c-3", "d-4"]
        assert format_align("a-1", vals) is None

    def test_format_align_none_without_dominant(self):
        vals = ["a-1", "b_2", "c.3", "d 4"]
        assert format_align("b_2", vals) is None


class TestWMRR:
    def test_fd_violation_repaired(self):
        t = T(
            country=["US", "US", "US", "UK", "UK", "US"],
            capital=[
                "Washington", "Washington", "Washington",
                "London", "London", "London",
            ],
        )
        preds = wmrr.run(t)
        assert ("capital", 5) in flagged(preds)
        rep = [p for p in preds if p.row == 5][0]
        assert rep.repair == "Washington"

    def test_format_rule_recall(self):
        t = T(c=["03:45", "04:12", "09:59", "11:11", "03.22"])
        preds = wmrr.run(t)
        assert [p.repair for p in preds] == ["03:22"]

    def test_no_semantic_reasoning(self):
        # §5.2: WMRR misses semantic repairs.
        t = T(c=["Birmingham", "London", "Wales", "Hampton", "Birminxham"])
        assert all(p.repair != "Birmingham" for p in wmrr.run(t))

    def test_small_tables_skipped(self):
        assert wmrr.run(T(c=["a", "b"])) == []


class TestHoloClean:
    def test_categorical_snap(self):
        t = T(c=["red"] * 6 + ["blue"] * 5 + ["rad"])
        preds = holoclean_lite.run(t)
        assert [(p.row, p.repair) for p in preds] == [(11, "red")]

    def test_distinct_id_columns_untouched(self):
        t = T(c=[f"id-{i:04d}" for i in range(20)])
        assert holoclean_lite.run(t) == []

    def test_cooccurrence_informs_repair(self):
        t = T(
            dept=["sales", "sales", "eng", "eng"] * 4,
            code=["S", "S", "E", "E"] * 3 + ["S", "S", "E", "X"],
        )
        preds = holoclean_lite.run(t)
        rep = [p for p in preds if p.column == "code"]
        assert rep and rep[0].repair == "E"


class TestRaha:
    def _table(self):
        return T(c=["a-1", "a-2", "a-3", "a-4", "a-5", "b##99"])

    def test_labels_propagate_to_cluster(self):
        t = self._table()
        preds = raha_lite.run(t, {("c", 5): "a-6"})
        assert ("c", 5) in flagged(preds)

    def test_without_labels_majority_vote(self):
        preds = raha_lite.run(self._table(), {})
        # configuration-free fallback still finds the gross outlier
        assert ("c", 5) in flagged(preds)

    def test_clean_cluster_not_flagged_by_label(self):
        # A label landing on an all-quiet cell must not flag anything:
        # repeated values and repeated characters trip no detector.
        t = T(c=["a-1", "a-1", "a-2", "a-2", "a-3", "a-3", "b##9!"])
        preds = raha_lite.run(t, {("c", 0): "a-1"})
        assert ("c", 0) not in flagged(preds)


class TestAutoDetect:
    def test_rare_signature_flagged(self):
        t = T(c=["12-34"] * 9 + ["12:34"])
        assert ("c", 9) in flagged(autodetect_lite.run(t))

    def test_detection_only(self):
        t = T(c=["12-34"] * 9 + ["12:34"])
        assert all(p.repair is None for p in autodetect_lite.run(t))

    def test_semantic_structure_variation_false_positive(self):
        # §5.2: purely syntactic generalization flags multi-word cities.
        t = T(c=["London"] * 6 + ["Boston"] * 5 + ["New York"])
        assert ("c", 11) in flagged(autodetect_lite.run(t))

    def test_no_dominant_structure_silent(self):
        t = T(c=["a-1", "b_2", "c.3", "d 4", "e+5", "(f)6"])
        assert autodetect_lite.run(t) == []


class TestPottersWheel:
    def test_mdl_structure_violation(self):
        t = T(c=["ab-12"] * 10 + ["ab#12"])
        assert ("c", 10) in flagged(potters_wheel.run(t))

    def test_common_second_structure_absorbed(self):
        vals = ["ab-12"] * 8 + ["xy:9"] * 6
        assert potters_wheel.run(T(c=vals)) == []

    def test_detection_only(self):
        t = T(c=["ab-12"] * 10 + ["ab#12"])
        assert all(p.repair is None for p in potters_wheel.run(t))


class TestT5:
    def test_overfires_relative_to_pattern_systems(self):
        t = T(c=["aaaa1", "aaaa2", "aaaa3", "zq!?x", "aaaa5", "aaaa6"])
        assert ("c", 3) in flagged(t5_sim.run(t))

    def test_noisy_channel_decode_caps(self):
        t = T(c=["chrome", "chrome", "chrome", "chrome", "chrOme", "chrome"])
        preds = t5_sim.run(t)
        match = [p for p in preds if p.row == 4]
        if match:  # decoding is best-effort; if it fires it must fix case
            assert match[0].repair == "chrome"

    def test_repeated_values_trusted(self):
        t = T(c=["##" for _ in range(6)])
        assert t5_sim.run(t) == []


class TestGPTSim:
    def test_semantic_detection(self):
        t = T(c=["Birmingham", "London", "Wales", "Hampton", "Birminxham"])
        preds = gpt_sim.run(t)
        assert [(p.row, p.repair) for p in preds] == [(4, "Birmingham")]

    def test_quarter_range_outlier(self):
        # §5.1: GPT-3.5 spots Q5-20 in a quarters column.
        t = T(c=["Q1-22", "Q4-21", "Q5-20", "Q2-20", "Q1-21", "Q2-22", "Q4-20", "Q1-20"])
        preds = gpt_sim.run(t)
        assert ("c", 2) in flagged(preds)

    def test_syntactic_pattern_blindness(self):
        # §5.1: GPT-3.5 misses S1.4 among S.x.y values.
        t = T(c=["S.1.2", "S.2.3", "S1.4", "S.1.3", "S.2.1"])
        assert ("c", 2) not in flagged(gpt_sim.run(t))

    def test_repair_cell_head_uses_format(self):
        t = T(c=["03:45", "04:12", "09:59", "11:11", "03.22"])
        assert gpt_sim.repair_cell(t, "c", 4) == "03:22"

    def test_repair_cell_semantic(self):
        t = T(c=["Birmingham", "London", "Wales", "Hampton", "Birminxham"])
        assert gpt_sim.repair_cell(t, "c", 4) == "Birmingham"
