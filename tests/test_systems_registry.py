"""System registry and harness label protocol."""
import pandas as pd
import pytest

from repro.eval.harness import _labels_for
from repro.eval.systems import DETECTION_VIEW, SYSTEMS, get_system


class TestRegistry:
    def test_eight_table5_systems_present(self):
        for name in [
            "WMRR", "HoloClean", "Raha + GPT-3.5",
            "Potters-Wheel + GPT-3.5", "Auto-Detect + GPT-3.5",
            "T5", "GPT-3.5", "DataVinci",
        ]:
            assert name in SYSTEMS

    def test_ablations_registered(self):
        assert "DataVinci (no semantic abstraction)" in SYSTEMS
        assert "DataVinci (edit distance ranking)" in SYSTEMS

    def test_detection_views(self):
        assert set(DETECTION_VIEW) == {"Raha", "Potters-Wheel", "Auto-Detect"}

    def test_get_system_resolves_both(self):
        assert get_system("Raha") is DETECTION_VIEW["Raha"]
        assert get_system("DataVinci") is SYSTEMS["DataVinci"]

    def test_unknown_system_raises(self):
        with pytest.raises(KeyError):
            get_system("nonsense")

    def test_gpt_head_attaches_repairs(self):
        vals = [f"0{i}:1{i}" for i in range(10)] + ["03.22"]
        t = pd.DataFrame({"c": vals})
        preds = get_system("Auto-Detect + GPT-3.5")(t, None)
        assert preds and preds[0].repair == "03:22"

    def test_every_system_runs_on_small_table(self):
        t = pd.DataFrame({"c": ["a-1", "a-2", "a-3", "a-4", "b9"]})
        for name, fn in SYSTEMS.items():
            preds = fn(t, None)
            for p in preds:
                assert 0 <= p.row < len(t)


class TestLabels:
    def test_first_five_per_column(self):
        errors = {("c", r) for r in range(9)} | {("d", 0)}
        clean = {k: f"v{k[1]}" for k in errors}
        labels = _labels_for(clean, errors)
        assert len([k for k in labels if k[0] == "c"]) == 5
        assert ("c", 0) in labels and ("c", 8) not in labels
        assert labels[("d", 0)] == "v0"

    def test_empty(self):
        assert _labels_for({}, set()) == {}
