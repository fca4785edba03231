"""Edit actions, programs, and Levenshtein helper."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core.edits import (
    EditProgram,
    EditStep,
    alnum_edit_ops,
    levenshtein,
)


def prog(*steps):
    return EditProgram(tuple(steps))


class TestApply:
    def test_match_emits_consumed(self):
        p = prog(EditStep("M", char="a", emit="a"))
        assert p.apply() == "a"

    def test_table1_costs(self):
        assert EditStep("M", char="a", emit="a").cost == 0
        assert EditStep("I", emit="x").cost == 1
        assert EditStep("D", char="a").cost == 1
        assert EditStep("S", char="a", emit="b").cost == 1

    def test_example2_semantics(self):
        # [M, S(2), I(.)] over "AAA3" prefix behaviour: M keeps, S swaps,
        # I inserts without consuming.
        p = prog(
            EditStep("M", char="A", emit="A"),
            EditStep("S", char="A", emit="2"),
            EditStep("I", emit="."),
            EditStep("M", char="A", emit="A"),
            EditStep("M", char="3", emit="3"),
        )
        assert p.apply() == "A2.A3"
        assert p.consumed() == "AAA3"
        assert p.cost == 2

    def test_delete_consumes_without_emitting(self):
        p = prog(EditStep("D", char="x"), EditStep("M", char="a", emit="a"))
        assert p.apply() == "a"
        assert p.consumed() == "xa"

    def test_abstract_step_raises_until_concretized(self):
        p = prog(EditStep("S", char="a", emit=None))
        assert p.abstract_steps() == [0]
        with pytest.raises(ValueError):
            p.apply()
        assert p.concretize({0: "7"}).apply() == "7"

    def test_concretize_preserves_other_steps(self):
        p = prog(
            EditStep("M", char="x", emit="x"),
            EditStep("I", emit=None),
        )
        c = p.concretize({1: "-"})
        assert c.apply() == "x-"
        assert p.steps[1].emit is None  # original untouched


class TestAlnumOps:
    def test_counts_only_non_match_alnum(self):
        p = prog(
            EditStep("M", char="a", emit="a"),
            EditStep("I", emit="-"),
            EditStep("S", char="1", emit="2"),
        )
        assert alnum_edit_ops(p) == 1

    def test_delimiter_edits_free(self):
        p = prog(EditStep("I", emit="-"), EditStep("D", char="."))
        assert alnum_edit_ops(p) == 0


class TestLevenshtein:
    @pytest.mark.parametrize(
        "a,b,d",
        [
            ("", "", 0),
            ("abc", "abc", 0),
            ("abc", "abd", 1),
            ("abc", "ab", 1),
            ("kitten", "sitting", 3),
            ("", "xyz", 3),
        ],
    )
    def test_known_distances(self, a, b, d):
        assert levenshtein(a, b) == d

    @settings(max_examples=50, deadline=None)
    @given(st.text(max_size=8), st.text(max_size=8))
    def test_symmetry(self, a, b):
        assert levenshtein(a, b) == levenshtein(b, a)

    @settings(max_examples=50, deadline=None)
    @given(st.text(max_size=6), st.text(max_size=6), st.text(max_size=6))
    def test_triangle_inequality(self, a, b, c):
        assert levenshtein(a, c) <= levenshtein(a, b) + levenshtein(b, c)
