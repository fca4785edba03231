"""Minimal edit programs via DP — correctness against brute force."""
from itertools import product

from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import chars
from repro.core.editdp import (
    minimal_program,
    parse_consumption,
    program_edited_alt_groups,
    restrict_alt,
)
from repro.core.edits import levenshtein
from repro.core.nfa import build_dag, matches
from repro.core.regexlang import Alt, Cls, Lit, Pattern, Rep, lits


def P(*atoms):
    return Pattern(tuple(atoms))


def _language(pattern, max_len, alphabet="Ac.-013"):
    """Brute-force enumeration of short members of a pattern's language
    over a small alphabet, for minimality cross-checks."""
    out = set()
    for n in range(max_len + 1):
        for tup in product(alphabet, repeat=n):
            s = "".join(tup)
            if matches(pattern, s):
                out.add(s)
    return out


class TestMinimality:
    def test_intro_example(self):
        p = P(Lit("c"), Lit("-"), Cls(chars.DIGIT))
        prog = minimal_program(build_dag(p, 2), "c3")
        assert prog.cost == 1
        assert prog.apply() == "c-3"

    def test_fig4_example(self):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        prog = minimal_program(build_dag(p, 4), "AAA3")
        assert prog.cost == 3
        out = prog.concretize({i: "2" for i in prog.abstract_steps()}).apply()
        assert out == "A2.A3."

    def test_zero_cost_when_already_matching(self):
        p = P(*lits("abc"))
        prog = minimal_program(build_dag(p, 3), "abc")
        assert prog.cost == 0
        assert prog.apply() == "abc"

    def test_result_always_in_language(self):
        p = P(Lit("x"), Cls(chars.DIGIT), Cls(chars.DIGIT))
        for s in ["", "x", "x1", "yy12345", "99"]:
            prog = minimal_program(build_dag(p, max(1, len(s))), s)
            out = prog.concretize(
                {i: "0" for i in prog.abstract_steps()}
            ).apply()
            assert matches(p, out), (s, out)

    def test_cost_equals_levenshtein_to_language(self):
        p = P(Lit("c"), Lit("-"), Cls(chars.DIGIT))
        lang = _language(p, 4)
        for s in ["c3", "c-", "-1", "cc-11", ""]:
            prog = minimal_program(build_dag(p, max(1, len(s))), s)
            brute = min(levenshtein(s, m) for m in lang)
            assert prog.cost == brute, s

    @settings(max_examples=25, deadline=None)
    @given(st.text("A1.x", max_size=4))
    def test_cost_matches_bruteforce_rep_pattern(self, s):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        lang = _language(p, min(6, len(s) + 3), alphabet="A1.x")
        prog = minimal_program(build_dag(p, max(1, len(s))), s)
        brute = min(levenshtein(s, m) for m in lang)
        assert prog.cost == brute

    def test_prefers_matches_on_ties(self):
        # Among equal-cost programs, more original characters survive.
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        prog = minimal_program(build_dag(p, 4), "AAA3")
        matched = sum(1 for st_ in prog.steps if st_.action == "M")
        assert matched >= 3


class TestParse:
    def test_parse_records_slot_chars(self):
        p = P(Lit("A"), Cls(chars.DIGIT), Cls(chars.DIGIT))
        info = parse_consumption(build_dag(p, 3), "A25")
        assert sorted(info.slot_chars.values()) == ["2", "5"]

    def test_parse_rejects_nonmembers(self):
        p = P(Lit("A"), Cls(chars.DIGIT))
        assert parse_consumption(build_dag(p, 2), "AB") is None

    def test_parse_records_alt_choice(self):
        p = P(Alt(("CAT", "PRO")), Lit("1"))
        info = parse_consumption(build_dag(p, 4), "PRO1")
        assert list(info.alt_choices.values()) == [1]

    def test_parse_rep_occurrences_separate(self):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        info = parse_consumption(build_dag(p, 6), "A2.A5.")
        assert sorted(info.slot_chars.values()) == ["2", "5"]
        assert len(info.slot_chars) == 2  # distinct occurrence slots


class TestAltHandling:
    def test_edited_alt_groups_detected(self):
        p = P(Alt(("CAT", "PRO")), Lit("1"))
        dag = build_dag(p, 2)
        prog = minimal_program(dag, "C1")
        assert len(program_edited_alt_groups(prog)) == 1

    def test_unedited_alt_not_reported(self):
        p = P(Alt(("CAT", "PRO")), Lit("1"))
        prog = minimal_program(build_dag(p, 4), "CAT1")
        assert program_edited_alt_groups(prog) == set()

    def test_restrict_alt_forces_option(self):
        p = P(Alt(("CAT", "PRO")), Lit("1"))
        dag = build_dag(p, 2)
        for oi, expect in ((0, "CAT1"), (1, "PRO1")):
            prog = minimal_program(restrict_alt(dag, ("alt", 0), oi), "X1")
            assert prog.apply() == expect
