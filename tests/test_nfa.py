"""NFA matching and DAG unrolling."""
import pytest
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import chars
from repro.core.nfa import build_dag, matches
from repro.core.regexlang import Alt, Cls, Lit, Mask, Pattern, Rep, lits


def P(*atoms):
    return Pattern(tuple(atoms))


class TestMatching:
    def test_literal_sequence(self):
        p = P(*lits("abc"))
        assert matches(p, "abc")
        assert not matches(p, "ab")
        assert not matches(p, "abcd")

    def test_class_match(self):
        p = P(Lit("c"), Lit("-"), Cls(chars.DIGIT))
        assert matches(p, "c-1")
        assert not matches(p, "c-x")

    def test_alt_match(self):
        p = P(Alt(("CAT", "PRO")), Lit("1"))
        assert matches(p, "CAT1")
        assert matches(p, "PRO1")
        assert not matches(p, "DOG1")

    def test_alt_different_lengths(self):
        p = P(Alt(("ab", "abcd")), Lit("!"))
        assert matches(p, "ab!")
        assert matches(p, "abcd!")

    def test_rep_one_or_more(self):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        assert matches(p, "A1.")
        assert matches(p, "A1.A2.A3.")
        assert not matches(p, "")
        assert not matches(p, "A1")
        assert not matches(p, "A1.A2")

    def test_rep_followed_by_suffix(self):
        p = P(Rep((Cls(chars.DIGIT),)), Lit("x"))
        assert matches(p, "123x")
        assert not matches(p, "x")

    def test_mask_matching(self):
        m = chars.mask_char(0)
        p = P(Mask(m), Lit("-"), Cls(chars.DIGIT))
        assert matches(p, f"{m}-1")
        assert not matches(p, "a-1")

    def test_empty_pattern_matches_empty_string(self):
        assert matches(P(), "")
        assert not matches(P(), "a")

    def test_anchored_both_ends(self):
        p = P(Cls(chars.DIGIT))
        assert not matches(p, "12")
        assert not matches(p, "1a")


class TestDag:
    def test_edges_are_forward(self):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT))), Alt(("xy", "z")))
        dag = build_dag(p, 8)
        for e in dag.edges:
            assert e.u < e.v
        for u, v in dag.eps:
            assert u < v

    def test_unroll_count_follows_value_length(self):
        p = P(Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))))
        # unit length 3, value length 4 -> ceil(4/3) = 2 unrolls -> 6 edges
        dag = build_dag(p, 4)
        assert len(dag.edges) == 6
        assert len(dag.eps) == 2  # one exit per unroll

    def test_alt_edges_tagged(self):
        p = P(Alt(("CAT", "PRO")))
        dag = build_dag(p, 3)
        opts = {e.label.alt_option for e in dag.edges}
        assert opts == {0, 1}
        slots = {e.label.alt_slot for e in dag.edges}
        assert len(slots) == 1

    def test_cls_slots_carry_occurrence(self):
        p = P(Rep((Cls(chars.DIGIT),)))
        dag = build_dag(p, 3)
        slots = {e.label.slot for e in dag.edges}
        assert len(slots) == 3  # one per unrolled occurrence

    def test_label_admits(self):
        p = P(Cls(chars.UPPER))
        dag = build_dag(p, 1)
        lbl = dag.edges[0].label
        assert lbl.admits("Q") and not lbl.admits("q")
        assert lbl.is_abstract()


@st.composite
def _pattern_and_member(draw):
    """A random pattern plus a string constructed to be in its language."""
    n_atoms = draw(st.integers(1, 4))
    atoms, s = [], []
    for _ in range(n_atoms):
        kind = draw(st.sampled_from(["lit", "cls", "alt", "rep"]))
        if kind == "lit":
            ch = draw(st.sampled_from("ab-7"))
            atoms.append(Lit(ch))
            s.append(ch)
        elif kind == "cls":
            atoms.append(Cls(chars.DIGIT))
            s.append(draw(st.sampled_from("0123456789")))
        elif kind == "alt":
            opts = ("xx", "yyy")
            atoms.append(Alt(opts))
            s.append(draw(st.sampled_from(opts)))
        else:
            atoms.append(Rep((Lit("z"), Cls(chars.DIGIT))))
            for _ in range(draw(st.integers(1, 3))):
                s.append("z" + draw(st.sampled_from("0123456789")))
    return Pattern(tuple(atoms)), "".join(s)


class TestProperties:
    @settings(max_examples=60, deadline=None)
    @given(_pattern_and_member())
    def test_constructed_members_match(self, pm):
        pattern, member = pm
        assert matches(pattern, member)

    @settings(max_examples=60, deadline=None)
    @given(_pattern_and_member(), st.text("abz019-", max_size=6))
    def test_match_agrees_with_python_re(self, pm, probe):
        import re

        pattern, _ = pm
        from repro.core.regexlang import pattern_str

        # pattern_str is designed to be a valid Python regex for patterns
        # without masks (escaping handled for specials we generate).
        rx = re.compile(pattern_str(pattern).replace("(xx|yyy)", "(?:xx|yyy)"))
        assert matches(pattern, probe) == bool(rx.fullmatch(probe))
