"""FlashProfile-lite: tokenization, clustering, refinement."""
from hypothesis import given, settings
from hypothesis import strategies as st

from repro.core import chars
from repro.core.nfa import matches
from repro.core.profiler import (
    LearnedPattern,
    Token,
    learn_patterns,
    signature,
    significant_patterns,
    tokenize,
)
from repro.core.regexlang import Alt, Cls, Lit, Rep


class TestTokenize:
    def test_runs_merge_cases(self):
        assert tokenize("Chrome23") == (Token("A", "Chrome"), Token("D", "23"))

    def test_symbols_individual(self):
        toks = tokenize("a--b")
        assert [t.kind for t in toks] == ["A", "Y", "Y", "A"]

    def test_spaces_are_one_run(self):
        toks = tokenize("a  b")
        assert [t.kind for t in toks] == ["A", "SP", "A"]
        assert toks[1].text == "  "

    def test_mask_token(self):
        m = chars.mask_char(0)
        toks = tokenize(f"{m}-12")
        assert toks[0].kind == "M"

    def test_empty(self):
        assert tokenize("") == ()

    def test_roundtrip_text(self):
        for s in ["US-837-PRO", "03:45", "(12) 3", "a b_c9"]:
            assert "".join(t.text for t in tokenize(s)) == s


class TestSignature:
    def test_delimiters_distinguish(self):
        assert signature("a-1") != signature("a_1")

    def test_letter_text_does_not_distinguish(self):
        assert signature("US-12") == signature("UK-9")

    def test_repetition_collapses_to_root(self):
        assert signature("A2.") == signature("A2.A3.A9.")

    def test_non_periodic_keeps_whole(self):
        assert signature("03:45") != signature("03:45:59")


class TestLearn:
    def test_single_uniform_cluster(self):
        vals = ["US-123", "UK-456", "IN-789"]
        lps = learn_patterns(vals)
        assert len(lps) == 1
        assert lps[0].count == 3

    def test_learned_patterns_cover_their_values(self):
        vals = ["US-123", "usa_837", "QUAL-1", "A2.A3.", "A5.", "03:45", ""]
        for lp in learn_patterns(vals):
            for v in lp.values:
                assert matches(lp.pattern, v), (str(lp.pattern), v)

    def test_constants_specialize(self):
        vals = ["S.1.2", "S.2.3", "S.1.3"]
        (lp,) = learn_patterns(vals)
        assert str(lp.pattern).startswith("S")
        assert Lit("S") in lp.pattern.atoms

    def test_fixed_width_digits(self):
        vals = ["ab-12", "cd-34", "ef-56"]
        (lp,) = learn_patterns(vals)
        assert lp.pattern.atoms.count(Cls(chars.DIGIT)) == 2

    def test_variable_width_digits_quantified(self):
        vals = ["x-1", "x-22", "x-333"]
        (lp,) = learn_patterns(vals)
        assert Rep((Cls(chars.DIGIT),)) in lp.pattern.atoms

    def test_disjunction_learned(self):
        vals = ["a-CAT", "b-PRO", "c-CAT", "d-PRO", "e-CAT"]
        (lp,) = learn_patterns(vals)
        assert Alt(("CAT", "PRO")) in lp.pattern.atoms

    def test_no_disjunction_for_singletons(self):
        vals = ["a-CAT", "b-PRO", "c-DOG", "d-EEL"]
        (lp,) = learn_patterns(vals)
        assert not any(isinstance(a, Alt) for a in lp.pattern.atoms)

    def test_repetition_learned(self):
        vals = ["A2.A3.", "A3.", "A5.A7.A9."]
        (lp,) = learn_patterns(vals)
        assert str(lp.pattern) == "(A[0-9]\\.)+"

    def test_title_case_split(self):
        vals = ["London", "Wales", "Birmingham"]
        (lp,) = learn_patterns(vals)
        assert lp.pattern.atoms[0] == Cls(chars.UPPER)
        assert lp.pattern.atoms[1] == Rep((Cls(chars.LOWER),))

    def test_nested_rep_fallback_splits_by_count(self):
        # letter runs of variable width inside a repetition would need a
        # nested quantifier; the cluster must split instead of crashing.
        vals = ["ab-cd-", "x-", "ab-x-", "q-"]
        lps = learn_patterns(vals)
        for lp in lps:
            for v in lp.values:
                assert matches(lp.pattern, v)

    def test_max_patterns_caps(self):
        vals = [f"{c}{i}" * (i + 1) for i, c in enumerate("abcdefgh")]
        lps = learn_patterns(vals, max_patterns=3)
        assert len(lps) <= 3

    def test_sorted_by_coverage(self):
        vals = ["a1", "a2", "a3", "b-1"]
        lps = learn_patterns(vals)
        assert lps[0].count >= lps[-1].count

    @settings(max_examples=50, deadline=None)
    @given(st.lists(st.text("abAB01-_. ", min_size=0, max_size=10), min_size=1, max_size=12))
    def test_soundness_property(self, vals):
        """Every value always matches the pattern of its own cluster."""
        for lp in learn_patterns(vals):
            for v in lp.values:
                assert matches(lp.pattern, v)


class TestSignificance:
    def test_threshold_filters(self):
        lps = [
            LearnedPattern(learn_patterns(["a1", "a2"])[0].pattern, 8, []),
            LearnedPattern(learn_patterns(["b-"])[0].pattern, 1, []),
        ]
        sig = significant_patterns(lps, 10, 0.15)
        assert len(sig) == 1

    def test_singletons_never_significant(self):
        lps = learn_patterns(["only"])
        assert significant_patterns(lps, 1, 0.0) == []

    def test_delta_zero_keeps_all_recurring(self):
        lps = learn_patterns(["a1", "a2", "b-", "b-"])
        assert len(significant_patterns(lps, 4, 0.0)) == 2
