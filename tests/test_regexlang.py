"""Pattern AST invariants and rendering."""
import pytest

from repro.core import chars
from repro.core.regexlang import (
    Alt,
    Cls,
    Lit,
    Mask,
    Pattern,
    Rep,
    atom_min_len,
    lits,
    pattern_min_len,
    pattern_str,
)


class TestAtoms:
    def test_lit_single_char_only(self):
        with pytest.raises(ValueError):
            Lit("ab")

    def test_cls_unknown_name_rejected(self):
        with pytest.raises(ValueError):
            Cls("VOWELS")

    def test_mask_requires_mask_symbol(self):
        with pytest.raises(ValueError):
            Mask("x")
        Mask(chars.mask_char(0))  # ok

    def test_alt_needs_two_options(self):
        with pytest.raises(ValueError):
            Alt(("only",))
        with pytest.raises(ValueError):
            Alt(("a", ""))

    def test_rep_rejects_empty_unit(self):
        with pytest.raises(ValueError):
            Rep(())

    def test_rep_rejects_nesting(self):
        with pytest.raises(ValueError):
            Rep((Rep((Lit("a"),)),))

    def test_atoms_hashable(self):
        assert len({Lit("a"), Lit("a"), Cls(chars.DIGIT)}) == 2


class TestMinLen:
    def test_unit_atoms(self):
        assert atom_min_len(Lit("x")) == 1
        assert atom_min_len(Cls(chars.DIGIT)) == 1

    def test_alt_min_is_shortest_option(self):
        assert atom_min_len(Alt(("cat", "do"))) == 2

    def test_rep_min_is_one_unit(self):
        assert atom_min_len(Rep((Lit("a"), Cls(chars.DIGIT)))) == 2

    def test_pattern_min_len_sums(self):
        p = Pattern((Lit("c"), Lit("-"), Cls(chars.DIGIT)))
        assert pattern_min_len(p) == 3


class TestRendering:
    def test_run_length_compression(self):
        p = Pattern(tuple(Cls(chars.DIGIT) for _ in range(3)))
        assert pattern_str(p) == "[0-9]{3}"

    def test_mixed_rendering(self):
        p = Pattern((Lit("A"), Cls(chars.DIGIT), Lit(".")))
        assert pattern_str(p) == "A[0-9]\\."

    def test_rep_rendering(self):
        p = Pattern((Rep((Lit("A"), Cls(chars.DIGIT), Lit("."))),))
        assert pattern_str(p) == "(A[0-9]\\.)+"

    def test_alt_rendering(self):
        p = Pattern((Alt(("CAT", "PRO")),))
        assert pattern_str(p) == "(CAT|PRO)"

    def test_lits_helper(self):
        assert lits("ab") == (Lit("a"), Lit("b"))
