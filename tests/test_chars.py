"""Character classes and the mask alphabet."""
import pytest

from repro.core import chars


class TestClasses:
    def test_digit_class(self):
        assert chars.char_in_class("5", chars.DIGIT)
        assert not chars.char_in_class("a", chars.DIGIT)

    def test_bin_class_subset_of_digits(self):
        assert chars.CLASS_CHARS[chars.BIN] < chars.CLASS_CHARS[chars.DIGIT]

    def test_lower_upper_disjoint(self):
        assert not (chars.CLASS_CHARS[chars.LOWER] & chars.CLASS_CHARS[chars.UPPER])

    def test_alpha_is_union_of_cases(self):
        assert chars.CLASS_CHARS[chars.ALPHA] == (
            chars.CLASS_CHARS[chars.LOWER] | chars.CLASS_CHARS[chars.UPPER]
        )

    def test_alnum_contains_digits_and_letters(self):
        assert chars.CLASS_CHARS[chars.DIGIT] < chars.CLASS_CHARS[chars.ALNUM]
        assert chars.CLASS_CHARS[chars.ALPHA] < chars.CLASS_CHARS[chars.ALNUM]

    def test_alnumsp_adds_space(self):
        assert " " in chars.CLASS_CHARS[chars.ALNUMSP]
        assert " " not in chars.CLASS_CHARS[chars.ALNUM]

    def test_every_class_has_regex(self):
        assert set(chars.CLASS_REGEX) == set(chars.CLASS_CHARS)


class TestMaskAlphabet:
    def test_mask_char_roundtrip(self):
        for i in (0, 5, 19):
            assert chars.is_mask_char(chars.mask_char(i))

    def test_mask_chars_distinct(self):
        assert chars.mask_char(0) != chars.mask_char(1)

    def test_ordinary_chars_are_not_masks(self):
        for ch in "aZ9- _":
            assert not chars.is_mask_char(ch)

    def test_mask_limit_enforced(self):
        with pytest.raises(ValueError):
            chars.mask_char(0x200)


class TestBaseKind:
    @pytest.mark.parametrize(
        "ch,kind",
        [
            ("3", chars.DIGIT),
            ("a", chars.LOWER),
            ("Z", chars.UPPER),
            (" ", chars.SPACE),
            ("-", "SYM"),
            ("%", "SYM"),
        ],
    )
    def test_kinds(self, ch, kind):
        assert chars.base_kind(ch) == kind

    def test_mask_kind(self):
        assert chars.base_kind(chars.mask_char(2)) == "MASK"

    def test_unicode_digit_not_ascii_digit(self):
        # Arabic-Indic digit is isdigit() but outside [0-9]: falls to SYM.
        assert chars.base_kind("٣") == "SYM"
