"""The Excel-formula interpreter substrate."""
import pandas as pd
import pytest

from repro.formulas.engine import (
    DIV0_ERROR,
    NAME_ERROR,
    VALUE_ERROR,
    ExcelError,
    FormulaSyntaxError,
    is_error_value,
    parse_formula,
    referenced_columns,
    run_formula,
)


def run1(formula, **cols):
    """Run a formula over a one-row table built from kwargs."""
    data = {k: [v] for k, v in cols.items()} or {"_dummy": [""]}
    return run_formula(formula, pd.DataFrame(data))[0]


class TestParsing:
    def test_leading_equals_optional(self):
        assert parse_formula("=1+2") == parse_formula("1+2")

    def test_string_escaping(self):
        assert run1('="he said ""hi"""') == 'he said "hi"'

    def test_unbalanced_parens_rejected(self):
        with pytest.raises(FormulaSyntaxError):
            parse_formula("=LEN(")

    def test_trailing_garbage_rejected(self):
        with pytest.raises(FormulaSyntaxError):
            parse_formula("=1 2")

    def test_bad_character_rejected(self):
        with pytest.raises(FormulaSyntaxError):
            parse_formula("=1 @ 2")


class TestReferences:
    def test_structured_reference(self):
        assert run1("=[@a] & [@b]", a="x", b="y") == "xy"

    def test_a1_reference_maps_to_column_index(self):
        t = pd.DataFrame({"first": ["f"], "second": ["s"]})
        assert run_formula("=A99 & B1", t) == ["fs"]

    def test_unknown_column_is_name_error(self):
        assert run1("=[@nope]", a="x") == NAME_ERROR

    def test_referenced_columns(self):
        cols = ["Option", "Other"]
        f = '=RIGHT(A48, LEN(A48) - SEARCH("x", [@Other]))'
        assert referenced_columns(f, cols) == ["Option", "Other"]


class TestOperators:
    @pytest.mark.parametrize(
        "f,expect",
        [
            ("=1+2*3", 7.0),
            ("=(1+2)*3", 9.0),
            ("=-4+1", -3.0),
            ('="a"&"b"&"c"', "abc"),
            ("=10/4", 2.5),
            ("=2<3", True),
            ('="x"="X"', True),  # Excel compares text case-insensitively
            ("=3<>3", False),
            ("=2>=2", True),
        ],
    )
    def test_eval(self, f, expect):
        assert run1(f, a="") == expect

    def test_division_by_zero(self):
        assert run1("=1/0") == DIV0_ERROR

    def test_numeric_coercion_of_text(self):
        assert run1('="3" + 4') == 7.0

    def test_non_numeric_text_in_arithmetic(self):
        assert run1('="x" + 1') == VALUE_ERROR

    def test_concat_formats_integers(self):
        assert run1('=LEN("ab") & "!"') == "2!"


class TestFunctions:
    def test_search_case_insensitive(self):
        assert run1('=SEARCH("chrome", "XChromeY")') == 2.0

    def test_search_missing_is_value_error(self):
        assert run1('=SEARCH("-", "abc")') == VALUE_ERROR

    def test_find_case_sensitive(self):
        assert run1('=FIND("Ch", "chCh")') == 3.0

    def test_left_right_mid(self):
        assert run1('=LEFT("abcdef", 2)') == "ab"
        assert run1('=RIGHT("abcdef", 2)') == "ef"
        assert run1('=MID("abcdef", 2, 3)') == "bcd"

    def test_right_beyond_length(self):
        assert run1('=RIGHT("ab", 9)') == "ab"

    def test_len_value(self):
        assert run1('=LEN("abc")') == 3.0
        assert run1('=VALUE("12.5")') == 12.5
        assert run1('=VALUE("x1")') == VALUE_ERROR

    def test_concat_upper_lower_trim(self):
        assert run1('=CONCAT("a", 1, "b")') == "a1b"
        assert run1('=UPPER("aB")') == "AB"
        assert run1('=LOWER("aB")') == "ab"
        assert run1('=TRIM("  a   b ")') == "a b"

    def test_substitute_rept_exact(self):
        assert run1('=SUBSTITUTE("a-b-c", "-", "+")') == "a+b+c"
        assert run1('=REPT("ab", 3)') == "ababab"
        assert run1('=EXACT("a", "A")') is False

    def test_if_and_iferror(self):
        assert run1("=IF(2>1, \"yes\", \"no\")") == "yes"
        assert run1('=IFERROR(1/0, "fallback")') == "fallback"
        assert run1("=IFERROR(5, 9)") == 5.0

    def test_predicates(self):
        assert run1('=ISNUMBER("12")') is True
        assert run1('=ISNUMBER("x")') is False
        assert run1('=ISTEXT("x")') is True
        assert run1("=ISERROR(1/0)") is True

    def test_numeric_functions(self):
        assert run1("=ABS(-3)") == 3.0
        assert run1("=ROUND(2.567, 1)") == 2.6
        assert run1("=MIN(3, 1, 2)") == 1.0
        assert run1("=MAX(3, 1, 2)") == 3.0

    def test_unknown_function(self):
        assert run1("=FROBNICATE(1)") == NAME_ERROR


class TestErrorPropagation:
    def test_errors_flow_through_functions(self):
        assert run1("=LEN(1/0)") == DIV0_ERROR
        assert run1('=LEFT(1/0, 2)') == DIV0_ERROR

    def test_errors_flow_through_operators(self):
        assert run1('=1/0 & "x"') == DIV0_ERROR
        assert run1("=(1/0) + 1") == DIV0_ERROR

    def test_error_values_compare_by_code(self):
        assert ExcelError("#VALUE!") == VALUE_ERROR
        assert is_error_value(VALUE_ERROR)
        assert not is_error_value("ok")


class TestPaperExamples:
    def test_fig8_formula(self):
        t = pd.DataFrame({"Option": ["Chrome23", "C30", "Chrome19"]})
        f = '=RIGHT(A1, LEN(A1) - SEARCH("Chrome", A1) - LEN("Chrome") + 1)'
        assert run_formula(f, t) == ["23", VALUE_ERROR, "19"]

    def test_intro_search_formula(self):
        t = pd.DataFrame({"col1": ["c-1", "c-2", "c3", "c4"]})
        out = run_formula('=SEARCH("-", [@col1])', t)
        assert out == [2.0, 2.0, VALUE_ERROR, VALUE_ERROR]

    def test_example7_column_transformation(self):
        t = pd.DataFrame({"c1": ["x", "y", "z"], "c2": ["a", "b", "c"]})
        assert run_formula("=CONCAT([@c1], [@c2])", t) == ["xa", "yb", "zc"]
