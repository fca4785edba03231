"""Semantic abstraction (LLM surrogate): masking, styles, suggestions."""
from repro.core import chars, semantics
from repro.core.semantics import abstract_column


class TestMasking:
    def test_country_codes_masked(self):
        m = abstract_column(["US-123", "UK-21", "IN-9", "PL-7"])
        assert "country" in m.active_types
        assert all(
            chars.is_mask_char(mv.masked[0]) for mv in m.masked_values
        )

    def test_inactive_type_not_masked(self):
        # One city among codes: city never reaches the activation bar.
        m = abstract_column(["US-1", "UK-2", "London", "IN-3", "PL-4", "FR-5"])
        assert "city" not in m.active_types

    def test_numbers_only_column_untouched(self):
        m = abstract_column(["123", "456", "789", "012"])
        assert m.active_types == set()
        assert [mv.masked for mv in m.masked_values] == ["123", "456", "789", "012"]

    def test_disabled_returns_identity(self):
        m = abstract_column(["US-1", "UK-2"], enabled=False)
        assert m.active_types == set()
        assert m.masked_values[0].masked == "US-1"

    def test_dotted_abbreviation_span(self):
        m = abstract_column(["US-1", "u.k.-392", "IN-3", "FR-4"])
        mv = m.masked_values[1]
        assert mv.entities and mv.entities[0].surface == "u.k."
        assert "." not in mv.masked.split("-")[0].strip("")

    def test_multiword_entity_single_mask(self):
        cities = ["New York", "London", "Boston", "Salt Lake City", "Miami"]
        m = abstract_column(cities)
        assert all(len(mv.masked) == 1 for mv in m.masked_values)

    def test_example1_colors(self):
        m = abstract_column(["red 1", "dark green 2", "blue phone 3"])
        masked = [mv.masked for mv in m.masked_values]
        sym = semantics.mask_symbol("color")
        assert masked[0] == f"{sym} 1"
        assert masked[1] == f"{sym} 2"
        assert masked[2] == f"{sym} phone 3"

    def test_uppercase_code_does_not_match_titlecase_word(self):
        # CAT/JNR suffixes must not be mistaken for animals or months.
        m = abstract_column(["IN-1-CAT", "US-2-PRO", "PL-3-CAT", "FR-4-PRO"])
        assert "animal" not in m.active_types

    def test_quarter_values_not_swallowed(self):
        # Granularity: no KB type covers quarters, nothing is masked.
        m = abstract_column(["Q4-2002", "Q3-2002", "Q32001", "Q1-2004"])
        assert m.active_types == set()


class TestStylesAndSuggestions:
    def _code_model(self):
        return abstract_column(
            ["US-123", "UK-21", "IN-292", "PL-19", "FR-3", "DE-88", "usa_837"]
        )

    def test_dominant_style_learned(self):
        m = self._code_model()
        assert m.type_styles.get("country") == (1, "upper")

    def test_style_repair_suggestion(self):
        m = self._code_model()
        ent = m.masked_values[6].entities[0]
        assert ent.surface == "usa"
        assert m.suggestion(ent) == "US"

    def test_conforming_surface_unchanged(self):
        m = self._code_model()
        ent = m.masked_values[0].entities[0]
        assert m.suggestion(ent) == "US"
        assert not m.semantic_changed(0)

    def test_semantic_changed_flags_style_deviation(self):
        m = self._code_model()
        assert m.semantic_changed(6)

    def test_no_majority_no_repair(self):
        m = abstract_column(["US-1", "uk-2", "IND-3", "pl-4", "FRA-5", "de-6"])
        for i in range(6):
            assert not m.semantic_changed(i), i


class TestFuzzy:
    def test_typo_not_masked_but_suggested(self):
        m = abstract_column(
            ["Birmingham", "London", "Wales", "Hampton", "Birminxham"]
        )
        mv = m.masked_values[4]
        assert mv.masked == "Birminxham"  # stays literal -> pattern error
        assert mv.fuzzy_entities
        assert m.suggestion(mv.fuzzy_entities[0]) == "Birmingham"

    def test_bleu_to_blue(self):
        m = abstract_column(["red 1", "blue 2", "green 3", "bleu 4"])
        mv = m.masked_values[3]
        assert mv.fuzzy_entities
        assert m.suggestion(mv.fuzzy_entities[0]) == "blue"

    def test_no_fuzzy_when_type_inactive(self):
        m = abstract_column(["12-Birminxham"] * 2 + ["99-5", "42-7"])
        assert not m.masked_values[0].fuzzy_entities


class TestUnmask:
    def test_roundtrip_with_suggestion(self):
        m = abstract_column(["US-1", "UK-2", "IN-3", "FR-4", "usa_5"])
        mv = m.masked_values[4]
        repaired_masked = mv.masked.replace("_", "-")
        assert m.unmask(4, repaired_masked) == "US-5"

    def test_limited_concretization_reuses_surface(self):
        m = abstract_column(["US-1", "UK-2", "IN-3", "FR-4", "usa_5"])
        mv = m.masked_values[4]
        out = m.unmask(4, mv.masked.replace("_", "-"), reuse_surface=True)
        assert out == "usa-5"

    def test_inserted_mask_uses_best_surface(self):
        m = abstract_column(
            ["Junior", "Professional", "Senior", "Junior", "ProfeXssional"]
        )
        sym = semantics.mask_symbol("category")
        out = m.unmask(4, sym)
        assert out == "Professional"

    def test_mask_new_applies_fit_context(self):
        m = abstract_column(["US-1", "UK-2", "IN-3", "FR-4"])
        mv = m.mask_new("usa_9")
        assert chars.is_mask_char(mv.masked[0])
        assert m.semantic_changed_value(mv)
        assert m.unmask_value(mv, mv.masked.replace("_", "-")) == "US-9"


class TestCaseHelpers:
    def test_case_style(self):
        assert semantics.case_style("LONDON") == "upper"
        assert semantics.case_style("london") == "lower"
        assert semantics.case_style("London") == "title"
        assert semantics.case_style("LoNdOn") == "canonical"

    def test_apply_case(self):
        assert semantics.apply_case("United States", "upper") == "UNITED STATES"
        assert semantics.apply_case("UK", "lower") == "uk"
        assert semantics.apply_case("paris", "title") == "Paris"
        assert semantics.apply_case("MiXed", "canonical") == "MiXed"

    def test_mask_symbol_type_roundtrip(self):
        for t in ("country", "city", "category"):
            assert semantics.type_of_mask(semantics.mask_symbol(t)) == t
