"""Predicate features (Table 2) and the decision-tree learner (§3.4)."""
import numpy as np
import pandas as pd
import pytest

from repro.core.concretize import (
    DecisionTree,
    Feature,
    FeatureExtractor,
    _eval_feature,
    _tokens,
    learn_constraint,
    majority_label,
)


class TestTokens:
    def test_splits_on_non_alnum(self):
        assert _tokens("Ind-674-PRO") == ["Ind", "674", "PRO"]

    def test_splits_on_case_change(self):
        assert _tokens("CamelCase") == ["Camel", "Case"]

    def test_splits_alpha_digit(self):
        assert _tokens("abc123") == ["abc", "123"]

    def test_all_caps_run(self):
        # Standard camel splitting: the trailing capital starts a word.
        assert _tokens("HTTPSx9") == ["HTTP", "Sx", "9"]
        assert _tokens("HTTPS9") == ["HTTPS", "9"]


class TestPredicates:
    vals = ["US-123", "us-9", "", "#DIV/0!", "=SUM(A1)", "TRUE", "42", "n/a"]

    def _eval(self, kind, arg=None):
        return list(_eval_feature(Feature("c", kind, arg), self.vals))

    def test_equals(self):
        assert self._eval("equals", "42") == [False] * 6 + [True, False]

    def test_contains(self):
        got = self._eval("contains", "US")
        assert got[0] and not got[1]

    def test_startswith_endswith(self):
        assert self._eval("startswith", "US")[0]
        assert self._eval("endswith", "123")[0]

    def test_length(self):
        assert self._eval("length", 6)[0]

    def test_hasdigits_isnum(self):
        assert self._eval("hasdigits")[0]
        assert self._eval("isnum") == [False] * 6 + [True, False]

    def test_is_error_formula_logical_na_text(self):
        assert self._eval("iserror")[3]
        assert self._eval("isformula")[4]
        assert self._eval("islogical")[5]
        assert self._eval("isna")[7] and self._eval("isna")[2]
        assert self._eval("istext")[0] and not self._eval("istext")[6]


class TestExtractor:
    def test_constant_features_dropped(self):
        # TextContains(c, '-') true for every row is dropped (Example 6).
        t = pd.DataFrame({"c": ["a-1", "b-2", "c-3"]})
        fx = FeatureExtractor().fit(t)
        assert all(
            not (f.kind == "contains" and f.arg == "-") for f in fx.features
        )

    def test_transform_shape(self):
        t = pd.DataFrame({"c": ["a-1", "b-2", "c-3"], "d": ["x", "x", "y"]})
        fx = FeatureExtractor().fit(t)
        m = fx.transform(t)
        assert m.shape == (3, len(fx.features))
        assert m.dtype == bool

    def test_features_span_all_columns(self):
        t = pd.DataFrame({"c": ["a", "b", "a"], "d": ["1", "2", "2"]})
        fx = FeatureExtractor().fit(t)
        assert {f.column for f in fx.features} == {"c", "d"}

    def test_nan_safe(self):
        t = pd.DataFrame({"c": ["a", None, "b"]})
        fx = FeatureExtractor().fit(t)
        fx.transform(t)  # must not raise


class TestTree:
    def _xy(self):
        # label = 'P' iff feature 0; feature 1 is noise.
        x = np.array(
            [[True, False], [True, True], [False, False], [False, True]] * 3
        )
        y = ["P", "P", "J", "J"] * 3
        return x, y

    def test_perfect_split(self):
        x, y = self._xy()
        t = DecisionTree(max_depth=1, max_nodes=1).fit(x, y)
        assert t.accuracy(x, y) == 1.0
        assert t.n_nodes == 1

    def test_predict_one(self):
        x, y = self._xy()
        t = DecisionTree(max_depth=1, max_nodes=1).fit(x, y)
        assert t.predict_one(np.array([True, True])) == "P"
        assert t.predict_one(np.array([False, False])) == "J"

    def test_depth_zero_is_majority(self):
        x, y = self._xy()
        t = DecisionTree(max_depth=0, max_nodes=0).fit(x, y)
        assert set(t.predict(x)) == {majority_label(y)}

    def test_disjunction_needs_depth_two(self):
        # y = a OR b: one split cannot be exact, two levels can.
        x = np.array(
            [[a, b] for a in (True, False) for b in (True, False)] * 3
        )
        y = [("P" if (a or b) else "J") for a, b in x]
        shallow = DecisionTree(max_depth=1, max_nodes=1).fit(x, y)
        deep = DecisionTree(max_depth=2, max_nodes=3).fit(x, y)
        assert deep.accuracy(x, y) == 1.0 > shallow.accuracy(x, y)

    def test_no_features_gives_majority(self):
        x = np.zeros((4, 0), dtype=bool)
        t = DecisionTree(max_depth=2, max_nodes=3).fit(x, ["a", "a", "b", "a"])
        assert t.predict_one(np.zeros(0, dtype=bool)) == "a"


class TestLearnConstraint:
    def test_selects_smallest_qualifying_tree(self):
        x, y = TestTree()._xy()
        t = learn_constraint(x, y, alpha=0.8)
        assert t is not None and t.n_nodes == 1

    def test_returns_none_when_unlearnable(self):
        rng = np.random.default_rng(0)
        x = rng.random((40, 3)) > 0.5
        y = [str(i % 7) for i in range(40)]  # labels independent of x
        assert learn_constraint(x, y, alpha=0.95) is None

    def test_empty_training(self):
        assert learn_constraint(np.zeros((0, 2), dtype=bool), []) is None
        assert majority_label([]) is None

    def test_alpha_threshold_respected(self):
        x = np.array([[True], [True], [False], [False], [True]])
        y = ["a", "a", "b", "b", "b"]  # best single split is 80% accurate
        assert learn_constraint(x, y, alpha=0.9) is None
        assert learn_constraint(x, y, alpha=0.8) is not None


class TestEndToEndConstraint:
    def test_fig2_category_constraint(self):
        t = pd.DataFrame(
            {
                "Category": ["Junior", "Professional"] * 5,
                "ID": ["1-JNR", "2-PRO"] * 5,
            }
        )
        fx = FeatureExtractor().fit(t)
        m = fx.transform(t)
        labels = ["0" if c == "Junior" else "1" for c in t["Category"]]
        tree = learn_constraint(m, labels, alpha=0.8)
        assert tree is not None
        assert tree.predict(m) == labels
