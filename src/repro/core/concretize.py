"""Concretizing abstract edit actions with learned value constraints (§3.4).

Abstract edit actions (emit a character class, choose a disjunction
option) are resolved by decision trees learned over predicate features of
the *non-error* rows: for every class/disjunction slot of the inducing
pattern, the rows whose value parses against the pattern provide training
pairs ``features(row) → concrete value consumed at that slot`` (Example
5). At repair time the tree predicts the concrete value for the error row.

Features follow Table 2 (equals/contains/startsWith/endsWith/length/
hasDigits/isNum/isError/isFormula/isLogical/isNA/isText), instantiated
over every column of the table, with candidate constants drawn from the
column's values and their tokens (split on non-alphanumerics, case
changes, and alpha↔digit switches) and the top-5 most frequent cell
lengths. Constant-valued features are dropped (Example 6).

The tree learner mirrors the paper's selection rule: sample trees of
increasing (nodes, depth), keep those with training accuracy ≥ α (default
0.8), and return the smallest. scikit-learn is not available in this
container, so the greedy information-gain learner is implemented here.
"""
from __future__ import annotations

import math
import re
from collections import Counter
from dataclasses import dataclass

import numpy as np
import pandas as pd

_MAX_CONSTANTS_PER_COL = 15
_MAX_FEATURES = 512

_TOKEN_RE = re.compile(r"[A-Z][a-z]+|[A-Z]+(?![a-z])|[a-z]+|[0-9]+")


def _tokens(v: str) -> list[str]:
    """Tokens after splitting on non-alphanumerics, case changes, and
    alpha/digit switches (§3.4)."""
    return _TOKEN_RE.findall(v)


@dataclass(frozen=True)
class Feature:
    """One boolean predicate over one column."""

    column: str
    kind: str  # equals|contains|startswith|endswith|length|hasdigits|...
    arg: str | int | None = None

    def name(self) -> str:
        return f"{self.kind}({self.column}, {self.arg!r})" if self.arg is not None else f"{self.kind}({self.column})"


_NA_STRINGS = {"", "na", "n/a", "n.a.", "nan", "null", "none", "-"}
_LOGICAL = {"true", "false", "yes", "no"}
_NUM_RE = re.compile(r"^-?\d+(\.\d+)?$")


def _prepare(col: pd.Series) -> list[str]:
    """Column → plain list of strings, NaN-safe, computed once per column."""
    return ["" if pd.isna(v) else str(v) for v in col]


def _eval_feature(f: Feature, vals: list[str]) -> np.ndarray:
    """Evaluate one predicate over a prepared column. Plain Python beats
    pandas string ops at the benchmark's per-table row counts (tens to a
    few hundred) by an order of magnitude."""
    a = f.arg
    if f.kind == "equals":
        out = [v == a for v in vals]
    elif f.kind == "contains":
        out = [str(a) in v for v in vals]
    elif f.kind == "startswith":
        out = [v.startswith(str(a)) for v in vals]
    elif f.kind == "endswith":
        out = [v.endswith(str(a)) for v in vals]
    elif f.kind == "length":
        out = [len(v) == int(a) for v in vals]
    elif f.kind == "hasdigits":
        out = [any(c.isdigit() for c in v) for v in vals]
    elif f.kind == "isnum":
        out = [bool(_NUM_RE.fullmatch(v)) for v in vals]
    elif f.kind == "iserror":
        out = [v.startswith("#") for v in vals]
    elif f.kind == "isformula":
        out = [v.startswith("=") for v in vals]
    elif f.kind == "islogical":
        out = [v.lower() in _LOGICAL for v in vals]
    elif f.kind == "isna":
        out = [v.lower() in _NA_STRINGS for v in vals]
    elif f.kind == "istext":
        out = [any(c.isalpha() for c in v) for v in vals]
    else:
        raise ValueError(f.kind)
    return np.asarray(out, dtype=bool)


class FeatureExtractor:
    """Fit on a table of strings; transform any subset of its rows into a
    boolean feature matrix over Table-2 predicates."""

    def __init__(self) -> None:
        self.features: list[Feature] = []
        self._columns: list[str] = []

    def fit(self, table: pd.DataFrame) -> "FeatureExtractor":
        self._columns = list(table.columns)
        prepared = {c: _prepare(table[c]) for c in self._columns}
        feats: list[Feature] = []
        for c in self._columns:
            vals = prepared[c]
            consts = Counter(vals)
            for v, _ in consts.most_common(_MAX_CONSTANTS_PER_COL):
                if v:
                    feats.append(Feature(c, "equals", v))
            tok_counts = Counter(t for v in vals for t in set(_tokens(v)))
            for t, _ in tok_counts.most_common(_MAX_CONSTANTS_PER_COL):
                feats.append(Feature(c, "contains", t))
                feats.append(Feature(c, "startswith", t))
                feats.append(Feature(c, "endswith", t))
            for ln, _ in Counter(len(v) for v in vals).most_common(5):
                feats.append(Feature(c, "length", int(ln)))
            for kind in (
                "hasdigits",
                "isnum",
                "iserror",
                "isformula",
                "islogical",
                "isna",
                "istext",
            ):
                feats.append(Feature(c, kind))
        # Drop constant features (Example 6) and cap the total count.
        kept: list[Feature] = []
        for f in feats:
            vals = _eval_feature(f, prepared[f.column])
            if vals.any() and not vals.all():
                kept.append(f)
            if len(kept) >= _MAX_FEATURES:
                break
        self.features = kept
        return self

    def transform(self, table: pd.DataFrame) -> np.ndarray:
        if not self.features:
            return np.zeros((len(table), 0), dtype=bool)
        prepared = {
            c: _prepare(table[c]) for c in {f.column for f in self.features}
        }
        cols = [_eval_feature(f, prepared[f.column]) for f in self.features]
        return np.column_stack(cols)


# ------------------------------------------------------------------ trees


@dataclass
class _Node:
    feature: int | None = None  # None = leaf
    left: "_Node | None" = None  # feature False
    right: "_Node | None" = None  # feature True
    label: str | None = None


def _entropy(labels: list[str]) -> float:
    n = len(labels)
    if n == 0:
        return 0.0
    return -sum(
        (c / n) * math.log2(c / n) for c in Counter(labels).values() if c
    )


class DecisionTree:
    """Greedy information-gain decision tree over boolean features,
    bounded by ``max_depth`` and ``max_nodes`` split nodes."""

    def __init__(self, max_depth: int, max_nodes: int) -> None:
        self.max_depth = max_depth
        self.max_nodes = max_nodes
        self.root: _Node | None = None
        self.n_nodes = 0

    def fit(self, x: np.ndarray, y: list[str]) -> "DecisionTree":
        self._budget = self.max_nodes
        self.root = self._grow(x, list(y), np.arange(len(y)), 0)
        self.n_nodes = self.max_nodes - self._budget
        return self

    def _grow(self, x: np.ndarray, y: list[str], idx: np.ndarray, depth: int) -> _Node:
        labels = [y[i] for i in idx]
        majority = Counter(labels).most_common(1)[0][0]
        if (
            depth >= self.max_depth
            or self._budget <= 0
            or len(set(labels)) == 1
            or x.shape[1] == 0
        ):
            return _Node(label=majority)
        base = _entropy(labels)
        best_gain, best_f = 0.0, None
        for f in range(x.shape[1]):
            mask = x[idx, f]
            n_t = int(mask.sum())
            if n_t == 0 or n_t == len(idx):
                continue
            lt = [y[i] for i in idx[mask]]
            lf = [y[i] for i in idx[~mask]]
            gain = base - (
                len(lt) / len(idx) * _entropy(lt)
                + len(lf) / len(idx) * _entropy(lf)
            )
            if gain > best_gain + 1e-12:
                best_gain, best_f = gain, f
        if best_f is None:
            return _Node(label=majority)
        self._budget -= 1
        mask = x[idx, best_f]
        return _Node(
            feature=best_f,
            right=self._grow(x, y, idx[mask], depth + 1),
            left=self._grow(x, y, idx[~mask], depth + 1),
        )

    def predict_one(self, row: np.ndarray) -> str:
        node = self.root
        assert node is not None, "tree not fitted"
        while node.label is None:
            node = node.right if row[node.feature] else node.left
        return node.label

    def predict(self, x: np.ndarray) -> list[str]:
        return [self.predict_one(x[i]) for i in range(x.shape[0])]

    def accuracy(self, x: np.ndarray, y: list[str]) -> float:
        if not y:
            return 0.0
        pred = self.predict(x)
        return sum(p == t for p, t in zip(pred, y)) / len(y)


def learn_constraint(
    x: np.ndarray, y: list[str], *, alpha: float = 0.8
) -> DecisionTree | None:
    """The paper's tree-selection rule: grow trees of increasing size,
    keep those with training accuracy ≥ α, return the smallest
    (nodes, depth). None when no tree qualifies."""
    if len(y) == 0:
        return None
    candidates: list[tuple[int, int, DecisionTree]] = []
    for depth, nodes in ((1, 1), (2, 3), (3, 7)):
        t = DecisionTree(max_depth=depth, max_nodes=nodes).fit(x, y)
        if t.accuracy(x, y) >= alpha:
            candidates.append((t.n_nodes, depth, t))
    if not candidates:
        return None
    candidates.sort(key=lambda c: (c[0], c[1]))
    return candidates[0][2]


def majority_label(y: list[str]) -> str | None:
    """Most frequent training value — fallback when no tree reaches α."""
    return Counter(y).most_common(1)[0][0] if y else None
