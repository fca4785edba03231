"""Shared types and helpers for baseline systems.

Every system implements ``run(table, labels) -> list[Prediction]`` where
``table`` is a pandas DataFrame of strings, ``labels`` optionally maps
``(column, row)`` of *known* errors to their clean values (used only by
semi-supervised systems — the harness passes the first 5 ground-truth
errors per column, as the paper does for Raha), and each
:class:`Prediction` is one flagged cell with an optional repair.
"""
from __future__ import annotations

import re
from collections import Counter
from dataclasses import dataclass

import pandas as pd

from ..core.edits import levenshtein
from ..core.profiler import signature


@dataclass(frozen=True)
class Prediction:
    """One flagged cell and the system's suggested repair (None = detect
    only / no repair produced)."""

    column: str
    row: int
    original: str
    repair: str | None


Labels = dict[tuple[str, int], str]


def str_table(table: pd.DataFrame) -> pd.DataFrame:
    return table.astype("string").fillna("").astype(str)


def column_values(table: pd.DataFrame, col: str) -> list[str]:
    return [str(v) for v in str_table(table)[col]]


def value_counts(values: list[str]) -> Counter:
    return Counter(values)


def signature_counts(values: list[str]) -> Counter:
    return Counter(signature(v) for v in values)


def nearest_frequent(
    value: str,
    counts: Counter,
    *,
    min_count: int = 2,
    max_dist: int | None = None,
    categorical_guard: bool = True,
) -> str | None:
    """The closest (by edit distance) column value with support, or None.
    Default distance budget scales with value length.

    ``categorical_guard`` suppresses snapping in high-cardinality columns
    of near-duplicate but *distinct* values (phone numbers, ``Q1-22`` vs
    ``Q1-23``): a rare value is only snapped when the column is
    categorical-like (few distinct values) or the value's token structure
    deviates from the target's.
    """
    n = sum(counts.values())
    distinct = len(counts)
    categorical = distinct <= max(5, n // 8)
    budget = max_dist if max_dist is not None else max(1, len(value) // 3)
    best: tuple[int, int, str] | None = None
    for cand, cnt in counts.items():
        if cand == value or cnt < min_count:
            continue
        d = levenshtein(value, cand)
        if d > budget:
            continue
        if (
            categorical_guard
            and not categorical
            and signature(value) == signature(cand)
        ):
            continue  # same structure, high-cardinality — likely distinct
        if best is None or (d, -cnt) < (best[0], -best[1]):
            best = (d, cnt, cand)
    return best[2] if best else None


_NUM_RE = re.compile(r"^-?\d+(\.\d+)?$")


def is_numeric_column(values: list[str]) -> bool:
    nonempty = [v for v in values if v]
    return bool(nonempty) and all(_NUM_RE.fullmatch(v) for v in nonempty)


def _dominant_template(values: list[str]):
    """The column's dominant token structure, or None.

    Returns (signature, slots) where each slot is ('delim', text) or
    (kind, mode_length) for content runs — the raw material for
    structure-based rectification."""
    from ..core.profiler import tokenize

    sigs = Counter(signature(v) for v in values)
    dom, cnt = sigs.most_common(1)[0]
    n = len(values)
    if cnt < max(3, int(0.5 * n)):
        return None
    member_toks = [tokenize(v) for v in values if signature(v) == dom]
    # Only flat (non-repeating) structures are templatable.
    width = {len(t) for t in member_toks}
    if len(width) != 1:
        return None
    w = width.pop()
    slots = []
    for i in range(w):
        kinds = {t[i].kind for t in member_toks}
        if len(kinds) != 1:
            return None
        kind = kinds.pop()
        if kind in ("Y", "SP"):
            texts = Counter(t[i].text for t in member_toks)
            slots.append(("delim", texts.most_common(1)[0][0]))
        else:
            lens = Counter(len(t[i].text) for t in member_toks)
            slots.append((kind, lens.most_common(1)[0][0]))
    return dom, slots


def format_align(value: str, values: list[str]) -> str | None:
    """Rectify ``value`` toward the column's dominant structure.

    Handles the two structure-only repairs a rule system (or an LLM
    imitating the common format) performs without any character-level
    search: (a) delimiter realignment — the value's content runs match
    the template's, only separators differ (``03.45`` → ``03:45``,
    ``(937) 509 6413`` → ``937-509-6413``, ``S1.4`` → ``S.1.4``); and
    (b) run splitting — the value lost its separators entirely and its
    characters split exactly into the template's content runs at their
    modal lengths (``0334`` → ``03:34``, ``Q321`` → ``Q3-21``).

    Returns None when the value already conforms or cannot be aligned
    unambiguously."""
    from ..core.profiler import tokenize

    tmpl = _dominant_template(values)
    if tmpl is None:
        return None
    dom, slots = tmpl
    if signature(value) == dom:
        return None
    toks = tokenize(value)
    content = [t for t in toks if t.kind not in ("Y", "SP")]
    content_slots = [s for s in slots if s[0] != "delim"]
    # (a) delimiter realignment: content runs match one-to-one.
    if [t.kind for t in content] == [s[0] for s in content_slots]:
        out, ci = [], 0
        for s in slots:
            if s[0] == "delim":
                out.append(s[1])
            else:
                out.append(content[ci].text)
                ci += 1
        rebuilt = "".join(out)
        return rebuilt if rebuilt != value else None
    # (b) run splitting at modal lengths.
    stream = "".join(t.text for t in content)
    out, pos = [], 0
    for s in slots:
        if s[0] == "delim":
            out.append(s[1])
            continue
        kind, ln = s
        chunk = stream[pos : pos + ln]
        if len(chunk) < ln:
            return None
        ok = all(
            (c.isdigit() if kind == "D" else c.isalpha()) for c in chunk
        )
        if not ok:
            return None
        out.append(chunk)
        pos += ln
    if pos != len(stream):
        return None
    rebuilt = "".join(out)
    return rebuilt if rebuilt != value else None
