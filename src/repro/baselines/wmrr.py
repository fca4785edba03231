"""WMRR lite (§4.3 baseline 1): weighted matching rectifying rules.

Ahmad & Wang's WMRR discovers weighted rectifying rules from dirty data
without user input: rules match a context and rectify a deviating value,
weighted by support and confidence, with conflicts resolved by weight.
The lite reimplementation (the original tool is not public; the paper's
authors also reimplemented it) discovers two rule families:

* **inter-column rules** — near-functional dependencies ``A=a → B=b``
  with confidence ≥ 0.8 and support ≥ 2; a row where the consequent
  deviates and the deviation is rare gets flagged, repaired to ``b``;
* **intra-column rectifying rules** — a rare value within small edit
  distance of a frequent value is rewritten to it (the "matching" part),
  weighted by the target's frequency over the distance.

As the paper observes (§5.2), WMRR captures inter- and intra-column
dependencies well but performs no semantic reasoning.
"""
from __future__ import annotations

from collections import Counter, defaultdict

import pandas as pd

from .common import (
    Labels,
    Prediction,
    column_values,
    format_align,
    nearest_frequent,
    str_table,
    value_counts,
)

# Rules are mined from the dirty data itself, so confidence must leave
# headroom for the very errors the rules are meant to rectify.
_CONFIDENCE = 0.75
_SUPPORT = 2
_MAX_CARD = 30  # FD antecedents only over low-cardinality columns


def _fd_rules(st: pd.DataFrame):
    """(colA, a, colB) → (b, weight) for confident value mappings."""
    rules: dict[tuple[str, str, str], tuple[str, float]] = {}
    cols = list(st.columns)
    for ca in cols:
        va = column_values(st, ca)
        if len(set(va)) > _MAX_CARD:
            continue
        for cb in cols:
            if ca == cb:
                continue
            vb = column_values(st, cb)
            pair_counts: dict[str, Counter] = defaultdict(Counter)
            for a, b in zip(va, vb):
                pair_counts[a][b] += 1
            for a, cnt in pair_counts.items():
                total = sum(cnt.values())
                b, c = cnt.most_common(1)[0]
                if c >= _SUPPORT and c / total >= _CONFIDENCE and len(cnt) > 1:
                    rules[(str(ca), a, str(cb))] = (b, c / total * c)
    return rules


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    st = str_table(table)
    n = len(st)
    if n < 4:
        return []
    rules = _fd_rules(st)
    # Best rectification per cell, by rule weight.
    best: dict[tuple[str, int], tuple[float, str]] = {}
    cols = list(st.columns)
    for (ca, a, cb), (b, w) in rules.items():
        va = column_values(st, ca)
        vb = column_values(st, cb)
        for i in range(n):
            if va[i] == a and vb[i] != b:
                key = (cb, i)
                if key not in best or w > best[key][0]:
                    best[key] = (w, b)
    out: list[Prediction] = []
    flagged: set[tuple[str, int]] = set()
    for (cb, i), (w, b) in best.items():
        out.append(Prediction(cb, i, str(st.iloc[i][cb]), b))
        flagged.add((cb, i))
    # Intra-column rectifying rules. The categorical guard of
    # ``nearest_frequent`` keeps the matching rules away from
    # high-cardinality columns of legitimately near-identical values
    # (IDs, timestamps); structural rules rectify format deviations
    # toward the dominant structure.
    for col in cols:
        values = column_values(st, col)
        counts = value_counts(values)
        min_count = max(2, n // 20)
        for i, v in enumerate(values):
            if not v or counts[v] > 1 or (str(col), i) in flagged:
                continue
            target = nearest_frequent(
                v, counts, min_count=min_count, max_dist=max(1, min(2, len(v) // 4))
            )
            if target is None:
                target = format_align(v, values)
            if target is not None:
                out.append(Prediction(str(col), i, v, target))
    return out
