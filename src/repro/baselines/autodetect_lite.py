"""Auto-Detect lite (§4.3 baseline 4): pattern-signature outlier detection.

Auto-Detect generalizes values into patterns and uses large-corpus
co-occurrence statistics of pattern pairs to flag incompatible values in
a column. Without the 100M-table corpus, the lite version keeps the core
mechanism — generalize every value through a hierarchy of signatures and
apply a ratio test between the dominant signature and a value's rare
signature — which is exactly the single-column specialization of their
incompatibility score.

By design (as the paper notes in §5.2) it is purely syntactic: it never
consults semantics and cannot propose repairs (the harness attaches the
GPT repair head for Table 6).
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from ..core.profiler import signature, tokenize
from .common import Labels, Prediction, column_values, str_table

_DOMINANT = 0.5  # a signature family this frequent defines the column
_RARE = 0.1  # a value this rare (by signature) is incompatible


def _coarse(v: str) -> tuple:
    """Coarser generalization level: letters/digits collapse, delimiters
    keep identity — one step up Auto-Detect's generalization tree."""
    out = []
    for t in tokenize(v):
        if t.kind in ("A", "D"):
            out.append("W")  # any word/number chunk
        elif t.kind == "SP":
            out.append(" ")
        else:
            out.append(t.text)
    # collapse adjacent W (a letter-digit boundary is not structure here)
    collapsed: list[str] = []
    for x in out:
        if x == "W" and collapsed and collapsed[-1] == "W":
            continue
        collapsed.append(x)
    return tuple(collapsed)


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    out: list[Prediction] = []
    st = str_table(table)
    for col in st.columns:
        values = column_values(st, col)
        n = len(values)
        if n < 4:
            continue
        for level in (signature, _coarse):
            sigs = [level(v) for v in values]
            counts = Counter(sigs)
            top_share = counts.most_common(1)[0][1] / n
            if top_share < _DOMINANT:
                continue  # no dominant structure at this level
            for i, (v, s) in enumerate(zip(values, sigs)):
                if v and counts[s] / n <= _RARE and counts[s] < counts.most_common(1)[0][1]:
                    out.append(Prediction(str(col), i, v, None))
            break  # flag at the most specific level with dominance
    # dedupe (a cell can only be flagged once)
    seen: set[tuple[str, int]] = set()
    uniq = []
    for p in out:
        if (p.column, p.row) not in seen:
            seen.add((p.column, p.row))
            uniq.append(p)
    return uniq
