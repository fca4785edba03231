"""Raha lite (§4.3 baseline 3): detector ensemble + clustering + labels.

Raha runs a battery of cheap error-detection strategies, clusters cells
by their strategy-agreement vectors, asks the user to label a few cells,
and propagates labels cluster-wide. The lite version keeps that exact
architecture with five strategies:

* value-frequency outlier (rare value in a low-cardinality column),
* signature outlier (rare token-structure),
* length outlier (beyond median ± 2·MAD),
* rare-character detector (contains a character rare in the column),
* NA/empty detector.

Labels: as in the paper's evaluation protocol, the harness passes the
first (top-to-bottom) 5 ground-truth errors per column; every cluster
containing a labeled error is flagged entirely. Cells whose vector fires
no strategy are never flagged. Detection only — the GPT repair head is
attached for Table 6.
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from ..core.profiler import signature
from .common import Labels, Prediction, column_values, str_table

_NA = {"", "na", "n/a", "nan", "null", "none", "-", "?"}


def _strategies(values: list[str]) -> list[tuple[bool, ...]]:
    n = len(values)
    counts = Counter(values)
    sigs = [signature(v) for v in values]
    sig_counts = Counter(sigs)
    lens = sorted(len(v) for v in values)
    median = lens[n // 2]
    mad = sorted(abs(len(v) - median) for v in values)[n // 2]
    char_counts: Counter = Counter(c for v in values for c in set(v))
    top_sig = sig_counts.most_common(1)[0][1]
    vectors = []
    for v, s in zip(values, sigs):
        # Frequency outlier only means something in low-cardinality
        # columns; a column of unique IDs makes every cell "rare".
        freq_out = len(counts) <= max(3, n // 4) and counts[v] == 1
        sig_out = (
            sig_counts[s] <= max(1, int(0.1 * n)) and sig_counts[s] < top_sig
        )
        len_out = abs(len(v) - median) > 2 * max(1, mad)
        rare_char = any(char_counts[c] <= max(1, n // 20) for c in set(v))
        is_na = v.strip().lower() in _NA
        vectors.append((freq_out, sig_out, len_out, rare_char, is_na))
    return vectors


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    labels = labels or {}
    out: list[Prediction] = []
    st = str_table(table)
    for col in st.columns:
        values = column_values(st, col)
        n = len(values)
        if n < 4:
            continue
        vectors = _strategies(values)
        clusters: dict[tuple[bool, ...], list[int]] = {}
        for i, vec in enumerate(vectors):
            clusters.setdefault(vec, []).append(i)
        labeled_rows = [
            r for (c, r), _ in labels.items() if c == str(col) and r < n
        ][:5]
        flagged_clusters: set[tuple[bool, ...]] = set()
        for r in labeled_rows:
            vec = vectors[r]
            if any(vec):  # the all-quiet cluster is never flagged
                flagged_clusters.add(vec)
        if not labeled_rows:
            # Configuration-free fallback: clusters where at least two
            # strategies agree.
            flagged_clusters = {
                vec for vec in clusters if sum(vec) >= 2
            }
        for vec in flagged_clusters:
            for i in clusters.get(vec, []):
                out.append(Prediction(str(col), i, values[i], None))
    return out
