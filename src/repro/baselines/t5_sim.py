"""T5 stand-in (§4.3 baseline 6): a character-trigram noisy-channel model.

No GPU or transformer weights exist in this container, so the fine-tuned
T5 baseline is replaced by the closest classic analogue of a small
sequence model: a column-conditional character trigram language model
with Laplace smoothing. A value whose average trigram log-probability is
an outlier (z-score above a loose threshold) is flagged; repairs snap to
the most likely near neighbour in the column.

This is a genuinely weak learner with the failure profile Table 5/6
report for T5: it over-fires (short or legitimately diverse columns look
improbable), has the lowest precision of all systems, and its repairs
frequently miss because it has no notion of column structure.
"""
from __future__ import annotations

import math
from collections import Counter

import pandas as pd

from .common import (
    Labels,
    Prediction,
    column_values,
    nearest_frequent,
    str_table,
    value_counts,
)

_BOUND = "\x02"
_Z_THRESHOLD = 1.0  # loose on purpose — T5's fire rate is the highest


def _trigrams(v: str) -> list[str]:
    padded = _BOUND * 2 + v + _BOUND
    return [padded[i : i + 3] for i in range(len(padded) - 2)]


class _TrigramLM:
    """Laplace-smoothed char trigram model fit on one column."""

    def __init__(self, values: list[str]) -> None:
        self.tri: Counter = Counter()
        self.bi: Counter = Counter()
        self.vocab: set[str] = set(_BOUND)
        for v in values:
            for t in _trigrams(v):
                self.tri[t] += 1
                self.bi[t[:2]] += 1
            self.vocab.update(v)

    def avg_nll(self, v: str) -> float:
        """Average negative log-likelihood per character of ``v``."""
        tris = _trigrams(v)
        if not tris:
            return 0.0
        vsize = max(1, len(self.vocab))
        total = 0.0
        for t in tris:
            p = (self.tri[t] + 1) / (self.bi[t[:2]] + vsize)
            total += -math.log(p)
        return total / len(tris)


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    out: list[Prediction] = []
    st = str_table(table)
    for col in st.columns:
        values = column_values(st, col)
        if len(values) < 4:
            continue
        lm = _TrigramLM(values)
        scores = [lm.avg_nll(v) for v in values]
        mean = sum(scores) / len(scores)
        var = sum((s - mean) ** 2 for s in scores) / len(scores)
        std = math.sqrt(var)
        counts = value_counts(values)
        for i, (v, s) in enumerate(zip(values, scores)):
            if not v or counts[v] > 2:
                continue  # recurring values are unlikely corruptions
            if std > 1e-9 and (s - mean) / std > _Z_THRESHOLD:
                repair = nearest_frequent(v, counts, min_count=2, max_dist=3)
                if repair is None:
                    repair = _decode(v, lm, s)
                out.append(Prediction(str(col), i, v, repair))
    return out


_VISUAL_INVERSE = {"0": "o", "1": "l", "3": "e", "4": "a", "7": "t", "5": "s"}


def _decode(v: str, lm: _TrigramLM, base_nll: float) -> str | None:
    """Noisy-channel decoding: hill-climb over single-character edits
    (delete, case flip, visual-typo inverse) toward lower perplexity —
    the seq2seq analogue of generating the most likely clean string."""
    best_v, best_s = v, base_nll
    for _ in range(3):  # at most 3 greedy edit rounds
        improved = False
        cands = []
        cur = best_v
        for i, ch in enumerate(cur):
            cands.append(cur[:i] + cur[i + 1 :])  # delete
            if ch.isalpha():
                cands.append(cur[:i] + ch.swapcase() + cur[i + 1 :])
            if ch in _VISUAL_INVERSE:
                for r in (
                    _VISUAL_INVERSE[ch],
                    _VISUAL_INVERSE[ch].upper(),
                ):
                    cands.append(cur[:i] + r + cur[i + 1 :])
        for cand in cands:
            if not cand:
                continue
            sc = lm.avg_nll(cand)
            if sc < best_s - 0.05:
                best_v, best_s, improved = cand, sc, True
        if not improved:
            break
    return best_v if best_v != v else None
