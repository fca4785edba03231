"""Potter's Wheel lite (§4.3 baseline 5): MDL column-structure inference.

Potter's Wheel infers the *structure* of a column — a sequence of domains
(words, integers, delimiters) — by minimum description length, and flags
values that do not conform. The lite version computes the MDL-best
structure over the token-kind sequences observed in the column (structure
cost + per-value encoding cost, with non-conforming values paid for at
escape cost) and flags the values the chosen structure does not cover.

Like the original as used in the paper's evaluation, it is detection
only (its interactive transformation learning needs a user); the harness
attaches the GPT repair head for Table 6, and per the paper it is only
reported on the Wikipedia-style benchmark.
"""
from __future__ import annotations

import math
from collections import Counter

import pandas as pd

from ..core.profiler import signature
from .common import Labels, Prediction, column_values, str_table

_ESCAPE_BITS_PER_CHAR = 6.0  # cost of spelling out a non-conforming value
_STRUCT_BITS_PER_TOKEN = 12.0  # cost of describing one structure token
_CONFORM_BITS_PER_CHAR = 4.0  # cost of a value under its structure


def _mdl(structures: list[tuple], values: list[str], sigs: list[tuple]) -> float:
    """Description length of the column under a set of structures."""
    cost = sum(
        _STRUCT_BITS_PER_TOKEN * max(1, len(s)) for s in structures
    )
    covered = set(structures)
    for v, s in zip(values, sigs):
        if s in covered:
            cost += _CONFORM_BITS_PER_CHAR * max(1, len(v))
        else:
            cost += _ESCAPE_BITS_PER_CHAR * max(1, len(v))
    return cost


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    out: list[Prediction] = []
    st = str_table(table)
    for col in st.columns:
        values = column_values(st, col)
        n = len(values)
        if n < 4:
            continue
        sigs = [signature(v) for v in values]
        counts = Counter(sigs)
        # Greedy MDL: add structures in frequency order while DL drops.
        ordered = [s for s, _ in counts.most_common()]
        chosen: list[tuple] = []
        best = math.inf
        for s in ordered:
            trial = chosen + [s]
            dl = _mdl(trial, values, sigs)
            if dl < best:
                best = dl
                chosen = trial
            else:
                break
        covered = set(chosen)
        if len(covered) == len(counts):
            continue  # every value conforms — nothing to flag
        for i, (v, s) in enumerate(zip(values, sigs)):
            if v and s not in covered:
                out.append(Prediction(str(col), i, v, None))
    return out
