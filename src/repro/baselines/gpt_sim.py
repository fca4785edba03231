"""GPT-3.5 stand-in (§4.3 baseline 7) and the "+GPT-3.5" repair head.

The container has no network, so the few-shot GPT-3.5 baseline is
simulated by an algorithm with an LLM's characteristic profile on this
task (as reported in §5.1):

* strong on **semantic** substrings — it shares the semantic knowledge
  base with DataVinci's abstraction module (typos, aliases, style
  deviations are detected and repaired);
* reasonable at **frequency/range** reasoning — near-duplicate rare
  values are snapped to frequent ones, and rare out-of-range tokens in
  otherwise-aligned values are spotted (the ``Q5-20`` example);
* blind to **syntactic pattern** violations — it never learns regular
  expressions, so errors like ``S1.4`` in ``{S.1.2, S.2.3, …}`` (all
  values distinct) are missed, exactly the failure mode the paper
  describes for GPT-3.5.

``repair_cell`` is the repair head the paper bolts onto detection-only
systems (Raha, Auto-Detect, Potter's Wheel): given one detected cell and
its column context, propose a repair.
"""
from __future__ import annotations

from collections import Counter

import pandas as pd

from ..core import semantics
from ..core.edits import levenshtein
from ..core.profiler import Token, tokenize
from .common import (
    Labels,
    Prediction,
    column_values,
    format_align,
    nearest_frequent,
    str_table,
    value_counts,
)

_RARE = 1  # a value is "rare" when it appears at most this many times
_FREQ_MIN = 2  # a snap target must appear at least this many times


def _semantic_repair(model: semantics.SemanticModel, mv) -> str:
    """Apply the model's suggestions to one value: masked entities via
    re-concretization, fuzzy (typo) entities via in-place span
    replacement."""
    out = model.unmask_value(mv, mv.masked)
    if out == mv.original and mv.fuzzy_entities:
        s = mv.original
        for ent in sorted(mv.fuzzy_entities, key=lambda e: -e.start):
            s = s[: ent.start] + model.suggestion(ent) + s[ent.end :]
        out = s
    return out


def _letter_diff(a: str, b: str) -> bool:
    """True when the (distance-1) difference between ``a`` and ``b``
    involves at least one alphabetic character."""
    if len(a) == len(b):
        pairs = [(x, y) for x, y in zip(a, b) if x != y]
        return any(x.isalpha() or y.isalpha() for x, y in pairs)
    short, long_ = (a, b) if len(a) < len(b) else (b, a)
    for i in range(len(long_)):
        if long_[:i] + long_[i + 1 :] == short:
            return long_[i].isalpha()
    return True


def _token_outlier(
    values: list[str], idx: int, tok_lists: list[tuple[Token, ...]]
) -> str | None:
    """Rare token in an aligned token slot → repaired value, else None.

    Emulates the LLM's range reasoning: in ``{Q1-22, Q4-21, Q5-20}`` the
    values align token-by-token; slot 2 holds digits {1,4,5,...} where
    ``5`` occurs once while the others recur — so ``Q5-20`` is suspect
    and the repair snaps the token to the closest recurring one.
    """
    kinds = [tuple(t.kind for t in tl) for tl in tok_lists]
    mine = kinds[idx]
    peers = [i for i, k in enumerate(kinds) if k == mine and i != idx]
    if len(peers) < 3:
        return None
    toks = list(tok_lists[idx])
    for pos in range(len(toks)):
        slot_vals = Counter(tok_lists[i][pos].text for i in peers)
        mine_text = toks[pos].text
        if slot_vals.get(mine_text, 0) > 0:
            continue
        if len(slot_vals) > 6:  # high-cardinality slot — not categorical
            continue
        recurring = [t for t, c in slot_vals.items() if c >= 2]
        if not recurring:
            continue
        best = min(recurring, key=lambda t: (levenshtein(mine_text, t), t))
        if levenshtein(mine_text, best) <= 1:
            toks[pos] = Token(toks[pos].kind, best)
            return "".join(t.text for t in toks)
    return None


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    """Few-shot-GPT-style detect+repair over every column."""
    out: list[Prediction] = []
    st = str_table(table)
    for col in st.columns:
        values = column_values(st, col)
        if len(values) < 4:
            continue
        counts = value_counts(values)
        model = semantics.abstract_column(values)
        tok_lists = [tokenize(v) for v in values]
        char_freq: Counter = Counter(c for v in values for c in set(v))
        for i, v in enumerate(values):
            if not v:
                continue
            # 1. semantic judgement (shared KB = shared LLM world knowledge)
            if model.semantic_changed(i):
                repaired = _semantic_repair(model, model.masked_values[i])
                out.append(
                    Prediction(str(col), i, v, repaired if repaired != v else None)
                )
                continue
            # 2. near-duplicate of a frequent value. The structure guard
            # is OFF — an LLM eagerly "fixes" rare values that resemble
            # frequent ones (its hallucinated-repair failure mode) — but
            # the single-character difference must involve a letter: a
            # pure digit discrepancy (Q1-22 vs Q1-23) reads as plausible
            # data, a letter near-miss reads as a typo.
            if counts[v] <= _RARE:
                snap = nearest_frequent(
                    v, counts, min_count=3, max_dist=1, categorical_guard=False
                )
                if snap is not None and _letter_diff(v, snap):
                    out.append(Prediction(str(col), i, v, snap))
                    continue
                # 3. categorical token out of range
                fixed = _token_outlier(values, i, tok_lists)
                if fixed is not None:
                    out.append(Prediction(str(col), i, v, fixed))
                    continue
                # 4. anomalous punctuation: a cell with delimiter
                # characters almost absent from the column reads as noise
                # to an LLM (letters are content and stay out of this
                # check); repair by imitating the dominant format, else
                # by dropping the offending characters.
                if len(values) >= 8 and _rare_chars(v, char_freq, len(values)):
                    fixed = format_align(v, values)
                    if fixed is None:
                        bad = {
                            c
                            for c in set(v)
                            if not c.isalnum()
                            and char_freq[c] <= max(1, len(values) // 20)
                        }
                        stripped = "".join(c for c in v if c not in bad)
                        fixed = stripped if stripped and stripped != v else None
                    out.append(Prediction(str(col), i, v, fixed))
    return out


def _rare_chars(v: str, char_freq: Counter, n: int) -> bool:
    return any(
        not c.isalnum() and char_freq[c] <= max(1, n // 20) for c in set(v)
    )


def repair_cell(table: pd.DataFrame, col: str, row: int) -> str | None:
    """The "+GPT-3.5" repair head for detection-only systems: repair one
    flagged cell from its spatial context (the paper samples 5 rows above
    and below plus neighbouring columns into the prompt)."""
    st = str_table(table)
    values = column_values(st, col)
    v = values[row]
    context = values[max(0, row - 5) : row] + values[row + 1 : row + 6]
    counts = value_counts(values)
    model = semantics.abstract_column(values)
    mv = model.masked_values[row]
    if model.semantic_changed_value(mv):
        repaired = _semantic_repair(model, mv)
        if repaired and repaired != v:
            return repaired
    snap = nearest_frequent(v, counts, min_count=_FREQ_MIN)
    if snap is not None:
        return snap
    fixed = _token_outlier(values, row, [tokenize(x) for x in values])
    if fixed is not None:
        return fixed
    # Imitate the common format: structural alignment to the dominant
    # shape (an LLM shown the column reproduces its format reliably,
    # even when it would not have *detected* the deviation itself).
    aligned = format_align(v, values)
    if aligned is not None:
        return aligned
    # Last resort: the closest context value.
    if context:
        closest = min(context, key=lambda c: levenshtein(v, c))
        if 0 < levenshtein(v, closest) <= 2:
            return closest
    return None
