"""HoloClean lite (§4.3 baseline 2): probabilistic repair by inference.

HoloClean compiles error signals and (optionally) denial constraints into
a factor graph and infers a posterior over each cell's value. The paper
evaluates it unsupervised, with a single vacuous denial constraint, so
what remains active is its statistical machinery: a per-cell posterior
over the column's value domain, with factors for value frequency and
co-occurrence with the other attributes of the tuple.

The lite version implements exactly that as naive-Bayes inference:

    P(v | row) ∝ P(v) · Π_c P(row[c] | v)

with add-one smoothing over the observed co-occurrence tables. A cell is
marked erroneous when the MAP value differs from the observed one, the
observed value is rare, and the posterior odds exceed a margin; the MAP
value is the suggested repair. Like the original, it is comparatively
heavyweight — inference touches every (cell × candidate) pair.
"""
from __future__ import annotations

import math
from collections import Counter, defaultdict

import pandas as pd

from ..core.edits import levenshtein
from .common import Labels, Prediction, column_values, str_table, value_counts

_MARGIN = math.log(2.0)  # posterior odds the MAP value must win by
_MAX_DOMAIN = 30  # candidate repairs per cell
_RARE = 1


def run(table: pd.DataFrame, labels: Labels | None = None) -> list[Prediction]:
    st = str_table(table)
    n = len(st)
    if n < 4:
        return []
    cols = [str(c) for c in st.columns]
    col_values = {c: column_values(st, c) for c in cols}
    priors = {c: value_counts(col_values[c]) for c in cols}
    # Co-occurrence tables P(other_val | v) per column pair.
    cooc: dict[tuple[str, str], dict[str, Counter]] = {}
    for c in cols:
        for c2 in cols:
            if c == c2:
                continue
            tab: dict[str, Counter] = defaultdict(Counter)
            for v, v2 in zip(col_values[c], col_values[c2]):
                tab[v][v2] += 1
            cooc[(c, c2)] = tab
    out: list[Prediction] = []
    for c in cols:
        values = col_values[c]
        domain = [v for v, _ in priors[c].most_common(_MAX_DOMAIN) if v]
        if len(domain) < 2:
            continue
        vocab = len(priors[c]) + 1
        for i, observed in enumerate(values):
            if not observed:
                continue
            cands = domain if observed in domain else domain + [observed]

            def logpost(v: str) -> float:
                # Leave-one-out: the cell's own tuple must not support its
                # observed value, or a dirty cell is its own evidence.
                own = 1 if v == observed else 0
                lp = math.log((priors[c][v] - own + 1) / (n - 1 + vocab))
                for c2 in cols:
                    if c2 == c:
                        continue
                    tab = cooc[(c, c2)]
                    seen = tab.get(v, Counter())
                    denom = sum(seen.values()) - own + len(priors[c2]) + 1
                    lp += math.log(
                        max(1, seen[col_values[c2][i]] - own + 1) / max(2, denom)
                    )
                # Minimality factor (HoloClean's repair model includes
                # string-similarity features): a candidate far from the
                # observed value needs proportionally more evidence.
                lp -= math.log(2.0) * levenshtein(v, observed)
                return lp

            # Inference runs for every cell (as in the original system);
            # a repair is only *emitted* for rare observed values whose
            # MAP alternative has real support and wins by a clear margin
            # (columns of all-distinct values stay untouched).
            scored = sorted(cands, key=lambda v: -logpost(v))
            map_v = scored[0]
            if (
                priors[c][observed] <= _RARE
                and map_v != observed
                and priors[c][map_v] >= 2
                and logpost(map_v) - logpost(observed) > _MARGIN
            ):
                out.append(Prediction(c, i, observed, map_v))
    return out
