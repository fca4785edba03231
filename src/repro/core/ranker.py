"""Heuristic repair-candidate ranker (§3.5).

A weighted linear combination of four edit-script properties, lower is
better:

1. string edit distance between the erroneous value and the repair,
2. count of alphanumeric edit operations (delimiter edits are safer),
3. edit distance from the repair to the closest non-error column value,
4. one minus the column fraction matching the inducing significant
   pattern (repairs toward dominant patterns are preferred).

The paper sets the weights manually from a small held-out set; the values
below were tuned the same way on a handful of generated columns.
"""
from __future__ import annotations

from dataclasses import dataclass

from .edits import EditProgram, alnum_edit_ops, levenshtein

W_EDIT_DIST = 1.0
W_ALNUM_OPS = 0.5
W_CLOSEST = 0.3
W_COVERAGE = 2.0

_MAX_NEIGHBOURS = 50


@dataclass
class Candidate:
    """One fully concretized repair candidate for a cell."""

    original: str
    repaired: str
    program: EditProgram | None
    coverage: float  # fraction of column covered by the inducing pattern
    pattern_str: str = ""
    score: float = 0.0


def score_candidate(
    cand: Candidate, clean_values: list[str], *, edit_distance_only: bool = False
) -> float:
    """Compute (and store) the ranker score. ``edit_distance_only``
    implements the *Edit distance ranking* ablation of §5.4.2."""
    d = levenshtein(cand.original, cand.repaired)
    if edit_distance_only:
        cand.score = float(d)
        return cand.score
    ops = alnum_edit_ops(cand.program) if cand.program is not None else d
    neighbours = clean_values[:_MAX_NEIGHBOURS]
    closest = (
        min(levenshtein(cand.repaired, v) for v in neighbours)
        if neighbours
        else 0
    )
    cand.score = (
        W_EDIT_DIST * d
        + W_ALNUM_OPS * ops
        + W_CLOSEST * closest
        + W_COVERAGE * (1.0 - cand.coverage)
    )
    return cand.score


def rank(
    candidates: list[Candidate],
    clean_values: list[str],
    *,
    edit_distance_only: bool = False,
) -> list[Candidate]:
    """Sort candidates best-first; deterministic tie-break on the string."""
    for c in candidates:
        score_candidate(c, clean_values, edit_distance_only=edit_distance_only)
    return sorted(candidates, key=lambda c: (c.score, c.repaired))
