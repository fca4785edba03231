"""The DataVinci pipeline: detect and repair string errors in a table (§3).

Per string column:

1. semantically abstract the column (§3.2) — mask substrings of active
   semantic types, remember repair suggestions;
2. learn patterns over the masked values (§3.1) and keep the significant
   ones (row coverage ≥ δ);
3. flag as errors the values outside every significant pattern's
   language, plus values whose abstraction already implies a semantic
   repair (a masked surface or fuzzy-matched typo whose suggestion
   differs);
4. for every flagged value and every significant pattern, derive a
   minimal abstract edit program (§3.3), concretize its abstract actions
   with learned value constraints (§3.4) and its mask symbols with the
   semantic suggestions, and rank the candidates (§3.5).

All ablations of §5.4 are switches on :class:`DataVinciConfig`.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from itertools import product

import numpy as np
import pandas as pd

from . import concretize, ranker, semantics
from .editdp import (
    minimal_program,
    parse_consumption,
    program_edited_alt_groups,
    restrict_alt,
)
from .nfa import build_dag, matches
from .profiler import LearnedPattern, learn_patterns, significant_patterns
from .regexlang import Alt


@dataclass
class DataVinciConfig:
    """Knobs of the pipeline; defaults are the full system."""

    delta: float = 0.15  # significance threshold δ (§3.1)
    max_patterns: int = 8  # FlashProfile's k
    alpha: float = 0.8  # decision-tree accuracy threshold α (§3.4)
    semantic: bool = True  # False → "No semantic abstraction" ablation
    semantic_repair: bool = True  # False → "Limited semantic concretization"
    learned_concretization: bool = True  # False → enumerate + rank only
    edit_distance_ranking: bool = False  # True → ranking ablation
    max_value_len: int = 80  # DP guard for pathological cells
    max_enumerate: int = 64  # candidate cap in enumeration mode
    min_rows: int = 4  # below this, no majority evidence exists


@dataclass
class CellRepair:
    """Detection + repair outcome for one flagged cell."""

    column: str
    row: int
    original: str
    repaired: str | None  # None: detected but no repair produced


@dataclass
class ColumnReport:
    """Everything DataVinci learned about one column — used by tests and
    the execution-guided engine."""

    column: str
    significant: list[LearnedPattern] = field(default_factory=list)
    flagged: list[int] = field(default_factory=list)
    repairs: list[CellRepair] = field(default_factory=list)


def _as_str_column(series: pd.Series) -> list[str]:
    return ["" if pd.isna(v) else str(v) for v in series]


def _is_stringy(values: list[str]) -> bool:
    """Columns that are wholly numeric are out of scope (the paper targets
    string columns); a column qualifies if any value has a non-digit,
    non-sign character."""
    import re

    return any(not re.fullmatch(r"-?\d+(\.\d+)?", v) for v in values if v)


class _SlotConstraints:
    """Lazy per-(pattern, slot) concretization constraints for a column."""

    def __init__(
        self,
        table: pd.DataFrame | None,
        clean_rows: list[int],
        config: DataVinciConfig,
        shared: dict | None = None,
    ) -> None:
        self.config = config
        self.clean_rows = clean_rows
        self.extractor: concretize.FeatureExtractor | None = None
        self.table = table
        self.features: np.ndarray | None = None
        if table is not None and len(table) and clean_rows:
            # The feature matrix depends only on the table — share it
            # across the table's columns via the caller-provided cache.
            if shared is not None and "features" in shared:
                self.extractor = shared["extractor"]
                self.features = shared["features"]
            else:
                self.extractor = concretize.FeatureExtractor().fit(table)
                self.features = self.extractor.transform(table)
                if shared is not None:
                    shared["extractor"] = self.extractor
                    shared["features"] = self.features
        self._cache: dict[tuple, tuple] = {}

    def _training(self, lp: LearnedPattern, masked: list[str]):
        """Parse every clean row that matches ``lp`` once; returns
        (row indices, slot_chars list, alt_choices list)."""
        rows, slots, alts = [], [], []
        for r in self.clean_rows:
            v = masked[r]
            if not matches(lp.pattern, v):
                continue
            info = parse_consumption(build_dag(lp.pattern, len(v)), v)
            if info is None:
                continue
            rows.append(r)
            slots.append(info.slot_chars)
            alts.append(info.alt_choices)
        return rows, slots, alts

    def resolve(
        self,
        lp: LearnedPattern,
        masked: list[str],
        slot: tuple,
        error_row: int | None,
        *,
        is_alt: bool,
    ) -> tuple[str | None, bool]:
        """Predict the concrete char (or alt option index, as str) for one
        slot of pattern ``lp`` at ``error_row``.

        Returns ``(choice, via_tree)``: ``via_tree`` is True when a
        decision tree meeting the α accuracy bar made the prediction;
        False means the majority fallback (or nothing learnable —
        ``choice`` None)."""
        key = (id(lp), slot)
        if key not in self._cache:
            rows, slot_infos, alt_infos = self._training(lp, masked)
            labels_by_row: list[tuple[int, str]] = []
            for r, sc, ac in zip(rows, slot_infos, alt_infos):
                if is_alt:
                    if slot in ac:
                        labels_by_row.append((r, str(ac[slot])))
                elif slot in sc:
                    labels_by_row.append((r, sc[slot]))
            tree = None
            fallback = concretize.majority_label([l for _, l in labels_by_row])
            if (
                labels_by_row
                and self.features is not None
                and len(set(l for _, l in labels_by_row)) > 1
            ):
                x = self.features[[r for r, _ in labels_by_row]]
                tree = concretize.learn_constraint(
                    x, [l for _, l in labels_by_row], alpha=self.config.alpha
                )
            self._cache[key] = (tree, fallback)
        tree, fallback = self._cache[key]
        if tree is not None and self.features is not None and error_row is not None:
            return tree.predict_one(self.features[error_row]), True
        return fallback, False


_VISUAL_INVERSE = {"0": "o", "1": "l", "3": "e", "4": "a", "7": "t", "5": "s"}


def _natural_choice(step) -> str | None:
    """Value-derived concretization for a substitution into a letter
    class: prefer the consumed character's case flip (``a``→``A``) or its
    visual-typo inverse (``0``→``o``, the paper's noise op 7 reversed)
    when the result is admitted by the edge. Substitutions into digit
    classes are left to the learned constraints — the visual map only
    runs letter-ward, since the corruption direction is letter→digit."""
    if step.action != "S" or step.char is None or step.edge is None:
        return None
    label = step.edge.label
    if label.kind != "cls":
        return None
    ch = step.char
    for cand in (ch.swapcase(), _VISUAL_INVERSE.get(ch, "")):
        if cand and cand.isalpha():
            for variant in (cand, cand.upper(), cand.lower()):
                if label.admits(variant):
                    return variant
    return None


def _enumeration_domain(label, observed: list[str]) -> list[str]:
    """Characters to enumerate for an abstract class edge, preferring
    characters actually observed at that slot in clean rows."""
    from . import chars as _chars

    if observed:
        return sorted(set(observed))
    return sorted(_chars.CLASS_CHARS[label.sym])


def _candidates_for_program(
    prog,
    lp: LearnedPattern,
    masked: list[str],
    v_masked: str,
    row: int | None,
    constraints: _SlotConstraints,
    config: DataVinciConfig,
    coverage: float,
) -> list[ranker.Candidate]:
    """Concretize one abstract edit program into candidate repairs.

    ``masked`` is the fit-time masked column (constraint training data);
    ``v_masked`` the erroneous masked value; ``row`` its index in the fit
    table, or None for a value outside the fit sample (no row features).
    """
    abstract = prog.abstract_steps()
    original = v_masked
    if not abstract:
        return [
            ranker.Candidate(original, prog.apply(), prog, coverage, str(lp.pattern))
        ]
    per_step_choices: list[list[str]] = []
    for i in abstract:
        step = prog.steps[i]
        slot = step.edge.label.slot
        choice: str | None = None
        if config.learned_concretization:
            learned, via_tree = (
                constraints.resolve(lp, masked, slot, row, is_alt=False)
                if slot is not None
                else (None, False)
            )
            if via_tree:
                choice = learned
            else:
                # No qualifying tree: value-derived transform first, then
                # the learned-majority fallback.
                choice = _natural_choice(step) or learned
        if choice is not None and len(choice) == 1:
            per_step_choices.append([choice])
        else:
            # Enumerate. With learned concretization the domain narrows
            # to characters observed at the slot in clean rows; the
            # "No learned concretization" ablation must not peek — it
            # enumerates the raw class domain, as the paper describes.
            observed: list[str] = []
            if config.learned_concretization and slot is not None:
                _, slot_infos, _ = constraints._training(lp, masked)
                observed = [sc[slot] for sc in slot_infos if slot in sc]
            dom = _enumeration_domain(step.edge.label, observed)
            per_step_choices.append(dom)
    out: list[ranker.Candidate] = []
    total = 1
    for dom in per_step_choices:
        total *= max(1, len(dom))
    if total > config.max_enumerate:
        # Keep the head of each domain to stay within budget.
        per_step_choices = [d[:2] for d in per_step_choices]
    for combo in product(*per_step_choices):
        concretized = prog.concretize(dict(zip(abstract, combo)))
        out.append(
            ranker.Candidate(
                original, concretized.apply(), concretized, coverage, str(lp.pattern)
            )
        )
        if len(out) >= config.max_enumerate:
            break
    return out


def repair_one(
    mv: semantics.MaskedValue,
    row: int | None,
    model: semantics.SemanticModel,
    sig: list[LearnedPattern],
    masked: list[str],
    n_total: int,
    constraints: _SlotConstraints,
    clean_unmasked: list[str],
    config: DataVinciConfig,
) -> str | None:
    """§3.3–§3.5 for one detected error value. ``masked``/``n_total`` are
    the fit-time masked column and its size; ``row`` is the value's index
    in the fit table, or None for out-of-sample values."""
    v = mv.masked
    original = mv.original
    if len(v) > config.max_value_len:
        return None
    # A value that already satisfies a significant pattern and carries no
    # semantic change needs no repair. This matters for execution-guided
    # repair (§3.6), where *every* input of a failing row is flagged: the
    # conforming inputs must come back unchanged instead of being
    # force-fitted onto some other learned pattern.
    if (
        any(matches(lp.pattern, v) for lp in sig)
        and not model.semantic_changed_value(mv)
    ):
        return None
    candidates: list[ranker.Candidate] = []
    for lp in sig:
        coverage = lp.count / n_total if n_total else 0.0
        dag = build_dag(lp.pattern, max(1, len(v)))
        progs = []
        base = minimal_program(dag, v)
        if base is None:
            continue
        edited_alts = program_edited_alt_groups(base)
        if edited_alts:
            # Enumerate options of the first edited disjunction; the
            # constraint model (or ranker) picks among them.
            slot = sorted(edited_alts)[0]
            alt_atom = _find_alt(lp, slot)
            n_opts = len(alt_atom.options) if alt_atom else 0
            preferred: str | None = None
            if config.learned_concretization:
                preferred, _ = constraints.resolve(lp, masked, slot, row, is_alt=True)
            for oi in range(n_opts):
                if preferred is not None and str(oi) != preferred:
                    continue
                p = minimal_program(restrict_alt(dag, slot, oi), v)
                if p is not None:
                    progs.append(p)
            if not progs:
                progs.append(base)
        else:
            progs.append(base)
        for prog in progs:
            candidates.extend(
                _candidates_for_program(
                    prog, lp, masked, v, row, constraints, config, coverage
                )
            )
    # Semantic concretization: replace masks with suggestions.
    finished: list[ranker.Candidate] = []
    seen: set[str] = set()
    for c in candidates:
        repaired = model.unmask_value(
            mv, c.repaired, reuse_surface=not config.semantic_repair
        )
        if repaired == original or not repaired:
            continue
        if repaired in seen:
            continue
        seen.add(repaired)
        finished.append(
            ranker.Candidate(original, repaired, c.program, c.coverage, c.pattern_str)
        )
    if not finished:
        return None
    best = ranker.rank(
        finished,
        clean_unmasked,
        edit_distance_only=config.edit_distance_ranking,
    )[0]
    return best.repaired


def repair_errors(
    masked: list[str],
    model: semantics.SemanticModel,
    sig: list[LearnedPattern],
    error_rows: list[int],
    table: pd.DataFrame | None,
    config: DataVinciConfig,
    column: str,
    shared: dict | None = None,
) -> list[CellRepair]:
    """§3.3–§3.5 for a set of already-detected error rows. Shared between
    the unsupervised pipeline and execution-guided repair (§3.6).
    ``shared`` caches the per-table feature matrix across columns."""
    n = len(masked)
    clean_rows = [r for r in range(n) if r not in set(error_rows)]
    constraints = _SlotConstraints(table, clean_rows, config, shared)
    clean_unmasked = [model.masked_values[r].original for r in clean_rows]
    repairs: list[CellRepair] = []
    for row in error_rows:
        repaired = repair_one(
            model.masked_values[row],
            row,
            model,
            sig,
            masked,
            n,
            constraints,
            clean_unmasked,
            config,
        )
        repairs.append(
            CellRepair(column, row, model.masked_values[row].original, repaired)
        )
    return repairs


def _find_alt(lp: LearnedPattern, slot: tuple) -> Alt | None:
    """Locate the Alt atom a slot refers to. Slot layout: ('alt', t) for a
    top-level atom t, ('alt', t, k, u) for unit atom u inside Rep t."""
    body = slot[1:]
    atom = lp.pattern.atoms[body[0]]
    if isinstance(atom, Alt):
        return atom
    if len(body) == 3 and hasattr(atom, "unit"):
        inner = atom.unit[body[2]]
        if isinstance(inner, Alt):
            return inner
    return None


def clean_column(
    values: list[str],
    table: pd.DataFrame | None,
    config: DataVinciConfig,
    column: str = "col",
    shared: dict | None = None,
) -> ColumnReport:
    """Run the full DataVinci pipeline on one string column."""
    report = ColumnReport(column=column)
    n = len(values)
    if n < config.min_rows or not _is_stringy(values):
        return report
    model = semantics.abstract_column(values, enabled=config.semantic)
    masked = [mv.masked for mv in model.masked_values]
    learned = learn_patterns(
        masked, max_patterns=config.max_patterns, mask_types=model.mask_types
    )
    sig = significant_patterns(learned, n, config.delta)
    report.significant = sig
    if not sig:
        return report  # irregular data — Fig 6 ② — report nothing
    flagged: list[int] = []
    for i, v in enumerate(masked):
        syntactic_error = not any(matches(lp.pattern, v) for lp in sig)
        semantic_error = config.semantic and model.semantic_changed(i)
        if syntactic_error or semantic_error:
            flagged.append(i)
    report.flagged = flagged
    if not flagged:
        return report
    report.repairs = repair_errors(
        masked, model, sig, flagged, table, config, column, shared
    )
    return report


def clean_table(
    table: pd.DataFrame, config: DataVinciConfig | None = None
) -> list[CellRepair]:
    """Detect and repair string errors in every column of ``table``."""
    config = config or DataVinciConfig()
    out: list[CellRepair] = []
    str_table = table.astype("string").fillna("").astype(str)
    shared: dict = {}
    for col in str_table.columns:
        values = _as_str_column(str_table[col])
        report = clean_column(values, str_table, config, column=str(col), shared=shared)
        out.extend(report.repairs)
    return out
