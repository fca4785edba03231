"""The Excel-Formulas benchmark (§4.2): (formula, input columns) pairs.

Each task is a table plus a column-defining formula; errors injected into
the input columns make the formula produce Excel error values on some
rows. Following the paper's filter, every generated task has at least one
failing cell and fewer than 25% failing cells; the single/multi column
split mirrors the paper's 7,200 : 3,800 ratio (≈65% single).

Formula templates pair each domain with a formula whose success depends
on the domain's structure, so the realistic corruptors produce genuine
execution failures (e.g. ``SEARCH("-", …)`` over country codes fails on
``us_837``-style errors — the paper's motivating example).
"""
from __future__ import annotations

from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from ..formulas.engine import is_error_value, run_formula
from .corrupt import BenchTable
from .domains import DOMAINS, Rng, _digits, _typo


@dataclass
class FormulaTask:
    """One benchmark entry: a dirty table and the formula over it."""

    table_id: str
    df: pd.DataFrame
    formula: str
    input_cols: list[str]
    clean: dict[tuple[str, int], str] = field(default_factory=dict)
    single: bool = True

    def as_bench_table(self) -> BenchTable:
        domains = {c: "" for c in map(str, self.df.columns)}
        return BenchTable(self.table_id, self.df, dict(self.clean), domains)


# (domain name, formula template) — single-column tasks. The formula
# references the domain's target column via [@Col].
_SINGLE_TEMPLATES: list[tuple[str, str]] = [
    ("chrome_ver", '=RIGHT([@Option], LEN([@Option]) - SEARCH("Chrome",[@Option]) - LEN("Chrome") + 1)'),
    ("code", '=SEARCH("-", [@Code])'),
    ("quarter", '=VALUE(RIGHT([@Quarter], LEN([@Quarter]) - SEARCH("-", [@Quarter])))'),
    ("duration", '=VALUE(LEFT([@Length], SEARCH(":", [@Length]) - 1))'),
    ("price", '=VALUE(SUBSTITUTE(SUBSTITUTE([@Price], "$", ""), ",", "!"))'),
    ("email", '=SEARCH("@", [@Email])'),
    ("mixing", '=SEARCH("%", [@Mixing])'),
    ("s_code", '=VALUE(MID([@SCode], 3, 1))'),
    ("phone", '=VALUE(LEFT([@Phone], 3))'),
    ("website", '=SEARCH("https://", [@Website])'),
]


def _numeric_column(rng: Rng, n: int) -> list[str]:
    return [_digits(rng, int(rng.integers(1, 5))) for _ in range(n)]


def _corrupt_numeric(rng: Rng, v: str) -> str:
    i = int(rng.integers(0, len(v) + 1))
    return v[:i] + str(rng.choice(list("abkxz"))) + v[i:]


def _make_single(rng: Rng, tid: int, row_range: tuple[int, int]) -> FormulaTask | None:
    dom_name, formula = _SINGLE_TEMPLATES[int(rng.integers(0, len(_SINGLE_TEMPLATES)))]
    dom = DOMAINS[dom_name]
    n = int(rng.integers(*row_range))
    df = dom.generate(rng, n).astype(str)
    clean: dict[tuple[str, int], str] = {}
    target = dom.target
    # Fig 8 regime: the chrome truncations recur often enough to form a
    # significant pattern of their own, so unsupervised majority-pattern
    # detection misses them and only execution-guidance catches them.
    cell_prob = 0.2 if dom_name == "chrome_ver" else 0.10
    for r in range(n):
        if rng.random() < cell_prob:
            v = str(df.iloc[r][target])
            fn = dom.corruptors[int(rng.integers(0, len(dom.corruptors)))]
            dirty = fn(rng, v)
            if dirty != v:
                clean[(target, r)] = v
                df.iloc[r, df.columns.get_loc(target)] = dirty
    task = FormulaTask(
        f"formula-s-{tid:05d}", df, formula, [target], clean, single=True
    )
    return task if _valid(task) else None


def _make_multi(rng: Rng, tid: int, row_range: tuple[int, int]) -> FormulaTask | None:
    n = int(rng.integers(*row_range))
    kind = int(rng.integers(0, 3))
    clean: dict[tuple[str, int], str] = {}
    if kind == 0:
        # Sum of 2-4 numeric string columns.
        k = int(rng.integers(2, 5))
        cols = {f"N{i+1}": _numeric_column(rng, n) for i in range(k)}
        df = pd.DataFrame(cols).astype(str)
        for c in cols:
            for r in range(n):
                if rng.random() < 0.05:
                    v = str(df.iloc[r][c])
                    dirty = _corrupt_numeric(rng, v)
                    clean[(c, r)] = v
                    df.iloc[r, df.columns.get_loc(c)] = dirty
        formula = "=" + " + ".join(f"VALUE([@{c}])" for c in cols)
        input_cols = list(cols)
    elif kind == 1:
        # Country-code column + quantity column.
        code = DOMAINS["code"].generate(rng, n).astype(str)
        df = code.assign(Qty=_numeric_column(rng, n)).astype(str)
        for r in range(n):
            if rng.random() < 0.08:
                v = str(df.iloc[r]["Code"])
                fn = DOMAINS["code"].corruptors[0]  # us_837 style
                clean[("Code", r)] = v
                df.iloc[r, df.columns.get_loc("Code")] = fn(rng, v)
            if rng.random() < 0.05:
                v = str(df.iloc[r]["Qty"])
                clean[("Qty", r)] = v
                df.iloc[r, df.columns.get_loc("Qty")] = _corrupt_numeric(rng, v)
        formula = (
            '=VALUE(RIGHT([@Code], LEN([@Code]) - SEARCH("-", [@Code])))'
            " + VALUE([@Qty])"
        )
        input_cols = ["Code", "Qty"]
    else:
        # Substring containment: Full = <Name><digits>, Sub = <Name>.
        names = DOMAINS["name_id"].generate(rng, n).astype(str)
        subs = [str(v).rstrip("0123456789") for v in names["UserID"]]
        df = pd.DataFrame({"Full": names["UserID"], "Sub": subs}).astype(str)
        for r in range(n):
            if rng.random() < 0.10:
                v = str(df.iloc[r]["Sub"])
                clean[("Sub", r)] = v
                df.iloc[r, df.columns.get_loc("Sub")] = _typo(rng, v)
        formula = "=SEARCH([@Sub], [@Full])"
        input_cols = ["Sub", "Full"]
    task = FormulaTask(
        f"formula-m-{tid:05d}", df, formula, input_cols, clean, single=False
    )
    return task if _valid(task) else None


def _valid(task: FormulaTask) -> bool:
    """Paper filter: ≥1 failing cell and <25% failing cells."""
    results = run_formula(task.formula, task.df)
    n_fail = sum(1 for r in results if is_error_value(r))
    return 1 <= n_fail < 0.25 * len(results)


def formula_tasks(
    n_tasks: int = 240,
    *,
    seed: int = 17,
    single_fraction: float = 0.65,
    row_range: tuple[int, int] = (30, 90),
) -> list[FormulaTask]:
    """Generate the benchmark; tasks failing the paper filter are
    regenerated (bounded retries) so the requested count is met."""
    rng = np.random.default_rng(seed)
    out: list[FormulaTask] = []
    tid = 0
    attempts = 0
    while len(out) < n_tasks and attempts < n_tasks * 20:
        attempts += 1
        single = rng.random() < single_fraction
        task = (
            _make_single(rng, tid, row_range)
            if single
            else _make_multi(rng, tid, row_range)
        )
        if task is not None:
            out.append(task)
            tid += 1
    return out
