"""Benchmark builders for the Wikipedia-like, Excel-like, and Synthetic
benchmarks (§4.2, Table 3).

Shape targets come from Table 3: Wikipedia tables are wide and short
(5.1 cols × 27.3 rows), Excel tables narrow and long (1.6 × 523.4),
Synthetic in between (4.3 × 447.5). Row counts default to a scaled-down
regime so the full evaluation runs in minutes; pass ``row_scale=1.0`` for
paper-scale tables.

Wikipedia/Excel use realistic per-domain corruptors at a low cell rate
(matching the low fire rates of Table 5); Synthetic uses the 7 generic
noise operations at the paper's 20% cell probability.
"""
from __future__ import annotations

import numpy as np
import pandas as pd

from .corrupt import BenchTable, corrupt_table
from .domains import CORRELATED_DOMAINS, DOMAINS, Domain, Rng


def _compose(
    rng: Rng, doms: list[Domain], n_rows: int
) -> tuple[pd.DataFrame, dict[str, Domain]]:
    """Side-by-side composition of domain fragments; duplicate column
    names get a numeric suffix; only target columns are corruptible."""
    parts: list[pd.DataFrame] = []
    col_domains: dict[str, Domain] = {}
    seen: set[str] = set()
    for dom in doms:
        frag = dom.generate(rng, n_rows)
        rename: dict[str, str] = {}
        for c in frag.columns:
            name = str(c)
            k = 2
            while name in seen:
                name = f"{c}_{k}"
                k += 1
            rename[str(c)] = name
            seen.add(name)
        frag = frag.rename(columns=rename)
        parts.append(frag)
        col_domains[rename[dom.target]] = dom
    return pd.concat(parts, axis=1), col_domains


def _pick_domains(rng: Rng, k: int, *, correlated_bias: float = 0.0) -> list[Domain]:
    """Sample ``k`` distinct domains; with probability ``correlated_bias``
    one slot is guaranteed to come from the correlated pool (columns
    whose values are derivable from a sibling column — the cases where
    learned concretization constraints matter)."""
    names = list(DOMAINS)
    picked: list[str] = []
    if correlated_bias > 0 and rng.random() < correlated_bias:
        picked.append(str(rng.choice(CORRELATED_DOMAINS)))
    rest = [n for n in names if n not in picked]
    idx = rng.choice(len(rest), size=min(k - len(picked), len(rest)), replace=False)
    picked.extend(rest[int(i)] for i in idx)
    return [DOMAINS[n] for n in picked]


def wikipedia_tables(
    n_tables: int = 120, *, seed: int = 7, row_scale: float = 1.0
) -> list[BenchTable]:
    """Wikipedia-like: many columns, few rows, realistic errors."""
    rng = np.random.default_rng(seed)
    out: list[BenchTable] = []
    for t in range(n_tables):
        n_rows = max(8, int(rng.integers(12, 45) * row_scale))
        doms = _pick_domains(rng, int(rng.integers(4, 7)))
        df, col_domains = _compose(rng, doms, n_rows)
        out.append(
            corrupt_table(
                f"wiki-{t:04d}", df, col_domains, rng, cell_prob=0.05, realistic=True
            )
        )
    return out


def excel_tables(
    n_tables: int = 60, *, seed: int = 11, row_scale: float = 0.25
) -> list[BenchTable]:
    """Excel-like: one or two columns, many rows, realistic errors.

    Paper-scale rows average 523; the default ``row_scale`` keeps the
    shape (few wide, many long) while bounding runtime.
    """
    rng = np.random.default_rng(seed)
    out: list[BenchTable] = []
    for t in range(n_tables):
        n_rows = max(20, int(rng.integers(250, 800) * row_scale))
        doms = _pick_domains(rng, 1 if rng.random() < 0.6 else 2)
        df, col_domains = _compose(rng, doms, n_rows)
        out.append(
            corrupt_table(
                f"excel-{t:04d}", df, col_domains, rng, cell_prob=0.03, realistic=True
            )
        )
    return out


def synthetic_tables(
    n_tables: int = 120, *, seed: int = 13, row_scale: float = 0.25
) -> list[BenchTable]:
    """Synthetically corrupted benchmark: generic noise operations at the
    paper's 20% cell probability (recall is measured against these)."""
    rng = np.random.default_rng(seed)
    out: list[BenchTable] = []
    for t in range(n_tables):
        n_rows = max(20, int(rng.integers(200, 700) * row_scale))
        doms = _pick_domains(rng, int(rng.integers(3, 6)), correlated_bias=0.7)
        df, col_domains = _compose(rng, doms, n_rows)
        out.append(
            corrupt_table(
                f"synth-{t:04d}", df, col_domains, rng, cell_prob=0.2, realistic=False
            )
        )
    return out
