"""Error injection.

Two regimes, matching §4.2:

* :func:`noise_ops` — the paper's 7 synthetic noise operations for the
  *Synthetic Errors* benchmark: (1) random character insert/delete/change,
  (2) random delimiter insert/delete/change, (3) random digit swap,
  (4) random character shuffle, (5) random capitalization, (6) decimal/
  comma swap in numerics, (7) visually-inspired typos {o→0, l→1, e→3,
  a→4, t→7, s→5}. Cells are corrupted with 20% probability; a corrupted
  cell receives 1–4 operations, each count with 25% probability, sampled
  without replacement.

* realistic domain corruptors (defined per domain in ``domains.py``) for
  the Wikipedia-like and Excel-like benchmarks, where errors are of the
  kinds found in the wild (Fig 1).

:class:`BenchTable` is the shared carrier: the dirty table, the ground
truth for corrupted cells, and the domain of each column.
"""
from __future__ import annotations

import string
from dataclasses import dataclass, field

import numpy as np
import pandas as pd

from .domains import Domain, Rng

_DELIMS = "-_.,:;/ ()"
_VISUAL = {"o": "0", "l": "1", "e": "3", "a": "4", "t": "7", "s": "5"}


@dataclass
class BenchTable:
    """One benchmark table: dirty data + ground truth + provenance."""

    table_id: str
    df: pd.DataFrame  # dirty values, all strings
    clean: dict[tuple[str, int], str] = field(default_factory=dict)
    domains: dict[str, str] = field(default_factory=dict)  # col -> domain name

    def error_cells(self) -> set[tuple[str, int]]:
        """Cells whose dirty value differs from ground truth."""
        return {
            (c, r)
            for (c, r), clean_v in self.clean.items()
            if str(self.df.iloc[r][c]) != clean_v
        }


# ------------------------------------------------- the 7 noise operations


def _op_char(rng: Rng, v: str) -> str:
    """(1) random character insertion, deletion, or change."""
    mode = int(rng.integers(0, 3))
    alphabet = string.ascii_letters + string.digits
    if mode == 0 or not v:
        i = int(rng.integers(0, len(v) + 1))
        return v[:i] + str(rng.choice(list(alphabet))) + v[i:]
    i = int(rng.integers(0, len(v)))
    if mode == 1:
        return v[:i] + v[i + 1 :]
    return v[:i] + str(rng.choice(list(alphabet))) + v[i + 1 :]


def _op_delim(rng: Rng, v: str) -> str:
    """(2) random delimiter insertion, deletion, or change."""
    delim_positions = [i for i, c in enumerate(v) if c in _DELIMS]
    mode = int(rng.integers(0, 3))
    if mode == 0 or not delim_positions:
        i = int(rng.integers(0, len(v) + 1))
        return v[:i] + str(rng.choice(list("-_.,:;/"))) + v[i:]
    i = int(rng.choice(delim_positions))
    if mode == 1:
        return v[:i] + v[i + 1 :]
    new = str(rng.choice([d for d in "-_.,:;/" if d != v[i]]))
    return v[:i] + new + v[i + 1 :]


def _op_digit_swap(rng: Rng, v: str) -> str:
    """(3) random digit swap (two digit positions exchange)."""
    digits = [i for i, c in enumerate(v) if c.isdigit()]
    if len(digits) < 2:
        return _op_char(rng, v)
    i, j = rng.choice(digits, 2, replace=False)
    lst = list(v)
    lst[i], lst[j] = lst[j], lst[i]
    return "".join(lst)


def _op_shuffle(rng: Rng, v: str) -> str:
    """(4) random shuffle of a short character span."""
    if len(v) < 3:
        return _op_char(rng, v)
    start = int(rng.integers(0, len(v) - 2))
    end = min(len(v), start + int(rng.integers(2, 5)))
    mid = list(v[start:end])
    rng.shuffle(mid)
    return v[:start] + "".join(mid) + v[end:]


def _op_capitalize(rng: Rng, v: str) -> str:
    """(5) random capitalization flip of one or more letters."""
    letters = [i for i, c in enumerate(v) if c.isalpha()]
    if not letters:
        return _op_char(rng, v)
    k = min(len(letters), 1 + int(rng.integers(0, 3)))
    idx = rng.choice(letters, k, replace=False)
    lst = list(v)
    for i in idx:
        lst[i] = lst[i].lower() if lst[i].isupper() else lst[i].upper()
    return "".join(lst)


def _op_decimal_comma(rng: Rng, v: str) -> str:
    """(6) decimal/comma swap in numerics."""
    if "." in v:
        return v.replace(".", ",", 1)
    if "," in v:
        return v.replace(",", ".", 1)
    return _op_delim(rng, v)


def _op_visual(rng: Rng, v: str) -> str:
    """(7) visually-inspired typos."""
    positions = [i for i, c in enumerate(v) if c.lower() in _VISUAL]
    if not positions:
        return _op_char(rng, v)
    i = int(rng.choice(positions))
    return v[:i] + _VISUAL[v[i].lower()] + v[i + 1 :]


NOISE_OPS = [
    _op_char,
    _op_delim,
    _op_digit_swap,
    _op_shuffle,
    _op_capitalize,
    _op_decimal_comma,
    _op_visual,
]


def noise_ops(rng: Rng, v: str) -> str:
    """Apply the paper's corruption recipe to one cell: 1–4 ops (25%
    probability each count), sampled without replacement."""
    k = 1 + int(rng.integers(0, 4))
    ops = rng.choice(len(NOISE_OPS), size=k, replace=False)
    out = v
    for oi in ops:
        out = NOISE_OPS[int(oi)](rng, out)
    return out


# -------------------------------------------------------- table corruption


def corrupt_table(
    table_id: str,
    clean_df: pd.DataFrame,
    col_domains: dict[str, Domain],
    rng: Rng,
    *,
    cell_prob: float,
    realistic: bool,
) -> BenchTable:
    """Corrupt ``clean_df`` in place of a fresh copy.

    ``realistic=True`` draws a domain corruptor per corrupted cell (the
    Wikipedia/Excel regime); ``realistic=False`` applies the 7 generic
    noise operations (the Synthetic regime). Ground truth is recorded for
    every touched cell, so precision/recall are exact.
    """
    df = clean_df.astype(str).copy().reset_index(drop=True)
    bt = BenchTable(table_id=table_id, df=df, domains={})
    for col in df.columns:
        dom = col_domains.get(str(col))
        bt.domains[str(col)] = dom.name if dom else ""
        corruptible = dom is not None and (not realistic or dom.corruptors)
        for r in range(len(df)):
            if not corruptible or rng.random() >= cell_prob:
                continue
            v = str(df.iloc[r][col])
            if realistic:
                fn = dom.corruptors[int(rng.integers(0, len(dom.corruptors)))]
                dirty = fn(rng, v)
            else:
                dirty = noise_ops(rng, v)
            if dirty != v:
                bt.clean[(str(col), r)] = v
                df.iloc[r, df.columns.get_loc(col)] = dirty
    return bt
