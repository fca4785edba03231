"""A small Excel-formula interpreter (the §3.6 execution substrate).

Execution-guided repair only needs per-row success/failure signals from a
*column-transformation program* — an Excel formula evaluated row by row
over the columns it references. This module implements the subset of
Excel used by the paper's examples and our formula benchmark:

* literals: numbers, ``"strings"`` (with ``""`` escaping), TRUE/FALSE;
* column references: structural ``[@Col]`` and A1-style (``A48`` — the
  letters select the column, the row number is ignored because the
  formula is evaluated for the current row, exactly like a filled-down
  spreadsheet column);
* operators: ``+ - * / & = <> < <= > >=``, unary minus, parentheses;
* functions: SEARCH, FIND, LEFT, RIGHT, MID, LEN, CONCAT(ENATE), UPPER,
  LOWER, TRIM, VALUE, SUBSTITUTE, REPT, IF, IFERROR, ISNUMBER, ISTEXT,
  ISERROR, ABS, ROUND, MIN, MAX, EXACT, LEN.

Error semantics follow Excel: ``SEARCH``/``FIND`` yield ``#VALUE!`` when
the needle is absent, ``VALUE`` on non-numeric text, division by zero
yields ``#DIV/0!``, arithmetic on non-numeric text yields ``#VALUE!``,
and errors propagate through every function except IFERROR/ISERROR.
"""
from __future__ import annotations

import re
from dataclasses import dataclass
from typing import Any, Callable

import pandas as pd


@dataclass(frozen=True)
class ExcelError:
    """An Excel error value (``#VALUE!`` etc.). Compares by code."""

    code: str

    def __str__(self) -> str:
        return self.code


VALUE_ERROR = ExcelError("#VALUE!")
DIV0_ERROR = ExcelError("#DIV/0!")
NA_ERROR = ExcelError("#N/A")
NAME_ERROR = ExcelError("#NAME?")


def is_error_value(v: Any) -> bool:
    return isinstance(v, ExcelError)


class FormulaSyntaxError(ValueError):
    """Raised when a formula cannot be parsed."""


# ---------------------------------------------------------------- lexer

_TOKEN_RE = re.compile(
    r"""
    (?P<ws>\s+)
  | (?P<number>\d+(\.\d+)?)
  | (?P<string>"(?:[^"]|"")*")
  | (?P<structref>\[@[A-Za-z_][A-Za-z0-9_ ]*\])
  | (?P<cellref>[A-Z]{1,2}\d+)
  | (?P<ident>[A-Za-z][A-Za-z0-9_]*)
  | (?P<op><=|>=|<>|[=<>+\-*/&(),%])
    """,
    re.VERBOSE,
)


def _lex(src: str) -> list[tuple[str, str]]:
    out: list[tuple[str, str]] = []
    pos = 0
    while pos < len(src):
        m = _TOKEN_RE.match(src, pos)
        if m is None:
            raise FormulaSyntaxError(f"bad character {src[pos]!r} in {src!r}")
        pos = m.end()
        kind = m.lastgroup
        if kind != "ws":
            out.append((kind, m.group()))
    return out


# ---------------------------------------------------------------- parser
# AST nodes: ('num', f) ('str', s) ('bool', b) ('col', name) ('colidx', i)
# ('call', fname, [args]) ('bin', op, l, r) ('neg', e)


class _Parser:
    def __init__(self, tokens: list[tuple[str, str]]):
        self.toks = tokens
        self.i = 0

    def peek(self) -> tuple[str, str] | None:
        return self.toks[self.i] if self.i < len(self.toks) else None

    def take(self) -> tuple[str, str]:
        t = self.peek()
        if t is None:
            raise FormulaSyntaxError("unexpected end of formula")
        self.i += 1
        return t

    def expect(self, text: str) -> None:
        t = self.take()
        if t[1] != text:
            raise FormulaSyntaxError(f"expected {text!r}, got {t[1]!r}")

    def parse(self):
        e = self.comparison()
        if self.peek() is not None:
            raise FormulaSyntaxError(f"trailing tokens: {self.toks[self.i:]}")
        return e

    def comparison(self):
        left = self.concat()
        t = self.peek()
        if t and t[1] in ("=", "<>", "<", "<=", ">", ">="):
            op = self.take()[1]
            right = self.concat()
            return ("bin", op, left, right)
        return left

    def concat(self):
        left = self.additive()
        while (t := self.peek()) and t[1] == "&":
            self.take()
            left = ("bin", "&", left, self.additive())
        return left

    def additive(self):
        left = self.multiplicative()
        while (t := self.peek()) and t[1] in ("+", "-"):
            op = self.take()[1]
            left = ("bin", op, left, self.multiplicative())
        return left

    def multiplicative(self):
        left = self.unary()
        while (t := self.peek()) and t[1] in ("*", "/"):
            op = self.take()[1]
            left = ("bin", op, left, self.unary())
        return left

    def unary(self):
        t = self.peek()
        if t and t[1] == "-":
            self.take()
            return ("neg", self.unary())
        if t and t[1] == "+":
            self.take()
            return self.unary()
        return self.primary()

    def primary(self):
        kind, text = self.take()
        if kind == "number":
            return ("num", float(text))
        if kind == "string":
            return ("str", text[1:-1].replace('""', '"'))
        if kind == "structref":
            return ("col", text[2:-1].strip())
        if kind == "cellref":
            letters = re.match(r"[A-Z]+", text).group()
            idx = 0
            for ch in letters:
                idx = idx * 26 + (ord(ch) - ord("A") + 1)
            return ("colidx", idx - 1)
        if kind == "ident":
            up = text.upper()
            if up == "TRUE":
                return ("bool", True)
            if up == "FALSE":
                return ("bool", False)
            self.expect("(")
            args = []
            if self.peek() and self.peek()[1] != ")":
                args.append(self.comparison())
                while self.peek() and self.peek()[1] == ",":
                    self.take()
                    args.append(self.comparison())
            self.expect(")")
            return ("call", up, args)
        if kind == "op" and text == "(":
            e = self.comparison()
            self.expect(")")
            return e
        raise FormulaSyntaxError(f"unexpected token {text!r}")


def parse_formula(formula: str):
    """Parse ``formula`` (with or without a leading ``=``) into an AST."""
    src = formula.strip()
    if src.startswith("="):
        src = src[1:]
    return _Parser(_lex(src)).parse()


def referenced_columns(formula: str, columns: list[str]) -> list[str]:
    """Names of the table columns a formula reads."""
    ast = parse_formula(formula)
    out: list[str] = []

    def walk(node):
        kind = node[0]
        if kind == "col" and node[1] in columns and node[1] not in out:
            out.append(node[1])
        elif kind == "colidx" and node[1] < len(columns):
            name = columns[node[1]]
            if name not in out:
                out.append(name)
        elif kind == "call":
            for a in node[2]:
                walk(a)
        elif kind == "bin":
            walk(node[2])
            walk(node[3])
        elif kind == "neg":
            walk(node[1])

    walk(ast)
    return out


# ------------------------------------------------------------- evaluator


def _to_number(v: Any) -> float | ExcelError:
    if isinstance(v, ExcelError):
        return v
    if isinstance(v, bool):
        return 1.0 if v else 0.0
    if isinstance(v, (int, float)):
        return float(v)
    s = str(v).strip()
    if re.fullmatch(r"-?\d+(\.\d+)?", s):
        return float(s)
    return VALUE_ERROR


def _to_text(v: Any) -> str | ExcelError:
    if isinstance(v, ExcelError):
        return v
    if isinstance(v, bool):
        return "TRUE" if v else "FALSE"
    if isinstance(v, float):
        return str(int(v)) if v == int(v) else str(v)
    return str(v)


def _num_fn(f: Callable[..., Any]) -> Callable[..., Any]:
    def wrapped(*args):
        nums = []
        for a in args:
            n = _to_number(a)
            if isinstance(n, ExcelError):
                return n
            nums.append(n)
        return f(*nums)

    return wrapped


def _search(needle, hay, start=1.0, *, case_sensitive=False):
    t_n, t_h = _to_text(needle), _to_text(hay)
    if isinstance(t_n, ExcelError):
        return t_n
    if isinstance(t_h, ExcelError):
        return t_h
    st = _to_number(start)
    if isinstance(st, ExcelError):
        return st
    if not case_sensitive:
        t_n, t_h = t_n.lower(), t_h.lower()
    pos = t_h.find(t_n, max(0, int(st) - 1))
    return float(pos + 1) if pos >= 0 else VALUE_ERROR


def _mk_functions() -> dict[str, Callable[..., Any]]:
    def left(s, n=1.0):
        t, k = _to_text(s), _to_number(n)
        if isinstance(t, ExcelError):
            return t
        if isinstance(k, ExcelError):
            return k
        if k < 0:
            return VALUE_ERROR
        return t[: int(k)]

    def right(s, n=1.0):
        t, k = _to_text(s), _to_number(n)
        if isinstance(t, ExcelError):
            return t
        if isinstance(k, ExcelError):
            return k
        if k < 0:
            return VALUE_ERROR
        return t[len(t) - int(min(k, len(t))) :]

    def mid(s, start, n):
        t, st, k = _to_text(s), _to_number(start), _to_number(n)
        for x in (t, st, k):
            if isinstance(x, ExcelError):
                return x
        if st < 1 or k < 0:
            return VALUE_ERROR
        return t[int(st) - 1 : int(st) - 1 + int(k)]

    def substitute(s, old, new):
        args = [_to_text(x) for x in (s, old, new)]
        for x in args:
            if isinstance(x, ExcelError):
                return x
        return args[0].replace(args[1], args[2])

    def concat(*args):
        out = []
        for a in args:
            t = _to_text(a)
            if isinstance(t, ExcelError):
                return t
            out.append(t)
        return "".join(out)

    def value(s):
        return _to_number(s)

    def _if(cond, then, other=False):
        if isinstance(cond, ExcelError):
            return cond
        return then if bool(cond) else other

    def iferror(v, fallback):
        return fallback if isinstance(v, ExcelError) else v

    def length(s):
        t = _to_text(s)
        return t if isinstance(t, ExcelError) else float(len(t))

    def trim(s):
        t = _to_text(s)
        return t if isinstance(t, ExcelError) else " ".join(t.split())

    def upper(s):
        t = _to_text(s)
        return t if isinstance(t, ExcelError) else t.upper()

    def lower(s):
        t = _to_text(s)
        return t if isinstance(t, ExcelError) else t.lower()

    def rept(s, n):
        t, k = _to_text(s), _to_number(n)
        if isinstance(t, ExcelError):
            return t
        if isinstance(k, ExcelError):
            return k
        return t * int(k)

    def exact(a, b):
        ta, tb = _to_text(a), _to_text(b)
        if isinstance(ta, ExcelError):
            return ta
        if isinstance(tb, ExcelError):
            return tb
        return ta == tb

    return {
        "SEARCH": _search,
        "FIND": lambda n, h, s=1.0: _search(n, h, s, case_sensitive=True),
        "LEFT": left,
        "RIGHT": right,
        "MID": mid,
        "LEN": length,
        "CONCAT": concat,
        "CONCATENATE": concat,
        "UPPER": upper,
        "LOWER": lower,
        "TRIM": trim,
        "VALUE": value,
        "SUBSTITUTE": substitute,
        "REPT": rept,
        "IF": _if,
        "IFERROR": iferror,
        "ISNUMBER": lambda v: not isinstance(v, ExcelError)
        and not isinstance(_to_number(v), ExcelError)
        and not (isinstance(v, str) and not re.fullmatch(r"\s*-?\d+(\.\d+)?\s*", v)),
        "ISTEXT": lambda v: isinstance(v, str),
        "ISERROR": lambda v: isinstance(v, ExcelError),
        "EXACT": exact,
        "ABS": _num_fn(abs),
        "ROUND": _num_fn(lambda x, d=0.0: round(x, int(d))),
        "MIN": _num_fn(min),
        "MAX": _num_fn(max),
    }


_FUNCTIONS = _mk_functions()


def eval_ast(node, row: dict[str, Any], columns: list[str]) -> Any:
    """Evaluate an AST for one row. ``row`` maps column name → value."""
    kind = node[0]
    if kind in ("num", "str", "bool"):
        return node[1]
    if kind == "col":
        if node[1] not in row:
            return NAME_ERROR
        return row[node[1]]
    if kind == "colidx":
        if node[1] >= len(columns):
            return NAME_ERROR
        return row[columns[node[1]]]
    if kind == "neg":
        n = _to_number(eval_ast(node[1], row, columns))
        return n if isinstance(n, ExcelError) else -n
    if kind == "bin":
        op = node[1]
        lv = eval_ast(node[2], row, columns)
        rv = eval_ast(node[3], row, columns)
        if op == "&":
            lt, rt = _to_text(lv), _to_text(rv)
            if isinstance(lt, ExcelError):
                return lt
            if isinstance(rt, ExcelError):
                return rt
            return lt + rt
        if op in ("+", "-", "*", "/"):
            ln, rn = _to_number(lv), _to_number(rv)
            if isinstance(ln, ExcelError):
                return ln
            if isinstance(rn, ExcelError):
                return rn
            if op == "+":
                return ln + rn
            if op == "-":
                return ln - rn
            if op == "*":
                return ln * rn
            if rn == 0:
                return DIV0_ERROR
            return ln / rn
        # comparisons
        if isinstance(lv, ExcelError):
            return lv
        if isinstance(rv, ExcelError):
            return rv
        ln, rn = _to_number(lv), _to_number(rv)
        if not isinstance(ln, ExcelError) and not isinstance(rn, ExcelError):
            a, b = ln, rn
        else:
            ta, tb = _to_text(lv), _to_text(rv)
            a, b = str(ta).lower(), str(tb).lower()
        if op == "=":
            return a == b
        if op == "<>":
            return a != b
        try:
            if op == "<":
                return a < b
            if op == "<=":
                return a <= b
            if op == ">":
                return a > b
            if op == ">=":
                return a >= b
        except TypeError:
            return VALUE_ERROR
    if kind == "call":
        fn = _FUNCTIONS.get(node[1])
        if fn is None:
            return NAME_ERROR
        args = [eval_ast(a, row, columns) for a in node[2]]
        lazy = {"IF", "IFERROR", "ISERROR", "ISNUMBER", "ISTEXT"}
        if node[1] not in lazy:
            for a in args:
                if isinstance(a, ExcelError):
                    return a
        try:
            return fn(*args)
        except TypeError:
            return VALUE_ERROR
    raise FormulaSyntaxError(f"bad AST node {node!r}")


def run_formula(formula: str, table: pd.DataFrame) -> list[Any]:
    """Evaluate a column-transformation formula for every row of ``table``."""
    ast = parse_formula(formula)
    columns = [str(c) for c in table.columns]
    results = []
    for _, prow in table.iterrows():
        row = {str(c): prow[c] for c in table.columns}
        results.append(eval_ast(ast, row, columns))
    return results
