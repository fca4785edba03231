"""Pattern AST for DataVinci's regular-expression language.

A :class:`Pattern` is a sequence of atoms:

* ``Lit(ch)``   — one concrete character,
* ``Cls(name)`` — one character drawn from a named character class (§3.1),
* ``Mask(sym)`` — one semantic mask symbol (§3.2), e.g. *Country*,
* ``Alt(options)`` — a string disjunction such as ``(CAT|PRO)``,
* ``Rep(unit)`` — one-or-more repetitions of a sub-sequence, e.g.
  ``(A[0-9].)+`` from Fig. 4.

Fixed-width classes like ``[0-9]{3}`` are represented as three consecutive
``Cls`` atoms, which keeps the repair DP (``editdp``) purely character
level. Atoms are immutable and hashable so patterns can be deduplicated
and used as dictionary keys by the profiler.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Union

from . import chars


@dataclass(frozen=True)
class Lit:
    """A single literal character."""

    ch: str

    def __post_init__(self) -> None:
        if len(self.ch) != 1:
            raise ValueError(f"Lit must hold one character, got {self.ch!r}")


@dataclass(frozen=True)
class Cls:
    """One character from the named class (see :mod:`repro.core.chars`)."""

    name: str

    def __post_init__(self) -> None:
        if self.name not in chars.CLASS_CHARS:
            raise ValueError(f"unknown character class {self.name!r}")


@dataclass(frozen=True)
class Mask:
    """One semantic mask symbol standing in for an abstracted substring."""

    sym: str
    type_name: str = ""

    def __post_init__(self) -> None:
        if not chars.is_mask_char(self.sym):
            raise ValueError(f"{self.sym!r} is not a mask symbol")


@dataclass(frozen=True)
class Alt:
    """A disjunction over whole strings, e.g. ``(CAT|PRO)``."""

    options: tuple[str, ...]

    def __post_init__(self) -> None:
        if len(self.options) < 2 or any(not o for o in self.options):
            raise ValueError(f"Alt needs >=2 non-empty options: {self.options}")


@dataclass(frozen=True)
class Rep:
    """One-or-more repetitions of ``unit`` (a tuple of atoms)."""

    unit: tuple["Atom", ...]

    def __post_init__(self) -> None:
        if not self.unit:
            raise ValueError("Rep unit must be non-empty")
        if any(isinstance(a, Rep) for a in self.unit):
            # Nested loops are rare in practice (paper footnote 3); the
            # profiler never emits them, and editdp's unroller assumes one
            # level, so reject them at construction time.
            raise ValueError("nested Rep is not supported")


Atom = Union[Lit, Cls, Mask, Alt, Rep]


@dataclass(frozen=True)
class Pattern:
    """An anchored pattern: the concatenation of ``atoms`` must match the
    whole string."""

    atoms: tuple[Atom, ...]

    def __str__(self) -> str:
        return pattern_str(self)


def atom_min_len(atom: Atom) -> int:
    """Minimum number of characters ``atom`` can consume."""
    if isinstance(atom, (Lit, Cls, Mask)):
        return 1
    if isinstance(atom, Alt):
        return min(len(o) for o in atom.options)
    if isinstance(atom, Rep):
        return sum(atom_min_len(a) for a in atom.unit)
    raise TypeError(atom)


def pattern_min_len(p: Pattern) -> int:
    """Minimum length of any string in the pattern's language."""
    return sum(atom_min_len(a) for a in p.atoms)


def _atom_str(atom: Atom) -> str:
    if isinstance(atom, Lit):
        return atom.ch if atom.ch.isalnum() or atom.ch == " " else f"\\{atom.ch}"
    if isinstance(atom, Cls):
        return chars.CLASS_REGEX[atom.name]
    if isinstance(atom, Mask):
        return f"<{atom.type_name or 'mask'}>"
    if isinstance(atom, Alt):
        return "(" + "|".join(atom.options) + ")"
    if isinstance(atom, Rep):
        return "(" + "".join(_atom_str(a) for a in atom.unit) + ")+"
    raise TypeError(atom)


def pattern_str(p: Pattern) -> str:
    """Human-readable regex-like rendering, with run-length compression of
    consecutive identical class atoms (``[0-9][0-9][0-9]`` → ``[0-9]{3}``)."""
    out: list[str] = []
    i, atoms = 0, p.atoms
    while i < len(atoms):
        a = atoms[i]
        j = i
        while j < len(atoms) and atoms[j] == a and isinstance(a, Cls):
            j += 1
        if j - i > 1:
            out.append(f"{_atom_str(a)}{{{j - i}}}")
            i = j
        else:
            out.append(_atom_str(a))
            i += 1
    return "".join(out)


def lits(s: str) -> tuple[Atom, ...]:
    """Convenience: a tuple of ``Lit`` atoms spelling out ``s``."""
    return tuple(Lit(c) for c in s)
