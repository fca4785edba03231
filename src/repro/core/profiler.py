"""FlashProfile-lite: learn regex patterns describing a string column (§3.1).

FlashProfile itself is closed-source; this module reimplements the part
DataVinci depends on: partition a column's values into clusters and give
each cluster the most specific pattern in our language that covers all of
its members, balancing specificity against generality:

1. tokenize each value into runs (letters, digits, masks, one token per
   delimiter character);
2. detect repetition — if a value's token-kind sequence is ``k`` copies of
   a primitive root, cluster by the root so ``A2.`` and ``A2.A3.`` share
   the quantified pattern ``(A[0-9].)+`` (Fig 4);
3. within a cluster, refine each aligned token position: a constant
   becomes a literal, a small set of recurring words becomes a string
   disjunction ``(CAT|PRO)``, same-length runs become fixed-width classes
   (``[0-9]{3}``), variable-length runs become quantified classes.

Every value provably matches its cluster's pattern (tested with
hypothesis). Patterns whose cluster covers at least a ``delta`` fraction
of rows are *significant*; values outside every significant pattern's
language are reported as data errors.
"""
from __future__ import annotations

from collections import Counter
from dataclasses import dataclass

from . import chars
from .regexlang import Alt, Atom, Cls, Lit, Mask, Pattern, Rep

# Tunables for disjunction detection, mirroring FlashProfile's preference
# for a few recurring constants over a generic class.
_ALT_MAX_OPTIONS = 4
_ALT_MIN_COUNT = 2
_ALT_MIN_LEN = 2


@dataclass(frozen=True)
class Token:
    """A maximal run of one character kind: ``A`` letters, ``D`` digits,
    ``SP`` spaces, ``M`` one mask symbol, ``Y`` one delimiter character."""

    kind: str
    text: str


def tokenize(s: str) -> tuple[Token, ...]:
    """Split ``s`` into runs; adjacent upper/lower runs merge into one
    letter token so ``Chrome`` is a single ``A`` token."""
    toks: list[Token] = []
    i = 0
    while i < len(s):
        ch = s[i]
        k = chars.base_kind(ch)
        if k in (chars.DIGIT,):
            j = i
            while j < len(s) and chars.base_kind(s[j]) == chars.DIGIT:
                j += 1
            toks.append(Token("D", s[i:j]))
            i = j
        elif k in (chars.LOWER, chars.UPPER):
            j = i
            while j < len(s) and chars.base_kind(s[j]) in (chars.LOWER, chars.UPPER):
                j += 1
            toks.append(Token("A", s[i:j]))
            i = j
        elif k == chars.SPACE:
            j = i
            while j < len(s) and s[j] == " ":
                j += 1
            toks.append(Token("SP", s[i:j]))
            i = j
        elif k == "MASK":
            toks.append(Token("M", ch))
            i += 1
        else:
            toks.append(Token("Y", ch))
            i += 1
    return tuple(toks)


def _token_key(t: Token) -> tuple:
    """Cluster key contribution: delimiters and masks keep their text (a
    ``-`` column and a ``_`` column must not merge); letter/digit/space
    runs cluster by kind only."""
    if t.kind in ("Y", "M"):
        return (t.kind, t.text)
    return (t.kind,)


def _primitive_root(keys: tuple) -> tuple:
    """Smallest prefix whose repetition spells out ``keys``."""
    n = len(keys)
    for p in range(1, n):
        if n % p == 0 and all(keys[i] == keys[i % p] for i in range(n)):
            return keys[:p]
    return keys


def signature(s: str) -> tuple:
    """Cluster key for a value: the primitive root of its token keys,
    tagged with whether the value actually repeats the root."""
    toks = tokenize(s)
    keys = tuple(_token_key(t) for t in toks)
    root = _primitive_root(keys)
    return root


def _case_sig(text: str) -> str:
    if text.isupper():
        return "U"
    if text.islower():
        return "L"
    if len(text) >= 2 and text[0].isupper() and text[1:].islower():
        return "T"
    return "X"


def _refine_letter_slot(texts: list[str]) -> tuple[Atom, ...]:
    """Most specific atoms covering all letter-run ``texts`` at a slot."""
    distinct = Counter(texts)
    if len(distinct) == 1:
        return tuple(Lit(c) for c in texts[0])
    if (
        2 <= len(distinct) <= _ALT_MAX_OPTIONS
        and len(distinct) < len(texts)
        and min(distinct.values()) >= _ALT_MIN_COUNT
        and all(len(t) >= _ALT_MIN_LEN for t in distinct)
    ):
        return (Alt(tuple(sorted(distinct))),)
    lens = {len(t) for t in texts}
    if len(lens) == 1:
        width = lens.pop()
        atoms: list[Atom] = []
        for pos in range(width):
            col = {t[pos] for t in texts}
            if all(c.isupper() for c in col):
                atoms.append(Cls(chars.UPPER))
            elif all(c.islower() for c in col):
                atoms.append(Cls(chars.LOWER))
            else:
                atoms.append(Cls(chars.ALPHA))
        return tuple(atoms)
    sigs = {_case_sig(t) for t in texts}
    if sigs == {"U"}:
        return (Rep((Cls(chars.UPPER),)),)
    if sigs == {"L"}:
        return (Rep((Cls(chars.LOWER),)),)
    if sigs <= {"T"} and all(len(t) >= 2 for t in texts):
        return (Cls(chars.UPPER), Rep((Cls(chars.LOWER),)))
    return (Rep((Cls(chars.ALPHA),)),)


def _refine_digit_slot(texts: list[str]) -> tuple[Atom, ...]:
    lens = {len(t) for t in texts}
    cls = (
        chars.BIN
        if all(set(t) <= {"0", "1"} for t in texts) and len(texts) >= 3
        else chars.DIGIT
    )
    if len(lens) == 1:
        return tuple(Cls(cls) for _ in range(lens.pop()))
    return (Rep((Cls(cls),)),)


def _refine_space_slot(texts: list[str]) -> tuple[Atom, ...]:
    lens = {len(t) for t in texts}
    if len(lens) == 1:
        return tuple(Lit(" ") for _ in range(lens.pop()))
    return (Rep((Lit(" "),)),)


def _refine_slot(kind_key: tuple, texts: list[str], mask_types: dict[str, str]) -> tuple[Atom, ...]:
    kind = kind_key[0]
    if kind == "Y":
        return (Lit(kind_key[1]),)
    if kind == "M":
        sym = kind_key[1]
        return (Mask(sym, mask_types.get(sym, "")),)
    if kind == "A":
        return _refine_letter_slot(texts)
    if kind == "D":
        return _refine_digit_slot(texts)
    if kind == "SP":
        return _refine_space_slot(texts)
    raise ValueError(kind_key)


@dataclass
class LearnedPattern:
    """One cluster's pattern together with its row coverage."""

    pattern: Pattern
    count: int
    values: list[str]

    def coverage(self, total: int) -> float:
        return self.count / total if total else 0.0


def _refine_flat(
    keys: tuple, token_lists: list[tuple[Token, ...]], mask_types: dict[str, str]
) -> Pattern:
    """Refine a cluster whose values all share the exact token-key list."""
    atoms: list[Atom] = []
    for slot in range(len(keys)):
        texts = [toks[slot].text for toks in token_lists]
        atoms.extend(_refine_slot(keys[slot], texts, mask_types))
    return Pattern(tuple(atoms))


def _refine_cluster(
    root: tuple, token_lists: list[tuple[Token, ...]], mask_types: dict[str, str]
) -> list[tuple[Pattern, list[int]]]:
    """Patterns for one root-signature cluster.

    Usually one quantified (or flat) pattern covering the whole cluster.
    When a unit slot would itself need a quantifier (variable-length run
    inside a repetition — nested loops, which the paper's own data shows
    to be vanishingly rare and which our language rejects), the cluster
    splits by repeat count into fixed-width patterns instead. Returns
    (pattern, member indices) pairs.
    """
    p = len(root)
    if p == 0:  # the empty-string cluster
        return [(Pattern(()), list(range(len(token_lists))))]
    reps = [len(toks) // p for toks in token_lists]
    if all(r == 1 for r in reps):
        return [(_refine_flat(root, token_lists, mask_types), list(range(len(token_lists))))]
    unit_atoms: list[Atom] = []
    for slot in range(p):
        texts = [
            toks[k * p + slot].text
            for toks in token_lists
            for k in range(len(toks) // p)
        ]
        unit_atoms.extend(_refine_slot(root[slot], texts, mask_types))
    if not any(isinstance(a, Rep) for a in unit_atoms):
        return [(Pattern((Rep(tuple(unit_atoms)),)), list(range(len(token_lists))))]
    # Nested-loop fallback: one flat pattern per repeat count.
    by_k: dict[int, list[int]] = {}
    for i, k in enumerate(reps):
        by_k.setdefault(k, []).append(i)
    out: list[tuple[Pattern, list[int]]] = []
    for k, members in by_k.items():
        keys = root * k
        sub = [token_lists[i] for i in members]
        out.append((_refine_flat(keys, sub, mask_types), members))
    return out


def learn_patterns(
    values: list[str],
    *,
    max_patterns: int | None = None,
    mask_types: dict[str, str] | None = None,
) -> list[LearnedPattern]:
    """Cluster ``values`` and learn one pattern per cluster, sorted by
    descending row coverage. ``mask_types`` names each mask symbol for
    display. ``max_patterns`` keeps only the top-k clusters (FlashProfile's
    k); dropped clusters simply yield uncovered (non-significant) values.
    """
    mask_types = mask_types or {}
    clusters: dict[tuple, list[str]] = {}
    for v in values:
        clusters.setdefault(signature(v), []).append(v)
    learned: list[LearnedPattern] = []
    for root, vals in clusters.items():
        token_lists = [tokenize(v) for v in vals]
        for pat, members in _refine_cluster(root, token_lists, mask_types):
            mvals = [vals[i] for i in members]
            learned.append(
                LearnedPattern(pattern=pat, count=len(mvals), values=mvals)
            )
    learned.sort(key=lambda lp: (-lp.count, str(lp.pattern)))
    if max_patterns is not None:
        learned = learned[:max_patterns]
    return learned


def significant_patterns(
    learned: list[LearnedPattern], total: int, delta: float
) -> list[LearnedPattern]:
    """Patterns individually covering at least ``delta`` of the rows, and
    never a single row (a singleton cluster is evidence of nothing)."""
    return [
        lp
        for lp in learned
        if lp.count >= 2 and total > 0 and lp.count / total >= delta
    ]
