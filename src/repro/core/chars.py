"""Character classes and the mask-symbol alphabet.

The paper (§3.1) uses regular expressions over all characters in the data
plus a fixed set of character classes: digits, cased and uncased letters,
alphanumeric, spaces, alphanumeric-with-spaces, and the recurring [01]
class. Semantic abstraction (§3.2) extends the alphabet with one mask
symbol per semantic type; we reserve a Unicode private-use range for
those so masked values remain ordinary Python strings.
"""
from __future__ import annotations

import string

# Class names, ordered from most to least specific for generalization.
BIN = "BIN"  # [01]
DIGIT = "DIGIT"  # [0-9]
LOWER = "LOWER"  # [a-z]
UPPER = "UPPER"  # [A-Z]
ALPHA = "ALPHA"  # [A-Za-z]
ALNUM = "ALNUM"  # [A-Za-z0-9]
SPACE = "SPACE"  # [ ]
ALNUMSP = "ALNUMSP"  # [A-Za-z0-9 ]

CLASS_CHARS: dict[str, frozenset[str]] = {
    BIN: frozenset("01"),
    DIGIT: frozenset(string.digits),
    LOWER: frozenset(string.ascii_lowercase),
    UPPER: frozenset(string.ascii_uppercase),
    ALPHA: frozenset(string.ascii_letters),
    ALNUM: frozenset(string.ascii_letters + string.digits),
    SPACE: frozenset(" "),
    ALNUMSP: frozenset(string.ascii_letters + string.digits + " "),
}

CLASS_REGEX: dict[str, str] = {
    BIN: "[01]",
    DIGIT: "[0-9]",
    LOWER: "[a-z]",
    UPPER: "[A-Z]",
    ALPHA: "[A-Za-z]",
    ALNUM: "[A-Za-z0-9]",
    SPACE: "[ ]",
    ALNUMSP: "[A-Za-z0-9 ]",
}

# Private-use area for semantic mask symbols: one char per semantic type.
_MASK_BASE = 0xE000
_MASK_LIMIT = 0xE0FF


def mask_char(type_index: int) -> str:
    """The single-character mask symbol for the ``type_index``-th semantic type."""
    cp = _MASK_BASE + type_index
    if cp > _MASK_LIMIT:
        raise ValueError(f"too many semantic types: {type_index}")
    return chr(cp)


def is_mask_char(ch: str) -> bool:
    """True when ``ch`` is a semantic mask symbol (private-use alphabet)."""
    return len(ch) == 1 and _MASK_BASE <= ord(ch) <= _MASK_LIMIT


def char_in_class(ch: str, cls: str) -> bool:
    """Membership test for one character against a named character class."""
    return ch in CLASS_CHARS[cls]


def base_kind(ch: str) -> str:
    """Coarse per-character kind used by the tokenizer.

    One of ``DIGIT``/``LOWER``/``UPPER``/``SPACE``/``MASK``/``SYM``.
    """
    if ch.isdigit() and ch in CLASS_CHARS[DIGIT]:
        return DIGIT
    if ch in CLASS_CHARS[LOWER]:
        return LOWER
    if ch in CLASS_CHARS[UPPER]:
        return UPPER
    if ch == " ":
        return SPACE
    if is_mask_char(ch):
        return "MASK"
    return "SYM"
