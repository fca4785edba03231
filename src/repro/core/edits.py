"""Edit actions and edit programs (Table 1, §3.3).

An edit program is the sequence of actions produced by the repair DP. Each
step optionally consumes one input character and optionally emits one
output character:

* ``M``  match        — consume ``char``, emit it           (cost 0)
* ``S``  substitute   — consume ``char``, emit ``emit``     (cost 1)
* ``I``  insert       — emit ``emit``                       (cost 1)
* ``D``  delete       — consume ``char``                    (cost 1)

``emit`` may be *abstract*: an unresolved character class (``S(0-9)``) or a
mask symbol inserted by the program. Abstract steps carry the DAG edge they
traversed so concretization (§3.4) can resolve them via the edge's slot.
"""
from __future__ import annotations

from dataclasses import dataclass, replace

from . import chars
from .nfa import Edge


@dataclass(frozen=True)
class EditStep:
    """One edit action. ``char`` is the consumed input character (M/S/D),
    ``emit`` the emitted output character (M/S/I) or None while abstract."""

    action: str  # 'M' | 'S' | 'I' | 'D'
    char: str | None = None
    emit: str | None = None
    edge: Edge | None = None

    @property
    def cost(self) -> int:
        return 0 if self.action == "M" else 1

    def is_abstract(self) -> bool:
        """True when the emitted character still needs concretization."""
        return self.action in ("S", "I") and self.emit is None

    def label_str(self) -> str:
        """Shorthand rendering, e.g. ``S(0-9)`` or ``I(-)``."""
        if self.action == "M":
            return "M"
        if self.action == "D":
            return "D"
        arg = self.emit
        if arg is None and self.edge is not None:
            lbl = self.edge.label
            arg = lbl.sym if lbl.kind != "cls" else chars.CLASS_REGEX[lbl.sym]
        return f"{self.action}({arg})"


@dataclass(frozen=True)
class EditProgram:
    """A sequence of edit steps, applied left to right over the input."""

    steps: tuple[EditStep, ...]

    @property
    def cost(self) -> int:
        return sum(s.cost for s in self.steps)

    def abstract_steps(self) -> list[int]:
        """Indices of steps whose emission is still abstract."""
        return [i for i, s in enumerate(self.steps) if s.is_abstract()]

    def concretize(self, choices: dict[int, str]) -> "EditProgram":
        """Resolve abstract steps; ``choices`` maps step index → character."""
        steps = list(self.steps)
        for i, ch in choices.items():
            steps[i] = replace(steps[i], emit=ch)
        return EditProgram(tuple(steps))

    def apply(self) -> str:
        """Emit the repaired string. All abstract steps must be resolved."""
        out: list[str] = []
        for s in self.steps:
            if s.action in ("M", "S", "I"):
                if s.emit is None:
                    raise ValueError(f"abstract step not concretized: {s}")
                out.append(s.emit)
        return "".join(out)

    def consumed(self) -> str:
        """The input string this program was derived for (M/S/D consume)."""
        return "".join(s.char for s in self.steps if s.char is not None)

    def __str__(self) -> str:
        return "[" + ", ".join(s.label_str() for s in self.steps) + "]"


def alnum_edit_ops(program: EditProgram) -> int:
    """Count of non-match ops that touch alphanumeric characters — ranker
    feature (2) of §3.5 (alphanumeric edits are riskier than delimiter
    edits)."""
    n = 0
    for s in program.steps:
        if s.action == "M":
            continue
        touched = [c for c in (s.char, s.emit) if c]
        if any(c.isalnum() for c in touched):
            n += 1
    return n


def levenshtein(a: str, b: str) -> int:
    """Plain Levenshtein distance — used by the ranker and minimality tests."""
    if a == b:
        return 0
    if len(a) < len(b):
        a, b = b, a
    prev = list(range(len(b) + 1))
    for i, ca in enumerate(a, 1):
        cur = [i]
        for j, cb in enumerate(b, 1):
            cur.append(min(prev[j] + 1, cur[j - 1] + 1, prev[j - 1] + (ca != cb)))
        prev = cur
    return prev[-1]
