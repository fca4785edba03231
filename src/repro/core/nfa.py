"""Pattern matching and loop unrolling.

Two services over :class:`repro.core.regexlang.Pattern`:

* :func:`matches` — anchored membership test, via breadth-first NFA
  simulation (handles ``Rep`` loops without unrolling);
* :func:`build_dag` — the §3.3 construction: interpret the pattern as an
  NFA and unroll each loop ``ceil(len(v) / len(cycle))`` times, yielding a
  DAG whose nodes are created in topological order (every edge goes from a
  lower to a higher node id). The repair DP (:mod:`repro.core.editdp`)
  runs over this DAG.

Every character-consuming edge carries an :class:`EdgeLabel`. Class and
mask edges additionally carry a *slot* — a stable address of the atom
occurrence inside the pattern (top-level index, plus unroll/offset for
atoms inside a ``Rep``) — so concretization (§3.4) can pool training
examples for "the first [0-9] edge" across values of different lengths.
"""
from __future__ import annotations

import math
from dataclasses import dataclass, field

from . import chars
from .regexlang import Alt, Atom, Cls, Lit, Mask, Pattern, Rep, atom_min_len

Slot = tuple


@dataclass(frozen=True)
class EdgeLabel:
    """Label of a character-consuming DAG edge.

    ``kind`` is ``lit``/``cls``/``mask``. ``sym`` is the literal character,
    class name, or mask symbol respectively. ``slot`` addresses the pattern
    atom occurrence (None for plain literals). For edges spelling out an
    ``Alt`` option, ``alt_slot``/``alt_option`` record which disjunction and
    which option the edge belongs to.
    """

    kind: str
    sym: str
    slot: Slot | None = None
    alt_slot: Slot | None = None
    alt_option: int | None = None
    type_name: str = ""

    def admits(self, ch: str) -> bool:
        """True when this edge can be traversed by consuming ``ch`` as-is."""
        if self.kind == "lit":
            return ch == self.sym
        if self.kind == "cls":
            return chars.char_in_class(ch, self.sym)
        return ch == self.sym  # mask

    def is_abstract(self) -> bool:
        """True when emitting on this edge requires concretization."""
        return self.kind == "cls"


@dataclass(frozen=True)
class Edge:
    u: int
    v: int
    label: EdgeLabel


@dataclass
class Dag:
    """Unrolled, acyclic pattern graph. Node ids are a topological order."""

    n_nodes: int
    edges: list[Edge]
    eps: list[tuple[int, int]]
    start: int
    accept: int
    out_edges: dict[int, list[Edge]] = field(default_factory=dict)
    out_eps: dict[int, list[int]] = field(default_factory=dict)

    def finalize(self) -> "Dag":
        self.out_edges = {}
        self.out_eps = {}
        for e in self.edges:
            self.out_edges.setdefault(e.u, []).append(e)
        for u, v in self.eps:
            self.out_eps.setdefault(u, []).append(v)
        return self


# ---------------------------------------------------------------- matching


def _consume(atom: Atom, s: str, starts: set[int]) -> set[int]:
    """Positions reachable after ``atom`` consumes input from ``starts``."""
    out: set[int] = set()
    if isinstance(atom, (Lit, Cls, Mask)):
        for p in starts:
            if p < len(s):
                ch = s[p]
                ok = (
                    ch == atom.ch
                    if isinstance(atom, Lit)
                    else chars.char_in_class(ch, atom.name)
                    if isinstance(atom, Cls)
                    else ch == atom.sym
                )
                if ok:
                    out.add(p + 1)
        return out
    if isinstance(atom, Alt):
        for p in starts:
            for o in atom.options:
                if s.startswith(o, p):
                    out.add(p + len(o))
        return out
    if isinstance(atom, Rep):
        cur = set(starts)
        seen: set[int] = set()
        while cur:
            for a in atom.unit:
                cur = _consume(a, s, cur)
            new = cur - seen
            seen |= new
            cur = new
        return seen
    raise TypeError(atom)


def matches(pattern: Pattern, s: str) -> bool:
    """Anchored match: does ``s`` belong to the pattern's language?"""
    positions: set[int] = {0}
    for atom in pattern.atoms:
        positions = _consume(atom, s, positions)
        if not positions:
            return False
    return len(s) in positions


# ----------------------------------------------------------- DAG building


class _Builder:
    def __init__(self) -> None:
        self.n = 1  # node 0 is start
        self.edges: list[Edge] = []
        self.eps: list[tuple[int, int]] = []

    def new_node(self) -> int:
        self.n += 1
        return self.n - 1

    def edge(self, u: int, v: int, label: EdgeLabel) -> None:
        assert u < v, "DAG edges must be forward in node-id order"
        self.edges.append(Edge(u, v, label))

    def emit(self, atom: Atom, u: int, addr: Slot, value_len: int) -> int:
        if isinstance(atom, Lit):
            v = self.new_node()
            self.edge(u, v, EdgeLabel("lit", atom.ch))
            return v
        if isinstance(atom, Cls):
            v = self.new_node()
            self.edge(u, v, EdgeLabel("cls", atom.name, slot=("cls",) + addr))
            return v
        if isinstance(atom, Mask):
            v = self.new_node()
            self.edge(
                u,
                v,
                EdgeLabel(
                    "mask", atom.sym, slot=("mask",) + addr, type_name=atom.type_name
                ),
            )
            return v
        if isinstance(atom, Alt):
            ends: list[int] = []
            chains: list[list[int]] = []
            for opt in atom.options:
                nodes = [self.new_node() for _ in range(len(opt) - 1)]
                chains.append(nodes)
            v = self.new_node()
            slot = ("alt",) + addr
            for oi, opt in enumerate(atom.options):
                nodes = chains[oi] + [v]
                prev = u
                for ci, ch in enumerate(opt):
                    self.edge(
                        prev,
                        nodes[ci],
                        EdgeLabel("lit", ch, alt_slot=slot, alt_option=oi),
                    )
                    prev = nodes[ci]
                ends.append(prev)
            return v
        if isinstance(atom, Rep):
            unit_len = max(1, sum(atom_min_len(a) for a in atom.unit))
            reps = max(1, math.ceil(value_len / unit_len))
            exits: list[int] = []
            cur = u
            for k in range(reps):
                for idx, ua in enumerate(atom.unit):
                    cur = self.emit(ua, cur, addr + (k, idx), value_len)
                exits.append(cur)
            v = self.new_node()
            for x in exits:
                self.eps.append((x, v))
            return v
        raise TypeError(atom)


def build_dag(pattern: Pattern, value_len: int) -> Dag:
    """Unroll ``pattern`` for a value of length ``value_len`` (§3.3, Fig 4)."""
    b = _Builder()
    u = 0
    for t, atom in enumerate(pattern.atoms):
        u = b.emit(atom, u, (t,), value_len)
    return Dag(
        n_nodes=b.n, edges=b.edges, eps=b.eps, start=0, accept=u
    ).finalize()
