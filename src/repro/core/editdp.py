"""Minimal edit programs via dynamic programming over the unrolled DAG (§3.3).

State ``(i, q)``: the first ``i`` characters of the erroneous value have
been consumed and the traversal sits at DAG node ``q``. Transitions follow
the paper's recurrence:

* insert  — traverse an edge emitting its label, consuming nothing (cost 1);
* match/substitute — traverse an edge consuming ``v[i]`` (cost 0 when the
  character is admitted by the edge label, else 1);
* delete  — consume ``v[i]`` without moving (cost 1);
* epsilon — loop-exit edges from unrolling, free and consuming nothing.

Node ids are a topological order (see :mod:`repro.core.nfa`), so one
ascending sweep per layer relaxes all intra-layer (insert/epsilon) moves.

The DP objective is lexicographic: primary the paper's edit cost, then
more matched characters, then fewer abstract emissions. The secondary
objectives pick, among minimal programs, the one that preserves the most
of the original value — e.g. ``AAA3`` vs ``(A[0-9].)+`` repairs to
``A<digit>.A3.`` (keeping the trailing ``3``; Fig 4's highlighted path)
rather than deleting it.

Complexity is O(n·E) time and memory for value length n and E DAG edges,
matching the paper's bound (their m² counts predecessor scans).
"""
from __future__ import annotations

from dataclasses import dataclass

from .edits import EditProgram, EditStep
from .nfa import Dag, Edge

_INF = (float("inf"), 0, 0)
_ZERO = (0, 0, 0)


def _step_cost(kind: str, edge: Edge | None) -> tuple[int, int, int]:
    """(edit cost, -matches, abstract emissions) contribution of one move."""
    if kind == "E":
        return _ZERO
    if kind == "M":
        return (0, -1, 0)
    if kind == "D":
        return (1, 0, 0)
    abstract = 1 if (edge is not None and edge.label.is_abstract()) else 0
    return (1, 0, abstract)  # I or S


def _add(a: tuple, b: tuple) -> tuple:
    return (a[0] + b[0], a[1] + b[1], a[2] + b[2])


@dataclass(frozen=True)
class ParseInfo:
    """Zero-cost parse of a clean value against a pattern DAG.

    ``slot_chars`` maps each class/mask slot occurrence to the concrete
    character that traversed it; ``alt_choices`` maps each string
    disjunction to the option index taken. Used as §3.4 training data.
    """

    slot_chars: dict[tuple, str]
    alt_choices: dict[tuple, int]


def _run(dag: Dag, s: str):
    """Forward DP. Returns (cost, parent) tables or (None, None) if the
    accept state is unreachable (cannot happen: inserts reach everything)."""
    n = len(s)
    width = dag.n_nodes
    cost = [[_INF] * width for _ in range(n + 1)]
    # parent[i][q] = (pi, pq, kind, edge) — kind in M/S/I/D/E
    parent: list[list[tuple | None]] = [[None] * width for _ in range(n + 1)]
    cost[0][dag.start] = _ZERO

    def relax(i: int, q: int, c: tuple, par: tuple) -> None:
        if c < cost[i][q]:
            cost[i][q] = c
            parent[i][q] = par

    for i in range(n + 1):
        # Intra-layer sweep in topological order: epsilon then insert.
        for u in range(width):
            cu = cost[i][u]
            if cu[0] == _INF[0]:
                continue
            for v in dag.out_eps.get(u, ()):
                relax(i, v, _add(cu, _step_cost("E", None)), (i, u, "E", None))
            for e in dag.out_edges.get(u, ()):
                relax(i, e.v, _add(cu, _step_cost("I", e)), (i, u, "I", e))
        if i == n:
            break
        ch = s[i]
        # Layer transition: match/substitute edges, then delete-in-place.
        for u in range(width):
            cu = cost[i][u]
            if cu[0] == _INF[0]:
                continue
            for e in dag.out_edges.get(u, ()):
                kind = "M" if e.label.admits(ch) else "S"
                relax(i + 1, e.v, _add(cu, _step_cost(kind, e)), (i, u, kind, e))
            relax(i + 1, u, _add(cu, _step_cost("D", None)), (i, u, "D", None))
    return cost, parent


def _backtrack(dag: Dag, s: str, cost, parent) -> EditProgram | None:
    n = len(s)
    if cost[n][dag.accept][0] == _INF[0]:
        return None
    steps: list[EditStep] = []
    i, q = n, dag.accept
    while not (i == 0 and q == dag.start):
        par = parent[i][q]
        assert par is not None, "broken parent chain"
        pi, pq, kind, edge = par
        if kind == "M":
            steps.append(EditStep("M", char=s[pi], emit=s[pi], edge=edge))
        elif kind == "S":
            emit = edge.label.sym if edge.label.kind != "cls" else None
            steps.append(EditStep("S", char=s[pi], emit=emit, edge=edge))
        elif kind == "I":
            emit = edge.label.sym if edge.label.kind != "cls" else None
            steps.append(EditStep("I", emit=emit, edge=edge))
        elif kind == "D":
            steps.append(EditStep("D", char=s[pi]))
        # 'E' contributes no step.
        i, q = pi, pq
    steps.reverse()
    return EditProgram(tuple(steps))


def minimal_program(dag: Dag, s: str) -> EditProgram | None:
    """A minimal abstract edit program taking ``s`` into the DAG's language."""
    cost, parent = _run(dag, s)
    return _backtrack(dag, s, cost, parent)


def parse_consumption(dag: Dag, s: str) -> ParseInfo | None:
    """Zero-cost parse of ``s``; None when ``s`` is not in the language."""
    cost, parent = _run(dag, s)
    n = len(s)
    if cost[n][dag.accept][0] != 0:
        return None
    program = _backtrack(dag, s, cost, parent)
    assert program is not None and program.cost == 0
    slot_chars: dict[tuple, str] = {}
    alt_choices: dict[tuple, int] = {}
    for step in program.steps:
        e = step.edge
        if e is None:
            continue
        lbl = e.label
        if lbl.slot is not None:
            slot_chars[lbl.slot] = step.char or ""
        if lbl.alt_slot is not None:
            alt_choices[lbl.alt_slot] = lbl.alt_option
    return ParseInfo(slot_chars=slot_chars, alt_choices=alt_choices)


def restrict_alt(dag: Dag, alt_slot: tuple, option: int) -> Dag:
    """A copy of ``dag`` where disjunction ``alt_slot`` is forced to one
    option — used to enumerate per-option repair candidates (§3.4)."""
    edges = [
        e
        for e in dag.edges
        if e.label.alt_slot != alt_slot or e.label.alt_option == option
    ]
    return Dag(
        n_nodes=dag.n_nodes,
        edges=edges,
        eps=list(dag.eps),
        start=dag.start,
        accept=dag.accept,
    ).finalize()


def program_alt_groups(program: EditProgram) -> dict[tuple, int]:
    """Disjunction groups the program's path goes through, with the option
    taken. Groups touched by a non-match step are repair-relevant."""
    groups: dict[tuple, int] = {}
    for step in program.steps:
        if step.edge is not None and step.edge.label.alt_slot is not None:
            groups[step.edge.label.alt_slot] = step.edge.label.alt_option
    return groups


def program_edited_alt_groups(program: EditProgram) -> set[tuple]:
    """Alt groups where the program performed at least one edit."""
    out: set[tuple] = set()
    for step in program.steps:
        if (
            step.edge is not None
            and step.edge.label.alt_slot is not None
            and step.action != "M"
        ):
            out.add(step.edge.label.alt_slot)
    return out
