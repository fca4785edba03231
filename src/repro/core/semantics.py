"""Semantic abstraction and concretization (§3.2) — the LLM surrogate.

The paper prompts GPT-3.5 with a whole column and asks it to (1) mask
substrings of ~20 predefined semantic types as ``{type(surface)}``, and
(2) optionally *repair* the masked surface (``u.k.`` → ``{country(UK)}``).
The container is offline, so this module substitutes the LLM with an
explicit knowledge base exercising the identical interface:

* **entity matching** — word n-grams (including dotted abbreviations like
  ``u.k.``) are looked up against per-type canonical entries and aliases;
* **column context** — a semantic type is only *active* (maskable) in a
  column when a majority of values contain it, mimicking the LLM seeing
  the whole column at once and masking only coherent concepts;
* **repair suggestions** — each matched entity carries a suggestion in the
  column-majority *surface style* (which field — full name vs. ISO code —
  and which casing the column predominantly uses), so ``usa`` in a column
  of ``US``/``UK``/``IND`` suggests ``US`` exactly as in Fig 2;
* **typo handling** — tokens that only fuzzy-match a KB entry (edit
  distance ≤ 2) of an active type are deliberately *not* masked: the value
  then fails the mask-based significant pattern, is flagged, and the
  stored fuzzy suggestion concretizes the repair (``Birminxham`` →
  ``Birmingham``), reproducing the paper's spelling-repair behaviour.

Granularity follows the paper: only the fixed type list is maskable, so a
column like ``[Q4-2002, Q32001]`` is never swallowed whole.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field

from . import chars
from .edits import levenshtein

# --------------------------------------------------------------------- KB

# Each entry: tuple of surface fields, most canonical first. Single-field
# types use 1-tuples. Field index is part of the learned column style.
_KB_RAW: dict[str, list[tuple[str, ...]]] = {
    "country": [
        ("United States", "US", "USA"),
        ("United Kingdom", "UK", "GBR"),
        ("India", "IN", "IND"),
        ("Poland", "PL", "POL"),
        ("Australia", "AU", "AUS"),
        ("Canada", "CA", "CAN"),
        ("Germany", "DE", "DEU"),
        ("France", "FR", "FRA"),
        ("Japan", "JP", "JPN"),
        ("China", "CN", "CHN"),
        ("Brazil", "BR", "BRA"),
        ("Mexico", "MX", "MEX"),
        ("Spain", "ES", "ESP"),
        ("Italy", "IT", "ITA"),
        ("Netherlands", "NL", "NLD"),
        ("Sweden", "SE", "SWE"),
        ("Norway", "NO", "NOR"),
        ("Ireland", "IE", "IRL"),
        ("Kenya", "KE", "KEN"),
        ("Egypt", "EG", "EGY"),
        ("South Africa", "ZA", "ZAF"),
        ("Thailand", "TH", "THA"),
        ("Vietnam", "VN", "VNM"),
    ],
    "city": [
        ("Birmingham",), ("London",), ("Hampton",), ("Rockford",),
        ("Boston",), ("Miami",), ("Chicago",), ("Seattle",), ("Austin",),
        ("Denver",), ("Paris",), ("Berlin",), ("Madrid",), ("Tokyo",),
        ("Sydney",), ("Toronto",), ("Dublin",), ("Oslo",), ("Houston",),
        ("Phoenix",), ("Dallas",), ("Atlanta",), ("Portland",),
        ("New York",), ("Los Angeles",), ("San Francisco",),
        ("San Jose",), ("New Orleans",), ("Salt Lake City",), ("Wales",),
        ("Zurich",), ("Geneva",), ("Lisbon",), ("Leeds",),
    ],
    "name": [
        ("John",), ("Matt",), ("Sophie",), ("Alice",), ("Carol",),
        ("David",), ("Emma",), ("Frank",), ("Grace",), ("Henry",),
        ("Isla",), ("Jack",), ("Kate",), ("Liam",), ("Noah",),
        ("Olivia",), ("Peter",), ("Quinn",), ("Ryan",), ("Sarah",),
        ("Thomas",), ("Victor",), ("Wendy",), ("Laura",), ("Oscar",),
        ("Tove",), ("Ravi",),
    ],
    "state": [
        ("California", "CA"), ("Texas", "TX"), ("Florida", "FL"),
        ("Nevada", "NV"), ("Oregon", "OR"), ("Washington", "WA"),
        ("Arizona", "AZ"), ("Colorado", "CO"), ("Georgia", "GA"),
        ("Illinois", "IL"), ("Michigan", "MI"), ("Ohio", "OH"),
        ("Virginia", "VA"), ("Montana", "MT"), ("Utah", "UT"),
        ("Kansas", "KS"), ("Iowa", "IA"), ("Maine", "ME"),
    ],
    "county": [
        ("Alpine",), ("Kings",), ("Lake",), ("Santa Clara",),
        ("Orange",), ("Marin",), ("Placer",), ("Kern",), ("Fresno",),
        ("Sonoma",), ("Monterey",), ("Humboldt",), ("Tulare",),
        ("Merced",), ("Shasta",), ("Yolo",), ("Napa",), ("Solano",),
        ("Nevada",),
    ],
    "color": [
        ("red",), ("green",), ("blue",), ("dark green",), ("light blue",),
        ("yellow",), ("orange",), ("purple",), ("black",), ("white",),
        ("gray",), ("pink",), ("brown",), ("cyan",), ("magenta",),
        ("violet",), ("maroon",), ("teal",),
    ],
    "month": [
        ("January", "Jan"), ("February", "Feb"), ("March", "Mar"),
        ("April", "Apr"), ("May", "May"), ("June", "Jun"),
        ("July", "Jul"), ("August", "Aug"), ("September", "Sep"),
        ("October", "Oct"), ("November", "Nov"), ("December", "Dec"),
    ],
    "weekday": [
        ("Monday", "Mon"), ("Tuesday", "Tue"), ("Wednesday", "Wed"),
        ("Thursday", "Thu"), ("Friday", "Fri"), ("Saturday", "Sat"),
        ("Sunday", "Sun"),
    ],
    "currency": [
        ("Dollar", "USD"), ("Euro", "EUR"), ("Pound", "GBP"),
        ("Rupee", "INR"), ("Yen", "JPY"), ("Franc", "CHF"),
        ("Krona", "SEK"), ("Peso", "MXN"), ("Real", "BRL"),
    ],
    "company": [
        ("Google",), ("Microsoft",), ("Amazon",), ("Facebook",),
        ("Apple",), ("Netflix",), ("Twitter",), ("Adobe",), ("Intel",),
        ("Nvidia",), ("Oracle",), ("Samsung",), ("Sony",), ("Tesla",),
        ("Youtube",), ("Instagram",), ("Linkedin",), ("Reddit",),
        ("Spotify",), ("Airbnb",),
    ],
    "language": [
        ("English",), ("French",), ("German",), ("Spanish",), ("Hindi",),
        ("Chinese",), ("Japanese",), ("Arabic",), ("Russian",),
        ("Portuguese",), ("Italian",), ("Korean",), ("Dutch",),
    ],
    "continent": [
        ("Africa",), ("Asia",), ("Europe",), ("Oceania",),
        ("Antarctica",), ("North America",), ("South America",),
    ],
    "nationality": [
        ("American",), ("British",), ("Indian",), ("Polish",),
        ("Australian",), ("Canadian",), ("Mexican",), ("Spanish",),
        ("Brazilian",), ("Swedish",), ("Norwegian",), ("Irish",),
    ],
    "team": [
        ("Lakers",), ("Warriors",), ("Celtics",), ("Bulls",), ("Heat",),
        ("Knicks",), ("Spurs",), ("Suns",), ("Rockets",), ("Nets",),
    ],
    "gender": [("Male", "M"), ("Female", "F"), ("Nonbinary", "X")],
    "position": [
        ("Manager",), ("Engineer",), ("Analyst",), ("Director",),
        ("Designer",), ("Developer",), ("Consultant",), ("Accountant",),
        ("Architect",), ("Scientist",),
    ],
    "brand": [
        ("Nike",), ("Adidas",), ("Puma",), ("Reebok",), ("Gucci",),
        ("Prada",), ("Zara",), ("Levis",), ("Rolex",), ("Lego",),
    ],
    "category": [
        ("Junior",), ("Professional",), ("Senior",), ("Amateur",),
        ("Beginner",), ("Advanced",), ("Intermediate",), ("Expert",),
    ],
    "animal": [
        ("Cat",), ("Dog",), ("Horse",), ("Lion",), ("Tiger",), ("Bear",),
        ("Eagle",), ("Shark",), ("Wolf",), ("Fox",), ("Otter",),
        ("Rabbit",),
    ],
    "browser": [
        ("Chrome",), ("Firefox",), ("Safari",), ("Edge",), ("Opera",),
        ("Brave",),
    ],
}

# Aliases map extra surfaces onto (type, entry_index, field_index_to_suggest)
_ALIASES: dict[str, list[tuple[str, int]]] = {
    "country": [
        ("america", 0), ("u.s.", 0), ("u.s.a.", 0), ("usa", 0),
        ("u.k.", 1), ("britain", 1), ("england", 1), ("great britain", 1),
        ("deutschland", 6), ("holland", 14),
    ],
    "state": [("cali", 0), ("fla", 2)],
}

SEMANTIC_TYPES: list[str] = list(_KB_RAW)
_TYPE_INDEX = {t: i for i, t in enumerate(SEMANTIC_TYPES)}

_MIN_KEY_LEN = 2  # single letters are never maskable (too ambiguous)


def _norm(s: str) -> str:
    """Normalization for KB lookup: lowercase, dots removed, spaces kept."""
    return re.sub(r"\.", "", s).lower().strip()


def _build_lookup() -> dict[str, list[tuple[str, int, int, str]]]:
    """normalized surface → [(type, entry index, field index, KB surface)]."""
    lut: dict[str, list[tuple[str, int, int, str]]] = {}
    for t, entries in _KB_RAW.items():
        for ei, entry in enumerate(entries):
            for fi, surf in enumerate(entry):
                key = _norm(surf)
                if len(key) >= _MIN_KEY_LEN:
                    lut.setdefault(key, []).append((t, ei, fi, surf))
    for t, pairs in _ALIASES.items():
        for surf, ei in pairs:
            key = _norm(surf)
            # Aliases suggest the entry but carry no field of their own.
            lut.setdefault(key, []).append((t, ei, -1, surf))
    return lut


_LOOKUP = _build_lookup()


def _case_compatible(span_text: str, kb_surface: str) -> bool:
    """Short Title-case KB words (``Cat``, ``Jun``) are only matched
    case-sensitively, so all-caps codes like ``CAT`` or ``JUN`` in an ID
    column are not mistaken for animals or months. Codes and lowercase
    words in the KB (``US``, ``USA``, ``usa``, ``red``) stay
    case-insensitive, and so do long words (typos aside, ``LONDON`` is
    unambiguous)."""
    key = _norm(kb_surface)
    if len(key) > 4:
        return True
    surf = re.sub(r"\.", "", kb_surface)
    if surf.isupper() or surf.islower():
        return True
    return re.sub(r"\.", "", span_text) == surf


def mask_symbol(type_name: str) -> str:
    """The single-character alphabet symbol for a semantic type."""
    return chars.mask_char(_TYPE_INDEX[type_name])


def type_of_mask(sym: str) -> str:
    return SEMANTIC_TYPES[ord(sym) - 0xE000]


def apply_case(canonical: str, style: str) -> str:
    """Render a canonical surface in a column's casing style."""
    if style == "upper":
        return canonical.upper()
    if style == "lower":
        return canonical.lower()
    if style == "title":
        return canonical.title()
    return canonical


def case_style(s: str) -> str:
    letters = [c for c in s if c.isalpha()]
    if not letters:
        return "canonical"
    if all(c.isupper() for c in letters):
        return "upper"
    if all(c.islower() for c in letters):
        return "lower"
    body = s.split(" ")
    if all(w and w[0].isupper() and w[1:].islower() for w in body if w):
        return "title"
    return "canonical"


# ------------------------------------------------------------ span finding


@dataclass(frozen=True)
class Entity:
    """A semantic substring found in one value."""

    type_name: str
    surface: str
    start: int
    end: int  # exclusive
    entry_index: int
    field_index: int  # -1 = alias (no field of its own)
    fuzzy: bool = False


_WORD_RE = re.compile(r"[A-Za-z]+")


def _candidate_spans(value: str) -> list[tuple[int, int, str]]:
    """(start, end, normalized key) for every word n-gram (n ≤ 3) whose
    words are separated by a single space, and for dotted abbreviations
    (``u.k.`` — single letters joined by dots, optional trailing dot)."""
    words = [(m.start(), m.end(), m.group()) for m in _WORD_RE.finditer(value)]
    spans: list[tuple[int, int, str]] = []
    for i in range(len(words)):
        for n in range(1, 4):
            if i + n > len(words):
                break
            s, e = words[i][0], words[i + n - 1][1]
            gap_ok = all(
                value[words[j][1] : words[j + 1][0]] == " "
                for j in range(i, i + n - 1)
            )
            if not gap_ok:
                break
            spans.append((s, e, _norm(value[s:e])))
    # Dotted abbreviations: u.k.  /  u.s.a
    for m in re.finditer(r"(?:[A-Za-z]\.){1,4}[A-Za-z]?\.?", value):
        if len(_norm(m.group())) >= _MIN_KEY_LEN:
            spans.append((m.start(), m.end(), _norm(m.group())))
    return spans


def _resolve(key: str, span_text: str) -> list[tuple[str, int, int]]:
    """KB metas for a normalized key, filtered by case compatibility."""
    return [
        (t, ei, fi)
        for (t, ei, fi, surf) in _LOOKUP.get(key, [])
        if _case_compatible(span_text, surf)
    ]


def _damerau(a: str, b: str) -> int:
    """Optimal-string-alignment distance: Levenshtein plus adjacent
    transpositions at cost 1, so ``bleu`` is one edit from ``blue``."""
    la, lb = len(a), len(b)
    d = [[0] * (lb + 1) for _ in range(la + 1)]
    for i in range(la + 1):
        d[i][0] = i
    for j in range(lb + 1):
        d[0][j] = j
    for i in range(1, la + 1):
        for j in range(1, lb + 1):
            cost = 0 if a[i - 1] == b[j - 1] else 1
            d[i][j] = min(
                d[i - 1][j] + 1, d[i][j - 1] + 1, d[i - 1][j - 1] + cost
            )
            if (
                i > 1
                and j > 1
                and a[i - 1] == b[j - 2]
                and a[i - 2] == b[j - 1]
            ):
                d[i][j] = min(d[i][j], d[i - 2][j - 2] + 1)
    return d[la][lb]


def _fuzzy_resolve(key: str, active: set[str]) -> tuple[str, int, int] | None:
    """Closest KB surface of an *active* type within edit distance 1
    (length ≥ 4) or 2 (length ≥ 6), with adjacent transpositions costing
    1 (``bleu`` → ``blue``). Returns (type, entry, field)."""
    if len(key) < 4:
        return None
    budget = 2 if len(key) >= 6 else 1
    best: tuple[int, tuple[str, int, int]] | None = None
    for cand, metas in _LOOKUP.items():
        if abs(len(cand) - len(key)) > budget:
            continue
        d = _damerau(key, cand)
        if 0 < d <= budget:
            for t, ei, fi, _surf in metas:
                if t in active and (best is None or d < best[0]):
                    best = (d, (t, ei, fi))
    return best[1] if best else None


def _choose_entities(v: str, active: set[str]) -> list["Entity"]:
    """Greedy longest-first non-overlapping exact entity spans of active
    types, sorted by start offset."""
    cands: list[tuple[int, int, str, tuple[str, int, int]]] = []
    for s, e, key in _candidate_spans(v):
        for meta in _resolve(key, v[s:e]):
            if meta[0] in active:
                cands.append((s, e, key, meta))
    cands.sort(key=lambda c: (-(c[1] - c[0]), c[0]))
    taken: list[Entity] = []
    used: list[tuple[int, int]] = []
    for s, e, key, (t, ei, fi) in cands:
        if any(not (e <= us or s >= ue) for us, ue in used):
            continue
        used.append((s, e))
        taken.append(Entity(t, v[s:e], s, e, ei, fi))
    taken.sort(key=lambda ent: ent.start)
    return taken


def _fuzzy_entities(v: str, ents: list["Entity"], active: set[str]) -> list["Entity"]:
    """Typo matches over word tokens not covered by exact entities."""
    covered = [(e.start, e.end) for e in ents]
    out: list[Entity] = []
    for m in _WORD_RE.finditer(v):
        if any(not (m.end() <= s or m.start() >= e) for s, e in covered):
            continue
        meta = _fuzzy_resolve(_norm(m.group()), active)
        if meta is not None:
            t, ei, fi = meta
            out.append(Entity(t, m.group(), m.start(), m.end(), ei, fi, fuzzy=True))
    return out


def _mask_string(v: str, ents: list["Entity"]) -> str:
    out, pos = [], 0
    for ent in ents:
        out.append(v[pos : ent.start])
        out.append(mask_symbol(ent.type_name))
        pos = ent.end
    out.append(v[pos:])
    return "".join(out)


# ------------------------------------------------------------ column model


@dataclass
class MaskedValue:
    """One value after abstraction."""

    original: str
    masked: str
    entities: list[Entity] = field(default_factory=list)  # masked spans, in order
    fuzzy_entities: list[Entity] = field(default_factory=list)  # unmasked typos


@dataclass
class SemanticModel:
    """Per-column abstraction state produced by :func:`abstract_column`."""

    masked_values: list[MaskedValue]
    active_types: set[str]
    # Learned surface style per type: (field index, case style).
    type_styles: dict[str, tuple[int, str]]
    mask_types: dict[str, str]  # mask symbol -> type name

    def suggestion(self, ent: Entity) -> str:
        """The repaired surface for an entity.

        Conservative, like an LLM reading the whole column: when the column
        has a dominant (field, case) style for the type (share ≥ 0.6), every
        entity is rendered in that style — this is what turns ``usa`` into
        ``US`` in a column of upper-case alpha-2 codes (Fig 2). Without a
        dominant style, exact surfaces are kept verbatim and only aliases
        (``america``, ``u.s.``) are rewritten to a concrete field.
        """
        entry = _KB_RAW[ent.type_name][ent.entry_index]
        style = self.type_styles.get(ent.type_name)
        if style is not None:
            fi, cs = style
            return apply_case(entry[min(fi, len(entry) - 1)], cs)
        if ent.field_index >= 0:
            return ent.surface
        fi = 1 if len(entry) > 1 else 0
        return entry[fi]

    def default_surface(self, type_name: str) -> str:
        """Suggestion for a mask inserted by a repair with no source entity:
        the most common styled surface of that type in the column."""
        from collections import Counter

        c = Counter(
            self.suggestion(e)
            for mv in self.masked_values
            for e in mv.entities
            if e.type_name == type_name
        )
        return c.most_common(1)[0][0] if c else type_name

    def best_surface(self, type_name: str, original: str) -> str:
        """Like :meth:`default_surface`, but anchored in the erroneous
        value: among the surfaces of this type seen in the column, pick
        the one closest (by edit distance) to the letters the corrupted
        value still carries — ``ProfeVs-Uional`` recovers *Professional*,
        not the column-majority category. Ties fall back to frequency."""
        from collections import Counter

        counts = Counter(
            self.suggestion(e)
            for mv in self.masked_values
            for e in mv.entities
            if e.type_name == type_name
        )
        if not counts:
            return type_name
        letters = "".join(c for c in original if c.isalpha()).lower()
        if not letters:
            return counts.most_common(1)[0][0]
        return min(
            counts,
            key=lambda s: (
                levenshtein(s.lower(), letters),
                -counts[s],
                s,
            ),
        )

    def mask_new(self, v: str) -> "MaskedValue":
        """Abstract a value not seen at fit time under the learned column
        context (active types and styles) — used when a fitted model is
        applied to new partitions (see :mod:`repro.core.spark_api`)."""
        ents = _choose_entities(v, self.active_types)
        return MaskedValue(
            v,
            _mask_string(v, ents),
            ents,
            _fuzzy_entities(v, ents, self.active_types),
        )

    def semantic_changed_value(self, mv: "MaskedValue") -> bool:
        """True when abstraction itself already implies a repair (a masked
        surface whose suggestion differs, or a fuzzy typo)."""
        if mv.fuzzy_entities:
            return True
        return any(self.suggestion(e) != e.surface for e in mv.entities)

    def semantic_changed(self, idx: int) -> bool:
        return self.semantic_changed_value(self.masked_values[idx])

    def unmask(
        self, idx: int, repaired_masked: str, *, reuse_surface: bool = False
    ) -> str:
        return self.unmask_value(
            self.masked_values[idx], repaired_masked, reuse_surface=reuse_surface
        )

    def unmask_value(
        self, mv: "MaskedValue", repaired_masked: str, *, reuse_surface: bool = False
    ) -> str:
        """Concretize mask symbols in a repaired masked string. Mask
        occurrences are filled per type, in order: first from the value's
        own masked entities, then from its fuzzy typo matches, finally
        from the column-majority surface. ``reuse_surface`` implements the
        *Limited semantic concretization* ablation: masks are filled with
        the original surfaces verbatim (no semantic repair)."""
        queues: dict[str, list[str]] = {}
        for e in mv.entities:
            queues.setdefault(e.type_name, []).append(
                e.surface if reuse_surface else self.suggestion(e)
            )
        if not reuse_surface:
            for e in mv.fuzzy_entities:
                queues.setdefault(e.type_name, []).append(self.suggestion(e))
        out: list[str] = []
        for ch in repaired_masked:
            if chars.is_mask_char(ch):
                t = self.mask_types.get(ch) or type_of_mask(ch)
                q = queues.get(t)
                if q:
                    out.append(q.pop(0))
                elif reuse_surface:
                    out.append("")  # nothing to reuse — drop the mask
                else:
                    out.append(self.best_surface(t, mv.original))
            else:
                out.append(ch)
        return "".join(out)


def abstract_column(
    values: list[str], *, activation: float = 0.5, enabled: bool = True
) -> SemanticModel:
    """Abstract a whole column at once (the paper prompts per column).

    A type is active when at least ``activation`` of the values contain an
    exact KB match for it (and at least two do) — the surrogate for the
    LLM's column-context judgement. Only active types are masked.
    """
    if not enabled:
        return SemanticModel(
            masked_values=[MaskedValue(v, v) for v in values],
            active_types=set(),
            type_styles={},
            mask_types={},
        )
    per_value_spans: list[list[tuple[int, int, str, tuple[str, int, int]]]] = []
    type_hits: dict[str, set[int]] = {}
    for i, v in enumerate(values):
        found = []
        for s, e, key in _candidate_spans(v):
            for meta in _resolve(key, v[s:e]):
                found.append((s, e, key, meta))
                type_hits.setdefault(meta[0], set()).add(i)
        per_value_spans.append(found)
    n = max(1, len(values))
    active = {
        t
        for t, hits in type_hits.items()
        if len(hits) >= 2 and len(hits) / n >= activation
    }

    # Learn surface style per active type from exact matches.
    from collections import Counter

    style_votes: dict[str, Counter] = {t: Counter() for t in active}
    chosen_spans: list[list[Entity]] = []
    for v in values:
        taken = _choose_entities(v, active)
        for ent in taken:
            if ent.field_index >= 0:
                style_votes[ent.type_name][
                    (ent.field_index, case_style(ent.surface))
                ] += 1
        chosen_spans.append(taken)

    # A style is only *enforced* when it clearly dominates the column;
    # otherwise surfaces are left alone (no repair), keeping false
    # positives down on legitimately mixed columns.
    type_styles: dict[str, tuple[int, str]] = {}
    n_entities = {
        t: sum(
            1 for ents in chosen_spans for e in ents if e.type_name == t
        )
        for t in active
    }
    for t, votes in style_votes.items():
        if votes and n_entities.get(t, 0) > 0:
            (fi, cs), cnt = votes.most_common(1)[0]
            if cnt / n_entities[t] >= 0.6:
                type_styles[t] = (fi, cs)

    mask_types = {mask_symbol(t): t for t in active}
    masked_values = [
        MaskedValue(
            v,
            _mask_string(v, ents),
            ents,
            _fuzzy_entities(v, ents, active),
        )
        for v, ents in zip(values, chosen_spans)
    ]
    return SemanticModel(
        masked_values=masked_values,
        active_types=active,
        type_styles=type_styles,
        mask_types=mask_types,
    )
