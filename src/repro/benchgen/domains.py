"""Clean-value generators for realistic string domains.

Each :class:`Domain` generates one or more correlated columns of clean
values, knows the *latent regular language* of each target column
(Definition 2.3 — used to judge "possible" repairs per Definition 2.4),
and provides realistic corruptors that produce the error types shown in
the paper's figures:

* ``phone`` / ``code`` / ``website`` — Fig 1's Excel examples,
* ``mixing`` / ``duration`` / ``city`` — Fig 1's Wikipedia examples,
* ``player_id`` (+ Category column) — Figs 2 and 5,
* ``county_id`` — the ``Nevad210 → Nevada_210`` example of §5.1,
* ``s_code`` — the ``S1.4`` syntactic error GPT-3.5 misses,
* ``chrome_ver`` — Fig 8's execution-guided example,
* plus quarters, dates, prices, names, categories, emails, months.

All randomness flows through an explicit ``numpy`` generator so every
benchmark is reproducible from its seed.
"""
from __future__ import annotations

import re
from dataclasses import dataclass, field
from typing import Callable

import numpy as np
import pandas as pd

Rng = np.random.Generator

_COUNTRIES_A2 = ["US", "UK", "IN", "PL", "AU", "CA", "DE", "FR", "JP", "BR"]
_COUNTRIES_A3 = {
    "US": "USA", "UK": "GBR", "IN": "IND", "PL": "POL", "AU": "AUS",
    "CA": "CAN", "DE": "DEU", "FR": "FRA", "JP": "JPN", "BR": "BRA",
}
_CITIES = [
    "Birmingham", "London", "Hampton", "Rockford", "Boston", "Miami",
    "Chicago", "Seattle", "Austin", "Denver", "Paris", "Berlin",
    "Madrid", "Tokyo", "Sydney", "Toronto", "Dublin", "Oslo",
]
_COUNTIES = [
    "Alpine", "Kings", "Lake", "Nevada", "Orange", "Marin", "Placer",
    "Kern", "Fresno", "Sonoma", "Monterey", "Humboldt", "Tulare",
]
_NAMES = [
    "John", "Sophie", "Alice", "Carol", "David", "Emma", "Frank",
    "Grace", "Henry", "Jack", "Kate", "Liam", "Noah", "Olivia",
    "Peter", "Ryan", "Sarah", "Wendy",
]
_COMPANIES = [
    "google", "youtube", "facebook", "twitter", "instagram",
    "linkedin", "reddit", "amazon", "netflix", "spotify",
]
_CATEGORIES = ["Junior", "Professional", "Senior", "Amateur"]
_CAT_SUFFIX = {"Junior": "JNR", "Professional": "PRO", "Senior": "SEN", "Amateur": "AMA"}
_MONTHS = ["Jan", "Feb", "Mar", "Apr", "May", "Jun", "Jul", "Aug", "Sep", "Oct", "Nov", "Dec"]

Corruptor = Callable[[Rng, str], str]


@dataclass
class Domain:
    """One table-fragment generator.

    ``generate(rng, n)`` returns the clean columns; ``target`` is the
    column errors are injected into; ``language`` is the latent regular
    language of the target column (anchored Python regex);
    ``corruptors`` produce realistic dirty versions of one clean value.
    ``semantic`` marks domains whose errors need world knowledge.
    """

    name: str
    generate: Callable[[Rng, int], pd.DataFrame]
    target: str
    language: str
    corruptors: list[Corruptor] = field(default_factory=list)
    semantic: bool = False

    def in_language(self, v: str) -> bool:
        return re.fullmatch(self.language, v) is not None


def _digits(rng: Rng, n: int) -> str:
    return "".join(str(d) for d in rng.integers(0, 10, n))


def _typo(rng: Rng, word: str) -> str:
    """One realistic letter-level typo inside a word, preserving case
    shape (substitute a middle letter)."""
    if len(word) < 4:
        return word + "x"
    i = int(rng.integers(1, len(word) - 1))
    repl = chr(ord("a") + int(rng.integers(0, 26)))
    if word[i].isupper():
        repl = repl.upper()
    if repl == word[i]:
        repl = "x" if word[i] != "x" else "z"
    return word[:i] + repl + word[i + 1 :]


# ------------------------------------------------------------------ domains


def _single(name: str, maker: Callable[[Rng], str]) -> Callable[[Rng, int], pd.DataFrame]:
    def gen(rng: Rng, n: int) -> pd.DataFrame:
        return pd.DataFrame({name: [maker(rng) for _ in range(n)]})

    return gen


def _phone(rng: Rng) -> str:
    return f"{_digits(rng, 3)}-{_digits(rng, 3)}-{_digits(rng, 4)}"


def _phone_format(rng: Rng, v: str) -> str:
    a, b, c = v.split("-")
    return f"({a}) {b} {c}"


def _phone_nodash(rng: Rng, v: str) -> str:
    return v.replace("-", "")


def _phone_extra_digit(rng: Rng, v: str) -> str:
    i = int(rng.integers(0, len(v)))
    return v[:i] + str(int(rng.integers(0, 10))) + v[i:]


def _code_gen(rng: Rng, n: int) -> pd.DataFrame:
    codes = []
    for _ in range(n):
        u = rng.random()
        if u < 0.04:
            cc = str(rng.choice(_RARE_CC_KNOWN))
        elif u < 0.05:
            cc = str(rng.choice(_RARE_CC_UNKNOWN))
        else:
            cc = str(rng.choice(_COUNTRIES_A2))
        codes.append(f"{cc}-{_digits(rng, 3)}")
    return pd.DataFrame({"Code": codes})


def _code_lower_underscore(rng: Rng, v: str) -> str:
    cc, num = v.split("-", 1)
    return f"{cc.lower()}_{num}"


def _code_a3(rng: Rng, v: str) -> str:
    cc, num = v.split("-", 1)
    return f"{_COUNTRIES_A3.get(cc, cc + 'X')}-{num}"


def _code_nodash_lower(rng: Rng, v: str) -> str:
    cc, num = v.split("-", 1)
    return f"{cc.lower()}{num}"


def _url(rng: Rng) -> str:
    return f"https://www.{rng.choice(_COMPANIES)}.com"


def _url_drop_scheme(rng: Rng, v: str) -> str:
    return v.replace("https://", "")


def _url_http(rng: Rng, v: str) -> str:
    return v.replace("https://", "http:/")


def _duration(rng: Rng) -> str:
    return f"{int(rng.integers(0, 10))}{int(rng.integers(0, 10))}:{int(rng.integers(0, 6))}{int(rng.integers(0, 10))}"


def _duration_dot(rng: Rng, v: str) -> str:
    return v.replace(":", ".")


def _mixing(rng: Rng) -> str:
    return f"{int(rng.integers(10, 60))} ({rng.integers(1, 10)}.{_digits(rng, 2)}%)"


def _mixing_drop_paren(rng: Rng, v: str) -> str:
    return v.rstrip(")")


def _mixing_drop_pct(rng: Rng, v: str) -> str:
    return v.replace("%", "")


# Legitimate rare values. The KNOWN pools are long-tail entities the LLM
# (here: the KB) still recognizes — they must not trip any system. The
# UNKNOWN pools model the genuine tail outside anyone's world knowledge;
# they are NOT errors but are natural false-positive bait for systems
# that key on rarity (including DataVinci's own masking).
_RARE_CITIES_KNOWN = ["Zurich", "Geneva", "Lisbon", "Leeds"]
_RARE_CITIES_UNKNOWN = ["Krakow", "Porto"]
_MULTIWORD_CITIES = ["New York", "Los Angeles", "San Francisco", "Salt Lake City"]
_RARE_NAMES_KNOWN = ["Tove", "Ravi"]
_RARE_NAMES_UNKNOWN = ["Marta", "Elio"]
_RARE_CC_KNOWN = ["ZA", "TH", "VN"]
_RARE_CC_UNKNOWN = ["PE"]


def _city_gen(rng: Rng, n: int) -> pd.DataFrame:
    vals = []
    for _ in range(n):
        u = rng.random()
        if u < 0.05:
            vals.append(str(rng.choice(_RARE_CITIES_KNOWN)))
        elif u < 0.065:
            vals.append(str(rng.choice(_RARE_CITIES_UNKNOWN)))
        elif u < 0.145:
            # Multi-word cities: same semantics, different token
            # structure — purely syntactic detectors flag these.
            vals.append(str(rng.choice(_MULTIWORD_CITIES)))
        else:
            vals.append(str(rng.choice(_CITIES)))
    return pd.DataFrame({"Area": vals})


def _city_typo(rng: Rng, v: str) -> str:
    return _typo(rng, v)


def _quarter(rng: Rng) -> str:
    return f"Q{int(rng.integers(1, 5))}-{int(rng.integers(18, 26))}"


def _quarter_nodash(rng: Rng, v: str) -> str:
    return v.replace("-", "")


def _player_gen(rng: Rng, n: int) -> pd.DataFrame:
    cats, pids = [], []
    for _ in range(n):
        if rng.random() < 0.2:
            cats.append(str(rng.choice(_CATEGORIES)))
            pids.append(f"QUAL-{_digits(rng, 3)}")
        else:
            cat = str(rng.choice(_CATEGORIES))
            cats.append(cat)
            pids.append(
                f"{rng.choice(_COUNTRIES_A2)}-{_digits(rng, 3)}-{_CAT_SUFFIX[cat]}"
            )
    return pd.DataFrame({"Category": cats, "PlayerID": pids})


def _player_mangle(rng: Rng, v: str) -> str:
    if v.startswith("QUAL-"):
        return v.replace("-", "_")
    parts = v.split("-")
    return f"{parts[0].lower()}_{parts[1]}"  # usa_837 style: drops suffix


def _county_gen(rng: Rng, n: int) -> pd.DataFrame:
    return pd.DataFrame(
        {"CountyID": [f"{rng.choice(_COUNTIES)}_{_digits(rng, 3)}" for _ in range(n)]}
    )


def _county_mangle(rng: Rng, v: str) -> str:
    county, num = v.split("_", 1)
    return f"{county[:-1]}{num}"  # Nevada_210 -> Nevad210


def _county_typo(rng: Rng, v: str) -> str:
    county, num = v.split("_", 1)
    return f"{_typo(rng, county)}_{num}"


def _s_code(rng: Rng) -> str:
    return f"S.{int(rng.integers(1, 4))}.{int(rng.integers(1, 5))}"


def _s_code_drop_dot(rng: Rng, v: str) -> str:
    return "S" + v[2:]  # S.1.4 -> S1.4


def _chrome(rng: Rng) -> str:
    return f"Chrome{int(rng.integers(15, 30))}"


def _chrome_truncate(rng: Rng, v: str) -> str:
    return "C" + v[len("Chrome") :]


def _date(rng: Rng) -> str:
    return f"{int(rng.integers(1995, 2025))}-{int(rng.integers(1, 13)):02d}-{int(rng.integers(1, 29)):02d}"


def _date_slash(rng: Rng, v: str) -> str:
    return v.replace("-", "/")


def _date_compact(rng: Rng, v: str) -> str:
    return v.replace("-", "")


def _price(rng: Rng) -> str:
    return f"${int(rng.integers(1, 999))}.{_digits(rng, 2)}"


def _price_drop_dollar(rng: Rng, v: str) -> str:
    return v[1:]


def _price_comma(rng: Rng, v: str) -> str:
    return v.replace(".", ",")


def _name_id(rng: Rng) -> str:
    u = rng.random()
    if u < 0.04:
        name = str(rng.choice(_RARE_NAMES_KNOWN))
    elif u < 0.055:
        name = str(rng.choice(_RARE_NAMES_UNKNOWN))
    else:
        name = str(rng.choice(_NAMES))
    return f"{name}{_digits(rng, 3)}"


def _name_id_typo(rng: Rng, v: str) -> str:
    m = re.match(r"([A-Za-z]+)(\d+)", v)
    return f"{_typo(rng, m.group(1))}{m.group(2)}"


def _category_gen(rng: Rng, n: int) -> pd.DataFrame:
    return pd.DataFrame(
        {"Category": [str(rng.choice(_CATEGORIES)) for _ in range(n)]}
    )


def _category_lower(rng: Rng, v: str) -> str:
    return v.lower()


def _category_typo(rng: Rng, v: str) -> str:
    return _typo(rng, v)


def _email(rng: Rng) -> str:
    return f"{str(rng.choice(_NAMES)).lower()}@{rng.choice(_COMPANIES)}.com"


def _email_drop_at(rng: Rng, v: str) -> str:
    return v.replace("@", "")


def _phone_mixed_gen(rng: Rng, n: int) -> pd.DataFrame:
    """Two *legitimate* phone formats coexist (70/30): hyphenated and
    parenthesized. Single-structure rectifiers (WMRR's format rules,
    Potter's Wheel MDL) misfire on the minority format; DataVinci keeps
    both patterns significant (δ ≤ 0.3) and stays quiet."""
    vals = []
    for _ in range(n):
        p = _phone(rng)
        if rng.random() < 0.3:
            a, b, c = p.split("-")
            p = f"({a}) {b} {c}"
        vals.append(p)
    return pd.DataFrame({"Contact": vals})


def _phone_mixed_corrupt(rng: Rng, v: str) -> str:
    return v.replace("-", "").replace("(", "").replace(")", "").replace(" ", "")


def _ref_mixed_gen(rng: Rng, n: int) -> pd.DataFrame:
    """Reference codes in long (``AB-123``, 65%) and legitimate compact
    (``AB123``, 35%) forms."""
    vals = []
    for _ in range(n):
        code = f"{chr(65 + int(rng.integers(0, 26)))}{chr(65 + int(rng.integers(0, 26)))}"
        num = _digits(rng, 3)
        vals.append(f"{code}-{num}" if rng.random() < 0.65 else f"{code}{num}")
    return pd.DataFrame({"Ref": vals})


def _ref_mixed_corrupt(rng: Rng, v: str) -> str:
    if "-" in v:
        return v.replace("-", "_")
    return v.lower()


_REGIONS = ["East", "West", "North", "South"]
_PRODUCTS = ["Laptop", "Phone", "Tablet", "Camera", "Router", "Screen"]


def _product_sku_gen(rng: Rng, n: int) -> pd.DataFrame:
    """Product + SKU, where the SKU embeds the product's initial — the
    other cross-column concretization domain."""
    prods = [str(rng.choice(_PRODUCTS)) for _ in range(n)]
    skus = [f"SKU-{p[0]}{_digits(rng, 4)}" for p in prods]
    return pd.DataFrame({"Product": prods, "SKU": skus})


def _sku_drop_letter(rng: Rng, v: str) -> str:
    return v[:4] + v[5:]  # SKU-L1234 -> SKU-1234


def _sku_lower(rng: Rng, v: str) -> str:
    return v.lower()


def _region_code_gen(rng: Rng, n: int) -> pd.DataFrame:
    """Two correlated columns: Region, and SiteID whose leading letter is
    the region's initial — concretizing a corrupted initial requires a
    cross-column constraint (the §3.4 decision-tree case)."""
    regions = [str(rng.choice(_REGIONS)) for _ in range(n)]
    sites = [f"{r[0]}-{_digits(rng, 3)}" for r in regions]
    return pd.DataFrame({"Region": regions, "SiteID": sites})


def _region_drop_letter(rng: Rng, v: str) -> str:
    return v[1:]  # E-123 -> -123: the initial must be re-derived


def _region_wrong_case(rng: Rng, v: str) -> str:
    return v[0].lower() + v[1:]


def _month_day(rng: Rng) -> str:
    return f"{rng.choice(_MONTHS)} {int(rng.integers(1, 29))}"


def _month_lower(rng: Rng, v: str) -> str:
    return v.lower()


_CITY_ALT = "|".join(
    _CITIES + _RARE_CITIES_KNOWN + _RARE_CITIES_UNKNOWN + _MULTIWORD_CITIES
)
_COUNTY_ALT = "|".join(_COUNTIES)
_NAME_ALT = "|".join(_NAMES + _RARE_NAMES_KNOWN + _RARE_NAMES_UNKNOWN)
_CAT_ALT = "|".join(_CATEGORIES)
_MONTH_ALT = "|".join(_MONTHS)

DOMAINS: dict[str, Domain] = {
    d.name: d
    for d in [
        Domain(
            "phone",
            _single("Phone", _phone),
            "Phone",
            r"\d{3}-\d{3}-\d{4}",
            [_phone_format, _phone_nodash, _phone_extra_digit],
        ),
        Domain(
            "code",
            _code_gen,
            "Code",
            r"[A-Z]{2}-\d{3}",
            [_code_lower_underscore, _code_a3, _code_nodash_lower],
            semantic=True,
        ),
        Domain(
            "website",
            _single("Website", _url),
            "Website",
            r"https://www\.[a-z]+\.com",
            [_url_drop_scheme, _url_http],
        ),
        Domain(
            "duration",
            _single("Length", _duration),
            "Length",
            r"\d{2}:\d{2}",
            [_duration_dot],
        ),
        Domain(
            "mixing",
            _single("Mixing", _mixing),
            "Mixing",
            r"\d+ \(\d\.\d{2}%\)",
            [_mixing_drop_paren, _mixing_drop_pct],
        ),
        Domain(
            "city",
            _city_gen,
            "Area",
            rf"(?:{_CITY_ALT})",
            [_city_typo],
            semantic=True,
        ),
        Domain(
            "quarter",
            _single("Quarter", _quarter),
            "Quarter",
            r"Q[1-4]-\d{2}",
            [_quarter_nodash],
        ),
        Domain(
            "player_id",
            _player_gen,
            "PlayerID",
            r"(?:[A-Z]{2}-\d{3}-(?:JNR|PRO|SEN|AMA)|QUAL-\d{3})",
            [_player_mangle],
            semantic=True,
        ),
        Domain(
            "county_id",
            _county_gen,
            "CountyID",
            rf"(?:{_COUNTY_ALT})_\d{{3}}",
            [_county_mangle, _county_typo],
            semantic=True,
        ),
        Domain(
            "s_code",
            _single("SCode", _s_code),
            "SCode",
            r"S\.\d\.\d",
            [_s_code_drop_dot],
        ),
        Domain(
            "chrome_ver",
            _single("Option", _chrome),
            "Option",
            r"Chrome\d{2}",
            [_chrome_truncate],
        ),
        Domain(
            "date",
            _single("Date", _date),
            "Date",
            r"\d{4}-\d{2}-\d{2}",
            [_date_slash, _date_compact],
        ),
        Domain(
            "price",
            _single("Price", _price),
            "Price",
            r"\$\d+\.\d{2}",
            [_price_drop_dollar, _price_comma],
        ),
        Domain(
            "name_id",
            _single("UserID", _name_id),
            "UserID",
            rf"(?:{_NAME_ALT})\d{{3}}",
            [_name_id_typo],
            semantic=True,
        ),
        Domain(
            "category",
            _category_gen,
            "Category",
            rf"(?:{_CAT_ALT})",
            [_category_lower, _category_typo],
            semantic=True,
        ),
        Domain(
            "email",
            _single("Email", _email),
            "Email",
            r"[a-z]+@[a-z]+\.com",
            [_email_drop_at],
        ),
        Domain(
            "month_day",
            _single("When", _month_day),
            "When",
            rf"(?:{_MONTH_ALT}) \d+",
            [_month_lower],
            semantic=True,
        ),
        Domain(
            "phone_mixed",
            _phone_mixed_gen,
            "Contact",
            r"(?:\d{3}-\d{3}-\d{4}|\(\d{3}\) \d{3} \d{4})",
            [_phone_mixed_corrupt],
        ),
        Domain(
            "ref_mixed",
            _ref_mixed_gen,
            "Ref",
            r"(?:[A-Z]{2}-\d{3}|[A-Z]{2}\d{3})",
            [_ref_mixed_corrupt],
        ),
        Domain(
            "region_code",
            _region_code_gen,
            "SiteID",
            r"[EWNS]-\d{3}",
            [_region_drop_letter, _region_wrong_case],
        ),
        Domain(
            "product_sku",
            _product_sku_gen,
            "SKU",
            r"SKU-[LPTCRS]\d{4}",
            [_sku_drop_letter, _sku_lower],
        ),
    ]
}

#: Domains whose target column is derivable from a sibling column —
#: the cases where §3.4's learned value constraints matter most.
CORRELATED_DOMAINS = ["player_id", "region_code", "product_sku"]

SYNTACTIC_DOMAINS = [d for d in DOMAINS.values() if not d.semantic]
SEMANTIC_DOMAINS = [d for d in DOMAINS.values() if d.semantic]
