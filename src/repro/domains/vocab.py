"""Semantic-domain vocabularies and code-value generators.

Three kinds of domains mirror the paper's taxonomy (Fig. 2/3):

- ``nl``    natural-language domains (country, city, names, ...) with a
  *common* tier (well-known values — in the simulated embedding/CTA
  vocabulary) and an *uncommon* tier (valid but rare values — OOV for the
  word-level embedding and low-scoring for CTA, the false-positive source of
  the paper's Fig. 3).
- ``code``  machine-generated domains (dates, urls, ids, genes, ...) produced
  by deterministic generators; recognized by patterns/validators, not by CTA.
- ``mixed`` domains whose values follow a dominant syntactic pattern with a
  legitimate minority format (age-group "65 & Above", unit "0.05%") — the
  pattern-method false-positive traps of Fig. 3 (C15-C17).

All vocabularies are deterministic (fixed seeds) so every Spark/DuckDB run
sees identical data.
"""
from __future__ import annotations

import string
from dataclasses import dataclass, field
from typing import Callable

import numpy as np

Generator = Callable[[np.random.Generator, int], list[str]]


@dataclass(frozen=True)
class DomainSpec:
    """One semantic domain.

    ``common``/``uncommon`` are the NL tiers (empty for pure code domains);
    ``generator`` produces fresh values for code domains (None for pure NL);
    ``pattern_shape`` documents the dominant syntactic shape, if any;
    ``columnar`` generators must be called once per column (they fix
    per-column structure, e.g. a column-specific code template).
    """

    name: str
    kind: str  # 'nl' | 'code' | 'mixed'
    common: tuple[str, ...] = ()
    uncommon: tuple[str, ...] = ()
    generator: Generator | None = None
    pattern_shape: str = ""
    columnar: bool = False

    def sample_value(self, rng: np.random.Generator) -> str:
        """One random in-domain value (any tier / generated)."""
        if self.generator is not None and (not self.common or rng.random() < 0.8):
            return self.generator(rng, 1)[0]
        pool = self.common + self.uncommon
        return str(pool[rng.integers(0, len(pool))])


# ---------------------------------------------------------------------------
# Synthetic word machinery (for large NL vocabularies like city/person names)
# ---------------------------------------------------------------------------

_CONS = "bcdfghjklmnprstvwz"
_VOWS = "aeiou"


def _syllable(rng: np.random.Generator) -> str:
    s = _CONS[rng.integers(0, len(_CONS))] + _VOWS[rng.integers(0, len(_VOWS))]
    if rng.random() < 0.35:
        s += _CONS[rng.integers(0, len(_CONS))]
    return s


def _word(rng: np.random.Generator, min_syl: int = 2, max_syl: int = 3) -> str:
    k = int(rng.integers(min_syl, max_syl + 1))
    return "".join(_syllable(rng) for _ in range(k))


def _word_list(
    seed: int, n: int, min_syl: int = 2, max_syl: int = 3,
    exclude: tuple[str, ...] = (),
) -> tuple[str, ...]:
    rng = np.random.default_rng(seed)
    out: list[str] = []
    seen: set[str] = set(exclude)
    while len(out) < n:
        w = _word(rng, min_syl, max_syl)
        if w not in seen:
            seen.add(w)
            out.append(w)
    return tuple(out)


# ---------------------------------------------------------------------------
# Hand-written NL vocabularies (small, real-world lists)
# ---------------------------------------------------------------------------

_COUNTRIES_COMMON = (
    "germany", "france", "italy", "spain", "portugal", "austria", "switzerland",
    "belgium", "netherlands", "denmark", "norway", "sweden", "finland", "poland",
    "ireland", "greece", "turkey", "russia", "china", "japan", "india", "brazil",
    "canada", "mexico", "argentina", "chile", "peru", "colombia", "egypt",
    "nigeria", "kenya", "morocco", "australia", "thailand", "vietnam", "korea",
    "indonesia", "malaysia", "philippines", "iceland", "hungary", "romania",
    "bulgaria", "croatia", "serbia", "ukraine", "israel", "jordan", "qatar",
    "singapore",
)
_COUNTRIES_UNCOMMON = (
    "liechtenstein", "andorra", "san marino", "vanuatu", "tuvalu", "kiribati",
    "palau", "nauru", "comoros", "djibouti", "bhutan", "brunei", "suriname",
    "eswatini", "lesotho", "timor-leste",
)

_STATE_ABBR = (
    "al", "ak", "az", "ar", "ca", "co", "ct", "de", "fl", "ga", "hi", "id",
    "il", "in", "ia", "ks", "ky", "la", "me", "md", "ma", "mi", "mn", "ms",
    "mo", "mt", "ne", "nv", "nh", "nj", "nm", "ny", "nc", "nd", "oh", "ok",
    "or", "pa", "ri", "sc", "sd", "tn", "tx", "ut", "vt", "va", "wa", "wv",
    "wi", "wy",
)

_STATE_FULL = (
    "alabama", "alaska", "arizona", "arkansas", "california", "colorado",
    "connecticut", "delaware", "florida", "georgia", "hawaii", "idaho",
    "illinois", "indiana", "iowa", "kansas", "kentucky", "louisiana", "maine",
    "maryland", "massachusetts", "michigan", "minnesota", "mississippi",
    "missouri", "montana", "nebraska", "nevada", "new hampshire", "new jersey",
    "new mexico", "new york", "north carolina", "north dakota", "ohio",
    "oklahoma", "oregon", "pennsylvania", "rhode island", "south carolina",
    "south dakota", "tennessee", "texas", "utah", "vermont", "virginia",
    "washington", "west virginia", "wisconsin", "wyoming",
)

_MONTHS = (
    "january", "february", "march", "april", "may", "june", "july", "august",
    "september", "october", "november", "december",
)
_WEEKDAYS = ("monday", "tuesday", "wednesday", "thursday", "friday", "saturday", "sunday")
_COLORS = (
    "red", "blue", "green", "yellow", "orange", "purple", "black", "white",
    "brown", "pink", "gray", "cyan", "magenta", "violet", "beige", "maroon",
)
_COLORS_UNCOMMON = ("chartreuse", "vermilion", "cerulean", "ochre", "taupe", "mauve")
_LANGUAGES = (
    "english", "french", "german", "spanish", "italian", "portuguese", "dutch",
    "russian", "chinese", "japanese", "korean", "arabic", "hindi", "turkish",
    "polish", "swedish", "greek", "hebrew", "thai", "vietnamese",
)
_LANGUAGES_UNCOMMON = ("quechua", "xhosa", "maltese", "faroese", "sami", "guarani")
_CURRENCIES = (
    "usd", "eur", "gbp", "jpy", "cny", "chf", "cad", "aud", "sek", "nok",
    "dkk", "inr", "brl", "mxn", "krw", "sgd", "hkd", "nzd", "zar", "pln",
)
_POSITIONS = ("defender", "midfield", "goalkeeper", "striker", "forward", "winger", "sweeper")
_POSITIONS_UNCOMMON = ("libero", "trequartista", "regista")
_RACE = ("white", "black", "asian", "hispanic", "others", "native american", "pacific islander")
_SEX = ("female", "male")
_YES_NO = ("yes", "no")
_FACILITY = (
    "restaurant", "school", "grocery store", "bakery", "hospital", "catering",
    "daycare", "pharmacy", "liquor store", "mobile food", "cafe", "tavern",
)
_FACILITY_UNCOMMON = ("children's service facility", "shared kitchen user", "golden diner")
_HOSPITAL_TYPE = (
    "acute care hospitals", "critical access hospitals", "childrens hospital",
    "psychiatric hospital", "rehabilitation hospital",
)
_SEGMENTS = ("building", "automobile", "machinery", "household", "furniture")
_PRODUCT_CAT = (
    "electronics", "clothing", "toys", "garden", "kitchen", "sports",
    "books", "music", "grocery", "beauty", "automotive", "office",
)

# Large synthetic NL vocabularies (deterministic)
_CITIES_COMMON = _word_list(101, 160)
_CITIES_UNCOMMON = _word_list(102, 160, exclude=_CITIES_COMMON)
_FIRST_COMMON = _word_list(103, 140)
_FIRST_UNCOMMON = _word_list(104, 140, exclude=_FIRST_COMMON)
_LAST_COMMON = _word_list(105, 140)
_LAST_UNCOMMON = _word_list(106, 140, exclude=_LAST_COMMON)
_COMPANY_COMMON = tuple(w + s for w, s in zip(_word_list(107, 120), ["corp", "inc", "ltd", "group"] * 30))
_COMPANY_UNCOMMON = tuple(w + s for w, s in zip(_word_list(108, 120), ["llc", "co", "gmbh", "plc"] * 30))


def _full_names(seed: int, n: int, firsts: tuple[str, ...], lasts: tuple[str, ...]) -> tuple[str, ...]:
    rng = np.random.default_rng(seed)
    return tuple(
        f"{firsts[rng.integers(0, len(firsts))]} {lasts[rng.integers(0, len(lasts))]}"
        for _ in range(n)
    )


_FULL_COMMON = _full_names(109, 200, _FIRST_COMMON, _LAST_COMMON)
_FULL_UNCOMMON = _full_names(110, 200, _FIRST_UNCOMMON, _LAST_UNCOMMON)


# ---------------------------------------------------------------------------
# Code-domain generators
# ---------------------------------------------------------------------------

def _gen_date(rng: np.random.Generator, n: int) -> list[str]:
    return [
        f"{rng.integers(1, 13)}/{rng.integers(1, 29)}/{rng.integers(1990, 2026)}"
        for _ in range(n)
    ]


def _gen_date_short(rng: np.random.Generator, n: int) -> list[str]:
    return [
        f"{rng.integers(1, 13)}/{rng.integers(1, 29)}/{rng.integers(0, 100):02d}"
        for _ in range(n)
    ]


def _gen_time(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(0, 24):02d}:{rng.integers(0, 60):02d}:{rng.integers(0, 60):02d}" for _ in range(n)]


def _gen_url(rng: np.random.Generator, n: int) -> list[str]:
    hosts = ("twitter.com", "example.com", "data.gov", "github.com", "archive.org")
    return [
        f"https://{hosts[rng.integers(0, len(hosts))]}/{_word(rng)}/status/{rng.integers(10**8, 10**9)}"
        for _ in range(n)
    ]


def _gen_email(rng: np.random.Generator, n: int) -> list[str]:
    hosts = ("gmail.com", "outlook.com", "yahoo.com", "corp.net")
    return [f"{_word(rng)}.{_word(rng)}@{hosts[rng.integers(0, len(hosts))]}" for _ in range(n)]


def _gen_ipv4(rng: np.random.Generator, n: int) -> list[str]:
    return [".".join(str(rng.integers(0, 256)) for _ in range(4)) for _ in range(n)]


def _gen_zip(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(0, 100000):05d}" for _ in range(n)]


def _gen_phone(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(200, 999)}-{rng.integers(200, 999)}-{rng.integers(0, 10000):04d}" for _ in range(n)]


def _luhn_body_sum(body: list[int]) -> int:
    """Luhn sum of the payload digits assuming a check digit will be
    appended: counting from the right of the *full* number, the check digit
    is position 0 (not doubled), so the body's rightmost digit is doubled."""
    total = 0
    for i, d in enumerate(reversed(body)):
        if i % 2 == 0:
            d *= 2
            if d > 9:
                d -= 9
        total += d
    return total


def _gen_credit_card(rng: np.random.Generator, n: int) -> list[str]:
    out = []
    for _ in range(n):
        body = [int(rng.integers(0, 10)) for _ in range(15)]
        check = (10 - _luhn_body_sum(body) % 10) % 10
        out.append("".join(map(str, body + [check])))
    return out


def _gen_fiscal_year(rng: np.random.Generator, n: int) -> list[str]:
    return [f"fy{rng.integers(10, 30)}" for _ in range(n)]


def _gen_movie_id(rng: np.random.Generator, n: int) -> list[str]:
    return [f"tt{rng.integers(0, 10**7):07d}" for _ in range(n)]


def _gen_contract_no(rng: np.random.Generator, n: int) -> list[str]:
    return [f"b{rng.integers(5 * 10**7, 6 * 10**7)}" for _ in range(n)]


def _gen_order_num(rng: np.random.Generator, n: int) -> list[str]:
    return [f"num{rng.integers(0, 10**6):06d}" for _ in range(n)]


def _gen_article_number(rng: np.random.Generator, n: int) -> list[str]:
    suf = ("spp", "pek", "ksv", "ppv", "wiv", "kst")
    return [
        "-".join(f"{rng.integers(0, 100):02d}" for _ in range(5)) + "-" + suf[rng.integers(0, len(suf))]
        for _ in range(n)
    ]


def _gen_gene(rng: np.random.Generator, n: int) -> list[str]:
    out = []
    for _ in range(n):
        if rng.random() < 0.8:
            letters = "".join(rng.choice(list(string.ascii_uppercase), rng.integers(3, 7)))
            out.append(f"{letters}{rng.integers(0, 100)}")
        else:  # minority clone-style ids like RP11-6L6.2
            out.append(f"RP{rng.integers(1, 20)}-{rng.integers(1, 900)}L{rng.integers(1, 9)}.{rng.integers(1, 9)}")
    return out


def _gen_web_domain(rng: np.random.Generator, n: int) -> list[str]:
    tlds = ("com", "net", "org", "info", "com.hk", "co.uk")
    return [f"{_word(rng)}.{tlds[rng.integers(0, len(tlds))]}" for _ in range(n)]


def _gen_duration(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(60, 200)} min" for _ in range(n)]


def _gen_sample_size(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(0, 500)} patients" for _ in range(n)]


def _gen_measurement(rng: np.random.Generator, n: int) -> list[str]:
    units = ("oz", "ml", "kg", "lb", "cm")
    return [f"{rng.integers(1, 100)} {units[rng.integers(0, len(units))]}" for _ in range(n)]


def _gen_product_code(rng: np.random.Generator, n: int) -> list[str]:
    return [
        "".join(rng.choice(list(string.ascii_lowercase), 3)) + str(rng.integers(100, 9999))
        for _ in range(n)
    ]


def _gen_price(rng: np.random.Generator, n: int) -> list[str]:
    return [f"${rng.integers(1, 2000)}.{rng.integers(0, 100):02d}" for _ in range(n)]


def _gen_percent(rng: np.random.Generator, n: int) -> list[str]:
    return [f"{rng.integers(0, 100)}.{rng.integers(0, 10)}%" for _ in range(n)]


# Mixed domains: enumerable vocab with a dominant pattern + legit minority.
_AGE_GROUPS = ("16-18", "19-24", "25-29", "30-34", "35-54", "55-64", "65 & above")
_PAY_RANGES = (
    "less than $50k", "$50-100k", "$100-200k", "$200-300k", "$300-500k",
    "$500-700k", "$700-900k", "above $900k",
)


def _gen_unit_mixed(rng: np.random.Generator, n: int) -> list[str]:
    out = []
    for _ in range(n):
        if rng.random() < 0.85:
            out.append(f"{rng.integers(1, 40)} oz")
        else:
            out.append(f"0.{rng.integers(1, 100):02d}%")
    return out


_MONTH_ABBR = ("jan", "feb", "mar", "apr", "may", "jun", "jul", "aug", "sep", "oct", "nov", "dec")

_CODE_SEPS = ("-", ".", "_", "/", ":", "")


def _code_segment(rng: np.random.Generator, kind: str) -> str:
    n = int(rng.integers(2, 6))
    if kind == "d":
        return "".join(str(rng.integers(0, 10)) for _ in range(n))
    return "".join(_CONS[rng.integers(0, len(_CONS))] for _ in range(n))


def _code_template(rng: np.random.Generator) -> tuple[tuple[str, ...], str]:
    """A column-specific code template: 2-4 segments of digit/alpha kind
    joined by one separator — the syntactic *shape* is template-specific."""
    k = int(rng.integers(2, 5))
    kinds = tuple("d" if rng.random() < 0.6 else "a" for _ in range(k))
    return kinds, _CODE_SEPS[rng.integers(0, len(_CODE_SEPS))]


def _gen_code_mixed(rng: np.random.Generator, n: int) -> list[str]:
    """Column-specific code domain with a legitimate minority format:
    ~90% of values follow one random template, ~10% a second one. Dilutes
    pattern-co-occurrence detectors the way real proprietary code columns
    do (paper Fig. 11): the pair of shapes is essentially unique per column,
    so no corpus statistic can bless the minority format."""
    maj = _code_template(rng)
    mino = _code_template(rng)
    out = []
    for _ in range(n):
        kinds, sep = maj if rng.random() < 0.85 else mino
        out.append(sep.join(_code_segment(rng, k) for k in kinds))
    return out


def _gen_date_mixed(rng: np.random.Generator, n: int) -> list[str]:
    """Dates with a dominant m/d/yyyy format and a legitimate textual
    minority ("jan 3 2020") — a validator/pattern false-positive trap."""
    out = []
    for _ in range(n):
        if rng.random() < 0.85:
            out.append(f"{rng.integers(1, 13)}/{rng.integers(1, 29)}/{rng.integers(1990, 2026)}")
        else:
            out.append(
                f"{_MONTH_ABBR[rng.integers(0, 12)]} {rng.integers(1, 29)} {rng.integers(1990, 2026)}"
            )
    return out


# ---------------------------------------------------------------------------
# The registry
# ---------------------------------------------------------------------------

DOMAINS: dict[str, DomainSpec] = {
    d.name: d
    for d in [
        # --- natural-language domains ---
        DomainSpec("country", "nl", _COUNTRIES_COMMON, _COUNTRIES_UNCOMMON),
        DomainSpec("state_abbr", "nl", _STATE_ABBR, ()),
        DomainSpec("state_full", "nl", _STATE_FULL, ()),
        DomainSpec("month", "nl", _MONTHS, ()),
        DomainSpec("weekday", "nl", _WEEKDAYS, ()),
        DomainSpec("color", "nl", _COLORS, _COLORS_UNCOMMON),
        DomainSpec("language", "nl", _LANGUAGES, _LANGUAGES_UNCOMMON),
        DomainSpec("currency_code", "nl", _CURRENCIES, ()),
        DomainSpec("city", "nl", _CITIES_COMMON, _CITIES_UNCOMMON),
        DomainSpec("first_name", "nl", _FIRST_COMMON, _FIRST_UNCOMMON),
        DomainSpec("last_name", "nl", _LAST_COMMON, _LAST_UNCOMMON),
        DomainSpec("full_name", "nl", _FULL_COMMON, _FULL_UNCOMMON),
        DomainSpec("company", "nl", _COMPANY_COMMON, _COMPANY_UNCOMMON),
        DomainSpec("position", "nl", _POSITIONS, _POSITIONS_UNCOMMON),
        DomainSpec("race", "nl", _RACE, ()),
        DomainSpec("sex", "nl", _SEX, ()),
        DomainSpec("yes_no", "nl", _YES_NO, ()),
        DomainSpec("facility_type", "nl", _FACILITY, _FACILITY_UNCOMMON),
        DomainSpec("hospital_type", "nl", _HOSPITAL_TYPE, ()),
        DomainSpec("mktsegment", "nl", _SEGMENTS, ()),
        DomainSpec("product_category", "nl", _PRODUCT_CAT, ()),
        # --- code domains ---
        DomainSpec("date", "code", generator=_gen_date, pattern_shape=r"\d+/\d+/\d+"),
        DomainSpec("date_short", "code", generator=_gen_date_short, pattern_shape=r"\d+/\d+/\d+"),
        DomainSpec("time", "code", generator=_gen_time, pattern_shape=r"\d+:\d+:\d+"),
        DomainSpec("url", "code", generator=_gen_url),
        DomainSpec("email", "code", generator=_gen_email),
        DomainSpec("ipv4", "code", generator=_gen_ipv4, pattern_shape=r"\d+.\d+.\d+.\d+"),
        DomainSpec("zip", "code", generator=_gen_zip, pattern_shape=r"\d+"),
        DomainSpec("phone", "code", generator=_gen_phone, pattern_shape=r"\d+-\d+-\d+"),
        DomainSpec("credit_card", "code", generator=_gen_credit_card, pattern_shape=r"\d+"),
        DomainSpec("fiscal_year", "code", generator=_gen_fiscal_year, pattern_shape=r"[a-z]+\d+"),
        DomainSpec("movie_id", "code", generator=_gen_movie_id, pattern_shape=r"[a-z]+\d+"),
        DomainSpec("contract_no", "code", generator=_gen_contract_no, pattern_shape=r"[a-z]+\d+"),
        DomainSpec("order_num", "code", generator=_gen_order_num, pattern_shape=r"[a-z]+\d+"),
        DomainSpec("article_number", "code", generator=_gen_article_number),
        DomainSpec("gene", "code", generator=_gen_gene),
        DomainSpec("web_domain", "code", generator=_gen_web_domain),
        DomainSpec("duration", "code", generator=_gen_duration, pattern_shape=r"\d+ [a-z]+"),
        DomainSpec("sample_size", "code", generator=_gen_sample_size, pattern_shape=r"\d+ [a-z]+"),
        DomainSpec("measurement", "code", generator=_gen_measurement, pattern_shape=r"\d+ [a-z]+"),
        DomainSpec("product_code", "code", generator=_gen_product_code, pattern_shape=r"[a-z]+\d+"),
        DomainSpec("price", "code", generator=_gen_price),
        DomainSpec("percent", "code", generator=_gen_percent),
        # --- mixed domains (dominant pattern + legit minority) ---
        DomainSpec("age_group", "mixed", _AGE_GROUPS, ()),
        DomainSpec("pay_range", "mixed", _PAY_RANGES, ()),
        DomainSpec("unit_mixed", "mixed", generator=_gen_unit_mixed),
        DomainSpec("date_mixed", "mixed", generator=_gen_date_mixed),
        DomainSpec("code_mixed", "mixed", generator=_gen_code_mixed, columnar=True),
    ]
}


def nl_domains() -> list[str]:
    return [d.name for d in DOMAINS.values() if d.kind == "nl"]


def code_domains() -> list[str]:
    return [d.name for d in DOMAINS.values() if d.kind == "code"]


def mixed_domains() -> list[str]:
    return [d.name for d in DOMAINS.values() if d.kind == "mixed"]


def domain_vocab(name: str) -> tuple[str, ...]:
    """Full enumerable vocabulary of a domain (common + uncommon tiers)."""
    d = DOMAINS[name]
    return d.common + d.uncommon
