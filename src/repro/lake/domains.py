"""Domain library for the synthetic data lake.

Each :class:`Domain` is one "underlying data-domain" in the paper's
sense (§1, Figure 3): a space of valid machine-generated values with a
ground-truth validation pattern.  Generators are deterministic in the
supplied ``numpy`` Generator so corpora are reproducible.

Domain families mirror the kinds the paper highlights: proprietary
timestamps, knowledge-base entity ids, ads-delivery statuses, GUIDs,
locales, versions, plus composite concatenations (Figure 8) and
natural-language columns (the ~33-43% the paper excludes from
pattern-based validation).

``truth_pattern`` is the canonical form of the ideal validation
pattern (used for the Table 2 ground-truth evaluation); for NL domains
it is ``None``.
"""
from __future__ import annotations

from dataclasses import dataclass, field
from typing import Callable, Dict, List, Optional

import numpy as np

Gen = Callable[[np.random.Generator, int], List[str]]


@dataclass(frozen=True)
class Domain:
    """One underlying data-domain with a ground-truth pattern."""

    name: str
    gen: Gen
    truth_pattern: Optional[str]
    #: relative share of corpus columns drawn from this domain
    weight: float = 1.0
    #: natural-language content — not amenable to pattern validation
    nl: bool = False


# ---------------------------------------------------------------------------
# atomic machine-generated domains
# ---------------------------------------------------------------------------

_MONTHS = ["Jan", "Feb", "Mar", "Apr", "May", "Jun",
           "Jul", "Aug", "Sep", "Oct", "Nov", "Dec"]


def _date_slash(rng, n):
    m = rng.integers(1, 13, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(1995, 2026, n)
    return [f"{a}/{b}/{c}" for a, b, c in zip(m, d, y)]


def _date_iso(rng, n):
    m = rng.integers(1, 13, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(1995, 2026, n)
    return [f"{c:04d}-{a:02d}-{b:02d}" for a, b, c in zip(m, d, y)]


def _date_mon(rng, n):
    mi = rng.integers(0, 12, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(1995, 2026, n)
    return [f"{_MONTHS[i]} {b:02d} {c}" for i, b, c in zip(mi, d, y)]


def _time_hms(rng, n):
    h = rng.integers(0, 24, n)
    m = rng.integers(0, 60, n)
    s = rng.integers(0, 60, n)
    return [f"{a}:{b:02d}:{c:02d}" for a, b, c in zip(h, m, s)]


def _datetime_12h(rng, n):
    mo = rng.integers(1, 13, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(2010, 2026, n)
    h = rng.integers(1, 13, n)
    mi = rng.integers(0, 60, n)
    s = rng.integers(0, 60, n)
    ap = rng.choice(["AM", "PM"], n)
    return [
        f"{a}/{b}/{c} {d_}:{e:02d}:{f:02d} {g}"
        for a, b, c, d_, e, f, g in zip(mo, d, y, h, mi, s, ap)
    ]


def _timestamp_iso(rng, n):
    m = rng.integers(1, 13, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(2010, 2026, n)
    h = rng.integers(0, 24, n)
    mi = rng.integers(0, 60, n)
    s = rng.integers(0, 60, n)
    return [
        f"{c:04d}-{a:02d}-{b:02d}T{d_:02d}:{e:02d}:{f:02d}Z"
        for a, b, c, d_, e, f in zip(m, d, y, h, mi, s)
    ]


_HEX = np.array(list("0123456789abcdef"))


def _hex_str(rng, n, k):
    idx = rng.integers(0, 16, (n, k))
    return ["".join(_HEX[row]) for row in idx]


def _guid(rng, n):
    parts = [_hex_str(rng, n, k) for k in (8, 4, 4, 4, 12)]
    return ["-".join(p) for p in zip(*parts)]


def _hex16(rng, n):
    return _hex_str(rng, n, 16)


_B36 = np.array(list("0123456789abcdefghijklmnopqrstuvwxyz"))


def _kb_entity(rng, n):
    # Bing/Freebase-style knowledge-base ids: /m/0<base36>{5-7}
    ln = rng.integers(5, 8, n)
    return [
        "/m/0" + "".join(_B36[rng.integers(0, 36, k)]) for k in ln
    ]


_LANGS = ["en", "fr", "de", "es", "pt", "zh", "ja", "ko", "it", "nl", "sv", "pl"]
_REGIONS = ["US", "GB", "FR", "DE", "ES", "BR", "CN", "JP", "KR", "IT", "NL", "SE"]


def _locale(rng, n):
    li = rng.integers(0, len(_LANGS), n)
    ri = rng.integers(0, len(_REGIONS), n)
    return [f"{_LANGS[a]}-{_REGIONS[b]}" for a, b in zip(li, ri)]


def _ip4(rng, n):
    o = rng.integers(0, 256, (n, 4))
    return [".".join(str(x) for x in row) for row in o]


def _version(rng, n):
    a = rng.integers(1, 20, n)
    b = rng.integers(0, 10, n)
    c = rng.integers(0, 20000, n)
    d = rng.integers(0, 10, n)
    return [f"{w}.{x}.{y}.{z}" for w, x, y, z in zip(a, b, c, d)]


_ADS_STATUS = ["Delivered", "Throttled", "Filtered", "Suspended", "Pending"]
_BOOKING_STATUS = ["OnBooking", "Completed", "Cancelled", "InProgress", "Failed"]


def _enum_gen(options):
    def gen(rng, n):
        idx = rng.integers(0, len(options), n)
        return [options[i] for i in idx]

    return gen


def _int_id8(rng, n):
    return [f"{x:08d}" for x in rng.integers(0, 10**8, n)]


def _int_seq(rng, n):
    return [str(x) for x in rng.integers(1, 10**6, n)]


def _float2(rng, n):
    return [f"{x:.2f}" for x in rng.random(n) * 10000]


def _percent(rng, n):
    return [f"{x:.1f}%" for x in rng.random(n) * 100]


def _currency(rng, n):
    return [f"${x:.2f}" for x in rng.random(n) * 5000]


def _yyyymm(rng, n):
    y = rng.integers(2000, 2026, n)
    m = rng.integers(1, 13, n)
    return [f"{a:04d}{b:02d}" for a, b in zip(y, m)]


def _mac(rng, n):
    parts = [_hex_str(rng, n, 2) for _ in range(6)]
    return [":".join(p) for p in zip(*parts)]


_HOSTS = ["contoso", "fabrikam", "adatum", "northwind", "tailspin"]


def _email_machine(rng, n):
    hi = rng.integers(0, len(_HOSTS), n)
    uid = rng.integers(0, 10**6, n)
    return [f"user{u}@{_HOSTS[h]}.com" for u, h in zip(uid, hi)]


_API_SEGMENTS = ["users", "orders", "items", "events", "sessions"]


def _url_path(rng, n):
    si = rng.integers(0, len(_API_SEGMENTS), n)
    v = rng.integers(1, 4, n)
    i = rng.integers(0, 10**6, n)
    return [f"/api/v{a}/{_API_SEGMENTS[b]}/{c}" for a, b, c in zip(v, si, i)]


_UPPER = np.array(list("ABCDEFGHIJKLMNOPQRSTUVWXYZ"))


def _code_dash(rng, n):
    li = rng.integers(0, 26, (n, 2))
    d = rng.integers(0, 10**4, n)
    return ["".join(_UPPER[row]) + f"-{x:04d}" for row, x in zip(li, d)]


def _flight(rng, n):
    li = rng.integers(0, 26, (n, 2))
    d = rng.integers(1, 10000, n)
    return ["".join(_UPPER[row]) + str(x) for row, x in zip(li, d)]


def _zip5(rng, n):
    return [f"{x:05d}" for x in rng.integers(0, 10**5, n)]


def _phone(rng, n):
    a = rng.integers(200, 1000, n)
    b = rng.integers(200, 1000, n)
    c = rng.integers(0, 10**4, n)
    return [f"({x}) {y}-{z:04d}" for x, y, z in zip(a, b, c)]


def _unix_ts(rng, n):
    return [str(x) for x in rng.integers(10**9, 2 * 10**9, n)]


def _file_path(rng, n):
    di = rng.integers(0, len(_API_SEGMENTS), n)
    i = rng.integers(0, 10**5, n)
    return [f"/data/{_API_SEGMENTS[d]}/file{x}.csv" for d, x in zip(di, i)]


def _token12(rng, n):
    idx = rng.integers(0, 36, (n, 12))
    chars = np.array(list("0123456789ABCDEFGHIJKLMNOPQRSTUVWXYZ"))
    return ["".join(chars[row]) for row in idx]


def _ticket(rng, n):
    return [f"INC{x:07d}" for x in rng.integers(0, 10**7, n)]


def _week_iso(rng, n):
    y = rng.integers(2000, 2026, n)
    w = rng.integers(1, 54, n)
    return [f"{a}-W{b:02d}" for a, b in zip(y, w)]


def _lat_lon(rng, n):
    # latitude kept unsigned so the level-1 skeleton is stable; the
    # longitude sign varies mid-string (",-") which <sym>+ absorbs
    lat = rng.random(n) * 90
    lon = rng.random(n) * 360 - 180
    return [f"{a:.4f},{b:.4f}" for a, b in zip(lat, lon)]


# ---------------------------------------------------------------------------
# composite domains (paper §3, Figure 8): concatenations of atomic parts
# ---------------------------------------------------------------------------

def _composite(parts: List[Gen], sep: str) -> Gen:
    def gen(rng, n):
        cols = [p(rng, n) for p in parts]
        return [sep.join(vals) for vals in zip(*cols)]

    return gen


def _dt_mdy_hms(rng, n):
    mo = rng.integers(1, 13, n)
    d = rng.integers(1, 29, n)
    y = rng.integers(2010, 2026, n)
    h = rng.integers(0, 24, n)
    mi = rng.integers(0, 60, n)
    s = rng.integers(0, 60, n)
    return [
        f"{a:02d}/{b:02d}/{c} {d_:02d}:{e:02d}:{f:02d}"
        for a, b, c, d_, e, f in zip(mo, d, y, h, mi, s)
    ]


_booking_composite = _composite(
    [_float2, _dt_mdy_hms, _dt_mdy_hms, _enum_gen(_BOOKING_STATUS)], "|"
)
_ads_log_composite = _composite(
    [_int_seq, _enum_gen(_ADS_STATUS), _timestamp_iso], "|"
)
_metric_composite = _composite([_date_iso, _time_hms, _float2, _percent], " ")
_session_composite = _composite([_hex16, _unix_ts, _ip4], ";")


# ---------------------------------------------------------------------------
# natural-language domains (excluded from pattern-based validation)
# ---------------------------------------------------------------------------

_COMPANY_A = ["Contoso", "Fabrikam", "Adatum", "Northwind", "Tailspin", "Proseware",
              "Woodgrove", "Litware", "Coho", "Lamna"]
_COMPANY_B = ["Ltd", "Inc", "LLC", "Corp", "Group", "Holdings", "& Sons", "Partners"]
_FIRST = ["James", "Mary", "Wei", "Aisha", "Carlos", "Yuki", "Priya", "Olga",
          "Liam", "Fatima", "Noah", "Emma"]
_LAST = ["Smith", "Garcia", "Chen", "Patel", "Kim", "Okafor", "Ivanov",
         "Dubois", "Silva", "Nguyen"]
_DEPTS = ["Human Resources", "Corporate Finance", "Field Sales",
          "Research and Development", "Customer Support",
          "Information Technology", "Legal Affairs", "Product Marketing"]
_CITIES = ["New York", "London", "Sao Paulo", "Tokyo", "Mumbai", "Berlin",
           "Cape Town", "Sydney", "Toronto", "Paris", "Mexico City", "Seoul"]
_WORDS = ["the", "quarterly", "report", "shows", "strong", "growth", "in",
          "regional", "sales", "despite", "supply", "issues", "for", "key",
          "product", "lines", "and", "improved", "margins"]


def _nl_pick2(a, b, sep=" "):
    def gen(rng, n):
        ia = rng.integers(0, len(a), n)
        ib = rng.integers(0, len(b), n)
        return [f"{a[x]}{sep}{b[y]}" for x, y in zip(ia, ib)]

    return gen


def _nl_sentence(rng, n):
    out = []
    for _ in range(n):
        k = rng.integers(4, 9)
        idx = rng.integers(0, len(_WORDS), k)
        out.append(" ".join(_WORDS[i] for i in idx))
    return out


def _nl_choice(options):
    return _enum_gen(options)


# ---------------------------------------------------------------------------
# registry
# ---------------------------------------------------------------------------

ALL_DOMAINS: List[Domain] = [
    # atomic machine-generated (weights approximate a popularity skew)
    Domain("date_slash", _date_slash, "<digit>+/<digit>+/<digit>{4}", 6.0),
    Domain("date_iso", _date_iso, "<digit>{4}-<digit>{2}-<digit>{2}", 6.0),
    Domain("date_mon", _date_mon, "<letter>{3} <digit>{2} <digit>{4}", 3.0),
    Domain("time_hms", _time_hms, "<digit>+:<digit>{2}:<digit>{2}", 4.0),
    Domain(
        "datetime_12h",
        _datetime_12h,
        "<digit>+/<digit>+/<digit>{4} <digit>+:<digit>{2}:<digit>{2} <letter>{2}",
        3.0,
    ),
    Domain(
        "timestamp_iso",
        _timestamp_iso,
        "<digit>{4}-<digit>{2}-<digit>{2}T<digit>{2}:<digit>{2}:<digit>{2}Z",
        4.0,
    ),
    Domain(
        "guid",
        _guid,
        "<alnum>{8}-<alnum>{4}-<alnum>{4}-<alnum>{4}-<alnum>{12}",
        5.0,
    ),
    Domain("hex16", _hex16, "<alnum>{16}", 3.0),
    Domain("kb_entity", _kb_entity, "/m/<alnum>+", 5.0),
    Domain("locale", _locale, "<letter>{2}-<letter>{2}", 4.0),
    Domain("ip4", _ip4, "<digit>+.<digit>+.<digit>+.<digit>+", 3.0),
    Domain("version", _version, "<digit>+.<digit>+.<digit>+.<digit>+", 2.0),
    Domain("ads_status", _enum_gen(_ADS_STATUS), "<letter>+", 3.0),
    Domain("booking_status", _enum_gen(_BOOKING_STATUS), "<letter>+", 3.0),
    # further pure single-word machine enums: production lakes contain
    # many of these, which is what keeps FPR_T(<letter>+) low despite
    # the occasional mixed natural-language column
    Domain("bool_str", _enum_gen(["TRUE", "FALSE"]), "<letter>+", 2.0),
    Domain(
        "log_level",
        _enum_gen(["TRACE", "DEBUG", "INFO", "WARN", "ERROR", "FATAL"]),
        "<letter>+",
        2.5,
    ),
    Domain(
        "weekday",
        _enum_gen(["Monday", "Tuesday", "Wednesday", "Thursday",
                   "Friday", "Saturday", "Sunday"]),
        "<letter>+",
        2.0,
    ),
    Domain(
        "country",
        _enum_gen(["France", "Germany", "Spain", "Japan", "Brazil",
                   "Canada", "India", "Australia", "Mexico", "Italy"]),
        "<letter>+",
        2.0,
    ),
    Domain(
        "color",
        _enum_gen(["Red", "Green", "Blue", "Yellow", "Black", "White"]),
        "<letter>+",
        1.5,
    ),
    Domain("int_id8", _int_id8, "<digit>{8}", 3.0),
    Domain("int_seq", _int_seq, "<digit>+", 5.0),
    Domain("float2", _float2, "<digit>+.<digit>{2}", 4.0),
    Domain("percent", _percent, "<digit>+.<digit>{1}%", 2.0),
    Domain("currency", _currency, "$<digit>+.<digit>{2}", 2.0),
    Domain("yyyymm", _yyyymm, "<digit>{6}", 2.0),
    Domain("mac", _mac, "<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}:<alnum>{2}", 1.5),
    Domain("email_machine", _email_machine, "user<digit>+@<letter>+.com", 2.0),
    Domain("url_path", _url_path, "/api/v<digit>{1}/<letter>+/<digit>+", 2.0),
    Domain("code_dash", _code_dash, "<letter>{2}-<digit>{4}", 3.0),
    Domain("flight", _flight, "<letter>{2}<digit>+", 2.5),
    Domain("zip5", _zip5, "<digit>{5}", 2.0),
    Domain("phone", _phone, "(<digit>{3}) <digit>{3}-<digit>{4}", 1.5),
    Domain("unix_ts", _unix_ts, "<digit>{10}", 2.0),
    Domain("file_path", _file_path, "/data/<letter>+/file<digit>+.csv", 1.5),
    Domain("token12", _token12, "<alnum>{12}", 2.5),
    Domain("ticket", _ticket, "INC<digit>{7}", 3.0),
    Domain("week_iso", _week_iso, "<digit>{4}-W<digit>{2}", 2.5),
    Domain("lat_lon", _lat_lon, "<digit>+.<digit>{4}<sym>+<digit>+.<digit>{4}", 1.5),
    Domain(
        "datetime_mdy_hms",
        _dt_mdy_hms,
        "<digit>{2}/<digit>{2}/<digit>{4} <digit>{2}:<digit>{2}:<digit>{2}",
        2.0,
    ),
    # composite domains (Figure 8 style) — wide columns
    Domain(
        "composite_booking",
        _booking_composite,
        "<digit>+.<digit>{2}|<digit>{2}/<digit>{2}/<digit>{4} "
        "<digit>{2}:<digit>{2}:<digit>{2}|<digit>{2}/<digit>{2}/<digit>{4} "
        "<digit>{2}:<digit>{2}:<digit>{2}|<letter>+",
        2.0,
    ),
    Domain(
        "composite_ads_log",
        _ads_log_composite,
        "<digit>+|<letter>+|<digit>{4}-<digit>{2}-<digit>{2}T"
        "<digit>{2}:<digit>{2}:<digit>{2}Z",
        2.0,
    ),
    Domain(
        "composite_metric",
        _metric_composite,
        "<digit>{4}-<digit>{2}-<digit>{2} <digit>+:<digit>{2}:<digit>{2} "
        "<digit>+.<digit>{2} <digit>+.<digit>{1}%",
        1.0,
    ),
    Domain(
        "composite_session",
        _session_composite,
        "<alnum>{16};<digit>{10};<digit>+.<digit>+.<digit>+.<digit>+",
        1.0,
    ),
    # natural-language domains (not pattern-validatable)
    Domain("nl_company", _nl_pick2(_COMPANY_A, _COMPANY_B), None, 4.0, nl=True),
    Domain("nl_person", _nl_pick2(_FIRST, _LAST), None, 4.0, nl=True),
    Domain("nl_dept", _nl_choice(_DEPTS), None, 3.0, nl=True),
    Domain("nl_city", _nl_choice(_CITIES), None, 1.5, nl=True),
    Domain("nl_text", _nl_sentence, None, 3.0, nl=True),
]

_BY_NAME: Dict[str, Domain] = {d.name: d for d in ALL_DOMAINS}


def domain_by_name(name: str) -> Domain:
    """Look up a domain by name (KeyError when unknown)."""
    return _BY_NAME[name]


def machine_domains() -> List[Domain]:
    """Domains with pattern-representable values (the paper's ~67%)."""
    return [d for d in ALL_DOMAINS if not d.nl]


def nl_domains() -> List[Domain]:
    return [d for d in ALL_DOMAINS if d.nl]


#: Ad-hoc special values a branch of production logic may emit (Figure 9).
SPECIAL_VALUES = ["N/A", "null", "-", "none", "__ERROR__", "unknown", "NaN"]
