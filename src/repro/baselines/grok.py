"""Grok-pattern baseline (§5.2).

Grok ships manually-curated regexes for *common* data types
(timestamps, IPs, UUIDs, …).  Validation: if every training value
matches one curated pattern, that pattern becomes the rule; columns in
proprietary formats find no match and get no rule — high precision,
low recall, exactly the paper's characterization.
"""
from __future__ import annotations

from typing import Optional, Sequence, Tuple

from repro.baselines.base import RegexRule

#: (name, anchored regex) — ordered specific → general so the first
#: full match is the tightest curated type.
GROK_PATTERNS: Tuple[Tuple[str, str], ...] = (
    ("UUID", r"[0-9a-fA-F]{8}-[0-9a-fA-F]{4}-[0-9a-fA-F]{4}-"
             r"[0-9a-fA-F]{4}-[0-9a-fA-F]{12}"),
    ("MAC", r"(?:[0-9a-fA-F]{2}:){5}[0-9a-fA-F]{2}"),
    ("IPV4", r"(?:\d{1,3}\.){3}\d{1,3}"),
    ("ISO8601", r"\d{4}-\d{2}-\d{2}T\d{2}:\d{2}:\d{2}(?:Z|[+-]\d{2}:?\d{2})?"),
    ("DATE_ISO", r"\d{4}-\d{2}-\d{2}"),
    ("DATE_US", r"\d{1,2}/\d{1,2}/\d{4}"),
    ("DATESTAMP_US", r"\d{1,2}/\d{1,2}/\d{4}[ T]\d{1,2}:\d{2}:\d{2}(?: [AP]M)?"),
    ("MONTHDAY_NAME", r"[A-Z][a-z]{2} \d{2} \d{4}"),
    ("TIME", r"\d{1,2}:\d{2}(?::\d{2})?"),
    ("EMAIL", r"[A-Za-z0-9._%+-]+@[A-Za-z0-9.-]+\.[A-Za-z]{2,}"),
    ("URIPATH", r"(?:/[A-Za-z0-9_.-]+)+/?"),
    ("VERSION", r"\d+(?:\.\d+){1,3}"),
    ("PERCENT", r"\d+(?:\.\d+)?%"),
    ("CURRENCY", r"\$\d+(?:\.\d{2})?"),
    ("HEX", r"(?:0x)?[0-9a-fA-F]{4,}"),
    ("ZIP", r"\d{5}(?:-\d{4})?"),
    ("PHONE_US", r"\(\d{3}\) \d{3}-\d{4}"),
    ("FLOAT", r"-?\d+\.\d+"),
    ("INT", r"-?\d+"),
    ("WORD", r"[A-Za-z]+"),
)


def fit(train_values: Sequence[str], ctx=None) -> Optional[RegexRule]:
    vals = [v for v in train_values if v]
    if not vals:
        return None
    import re

    for _, rx in GROK_PATTERNS:
        c = re.compile(rx)
        if all(c.fullmatch(v) for v in vals):
            return RegexRule((rx,))
    return None
