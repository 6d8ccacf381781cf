"""SSIS Data-Profiling-task style regex profiler.

SQL Server Integration Services' column-pattern profile emits regexes
built from observed character classes with observed length ranges
(e.g. ``[0-9]{1,2}/[0-9]{1,2}/[0-9]{4}``).  Tight length ranges over
the observed sample make it a profiler, not a validator: lengths that
first appear in future data trigger alarms.
"""
from __future__ import annotations

import re
from typing import List, Optional, Sequence

from repro.baselines.base import RegexRule
from repro.patterns.generate import _aligned_segment_texts, skeleton_groups
from repro.patterns.tokens import SYMBOL

_CLASS_RE = {True: "[0-9]", False: "[A-Za-z0-9]"}


def _segment_regex(cls: str, texts: Sequence[str]) -> str:
    distinct = list(dict.fromkeys(texts))
    lo = min(len(t) for t in distinct)
    hi = max(len(t) for t in distinct)
    quant = "{%d}" % lo if lo == hi else "{%d,%d}" % (lo, hi)
    if cls == SYMBOL:
        if len(distinct) == 1:
            return re.escape(distinct[0])
        chars = sorted({ch for t in distinct for ch in t})
        return "[" + re.escape("".join(chars)) + "]" + quant
    if all(t.isdigit() for t in distinct):
        body = "[0-9]"
    elif all(t.isalpha() for t in distinct):
        body = "[A-Za-z]"
    else:
        body = "[A-Za-z0-9]"
    return body + quant


def fit(train_values: Sequence[str], ctx=None) -> Optional[RegexRule]:
    vals = [v for v in train_values if v]
    if not vals:
        return None
    regexes: List[str] = []
    for group_vals in skeleton_groups(vals).values():
        aligned = _aligned_segment_texts(list(dict.fromkeys(group_vals)))
        if aligned is None:  # pragma: no cover - same skeleton by grouping
            continue
        regexes.append(
            "".join(_segment_regex(cls, texts) for cls, texts in aligned)
        )
    if not regexes:
        return None
    return RegexRule(tuple(regexes))
