"""XSystem-style pattern profiler (Ilyas et al., ICDE'18).

XSystem builds branching token structures and merges per-character
class unions.  We reproduce its qualitative behaviour: values are
branched by length, and within a branch every character position is
generalized to the union of observed characters (literal → digit →
letter → explicit set).  The resulting profile is highly specific —
excellent for summarization, brittle for validation (the paper's
Figure 10 places XSystem at low precision/recall), because any new
length or new character at a position alarms.
"""
from __future__ import annotations

import re
from collections import defaultdict
from typing import Dict, List, Optional, Sequence

from repro.baselines.base import RegexRule


def _position_regex(chars: set) -> str:
    if len(chars) == 1:
        return re.escape(next(iter(chars)))
    if all(c.isdigit() for c in chars):
        return "[0-9]"
    if all(c.isalpha() for c in chars):
        return "[A-Za-z]"
    if all(c.isalnum() for c in chars):
        return "[A-Za-z0-9]"
    return "[" + re.escape("".join(sorted(chars))) + "]"


def fit(train_values: Sequence[str], ctx=None) -> Optional[RegexRule]:
    vals = [v for v in train_values if v]
    if not vals:
        return None
    by_len: Dict[int, List[str]] = defaultdict(list)
    for v in vals:
        by_len[len(v)].append(v)
    regexes = []
    for length, group in sorted(by_len.items()):
        positions = [set() for _ in range(length)]
        for v in group:
            for i, ch in enumerate(v):
                positions[i].add(ch)
        regexes.append("".join(_position_regex(p) for p in positions))
    return RegexRule(tuple(regexes))
