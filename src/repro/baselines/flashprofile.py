"""FlashProfile-style profiler (Padhi et al., OOPSLA'18).

FlashProfile clusters syntactically-similar values and synthesizes one
pattern per cluster.  We cluster by level-1 skeleton (a faithful proxy
for its syntactic dissimilarity metric on machine-generated data) and
emit, per cluster, the most specific aligned pattern: constants where
uniform, fixed-length classes where lengths agree, length-ranged
classes otherwise.  The union of cluster patterns is the profile.
"""
from __future__ import annotations

import re
from typing import List, Optional, Sequence

from repro.baselines.base import RegexRule
from repro.patterns.generate import _aligned_segment_texts, skeleton_groups
from repro.patterns.tokens import SYMBOL, lex

_RUN_RE = {"D": "[0-9]", "L": "[A-Za-z]"}


def _segment_regex(cls: str, texts: Sequence[str]) -> str:
    distinct = list(dict.fromkeys(texts))
    if len(distinct) == 1:
        return re.escape(distinct[0])
    if cls == SYMBOL:
        chars = sorted({ch for t in distinct for ch in t})
        return "[" + re.escape("".join(chars)) + "]+"
    run_lists = [lex(t) for t in distinct]
    shapes = {tuple(r.cls for r in rl) for rl in run_lists}
    if len(shapes) == 1:
        shape = next(iter(shapes))
        parts = []
        for i, rcls in enumerate(shape):
            runs = [rl[i].text for rl in run_lists]
            if len(set(runs)) == 1:
                parts.append(re.escape(runs[0]))
                continue
            lo, hi = min(map(len, runs)), max(map(len, runs))
            quant = "{%d}" % lo if lo == hi else "{%d,%d}" % (lo, hi)
            parts.append(_RUN_RE[rcls] + quant)
        return "".join(parts)
    lo, hi = min(map(len, distinct)), max(map(len, distinct))
    quant = "{%d}" % lo if lo == hi else "{%d,%d}" % (lo, hi)
    return "[A-Za-z0-9]" + quant


def fit(train_values: Sequence[str], ctx=None) -> Optional[RegexRule]:
    vals = [v for v in train_values if v]
    if not vals:
        return None
    regexes: List[str] = []
    for group_vals in skeleton_groups(vals).values():
        aligned = _aligned_segment_texts(list(dict.fromkeys(group_vals)))
        if aligned is None:  # pragma: no cover
            continue
        regexes.append(
            "".join(_segment_regex(cls, texts) for cls, texts in aligned)
        )
    if not regexes:
        return None
    return RegexRule(tuple(regexes))
