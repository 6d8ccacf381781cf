"""Potter's Wheel pattern profiler (Raman & Hellerstein, VLDB'01).

PWheel picks the pattern minimizing *description length*: the cost of
the pattern itself plus the cost of encoding each value given the
pattern.  This is the canonical data-*profiling* objective the paper
contrasts with data-validation: on column C_1 of Figure 2 it happily
returns "Mar <digit>{2} 2019" — a great summary, a poor validator.

We reuse the reproduction's candidate enumeration as the structure
space and apply the MDL scoring; heterogeneous columns profile as a
disjunction of per-skeleton-group patterns (PWheel's structs support
unions of structures).
"""
from __future__ import annotations

import math
from typing import List, Optional, Sequence

from repro.baselines.base import RegexRule
from repro.patterns.generate import enumerate_consistent, skeleton_groups
from repro.patterns.pattern import CLASS, CONST, NUM, Pattern
from repro.patterns.tokens import ALNUM, DIGIT, LETTER, SYMBOL

#: bits per character by token class
_CHAR_BITS = {DIGIT: math.log2(10), LETTER: math.log2(52),
              ALNUM: math.log2(62), SYMBOL: math.log2(33)}
#: flat cost per pattern token (structure description)
_TOKEN_COST = 2.0


def _pattern_cost(p: Pattern) -> float:
    cost = 0.0
    for t in p.tokens:
        if t.kind == CONST:
            cost += _TOKEN_COST + 0.5 * len(t.text)
        else:
            cost += _TOKEN_COST
    return cost


def _data_cost(p: Pattern, values: Sequence[str]) -> float:
    """Encoding cost of values under p, approximated per token.

    Fixed-length class tokens cost ``k·bits``; unbounded tokens add a
    length header.  Constants are free.  The approximation charges each
    value its own length for '+' tokens (computed from the value's
    total length spread over non-constant tokens — exact per-token
    alignment is unnecessary for ranking patterns of the same column).
    """
    # character budget per value not covered by constants
    const_chars = sum(len(t.text) for t in p.tokens if t.kind == CONST)
    fixed = [(t.cls, t.length) for t in p.tokens
             if t.kind == CLASS and t.length is not None]
    plus = [t for t in p.tokens if (t.kind == CLASS and t.length is None)
            or t.kind == NUM]
    cost = 0.0
    fixed_chars = sum(k for _, k in fixed)
    fixed_cost = sum(k * _CHAR_BITS[cls] for cls, k in fixed)
    for v in values:
        cost += fixed_cost
        free_chars = max(0, len(v) - const_chars - fixed_chars)
        if plus:
            # length header + content bits at the loosest class rate
            cost += len(plus) * 2.0
            rate = max(
                _CHAR_BITS[t.cls] if t.kind == CLASS else _CHAR_BITS[DIGIT]
                for t in plus
            )
            cost += free_chars * rate
    return cost


#: bits to encode one escaped (pattern-non-conforming) character
_ESCAPE_BITS = 8.0
#: flat overhead per escaped value
_ESCAPE_HEADER = 4.0


def _escape_cost(values: Sequence[str]) -> float:
    return sum(_ESCAPE_HEADER + _ESCAPE_BITS * len(v) for v in values)


def mdl_best_pattern(values: Sequence[str]) -> Optional[Pattern]:
    """Single minimum-description-length pattern for a column.

    Potter's Wheel infers ONE structure per column; values the
    structure cannot express are encoded verbatim at escape cost.
    Candidates come from each skeleton group's consistent patterns;
    values outside the candidate's group pay the escape cost.
    """
    vals = list(dict.fromkeys(v for v in values if v))
    if not vals:
        return None
    best, best_cost = None, _escape_cost(vals)  # baseline: no structure
    for group_vals in skeleton_groups(vals).values():
        others = [v for v in vals if v not in set(group_vals)]
        esc = _escape_cost(others)
        for p in enumerate_consistent(list(dict.fromkeys(group_vals))):
            cost = _pattern_cost(p) + _data_cost(p, group_vals) + esc
            if cost < best_cost:
                best, best_cost = p, cost
    return best


def fit(train_values: Sequence[str], ctx=None) -> Optional[RegexRule]:
    """Profile the training values; strict validation with the result."""
    p = mdl_best_pattern(train_values)
    if p is None:
        return None
    return RegexRule((p.regex(),))
