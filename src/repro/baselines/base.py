"""Shared rule machinery for baseline methods.

Rules match values against regexes or dictionaries.  Validation runs
over *distinct values with counts* so that columns with many repeated
values (enums) cost one regex evaluation per distinct value.
"""
from __future__ import annotations

import re
from collections import Counter
from dataclasses import dataclass
from typing import Dict, List, Mapping, Sequence, Tuple


class CountingRule:
    """Mixin: ``validate(values)`` in terms of ``validate_counts``."""

    def validate(self, values: Sequence[str]) -> bool:
        return self.validate_counts(Counter(values))


@dataclass
class RegexRule(CountingRule):
    """Disjunction of anchored regexes; strict (any non-match alarms)."""

    regexes: Tuple[str, ...]

    def __post_init__(self):
        self._compiled = [re.compile(r) for r in self.regexes]

    def matches(self, value: str) -> bool:
        return any(c.fullmatch(value) is not None for c in self._compiled)

    def validate_counts(self, counts: Mapping[str, int]) -> bool:
        return all(self.matches(v) for v in counts)


@dataclass
class DictRule(CountingRule):
    """Dictionary rule (TFDV / Deequ-Cat at min_frac=1.0, Deequ-Fra below).

    Passes when at least ``min_frac`` of the (weighted) test values are
    inside the learned dictionary.
    """

    allowed: frozenset
    min_frac: float = 1.0

    def matches(self, value: str) -> bool:
        return value in self.allowed

    def validate_counts(self, counts: Mapping[str, int]) -> bool:
        total = sum(counts.values())
        if total == 0:
            return True
        inside = sum(c for v, c in counts.items() if v in self.allowed)
        if self.min_frac >= 1.0:
            return inside == total
        return inside / total >= self.min_frac
