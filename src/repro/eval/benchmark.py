"""Benchmark construction (paper §5.1).

A benchmark ``B`` is a random sample of corpus columns; each case
splits chronologically: the first 10% of values are the observed
"training data" the rules are inferred from, the remaining 90% arrive
"in the future" and are validated.  Cases whose domain is natural
language are kept in the sample but marked inapplicable — the paper
reports on the pattern-applicable subset (571/1000 on T_E, 359/1000 on
T_G).
"""
from __future__ import annotations

import math
from collections import Counter
from dataclasses import dataclass, field
from typing import Dict, List, Optional, Sequence

import numpy as np

from repro.lake.corpus import ColumnMeta
from repro.lake.domains import domain_by_name

#: ground-truth pattern for the FD-generated dependent columns
_FD_TRUTH = "<letter>+"


@dataclass
class Case:
    """One benchmark query column with its 10/90 split."""

    col_id: int
    domain: str
    truth_pattern: Optional[str]
    applicable: bool
    values: List[str]
    dirty: List[bool]
    train: List[str] = field(init=False)
    test: List[str] = field(init=False)
    test_counts: Counter = field(init=False)
    test_counts_clean: Counter = field(init=False)
    full_counts: Counter = field(init=False)

    def __post_init__(self):
        k = max(1, math.ceil(0.1 * len(self.values)))
        self.train = self.values[:k]
        self.test = self.values[k:]
        self.test_counts = Counter(self.test)
        # ground-truth precision drops injected dirty rows from the test
        # portion (paper: "manually remove values that should not belong")
        self.test_counts_clean = Counter(
            v for v, d in zip(self.values[k:], self.dirty[k:]) if not d
        )
        self.full_counts = Counter(self.values)


def _truth_of(domain: str) -> Optional[str]:
    if domain == "fd_dependent":
        return _FD_TRUTH
    return domain_by_name(domain).truth_pattern


def _applicable(domain: str) -> bool:
    if domain == "fd_dependent":
        return True
    return not domain_by_name(domain).nl


def build_benchmark(
    columns: Sequence[ColumnMeta],
    n_cases: int,
    *,
    seed: int = 0,
    min_values: int = 20,
) -> List[Case]:
    """Sample ``n_cases`` query columns from the corpus."""
    rng = np.random.default_rng(seed)
    eligible = [c for c in columns if len(c.values) >= min_values]
    n = min(n_cases, len(eligible))
    idx = rng.choice(len(eligible), size=n, replace=False)
    cases = []
    for i in idx:
        c = eligible[int(i)]
        cases.append(
            Case(
                col_id=c.col_id,
                domain=c.domain,
                truth_pattern=_truth_of(c.domain),
                applicable=_applicable(c.domain),
                values=list(c.values),
                dirty=list(c.dirty),
            )
        )
    return cases
