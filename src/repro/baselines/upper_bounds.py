"""Recall upper-bound analyses: FD-UB and AD-UB (§5.2).

Both assume perfect precision and bound the achievable recall of an
orthogonal method family, exactly as the paper does:

- **FD-UB**: fraction of benchmark columns participating in any exact
  functional dependency with a sibling column of the same file;
- **AD-UB**: Auto-Detect needs *both* columns of a pair to exhibit
  common coarse patterns; its recall upper bound on case ``i`` is the
  fraction of other columns whose (common) pattern differs from
  ``i``'s common pattern.
"""
from __future__ import annotations

from collections import Counter
from typing import Dict, List, Optional, Sequence, Tuple

from repro.patterns.tokens import SYMBOL, lex


def coarse_signature(value: str) -> tuple:
    """Auto-Detect-style coarse pattern: run classes + literal symbols.

    Finer than the level-1 skeleton (distinguishes ``1/2/2019`` from
    ``2019-01-02``), coarse enough that every value of a domain maps to
    few signatures — the granularity Auto-Detect's co-occurrence
    statistics operate at.
    """
    return tuple(
        (r.cls, r.text) if r.cls == SYMBOL else (r.cls, None)
        for r in lex(value)
    )


def _functionally_determines(a: Sequence[str], b: Sequence[str]) -> bool:
    """Exact FD check A→B over row-aligned columns."""
    mapping: Dict[str, str] = {}
    for x, y in zip(a, b):
        if mapping.setdefault(x, y) != y:
            return False
    return True


def fd_participates(
    col_values: Sequence[str], siblings: Sequence[Sequence[str]]
) -> bool:
    """Does the column join an FD (either direction) with any sibling?

    Only row-aligned (equal-length) siblings are comparable.  Trivial
    FDs via all-distinct determinants are excluded: a key column
    determines everything, which carries no validation signal — the
    paper's "FDs inferred from instances may not hold semantically"
    caveat; we still count key→value pairs when the dependent side has
    repeats (the generated FD pairs in the lake are of this form with
    non-key determinants).
    """
    n = len(col_values)
    for sib in siblings:
        if len(sib) != n or n == 0:
            continue
        for det, dep in ((col_values, sib), (sib, col_values)):
            if len(set(det)) == n:  # all-distinct determinant: trivial
                continue
            if _functionally_determines(det, dep):
                return True
    return False


def fd_ub_recall(cases_in_fd: Sequence[bool]) -> float:
    """FD-UB recall: fraction of benchmark columns inside any FD."""
    if not cases_in_fd:
        return 0.0
    return sum(cases_in_fd) / len(cases_in_fd)


def common_patterns(
    columns: Sequence[Sequence[str]], min_columns: int = 20
) -> Counter:
    """Coarse patterns (majority skeletons) common across the corpus."""
    counts: Counter = Counter()
    for col in columns:
        if not col:
            continue
        top, top_n = Counter(coarse_signature(v) for v in col).most_common(1)[0]
        if top_n * 2 > len(col):
            counts[top] += 1
    return Counter({s: n for s, n in counts.items() if n >= min_columns})


def ad_ub_recall(case_skeletons: Sequence[Optional[tuple]],
                 common: Counter) -> float:
    """AD-UB average recall over benchmark cases.

    Case ``i`` can flag case ``j`` only if both majority patterns are
    common and they differ.
    """
    n = len(case_skeletons)
    if n < 2:
        return 0.0
    total = 0.0
    for i in range(n):
        si = case_skeletons[i]
        if si is None or si not in common:
            continue
        flagged = sum(
            1
            for j in range(n)
            if j != i
            and case_skeletons[j] is not None
            and case_skeletons[j] in common
            and case_skeletons[j] != si
        )
        total += flagged / (n - 1)
    return total / n
