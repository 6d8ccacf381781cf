"""Horizontal cuts — FMDV-H (paper §4).

The decision version of FMDV-H is NP-hard (Theorem 2); like the paper
we solve the practically-easy instances greedily: values whose coarse
patterns do not intersect the majority's are discarded (up to a ``θ``
fraction), then the basic FMDV runs on the conforming remainder.

Our greedy unit is the level-1 *skeleton group*: non-conforming
values ("N/A", "__ERROR__", …) virtually never share a skeleton with
the machine-generated majority, which is exactly the observation the
paper exploits ("patterns of non-conforming values often do not
intersect with those of normal values").
"""
from __future__ import annotations

from typing import List, Optional, Sequence, Tuple

from repro.patterns.generate import skeleton_groups


def conforming_majority(
    values: Sequence[str], theta: float
) -> Optional[List[str]]:
    """Largest skeleton group if it covers ≥ (1-θ) of values, else None.

    Equation (16): the selected hypothesis must match at least a
    ``1-θ`` fraction of the query column.
    """
    vals = list(values)
    if not vals:
        return None
    groups = skeleton_groups(vals)
    kept = max(groups.values(), key=len)
    if len(kept) / len(vals) >= 1.0 - theta:
        return kept
    return None


def nonconforming_fraction(values: Sequence[str], matcher) -> float:
    """θ_C(h): fraction of values not matched by the rule's pattern."""
    vals = list(values)
    if not vals:
        return 0.0
    bad = sum(1 for v in vals if not matcher(v))
    return bad / len(vals)
