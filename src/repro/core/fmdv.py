"""FMDV — the basic FPR-minimizing data-validation solver (paper §2.3).

Given a query column ``C`` and the offline :class:`PatternIndex`, pick

    argmin_{h ∈ H(C)}  FPR_T(h)
    s.t.  FPR_T(h) ≤ r,   Cov_T(h) ≥ m        (Equations 5–7)

Patterns absent from the index have unknown (effectively zero)
coverage and are infeasible — this is how under-generalized patterns
(e.g. ``<digit>{1}`` months learned from a small sample) get rejected
even when no corpus column happens to contradict them directly.

Ties on FPR are broken towards *smaller coverage* (the more specific
pattern): among equally-safe hypotheses the tighter one catches more
drift, which is the spirit of the paper's CMDV dual.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence, Tuple

from repro.core.index import PatternIndex
from repro.patterns.generate import MAX_PATTERNS, hypothesis_patterns
from repro.patterns.pattern import Pattern


@dataclass(frozen=True)
class FMDVConfig:
    """Knobs shared by all FMDV variants (paper defaults scaled to the
    synthetic corpus — see DESIGN.md §2 for the m scaling argument)."""

    r: float = 0.1           # max corpus-estimated FPR (Eq. 6)
    m: int = 10              # min corpus coverage (Eq. 7)
    tau: int = 13            # max tokens indexed offline (§2.4)
    theta: float = 0.1       # FMDV-H tolerance (Eq. 16)
    alpha: float = 0.01      # significance for the drift test (§4)
    test: str = "fisher"     # 'fisher' | 'chi2'
    max_patterns: int = MAX_PATTERNS


@dataclass(frozen=True)
class Solution:
    """A feasible FMDV solution with its corpus-estimated scores."""

    pattern: Pattern
    fpr: float
    cov: int


def best_feasible(
    candidates: Sequence[Pattern], index: PatternIndex, cfg: FMDVConfig
) -> Optional[Solution]:
    """Minimize FPR over feasible candidates (ties → smaller coverage)."""
    best: Optional[Solution] = None
    for h in candidates:
        st = index.lookup(h.canonical())
        if st is None or st.cov < cfg.m or st.fpr > cfg.r:
            continue
        # '<=' keeps the later candidate on exact ties; candidates are
        # enumerated general→specific, so ties resolve to the most
        # specific equally-safe pattern (e.g. <digit>{4} over <digit>+
        # for a year position present in every date column).
        if best is None or (st.fpr, st.cov) <= (best.fpr, best.cov):
            best = Solution(h, st.fpr, st.cov)
    return best


def solve_fmdv(
    values: Sequence[str], index: PatternIndex, cfg: FMDVConfig
) -> Optional[Solution]:
    """Basic FMDV on a (assumed homogeneous) query column."""
    H = hypothesis_patterns(values, max_patterns=cfg.max_patterns)
    return best_feasible(H, index, cfg)
