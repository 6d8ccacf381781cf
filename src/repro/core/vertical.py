"""Vertical cuts — FMDV-V (paper §3).

A composite query column (Figure 8) is aligned segment-by-segment
(trivial MSA for identical skeletons, which machine-generated columns
have after horizontal filtering), then split into sub-columns by
dynamic programming over Equation (11):

    minFPR(C[s,e]) = min( direct-FMDV(C[s,e]),
                          min_t minFPR(C[s,t]) + minFPR(C[t+1,e]) )

Each chosen segment must satisfy the coverage constraint (Eq. 10);
the *sum* of segment FPRs must satisfy the global budget r (Eq. 9).
Spans wider than ``tau`` tokens cannot appear in the offline index and
are only solvable by splitting — which is exactly how the paper's
offline token-length cap is "compensated" online.

Deviation (documented in DESIGN.md): a span consisting solely of a
symbol run constant across all values (a delimiter like "|") is
validated as a free constant (FPR 0, no coverage requirement).  The
paper's 7M-column corpus supplies cross-column evidence for arbitrary
separator fragments; a synthetic lake cannot, and a constant delimiter
carries no generalization risk.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, List, Optional, Sequence, Tuple

from repro.core.fmdv import FMDVConfig, Solution
from repro.core.index import PatternIndex
from repro.patterns.generate import (
    _aligned_segment_texts,
    _ranked_product,
    _segment_options,
)
from repro.patterns.pattern import Pattern, Token
from repro.patterns.tokens import SYMBOL

_FREE_COV = 1 << 30  # coverage stand-in for free delimiter segments
_INF = float("inf")


@dataclass
class _Cell:
    """DP cell: best achievable FPR for a span + its segment patterns."""

    fpr: float
    parts: List[Solution]


def solve_fmdv_v(
    values: Sequence[str], index: PatternIndex, cfg: FMDVConfig
) -> Optional[Solution]:
    """FMDV with vertical cuts on a single-skeleton query column.

    Returns the composed (concatenated) pattern with the summed FPR and
    the min segment coverage, or None when no segmentation satisfies
    the constraints (including columns with mixed skeletons — those are
    the business of horizontal cuts).
    """
    vals = list(dict.fromkeys(values))
    if not vals or any(v == "" for v in vals):
        return None
    # §3: tokenize into coarse classes and multi-sequence-align before
    # cutting.  Our pattern language has no optional tokens, so only
    # gap-free alignments are usable (for machine-generated columns the
    # MSA is trivial — the paper's Example 7); gapped columns are the
    # business of horizontal cuts.
    from repro.core.align import gap_free, greedy_msa
    from repro.patterns.tokens import segments as _segments

    msa = greedy_msa([[s.cls for s in _segments(v)] for v in vals])
    if not gap_free(msa):
        return None
    aligned = _aligned_segment_texts(vals)
    if aligned is None:  # pragma: no cover - gap-free MSA implies aligned
        return None
    n = len(aligned)
    options = []
    widths = []
    free = []
    for cls, texts in aligned:
        opts, width = _segment_options(cls, texts)
        options.append(opts)
        widths.append(width)
        free.append(cls == SYMBOL and len(set(texts)) == 1)

    def direct(s: int, e: int) -> Optional[Solution]:
        if all(free[i] for i in range(s, e + 1)):
            text = "".join(aligned[i][1][0] for i in range(s, e + 1))
            return Solution(Pattern.of([Token.const(text)]), 0.0, _FREE_COV)
        if sum(widths[s : e + 1]) > cfg.tau:
            return None
        best: Optional[Solution] = None
        for combo in _ranked_product(options[s : e + 1], cfg.max_patterns):
            h = Pattern.of(tok for part in combo for tok in part)
            st = index.lookup(h.canonical())
            if st is None or st.cov < cfg.m:
                continue
            # '<=': most-specific equally-safe pattern wins (see fmdv.py)
            if best is None or (st.fpr, st.cov) <= (best.fpr, best.cov):
                best = Solution(h, st.fpr, st.cov)
        return best

    # bottom-up DP over spans (Equation 11)
    table: Dict[Tuple[int, int], _Cell] = {}
    for length in range(1, n + 1):
        for s in range(0, n - length + 1):
            e = s + length - 1
            cell = _Cell(_INF, [])
            d = direct(s, e)
            if d is not None:
                cell = _Cell(d.fpr, [d])
            for t in range(s, e):
                left, right = table[(s, t)], table[(t + 1, e)]
                if left.fpr + right.fpr < cell.fpr:
                    cell = _Cell(left.fpr + right.fpr, left.parts + right.parts)
            table[(s, e)] = cell

    final = table[(0, n - 1)]
    if final.fpr == _INF or final.fpr > cfg.r:
        return None
    pattern = final.parts[0].pattern
    for part in final.parts[1:]:
        pattern = pattern.concat(part.pattern)
    cov = min(p.cov for p in final.parts)
    return Solution(pattern, final.fpr, cov)
