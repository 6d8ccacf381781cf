"""Precision/recall evaluation harness (paper §5.1).

For every applicable case ``C_i``:

- ``P_A(C_i) = 1`` iff the rule learned on ``C_i^train`` raises no
  alarm on ``C_i^test`` (same column, future rows);
- ``R_A(C_i)`` = fraction of other cases ``C_j`` (j≠i) the rule flags
  (simulated schema-drift);
- recall is squashed to 0 whenever the case false-alarms.

The ground-truth variant (Table 2) additionally (1) scores precision
on the test rows minus injected dirt and (2) does not count
same-domain / same-truth-pattern columns as recall losses — both
adjustments the paper performed by hand, which our generator labels
make exact.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Callable, Dict, List, Optional, Sequence

from repro.eval.benchmark import Case
from repro.eval.methods import EvalContext


@dataclass
class CaseResult:
    col_id: int
    domain: str
    precision: float  # 0 or 1
    recall: float
    has_rule: bool

    @property
    def f1(self) -> float:
        if self.precision == 0 or self.recall == 0:
            return 0.0
        return 2 * self.precision * self.recall / (self.precision + self.recall)


@dataclass
class MethodScores:
    name: str
    precision: float
    recall: float
    cases: List[CaseResult]

    @property
    def f1(self) -> float:
        if self.precision + self.recall == 0:
            return 0.0
        return 2 * self.precision * self.recall / (self.precision + self.recall)


def _same_domain(a: Case, b: Case) -> bool:
    if a.domain == b.domain:
        return True
    return (
        a.truth_pattern is not None and a.truth_pattern == b.truth_pattern
    )


def evaluate_method(
    name: str,
    fit: Callable,
    cases: Sequence[Case],
    ctx: EvalContext,
    *,
    ground_truth: bool = False,
) -> MethodScores:
    """Run one method over the applicable cases of a benchmark."""
    applicable = [c for c in cases if c.applicable]
    rules = [fit(c.train, ctx) for c in applicable]
    results: List[CaseResult] = []
    n = len(applicable)
    for i, (case, rule) in enumerate(zip(applicable, rules)):
        if rule is None:
            # no rule learned: never alarms — vacuous precision, no recall
            results.append(CaseResult(case.col_id, case.domain, 1.0, 0.0, False))
            continue
        test_counts = (
            case.test_counts_clean if ground_truth else case.test_counts
        )
        precision = 1.0 if rule.validate_counts(test_counts) else 0.0
        flagged = 0
        denom = 0
        for j, other in enumerate(applicable):
            if j == i:
                continue
            if ground_truth and _same_domain(case, other):
                continue
            denom += 1
            if not rule.validate_counts(other.full_counts):
                flagged += 1
        recall = flagged / denom if denom else 0.0
        if precision == 0.0:
            recall = 0.0  # squash (paper: false-alarms void the rule)
        results.append(
            CaseResult(case.col_id, case.domain, precision, recall, True)
        )
    p = sum(r.precision for r in results) / len(results) if results else 0.0
    r = sum(r.recall for r in results) / len(results) if results else 0.0
    return MethodScores(name, p, r, results)


def evaluate_all(
    method_fits: Dict[str, Callable],
    cases: Sequence[Case],
    ctx: EvalContext,
    *,
    ground_truth: bool = False,
) -> Dict[str, MethodScores]:
    return {
        name: evaluate_method(name, fit, cases, ctx, ground_truth=ground_truth)
        for name, fit in method_fits.items()
    }
