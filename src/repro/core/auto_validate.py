"""Auto-Validate front-end: the four FMDV variants + validation rules.

``learn_rule(values, index, cfg, variant)`` trains a
:class:`ValidationRule` from the observed 10% of a column;
``rule.validate(test_values)`` applies it to future data.

Variants (paper §5.2):

- ``fmdv``    — basic (§2), strict validation (any non-match alarms);
- ``fmdv-v``  — vertical cuts (§3), strict validation;
- ``fmdv-h``  — horizontal cuts (§4), statistical validation via the
  two-sample homogeneity test;
- ``fmdv-vh`` — horizontal filter, then vertical DP, statistical
  validation.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import List, Optional, Sequence

from repro.core.fmdv import FMDVConfig, Solution, solve_fmdv
from repro.core.horizontal import conforming_majority, nonconforming_fraction
from repro.core.index import PatternIndex
from repro.core.stats import proportion_shift_pvalue
from repro.core.vertical import solve_fmdv_v
from repro.patterns.pattern import compile_canonical

VARIANTS = ("fmdv", "fmdv-v", "fmdv-h", "fmdv-vh")


@dataclass(frozen=True)
class ValidationRule:
    """A learned validation rule for one column.

    ``mode='strict'``: alarm on any non-matching value (FMDV / FMDV-V).
    ``mode='stat'``: alarm only when the non-conforming fraction has
    shifted significantly versus training (FMDV-H / FMDV-VH, §4).
    """

    pattern: str          # canonical pattern
    mode: str             # 'strict' | 'stat'
    theta_train: float    # non-conforming fraction observed at training
    n_train: int
    alpha: float = 0.01
    test: str = "fisher"
    fpr_estimate: float = 0.0
    coverage: int = 0

    def matches(self, value: str) -> bool:
        return compile_canonical(self.pattern).fullmatch(value) is not None

    def validate_counts(self, counts) -> bool:
        """Validate a column given as {distinct value: count}."""
        total = sum(counts.values())
        if total == 0:
            return True
        bad = sum(c for v, c in counts.items() if not self.matches(v))
        if self.mode == "strict":
            return bad == 0
        theta_test = bad / total
        if theta_test <= self.theta_train:
            return True
        k1 = round(self.theta_train * self.n_train)
        p = proportion_shift_pvalue(
            k1, self.n_train, bad, total, test=self.test
        )
        return p >= self.alpha

    def validate(self, values: Sequence[str]) -> bool:
        """True = column passes; False = alarm."""
        from collections import Counter

        return self.validate_counts(Counter(values))


def _rule_from_solution(
    sol: Solution, values: Sequence[str], mode: str, cfg: FMDVConfig
) -> ValidationRule:
    matcher = compile_canonical(sol.pattern.canonical())
    theta = nonconforming_fraction(values, lambda v: matcher.fullmatch(v))
    return ValidationRule(
        pattern=sol.pattern.canonical(),
        mode=mode,
        theta_train=theta,
        n_train=len(list(values)),
        alpha=cfg.alpha,
        test=cfg.test,
        fpr_estimate=sol.fpr,
        coverage=sol.cov,
    )


def learn_rule(
    values: Sequence[str],
    index: PatternIndex,
    cfg: FMDVConfig = FMDVConfig(),
    variant: str = "fmdv-vh",
) -> Optional[ValidationRule]:
    """Train a validation rule; None when no feasible pattern exists."""
    vals = [v for v in values if v is not None]
    if not vals:
        return None
    if variant == "fmdv":
        sol = solve_fmdv(vals, index, cfg)
        return _rule_from_solution(sol, vals, "strict", cfg) if sol else None
    if variant == "fmdv-v":
        sol = solve_fmdv_v(vals, index, cfg)
        return _rule_from_solution(sol, vals, "strict", cfg) if sol else None
    if variant in ("fmdv-h", "fmdv-vh"):
        kept = conforming_majority(vals, cfg.theta)
        if kept is None:
            return None
        solver = solve_fmdv if variant == "fmdv-h" else solve_fmdv_v
        sol = solver(kept, index, cfg)
        return _rule_from_solution(sol, vals, "stat", cfg) if sol else None
    raise ValueError(f"unknown variant {variant!r}")
