"""Two-sample homogeneity tests (paper §4, "Distributional test").

The paper compares the non-conforming fraction at training time
(``k1/n1``) against test time (``k2/n2``) with *Fisher's exact test*
and *Pearson's χ² with Yates correction*, flagging the test column only
when the null hypothesis (same binomial) is rejected.  scipy is not
available offline, so both tests are implemented here from first
principles (log-gamma hypergeometric PMF; erfc-based χ²(1) survival
function) and unit-tested against published values.
"""
from __future__ import annotations

import math
from functools import lru_cache


@lru_cache(maxsize=1 << 16)
def _lchoose(n: int, k: int) -> float:
    if k < 0 or k > n:
        return float("-inf")
    return math.lgamma(n + 1) - math.lgamma(k + 1) - math.lgamma(n - k + 1)


def _hypergeom_logpmf(k: int, M: int, K: int, n: int) -> float:
    """log P[X = k] for X ~ Hypergeom(M population, K successes, n draws)."""
    return _lchoose(K, k) + _lchoose(M - K, n - k) - _lchoose(M, n)


def fisher_exact_two_tailed(a: int, b: int, c: int, d: int) -> float:
    """Two-tailed Fisher's exact test p-value for the 2x2 table [[a,b],[c,d]].

    Sums the probabilities of all tables with the same margins whose
    point probability does not exceed the observed one (the standard
    "method of small p-values", matching scipy's two-sided mode).
    """
    M = a + b + c + d
    if M == 0:
        return 1.0
    K = a + b  # row-1 total
    n = a + c  # col-1 total
    obs = _hypergeom_logpmf(a, M, K, n)
    lo = max(0, n - (M - K))
    hi = min(K, n)
    eps = 1e-9  # tolerance for float ties, as in standard implementations
    p = 0.0
    for k in range(lo, hi + 1):
        lp = _hypergeom_logpmf(k, M, K, n)
        if lp <= obs + eps:
            p += math.exp(lp)
    return min(1.0, p)


def chi2_sf_1df(x: float) -> float:
    """Survival function of χ² with one degree of freedom."""
    if x <= 0:
        return 1.0
    return math.erfc(math.sqrt(x / 2.0))


def chi2_yates(a: int, b: int, c: int, d: int) -> float:
    """Yates-corrected χ² p-value for the 2x2 table [[a,b],[c,d]]."""
    N = a + b + c + d
    r1, r2 = a + b, c + d
    c1, c2 = a + c, b + d
    if min(r1, r2, c1, c2) == 0:
        return 1.0
    num = N * max(0.0, abs(a * d - b * c) - N / 2.0) ** 2
    stat = num / (r1 * r2 * c1 * c2)
    return chi2_sf_1df(stat)


def proportion_shift_pvalue(
    k1: int, n1: int, k2: int, n2: int, *, test: str = "fisher"
) -> float:
    """p-value that the non-conforming rate changed between two samples.

    ``k1/n1`` = train non-conforming, ``k2/n2`` = test non-conforming.
    Table layout: rows = samples, cols = (non-conforming, conforming).
    """
    a, b = k1, n1 - k1
    c, d = k2, n2 - k2
    if test == "fisher":
        return fisher_exact_two_tailed(a, b, c, d)
    if test == "chi2":
        return chi2_yates(a, b, c, d)
    raise ValueError(f"unknown test {test!r}")
