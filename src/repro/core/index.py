"""Offline pattern index (paper §2.4, Figure 7).

One full Spark scan of the corpus computes, for every pattern
``p ∈ P(T)``:

- ``FPR_T(p)`` — the average of local impurities ``Imp_D(p)`` over all
  columns ``D`` with at least one matching value (Definition 3), and
- ``Cov_T(p)`` — the number of such columns (Equation 7's coverage).

The dataflow is the paper's map-reduce job expressed on DataFrames:
``groupBy(col_id).applyInPandas`` enumerates per-column candidates with
local impurities (the "map"), then ``groupBy(pattern).agg(avg, count)``
aggregates them corpus-wide (the "reduce").  The aggregated result is
collected into a driver-side dict (:class:`PatternIndex`) that is
orders of magnitude smaller than the corpus, enabling the paper's
tens-of-milliseconds online lookups.
"""
from __future__ import annotations

from dataclasses import dataclass
from typing import Dict, Iterable, List, Optional, Sequence, Tuple

import pandas as pd
from pyspark.sql import DataFrame
from pyspark.sql import functions as F

from repro.patterns.generate import MAX_PATTERNS, column_candidates
from repro.patterns.pattern import Pattern


@dataclass(frozen=True)
class PatternStats:
    """Pre-computed corpus statistics for one pattern."""

    fpr: float
    cov: int


class PatternIndex:
    """Driver-side lookup table: canonical pattern → (FPR_T, Cov_T)."""

    def __init__(self, stats: Dict[str, PatternStats], tau: int):
        self._stats = stats
        self.tau = tau

    def lookup(self, canonical: str) -> Optional[PatternStats]:
        return self._stats.get(canonical)

    def __len__(self) -> int:
        return len(self._stats)

    def __contains__(self, canonical: str) -> bool:
        return canonical in self._stats

    def items(self) -> Iterable[Tuple[str, PatternStats]]:
        return self._stats.items()

    def to_pandas(self) -> pd.DataFrame:
        return pd.DataFrame(
            {
                "pattern": list(self._stats),
                "fpr": [s.fpr for s in self._stats.values()],
                "cov": [s.cov for s in self._stats.values()],
            }
        )

    @staticmethod
    def from_pandas(pdf: pd.DataFrame, tau: int) -> "PatternIndex":
        stats = {
            r.pattern: PatternStats(float(r.fpr), int(r.cov))
            for r in pdf.itertuples()
        }
        return PatternIndex(stats, tau)


_PAIRS_SCHEMA = "col_id int, pattern string, imp double"


def _make_emitter(tau: int, min_group_frac: float, max_patterns: int):
    """Per-column candidate enumeration, run inside Spark workers."""

    def emit(pdf: pd.DataFrame) -> pd.DataFrame:
        col_id = int(pdf["col_id"].iloc[0])
        values = pdf["value"].tolist()
        cands = column_candidates(
            values,
            tau=tau,
            min_group_frac=min_group_frac,
            max_patterns=max_patterns,
        )
        return pd.DataFrame(
            {
                "col_id": col_id,
                "pattern": [p.canonical() for p, _ in cands],
                "imp": [imp for _, imp in cands],
            }
        )

    return emit


def pattern_column_pairs(
    corpus_df: DataFrame,
    *,
    tau: int = 13,
    min_group_frac: float = 0.1,
    max_patterns: int = MAX_PATTERNS,
) -> DataFrame:
    """The "map" stage: (col_id, pattern, local impurity) pairs."""
    return corpus_df.select("col_id", "value").groupBy("col_id").applyInPandas(
        _make_emitter(tau, min_group_frac, max_patterns), schema=_PAIRS_SCHEMA
    )


def aggregate_index(pairs: DataFrame) -> DataFrame:
    """The "reduce" stage: corpus-wide FPR_T / Cov_T per pattern."""
    return pairs.groupBy("pattern").agg(
        F.avg("imp").alias("fpr"), F.count("col_id").alias("cov")
    )


def build_index(
    corpus_df: DataFrame,
    *,
    tau: int = 13,
    min_group_frac: float = 0.1,
    max_patterns: int = MAX_PATTERNS,
) -> PatternIndex:
    """Run the full offline job and collect the summary index."""
    pairs = pattern_column_pairs(
        corpus_df,
        tau=tau,
        min_group_frac=min_group_frac,
        max_patterns=max_patterns,
    )
    agg = aggregate_index(pairs)
    return PatternIndex.from_pandas(agg.toPandas(), tau)


def build_index_local(
    columns: Sequence[Sequence[str]],
    *,
    tau: int = 13,
    min_group_frac: float = 0.1,
    max_patterns: int = MAX_PATTERNS,
) -> PatternIndex:
    """Single-process reference implementation of the offline job.

    Same map/reduce semantics as :func:`build_index`, without Spark —
    used by unit tests (to cross-check the Spark job) and by small
    driver-side experiments.
    """
    sums: Dict[str, float] = {}
    covs: Dict[str, int] = {}
    for col in columns:
        for p, imp in column_candidates(
            list(col),
            tau=tau,
            min_group_frac=min_group_frac,
            max_patterns=max_patterns,
        ):
            key = p.canonical()
            sums[key] = sums.get(key, 0.0) + imp
            covs[key] = covs.get(key, 0) + 1
    stats = {k: PatternStats(sums[k] / covs[k], covs[k]) for k in sums}
    return PatternIndex(stats, tau)


# ---------------------------------------------------------------------------
# no-index reference path (paper Figure 14, "FMDV (no-index)")
# ---------------------------------------------------------------------------

def scan_stats(
    columns: Sequence[Sequence[str]], patterns: Sequence[Pattern]
) -> Dict[str, PatternStats]:
    """Compute FPR_T/Cov_T for given patterns by scanning raw columns.

    This is the naive online path the paper's offline index replaces —
    kept for the latency comparison.  ``columns`` is the corpus as raw
    value lists.
    """
    sums = {p.canonical(): 0.0 for p in patterns}
    covs = {p.canonical(): 0 for p in patterns}
    for col in columns:
        n = len(col)
        if n == 0:
            continue
        distinct: Dict[str, int] = {}
        for v in col:
            distinct[v] = distinct.get(v, 0) + 1
        for p in patterns:
            matched = sum(c for v, c in distinct.items() if p.matches(v))
            if matched > 0:
                key = p.canonical()
                covs[key] += 1
                sums[key] += 1.0 - matched / n
    return {
        k: PatternStats(sums[k] / covs[k], covs[k])
        for k in sums
        if covs[k] > 0
    }
