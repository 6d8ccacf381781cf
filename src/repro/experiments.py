"""Experiment drivers: one function per table/figure of the paper.

Shared by ``jobs/`` (spark-submit entrypoints) and ``benchmarks/``
(pytest-benchmark harnesses).  Every function returns a pandas frame
whose rows mirror what the paper's table/figure reports; EXPERIMENTS.md
records paper-vs-measured values side by side.
"""
from __future__ import annotations

import time
from dataclasses import dataclass, replace
from typing import Dict, List, Optional, Sequence, Tuple

import numpy as np
import pandas as pd
from pyspark.sql import SparkSession

from repro.baselines import flashprofile, pwheel, xsystem
from repro.baselines.upper_bounds import (
    ad_ub_recall,
    coarse_signature,
    common_patterns,
    fd_participates,
    fd_ub_recall,
)
from repro.core.auto_validate import learn_rule
from repro.core.fmdv import FMDVConfig
from repro.core.index import PatternIndex, build_index, scan_stats
from repro.eval.benchmark import Case, build_benchmark
from repro.eval.harness import MethodScores, evaluate_all, evaluate_method
from repro.eval.methods import METHODS, EvalContext
from repro.eval.user_study import PROGRAMMERS
from repro.kaggle.drift import run_all as kaggle_run_all
from repro.kaggle.tasks import TASKS
from repro.lake.corpus import (
    ENTERPRISE,
    GOVERNMENT,
    Corpus,
    CorpusSpec,
    build_corpus,
    corpus_stats,
)
from repro.patterns.generate import hypothesis_patterns
from repro.patterns.pattern import parse_pattern

#: default experiment knobs (paper-scaled; DESIGN.md §2)
DEFAULT_CFG = FMDVConfig(r=0.1, m=10, tau=13, theta=0.1)
#: benchmark sizes (paper: 1000; scaled with the corpus)
N_CASES_E = 150
N_CASES_G = 120


@dataclass
class Prepared:
    """A corpus with its offline index and evaluation context."""

    corpus: Corpus
    index: PatternIndex
    ctx: EvalContext
    cases: List[Case]


def prepare(
    spark: SparkSession,
    spec: CorpusSpec = ENTERPRISE,
    *,
    n_cases: int = N_CASES_E,
    cfg: FMDVConfig = DEFAULT_CFG,
    benchmark_seed: int = 11,
) -> Prepared:
    """Build corpus + offline Spark index + benchmark, once."""
    corpus = build_corpus(spark, spec)
    index = build_index(corpus.df, tau=cfg.tau)
    ctx = EvalContext(
        index=index,
        corpus_columns=[c.values for c in corpus.columns],
        cfg=cfg,
    )
    cases = build_benchmark(corpus.columns, n_cases, seed=benchmark_seed)
    return Prepared(corpus, index, ctx, cases)


# ---------------------------------------------------------------------------
# Table 1 — corpus characteristics
# ---------------------------------------------------------------------------

def table1(spark: SparkSession) -> pd.DataFrame:
    rows = []
    for spec in (ENTERPRISE, GOVERNMENT):
        corpus = build_corpus(spark, spec)
        st = corpus_stats(corpus.df).toPandas().iloc[0]
        rows.append(
            {
                "corpus": spec.name,
                "n_files": int(st.n_files),
                "n_cols": int(st.n_cols),
                "avg_value_cnt": round(float(st.avg_value_cnt), 1),
                "std_value_cnt": round(float(st.std_value_cnt), 1),
                "avg_distinct_cnt": round(float(st.avg_distinct_cnt), 1),
                "std_distinct_cnt": round(float(st.std_distinct_cnt), 1),
            }
        )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------------
# Figure 10 — precision/recall of all methods (+ FD-UB / AD-UB)
# ---------------------------------------------------------------------------

def fig10(prep: Prepared) -> pd.DataFrame:
    scores = evaluate_all(METHODS, prep.cases, prep.ctx)
    rows = [
        {
            "method": name,
            "precision": round(s.precision, 3),
            "recall": round(s.recall, 3),
            "f1": round(s.f1, 3),
        }
        for name, s in scores.items()
    ]
    rows.append(_fd_ub_row(prep))
    rows.append(_ad_ub_row(prep))
    return pd.DataFrame(rows)


def _fd_ub_row(prep: Prepared) -> dict:
    by_file: Dict[int, List] = {}
    for c in prep.corpus.columns:
        by_file.setdefault(c.file_id, []).append(c)
    flags = []
    for case in prep.cases:
        if not case.applicable:
            continue
        col = prep.corpus.columns[case.col_id]
        siblings = [
            s.values for s in by_file[col.file_id] if s.col_id != col.col_id
        ]
        flags.append(fd_participates(col.values, siblings))
    return {
        "method": "FD-UB",
        "precision": 1.0,
        "recall": round(fd_ub_recall(flags), 3),
        "f1": float("nan"),
    }


def _ad_ub_row(prep: Prepared) -> dict:
    common = common_patterns(
        prep.ctx.corpus_columns, min_columns=max(10, prep.ctx.cfg.m)
    )
    sigs = []
    for case in prep.cases:
        if not case.applicable:
            continue
        from collections import Counter

        top, top_n = Counter(
            coarse_signature(v) for v in case.values
        ).most_common(1)[0]
        sigs.append(top if top_n * 2 > len(case.values) else None)
    return {
        "method": "AD-UB",
        "precision": 1.0,
        "recall": round(ad_ub_recall(sigs, common), 3),
        "f1": float("nan"),
    }


# ---------------------------------------------------------------------------
# Table 2 — programmatic vs ground-truth evaluation (FMDV-VH)
# ---------------------------------------------------------------------------

def table2(prep: Prepared) -> pd.DataFrame:
    fit = METHODS["FMDV-VH"]
    prog = evaluate_method("FMDV-VH", fit, prep.cases, prep.ctx)
    truth = evaluate_method(
        "FMDV-VH", fit, prep.cases, prep.ctx, ground_truth=True
    )
    return pd.DataFrame(
        [
            {
                "evaluation": "Programmatic evaluation",
                "precision": round(prog.precision, 3),
                "recall": round(prog.recall, 3),
            },
            {
                "evaluation": "Ground-truth (generator labels)",
                "precision": round(truth.precision, 3),
                "recall": round(truth.recall, 3),
            },
        ]
    )


# ---------------------------------------------------------------------------
# Figure 11 — case-by-case F1 of competitive methods
# ---------------------------------------------------------------------------

FIG11_METHODS = ["FMDV-VH", "PWheel", "SM-I-1", "Deequ-Fra"]


def fig11(prep: Prepared, n_cases: int = 100) -> pd.DataFrame:
    subset = [c for c in prep.cases if c.applicable][:n_cases]
    frames = {}
    for name in FIG11_METHODS:
        s = evaluate_method(name, METHODS[name], subset, prep.ctx)
        frames[name] = {r.col_id: r.f1 for r in s.cases}
    ref = sorted(
        frames["FMDV-VH"].items(), key=lambda kv: -kv[1]
    )  # sorted by FMDV-VH, as in the paper
    rows = []
    for rank, (col_id, _) in enumerate(ref):
        row = {"rank": rank, "col_id": col_id}
        for name in FIG11_METHODS:
            row[name] = round(frames[name][col_id], 3)
        rows.append(row)
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------------
# Figure 12 — sensitivity of the FMDV variants to r, m, tau, theta
# ---------------------------------------------------------------------------

FMDV_VARIANTS = ["FMDV", "FMDV-V", "FMDV-H", "FMDV-VH"]
R_SWEEP = [0.0, 0.02, 0.05, 0.1]
M_SWEEP = [0, 5, 10, 25]
TAU_SWEEP = [8, 13]
THETA_SWEEP = [0.02, 0.05, 0.1, 0.2]


def _eval_variants(cases, ctx) -> List[dict]:
    out = []
    for name in FMDV_VARIANTS:
        s = evaluate_method(name, METHODS[name], cases, ctx)
        out.append(
            {
                "method": name,
                "precision": round(s.precision, 3),
                "recall": round(s.recall, 3),
            }
        )
    return out


def fig12(
    spark: SparkSession, prep: Prepared, *, n_cases: int = 60
) -> pd.DataFrame:
    cases = prep.cases[:n_cases]
    rows = []
    for r in R_SWEEP:
        ctx = replace(prep.ctx, cfg=replace(prep.ctx.cfg, r=r))
        for row in _eval_variants(cases, ctx):
            rows.append({"knob": "r", "value": r, **row})
    for m in M_SWEEP:
        ctx = replace(prep.ctx, cfg=replace(prep.ctx.cfg, m=m))
        for row in _eval_variants(cases, ctx):
            rows.append({"knob": "m", "value": m, **row})
    for theta in THETA_SWEEP:
        ctx = replace(prep.ctx, cfg=replace(prep.ctx.cfg, theta=theta))
        for row in _eval_variants(cases, ctx):
            rows.append({"knob": "theta", "value": theta, **row})
    for tau in TAU_SWEEP:
        if tau == prep.ctx.cfg.tau:
            index = prep.index
        else:
            index = build_index(prep.corpus.df, tau=tau)
        ctx = replace(
            prep.ctx, index=index, cfg=replace(prep.ctx.cfg, tau=tau)
        )
        for row in _eval_variants(cases, ctx):
            rows.append({"knob": "tau", "value": tau, **row})
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------------
# Figure 13 — distribution of patterns in the offline index
# ---------------------------------------------------------------------------

def fig13(prep: Prepared) -> Tuple[pd.DataFrame, pd.DataFrame]:
    idx_pdf = prep.index.to_pandas()
    idx_pdf["token_len"] = idx_pdf["pattern"].map(
        lambda p: len(parse_pattern(p).tokens)
    )
    by_len = (
        idx_pdf.groupby("token_len")
        .size()
        .reset_index(name="n_patterns")
        .sort_values("token_len")
        .reset_index(drop=True)
    )
    # coverage histogram in powers of two (the paper's log-log shape)
    idx_pdf["cov_bucket"] = idx_pdf["cov"].map(
        lambda c: 1 << int(np.floor(np.log2(max(1, c))))
    )
    by_cov = (
        idx_pdf.groupby("cov_bucket")
        .size()
        .reset_index(name="n_patterns")
        .sort_values("cov_bucket")
        .reset_index(drop=True)
    )
    return by_len, by_cov


# ---------------------------------------------------------------------------
# Figure 14 — per-query-column latency
# ---------------------------------------------------------------------------

def _time_fit(fit, cases, ctx, repeats: int = 1) -> float:
    t0 = time.perf_counter()
    for _ in range(repeats):
        for c in cases:
            fit(c.train, ctx)
    return (time.perf_counter() - t0) * 1000.0 / (len(cases) * repeats)


def fig14(prep: Prepared, *, n_cases: int = 30) -> pd.DataFrame:
    cases = [c for c in prep.cases if c.applicable][:n_cases]
    rows = []
    for name in ["FMDV", "FMDV-V", "FMDV-H", "FMDV-VH"]:
        rows.append(
            {"method": name, "ms_per_column": _time_fit(METHODS[name], cases, prep.ctx)}
        )
    for name, mod in [
        ("PWheel", pwheel),
        ("XSystem", xsystem),
        ("FlashProfile", flashprofile),
    ]:
        rows.append(
            {
                "method": name,
                "ms_per_column": _time_fit(
                    lambda t, ctx: mod.fit(t), cases, prep.ctx
                ),
            }
        )
    # no-index reference: corpus scan per query column (tiny sample)
    scan_cases = cases[:3]
    t0 = time.perf_counter()
    for c in scan_cases:
        H = hypothesis_patterns(c.train)[:50]
        if H:
            scan_stats(prep.ctx.corpus_columns, H)
    ms = (time.perf_counter() - t0) * 1000.0 / len(scan_cases)
    rows.append({"method": "FMDV (no-index)", "ms_per_column": ms})
    out = pd.DataFrame(rows)
    out["ms_per_column"] = out["ms_per_column"].round(2)
    return out


# ---------------------------------------------------------------------------
# Table 3 — user study (simulated programmer policies)
# ---------------------------------------------------------------------------

def table3(prep: Prepared, *, n_cases: int = 20) -> pd.DataFrame:
    cases = [c for c in prep.cases if c.applicable][:n_cases]
    rows = []
    for name, fit in PROGRAMMERS.items():
        s = evaluate_method(name, lambda t, ctx: fit(t), cases, prep.ctx)
        rows.append(
            {
                "who": name,
                "precision": round(s.precision, 3),
                "recall": round(s.recall, 3),
                "avg_time_sec": float("nan"),  # human time: see paper
            }
        )
    t_ms = _time_fit(METHODS["FMDV-VH"], cases, prep.ctx)
    s = evaluate_method("FMDV-VH", METHODS["FMDV-VH"], cases, prep.ctx)
    rows.append(
        {
            "who": "FMDV-VH",
            "precision": round(s.precision, 3),
            "recall": round(s.recall, 3),
            "avg_time_sec": round(t_ms / 1000.0, 4),
        }
    )
    return pd.DataFrame(rows)


# ---------------------------------------------------------------------------
# Figure 15 — Kaggle schema-drift case study
# ---------------------------------------------------------------------------

def fig15(spark: SparkSession, prep: Prepared) -> pd.DataFrame:
    results = kaggle_run_all(spark, TASKS, prep.index, prep.ctx.cfg, seed=5)
    return pd.DataFrame(
        [
            {
                "task": r.name,
                "kind": r.kind,
                "score_clean": round(r.score_clean, 3),
                "score_drift": round(r.score_drift, 3),
                "rel_quality_pct": round(100 * r.rel_drift, 1),
                "drift_detected": r.detected,
                "false_positive": r.false_positive,
            }
            for r in results
        ]
    )
