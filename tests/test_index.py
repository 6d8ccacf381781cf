"""Tests for the offline index: local reference builder, the Spark job
(cross-checked against the local builder and the DuckDB oracle), and
the no-index scan path."""
import numpy as np
import pandas as pd
import pytest

from repro.core.index import (
    PatternIndex,
    PatternStats,
    aggregate_index,
    build_index,
    build_index_local,
    pattern_column_pairs,
    scan_stats,
)
from repro.lake.corpus import ENTERPRISE, build_corpus, scaled
from repro.lake.domains import domain_by_name
from repro.oracle import assert_equivalent
from repro.patterns.pattern import parse_pattern

DATE = "<digit>+/<digit>+/<digit>{4}"


def _dates(n, seed=0):
    return domain_by_name("date_slash").gen(np.random.default_rng(seed), n)


class TestLocalBuilder:
    def test_pure_domain_columns_give_zero_fpr(self):
        cols = [_dates(80, s) for s in range(30)]
        idx = build_index_local(cols)
        st = idx.lookup(DATE)
        assert st is not None
        assert st.fpr == pytest.approx(0.0)
        assert st.cov == 30

    def test_impure_columns_raise_fpr(self):
        cols = [_dates(90, s) + ["N/A"] * 10 for s in range(10)]
        idx = build_index_local(cols, min_group_frac=0.05)
        st = idx.lookup(DATE)
        assert st.cov == 10
        assert st.fpr == pytest.approx(0.1)

    def test_narrow_pattern_high_fpr(self):
        # zero-padded day pattern over unpadded data: when a column has
        # both 1- and 2-digit months, <digit>{1}-prefixed patterns are
        # not even consistent; check a fixed-length day variant instead
        cols = [_dates(100, s) for s in range(5)]
        idx = build_index_local(cols)
        # every enumerated pattern for these pure columns has imp 0
        assert all(s.fpr == 0.0 for _, s in idx.items())

    def test_coverage_counts_columns_not_values(self):
        cols = [_dates(10, 1), _dates(200, 2)]
        idx = build_index_local(cols)
        assert idx.lookup(DATE).cov == 2

    def test_round_trip_pandas(self):
        idx = build_index_local([_dates(50, 3)])
        pdf = idx.to_pandas()
        idx2 = PatternIndex.from_pandas(pdf, tau=13)
        assert len(idx2) == len(idx)
        assert idx2.lookup(DATE) == idx.lookup(DATE)

    def test_contains_and_len(self):
        idx = build_index_local([_dates(50, 3)])
        assert DATE in idx
        assert len(idx) > 0


class TestScanStats:
    def test_matches_local_index_on_shared_patterns(self):
        cols = [_dates(60, s) for s in range(8)]
        idx = build_index_local(cols)
        pats = [parse_pattern(DATE)]
        scan = scan_stats(cols, pats)
        assert scan[DATE].cov == idx.lookup(DATE).cov
        assert scan[DATE].fpr == pytest.approx(idx.lookup(DATE).fpr)

    def test_no_match_no_entry(self):
        scan = scan_stats([["abc", "def"]], [parse_pattern("<digit>+")])
        assert scan == {}

    def test_partial_match_impurity(self):
        scan = scan_stats(
            [["1", "2", "x", "y"]], [parse_pattern("<digit>+")]
        )
        assert scan["<digit>+"].fpr == pytest.approx(0.5)


@pytest.mark.spark
class TestSparkIndexJob:
    @pytest.fixture(scope="class")
    def small_corpus(self, spark):
        return build_corpus(spark, scaled(ENTERPRISE, 0.03, seed=99))

    def test_spark_index_equals_local(self, small_corpus):
        spark_idx = build_index(small_corpus.df)
        local_idx = build_index_local(
            [c.values for c in small_corpus.columns]
        )
        assert len(spark_idx) == len(local_idx)
        for pat, st in local_idx.items():
            got = spark_idx.lookup(pat)
            assert got is not None, pat
            assert got.cov == st.cov
            assert got.fpr == pytest.approx(st.fpr, abs=1e-9)

    def test_aggregation_against_oracle(self, small_corpus):
        pairs = pattern_column_pairs(small_corpus.df)
        pairs_pdf = pairs.toPandas()
        agg = aggregate_index(pairs)
        sql = """
            SELECT pattern,
                   AVG(imp)      AS fpr,
                   COUNT(col_id) AS cov
            FROM pairs GROUP BY pattern
        """
        assert_equivalent(agg, sql, pairs=pairs_pdf)

    def test_wide_columns_absent_under_small_tau(self, spark, small_corpus):
        idx8 = build_index(small_corpus.df, tau=8)
        idx13 = build_index(small_corpus.df, tau=13)
        # tau=8 index is a subset: fewer or equal patterns
        assert len(idx8) <= len(idx13)
        # the 12-token ISO timestamp pattern needs tau >= 12
        ts = (
            "<digit>{4}-<digit>{2}-<digit>{2}T"
            "<digit>{2}:<digit>{2}:<digit>{2}Z"
        )
        assert ts in idx13
        assert ts not in idx8
