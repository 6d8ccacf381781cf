"""Tests for the corpus builder, including an oracle-checked Table 1
aggregation on Spark."""
import numpy as np
import pandas as pd
import pytest

from repro.lake import domains as dom
from repro.lake.corpus import (
    ENTERPRISE,
    GOVERNMENT,
    CorpusSpec,
    build_corpus,
    columns_to_pandas,
    corpus_stats,
    generate_columns,
    scaled,
)
from repro.oracle import assert_equivalent

TINY = scaled(ENTERPRISE, 0.04)  # ~20 files


class TestGenerateColumns:
    def test_deterministic(self):
        a = generate_columns(TINY)
        b = generate_columns(TINY)
        assert [c.values for c in a[:10]] == [c.values for c in b[:10]]

    def test_col_ids_sequential(self):
        cols = generate_columns(TINY)
        assert [c.col_id for c in cols] == list(range(len(cols)))

    def test_columns_within_spec_bounds(self):
        cols = generate_columns(TINY)
        for c in cols[:50]:
            assert TINY.values_per_col[0] <= len(c.values) <= TINY.values_per_col[1]

    def test_domains_exist_or_fd(self):
        cols = generate_columns(TINY)
        names = {d.name for d in dom.ALL_DOMAINS} | {"fd_dependent"}
        assert all(c.domain in names for c in cols)

    def test_dirty_flags_align(self):
        cols = generate_columns(TINY)
        assert all(len(c.values) == len(c.dirty) for c in cols)

    def test_some_dirty_values_present(self):
        cols = generate_columns(scaled(ENTERPRISE, 0.2))
        assert any(any(c.dirty) for c in cols)

    def test_fd_pairs_present(self):
        cols = generate_columns(scaled(ENTERPRISE, 0.3))
        assert any(c.domain == "fd_dependent" for c in cols)

    def test_fd_dependency_holds(self):
        cols = generate_columns(scaled(ENTERPRISE, 0.3))
        by_id = {c.col_id: c for c in cols}
        for c in cols:
            if c.domain == "fd_dependent":
                det = by_id[c.col_id - 1]
                mapping = {}
                for a, b in zip(det.values, c.values):
                    assert mapping.setdefault(a, b) == b

    def test_government_spec_is_dirtier(self):
        assert GOVERNMENT.p_special > ENTERPRISE.p_special
        assert GOVERNMENT.p_impure > ENTERPRISE.p_impure


class TestPandasView:
    def test_long_frame_shape(self):
        cols = generate_columns(TINY)
        pdf = columns_to_pandas(cols)
        assert len(pdf) == sum(len(c.values) for c in cols)
        assert list(pdf.columns) == [
            "file_id", "col_id", "row_idx", "value", "domain", "dirty",
        ]

    def test_row_order_preserved(self):
        cols = generate_columns(TINY)
        pdf = columns_to_pandas(cols)
        got = pdf[pdf.col_id == 0].sort_values("row_idx")["value"].tolist()
        assert got == cols[0].values


@pytest.mark.spark
class TestCorpusOnSpark:
    def test_build_attaches_spark_df(self, spark):
        corpus = build_corpus(spark, TINY)
        assert corpus.df is not None
        assert corpus.df.count() == len(corpus.pdf)

    def test_table1_stats_against_oracle(self, spark):
        corpus = build_corpus(spark, TINY)
        stats = corpus_stats(corpus.df)
        sql = """
            WITH per_col AS (
                SELECT col_id,
                       MIN(file_id)          AS file_id,
                       COUNT(value)          AS value_cnt,
                       COUNT(DISTINCT value) AS distinct_cnt
                FROM corpus GROUP BY col_id
            )
            SELECT COUNT(DISTINCT file_id)   AS n_files,
                   COUNT(col_id)             AS n_cols,
                   AVG(value_cnt)            AS avg_value_cnt,
                   STDDEV_POP(value_cnt)     AS std_value_cnt,
                   AVG(distinct_cnt)         AS avg_distinct_cnt,
                   STDDEV_POP(distinct_cnt)  AS std_distinct_cnt
            FROM per_col
        """
        assert_equivalent(stats, sql, corpus=corpus.pdf)
