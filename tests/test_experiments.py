"""Integration tests for the experiment drivers, on a scaled-down
corpus so the whole module runs in tens of seconds (the full-scale runs
live in benchmarks/)."""
import numpy as np
import pandas as pd
import pytest

from repro.experiments import (
    FIG11_METHODS,
    FMDV_VARIANTS,
    fig11,
    fig12,
    fig13,
    fig14,
    prepare,
    table2,
    table3,
)
from repro.lake.corpus import ENTERPRISE, scaled
from repro.oracle import assert_equivalent

SMALL = scaled(ENTERPRISE, 0.06)


@pytest.fixture(scope="module")
def prep(spark):
    return prepare(spark, SMALL, n_cases=25)


@pytest.mark.spark
@pytest.mark.slow
class TestDrivers:
    def test_prepare_builds_everything(self, prep):
        assert len(prep.index) > 100
        assert len(prep.cases) == 25
        assert prep.ctx.cfg.tau == 13

    def test_table2_rows(self, prep):
        df = table2(prep)
        assert list(df.evaluation) == [
            "Programmatic evaluation",
            "Ground-truth (generator labels)",
        ]
        assert df.precision.between(0, 1).all()
        assert df.recall.between(0, 1).all()

    def test_fig11_shape(self, prep):
        df = fig11(prep, n_cases=15)
        assert set(FIG11_METHODS) <= set(df.columns)
        assert (df[FIG11_METHODS] <= 1).all().all()
        # sorted descending by FMDV-VH
        assert (df["FMDV-VH"].diff().dropna() <= 1e-9).all()

    def test_fig12_covers_all_knobs(self, spark, prep):
        df = fig12(spark, prep, n_cases=15)
        assert set(df.knob) == {"r", "m", "theta", "tau"}
        assert set(df.method) == set(FMDV_VARIANTS)
        # r=0 recall never exceeds r=0.1 recall for any variant
        for v in FMDV_VARIANTS:
            r0 = df[(df.knob == "r") & (df.value == 0.0) & (df.method == v)]
            r1 = df[(df.knob == "r") & (df.value == 0.1) & (df.method == v)]
            assert r0.iloc[0].recall <= r1.iloc[0].recall + 1e-9

    def test_fig13_distributions(self, spark, prep):
        by_len, by_cov = fig13(prep)
        assert by_len.n_patterns.sum() == len(prep.index)
        assert by_cov.n_patterns.sum() == len(prep.index)
        # oracle-check the token-length aggregation
        idx_pdf = prep.index.to_pandas()
        from repro.patterns.pattern import parse_pattern

        idx_pdf["token_len"] = idx_pdf.pattern.map(
            lambda p: len(parse_pattern(p).tokens)
        )
        spark_df = spark.createDataFrame(by_len)
        assert_equivalent(
            spark_df,
            """
            SELECT token_len, COUNT(*) AS n_patterns
            FROM idx GROUP BY token_len
            """,
            idx=idx_pdf,
        )

    def test_fig14_latency_orders(self, prep):
        df = fig14(prep, n_cases=8)
        ms = df.set_index("method")["ms_per_column"]
        assert (ms > 0).all()
        # indexed lookups beat the raw corpus scan by a wide margin
        assert ms["FMDV"] * 10 < ms["FMDV (no-index)"]

    def test_table3_simulated_study(self, prep):
        df = table3(prep, n_cases=10)
        assert len(df) == 4
        by = df.set_index("who")
        assert by.loc["FMDV-VH", "avg_time_sec"] < 2.0
