"""Tests for the provided TPC-H-lite generators and the Auto-Validate
extensions in synth_data, including an end-to-end check that FMDV rules
learned over TPC-H string columns behave sensibly."""
import pytest

from repro import synth_data
from repro.core.auto_validate import learn_rule
from repro.core.fmdv import FMDVConfig
from repro.oracle import assert_equivalent


@pytest.mark.spark
class TestProvidedGenerators:
    def test_lineitem_schema(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        assert "l_orderkey" in li.columns
        assert li.count() == 6000

    def test_oracle_roundtrip_on_aggregation(self, spark):
        li = synth_data.lineitem(spark, sf=0.001)
        li_pdf = li.toPandas()
        agg = li.groupBy("l_returnflag").count().withColumnRenamed(
            "count", "cnt"
        )
        assert_equivalent(
            agg,
            "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
            li=li_pdf,
        )

    def test_zipf_keys_skewed(self, spark):
        df = synth_data.zipf_keys(spark, n=5000, n_keys=100).toPandas()
        top = df.k.value_counts().iloc[0]
        assert top > 5000 / 100 * 3  # clearly skewed


@pytest.mark.spark
class TestAutoValidateExtensions:
    def test_data_lake_schema(self, spark):
        df = synth_data.data_lake(spark, sf=0.02)
        assert set(df.columns) == {
            "file_id", "col_id", "row_idx", "value", "domain", "dirty",
        }
        assert df.count() > 0

    def test_tpch_string_columns_validate(self, spark, tiny_index):
        cols = synth_data.tpch_string_columns(spark, sf=0.002)
        cfg = FMDVConfig(r=0.1, m=5)
        # shipdate is ISO dates — the lake's date_iso domain covers it
        dates = cols["l_shipdate"]
        rule = learn_rule(dates[:30], tiny_index, cfg, "fmdv-vh")
        assert rule is not None
        assert rule.validate(dates[30:500])
        # market segments are letter enums — rule generalizes, and it
        # flags a column from a different domain (schema drift)
        seg_rule = learn_rule(cols["c_mktsegment"][:50], tiny_index, cfg, "fmdv-vh")
        assert seg_rule is not None
        assert seg_rule.validate(cols["c_mktsegment"][50:])
        assert not seg_rule.validate(dates[:200])
