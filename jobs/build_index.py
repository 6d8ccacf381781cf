"""spark-submit entrypoint: offline index build (paper §2.4).

Builds the enterprise-lite corpus, runs the offline Spark indexing job
and writes the index to parquet.

Usage: spark-submit jobs/build_index.py [output_dir] [tau]
"""
import sys

from pyspark.sql import SparkSession

from repro.core.index import aggregate_index, pattern_column_pairs
from repro.lake.corpus import ENTERPRISE, build_corpus


def main() -> None:
    out = sys.argv[1] if len(sys.argv) > 1 else "/tmp/auto_validate_index"
    tau = int(sys.argv[2]) if len(sys.argv) > 2 else 13
    spark = SparkSession.builder.appName("build_index").getOrCreate()
    corpus = build_corpus(spark, ENTERPRISE)
    agg = aggregate_index(pattern_column_pairs(corpus.df, tau=tau))
    agg.write.mode("overwrite").parquet(out)
    n = agg.count()
    print(f"offline index: {n} patterns (tau={tau}) written to {out}")


if __name__ == "__main__":
    main()
