"""spark-submit entrypoint: Figure 13 — index pattern distribution.

Usage: spark-submit jobs/fig13_pattern_analysis.py
"""
from pyspark.sql import SparkSession

from repro.experiments import fig13, prepare


def main() -> None:
    spark = SparkSession.builder.appName("fig13_patterns").getOrCreate()
    prep = prepare(spark)
    by_len, by_cov = fig13(prep)
    print("\n=== Figure 13(a): patterns by token length ===")
    print(by_len.to_string(index=False))
    print("\n=== Figure 13(b): patterns by coverage bucket ===")
    print(by_cov.to_string(index=False))


if __name__ == "__main__":
    main()
