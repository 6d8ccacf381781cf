"""spark-submit entrypoint: Table 1 — characteristics of data corpora.

Usage: spark-submit jobs/table1_corpus_stats.py
"""
from pyspark.sql import SparkSession

from repro.experiments import table1


def main() -> None:
    spark = SparkSession.builder.appName("table1_corpus_stats").getOrCreate()
    df = table1(spark)
    print("\n=== Table 1: Characteristics of data corpora ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
