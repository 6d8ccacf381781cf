"""spark-submit entrypoint: Figure 14 — per-query-column latency.

Usage: spark-submit jobs/fig14_latency.py
"""
from pyspark.sql import SparkSession

from repro.experiments import fig14, prepare


def main() -> None:
    spark = SparkSession.builder.appName("fig14_latency").getOrCreate()
    prep = prepare(spark)
    df = fig14(prep)
    print("\n=== Figure 14: latency per query column (ms) ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
