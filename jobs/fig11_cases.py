"""spark-submit entrypoint: Figure 11 — case-by-case F1 comparison.

Usage: spark-submit jobs/fig11_cases.py
"""
from pyspark.sql import SparkSession

from repro.experiments import fig11, prepare


def main() -> None:
    spark = SparkSession.builder.appName("fig11_cases").getOrCreate()
    prep = prepare(spark)
    df = fig11(prep)
    print("\n=== Figure 11: case-by-case F1 (sorted by FMDV-VH) ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
