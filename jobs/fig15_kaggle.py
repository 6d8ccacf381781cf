"""spark-submit entrypoint: Figure 15 — Kaggle schema-drift case study.

Usage: spark-submit jobs/fig15_kaggle.py
"""
from pyspark.sql import SparkSession

from repro.experiments import fig15, prepare


def main() -> None:
    spark = SparkSession.builder.appName("fig15_kaggle").getOrCreate()
    prep = prepare(spark)
    df = fig15(spark, prep)
    print("\n=== Figure 15: schema-drift impact and detection ===")
    print(df.to_string(index=False))
    detected = int(df["drift_detected"].sum())
    print(f"\ndrift detected in {detected} / {len(df)} tasks "
          f"(paper: 8/11), false positives: {int(df['false_positive'].sum())}")


if __name__ == "__main__":
    main()
