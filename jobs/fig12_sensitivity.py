"""spark-submit entrypoint: Figure 12 — sensitivity to r, m, tau, theta.

Usage: spark-submit jobs/fig12_sensitivity.py
"""
from pyspark.sql import SparkSession

from repro.experiments import fig12, prepare


def main() -> None:
    spark = SparkSession.builder.appName("fig12_sensitivity").getOrCreate()
    prep = prepare(spark)
    df = fig12(spark, prep)
    print("\n=== Figure 12: FMDV sensitivity analysis ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
