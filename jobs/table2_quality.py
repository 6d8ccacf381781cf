"""spark-submit entrypoint: Table 2 — programmatic vs ground-truth eval.

Usage: spark-submit jobs/table2_quality.py
"""
from pyspark.sql import SparkSession

from repro.experiments import prepare, table2


def main() -> None:
    spark = SparkSession.builder.appName("table2_quality").getOrCreate()
    prep = prepare(spark)
    df = table2(prep)
    print("\n=== Table 2: programmatic vs ground-truth quality (FMDV-VH) ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
