"""spark-submit entrypoint: Table 3 — (simulated) user study.

Usage: spark-submit jobs/table3_user_study.py
"""
from pyspark.sql import SparkSession

from repro.experiments import prepare, table3


def main() -> None:
    spark = SparkSession.builder.appName("table3_user_study").getOrCreate()
    prep = prepare(spark)
    df = table3(prep)
    print("\n=== Table 3: simulated programmers vs FMDV-VH (20 columns) ===")
    print("(human wall-clock times are not simulatable; see EXPERIMENTS.md)")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
