"""spark-submit entrypoint: Figure 10 — accuracy of all methods.

Usage: spark-submit jobs/fig10_accuracy.py [enterprise|government]
"""
import sys

from pyspark.sql import SparkSession

from repro.experiments import N_CASES_E, N_CASES_G, fig10, prepare
from repro.lake.corpus import ENTERPRISE, GOVERNMENT


def main() -> None:
    which = sys.argv[1] if len(sys.argv) > 1 else "enterprise"
    spec, n = (
        (ENTERPRISE, N_CASES_E)
        if which == "enterprise"
        else (GOVERNMENT, N_CASES_G)
    )
    spark = SparkSession.builder.appName("fig10_accuracy").getOrCreate()
    prep = prepare(spark, spec, n_cases=n)
    df = fig10(prep)
    print(f"\n=== Figure 10 ({which}): recall vs precision ===")
    print(df.to_string(index=False))


if __name__ == "__main__":
    main()
